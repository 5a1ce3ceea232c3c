"""T1 benchmark (Table I): dataset generation cost + statistics printout."""
import pytest

from repro.graphs.generators import DATASET_NAMES, dataset
from repro.graphs.schema import graph_stats

BENCH_SF = 0.01


@pytest.mark.parametrize("name", DATASET_NAMES)
def test_generate_dataset(benchmark, name):
    edges, membership = benchmark.pedantic(
        lambda: dataset(name, sf=BENCH_SF, seed=0), rounds=1, iterations=1
    )
    s = graph_stats(edges)
    print(f"\n[{name}] {s} communities={membership['sub'].nunique()}")
    assert s["vertices"] > 100 and s["edges"] > 500
