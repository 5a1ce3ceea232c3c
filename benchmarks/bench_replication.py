"""T7 benchmark (Fig. 8): offline layering with/without vertex replication,
plus the resulting upper-layer sizes (printed into the bench log)."""
import pytest

from repro.engine import algorithms as alg
from repro.graphs.generators import dataset
from repro.layph.layered import build_layered

BENCH_SF = 0.01


@pytest.mark.parametrize("replicate", [False, True])
def test_build_layered_uk(benchmark, spark, replicate):
    edges, membership = dataset("uk_lite", sf=BENCH_SF, seed=0)
    algo = alg.sssp(source=0)
    lg, _ = benchmark.pedantic(
        lambda: build_layered(
            spark, edges, algo, membership=membership, replicate=replicate
        ),
        rounds=1, iterations=1,
    )
    s = lg.sizes()
    print(f"\n[sizes replicate={replicate}] {s}")
    assert s["upper_vertices"] <= s["orig_vertices"]
    if replicate:
        assert s["n_proxies"] > 0


def test_lpa_discovery_uk(benchmark, spark):
    """Community discovery itself (the offline pipeline's first stage)."""
    from repro.layph.community import lpa_communities

    edges, _ = dataset("uk_lite", sf=BENCH_SF, seed=0)
    out = benchmark.pedantic(
        lambda: lpa_communities(spark, edges, K=200, n_iters=3), rounds=1, iterations=1
    )
    assert out["sub"].nunique() >= 2
