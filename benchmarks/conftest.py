"""Benchmark-scoped fixtures: workloads are built once per session."""
import pytest

from repro.experiments.common import build_layph, make_workload

BENCH_SF = 0.01  # ~2k vertices / ~15k edges — keeps the bench suite minutes-scale
BENCH_TOL = 1e-4  # looser than the paper's 1e-6 purely to bound bench runtime


@pytest.fixture(scope="session")
def workloads():
    """(dataset, algo) -> Workload cache shared by all benchmarks."""
    cache = {}

    def get(ds: str, algo: str, **kw):
        key = (ds, algo, tuple(sorted(kw.items())))
        if key not in cache:
            cache[key] = make_workload(ds, algo, sf=BENCH_SF, tol=BENCH_TOL, **kw)
        return cache[key]

    return get


@pytest.fixture(scope="session")
def layph_engines(spark, workloads):
    """(dataset, algo, replicate) -> initialized LayphEngine cache."""
    cache = {}

    def get(ds: str, algo: str, replicate: bool = True):
        key = (ds, algo, replicate)
        if key not in cache:
            cache[key] = build_layph(spark, workloads(ds, algo), replicate=replicate)
        return cache[key]

    return get
