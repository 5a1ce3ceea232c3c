"""T2/T3 benchmarks (Fig. 5/6): per-system incremental response time.

One pedantic round per cell — each run is a full incremental reaction to
the same ΔG from the same converged states. pytest-benchmark's table is the
reproduction of the paper's response-time comparison at bench scale.
"""
import copy

import pytest

from repro.experiments.common import make_workload
from repro.incremental.baselines import SYSTEMS

BENCH_SF = 0.01
BENCH_TOL = 1e-4

MIN_SYSTEMS = ["restart", "kickstarter", "risgraph", "ingress"]
SUM_SYSTEMS = ["restart", "graphbolt", "dzig", "ingress"]


@pytest.mark.parametrize("system", MIN_SYSTEMS)
def test_sssp_uk(benchmark, spark, workloads, system):
    w = workloads("uk_lite", "sssp")
    runner, _ = SYSTEMS[system]
    benchmark.pedantic(
        lambda: runner(spark, w.edges, w.delta, w.old_states, w.algo),
        rounds=1, iterations=1,
    )


@pytest.mark.parametrize("system", SUM_SYSTEMS)
def test_pagerank_uk(benchmark, spark, workloads, system):
    w = workloads("uk_lite", "pagerank")
    runner, _ = SYSTEMS[system]
    benchmark.pedantic(
        lambda: runner(spark, w.edges, w.delta, w.old_states, w.algo),
        rounds=1, iterations=1,
    )


@pytest.mark.parametrize("algo", ["sssp", "pagerank"])
def test_layph_uk(benchmark, spark, workloads, layph_engines, algo):
    w = workloads("uk_lite", algo)
    eng = layph_engines("uk_lite", algo)
    # Each measured round runs on a fresh copy of the engine state so rounds
    # apply the same ΔG to the same layered graph.
    def run():
        e = copy.copy(eng)
        e.lg, e.x = eng.lg, eng.x.copy()
        e.caches = None if eng.caches is None else eng.caches.copy()
        return e.run_delta(w.delta)

    benchmark.pedantic(run, rounds=1, iterations=1)


@pytest.mark.parametrize("ds", ["it_lite", "sk_lite", "wb_lite"])
def test_layph_other_datasets_sssp(benchmark, spark, workloads, layph_engines, ds):
    w = workloads(ds, "sssp")
    eng = layph_engines(ds, "sssp")
    benchmark.pedantic(lambda: eng.run_delta(w.delta), rounds=1, iterations=1)


@pytest.mark.parametrize("system", ["ingress", "layph"])
def test_vertex_updates_pagerank(benchmark, spark, layph_engines, system):
    """T3 (Fig. 5e): vertex-update batch, the two surviving systems."""
    w = make_workload(
        "uk_lite", "pagerank", sf=BENCH_SF, tol=BENCH_TOL,
        delta_kind="vertices", n_add=5, n_del=3,
    )
    if system == "layph":
        eng = layph_engines("uk_lite", "pagerank")
        benchmark.pedantic(lambda: eng.run_delta(w.delta), rounds=1, iterations=1)
    else:
        runner, _ = SYSTEMS[system]
        benchmark.pedantic(
            lambda: runner(spark, w.edges, w.delta, w.old_states, w.algo),
            rounds=1, iterations=1,
        )
