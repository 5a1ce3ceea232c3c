"""T8 benchmark (Fig. 11): offline preprocessing vs accumulated incremental
gain — three Layph rounds vs three Ingress rounds from the same start."""
import pytest

from repro.experiments.common import make_workload
from repro.graphs.updates import apply_delta, random_edge_delta
from repro.incremental.ingress import ingress_incremental
from repro.layph.engine import LayphEngine

BENCH_SF = 0.01
BENCH_TOL = 1e-4
ROUNDS = 3


def test_layph_offline_plus_rounds(benchmark, spark):
    w = make_workload("uk_lite", "sssp", sf=BENCH_SF, tol=BENCH_TOL)

    def run():
        eng = LayphEngine(
            spark, w.edges, w.algo, membership=w.membership
        ).initialize()
        cur = w.edges
        for r in range(ROUNDS):
            delta = random_edge_delta(cur, n_add=5, n_del=5, seed=100 + r)
            eng.run_delta(delta)
            cur = apply_delta(cur, delta)
        return eng

    benchmark.pedantic(run, rounds=1, iterations=1)


def test_ingress_rounds(benchmark, spark):
    w = make_workload("uk_lite", "sssp", sf=BENCH_SF, tol=BENCH_TOL)

    def run():
        cur_edges, cur_states = w.edges, w.old_states
        for r in range(ROUNDS):
            delta = random_edge_delta(cur_edges, n_add=5, n_del=5, seed=100 + r)
            cur_states, _ = ingress_incremental(
                spark, cur_edges, delta, cur_states, w.algo
            )
            cur_edges = apply_delta(cur_edges, delta)
        return cur_states

    benchmark.pedantic(run, rounds=1, iterations=1)


def test_space_overhead(benchmark, spark, layph_engines):
    """Fig. 11a: shortcut rows vs original edges (printed)."""
    eng = layph_engines("uk_lite", "sssp")
    s = benchmark.pedantic(lambda: eng.lg.sizes(), rounds=1, iterations=1)
    print(f"\n[space] extra_space_ratio={s['extra_space_ratio']:.3f}")
    assert s["shortcut_rows"] > 0
