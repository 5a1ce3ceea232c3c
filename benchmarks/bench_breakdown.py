"""T4 benchmark (Fig. 7): one full Layph round per algorithm; the per-phase
proportions are printed so the bench log carries the breakdown table."""
import copy

import pytest


@pytest.mark.parametrize("algo", ["sssp", "bfs", "pagerank", "php"])
def test_layph_phases_uk(benchmark, spark, workloads, layph_engines, algo):
    w = workloads("uk_lite", algo)
    eng = layph_engines("uk_lite", algo)

    def run():
        e = copy.copy(eng)
        e.lg, e.x = eng.lg, eng.x.copy()
        e.caches = None if eng.caches is None else eng.caches.copy()
        _, stats = e.run_delta(w.delta)
        return stats

    stats = benchmark.pedantic(run, rounds=1, iterations=1)
    total = max(sum(stats.phase_seconds.values()), 1e-9)
    parts = {k: f"{100 * v / total:.0f}%" for k, v in stats.phase_seconds.items()}
    print(f"\n[breakdown {algo}] {parts}")
    assert set(stats.phase_seconds) >= {"layered_update", "upload", "upper", "assign"}
