"""T6 benchmark (Fig. 10): Layph vs Ingress at growing |ΔG|.

The speedup shrinking as the batch grows is the figure's shape.
"""
import pytest

from repro.experiments.common import build_layph, make_workload
from repro.incremental.baselines import SYSTEMS

BENCH_SF = 0.01
BENCH_TOL = 1e-4


@pytest.mark.parametrize("n_updates", [4, 40, 400])
@pytest.mark.parametrize("system", ["ingress", "layph"])
def test_sssp_batch_size(benchmark, spark, system, n_updates):
    w = make_workload(
        "uk_lite", "sssp", sf=BENCH_SF, tol=BENCH_TOL,
        n_add=n_updates // 2, n_del=n_updates // 2,
    )
    if system == "layph":
        eng = build_layph(spark, w)
        benchmark.pedantic(lambda: eng.run_delta(w.delta), rounds=1, iterations=1)
    else:
        runner, _ = SYSTEMS[system]
        benchmark.pedantic(
            lambda: runner(spark, w.edges, w.delta, w.old_states, w.algo),
            rounds=1, iterations=1,
        )
