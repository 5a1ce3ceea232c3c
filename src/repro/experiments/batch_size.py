"""T6 (= Fig. 10): Layph's speedup over competitors vs ΔG batch size.

The paper sweeps 10 … 10M updates on UK (|E| ≈ 9.4e8); we sweep the same
|ΔG|/|E| ratios against our |E|.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.common import (
    build_layph,
    make_workload,
    run_system,
    systems_for,
)

#: |ΔG| as a fraction of |E| — mirrors the paper's 10…10M span on 9.4e8 edges.
RATIOS = [1e-5, 1e-4, 1e-3, 1e-2, 1e-1]


def run(
    spark: SparkSession,
    *,
    sf: float = 0.02,
    ds: str = "uk_lite",
    algos: list[str] | None = None,
    systems: list[str] | None = None,
    ratios: list[float] | None = None,
    seed: int = 0,
    tol: float = 1e-6,
) -> pd.DataFrame:
    algos = algos or ["sssp", "pagerank"]
    systems = systems or ["kickstarter", "risgraph", "graphbolt", "dzig", "ingress"]
    rows = []
    for algo_name in algos:
        for ratio in ratios or RATIOS:
            w0 = make_workload(ds, algo_name, sf=sf, seed=seed, tol=tol)
            n = max(1, int(len(w0.edges) * ratio / 2))
            w = make_workload(ds, algo_name, sf=sf, seed=seed, n_add=n, n_del=n, tol=tol)
            eng = build_layph(spark, w)
            lay = run_system(spark, "layph", w, layph_engine=eng)
            for system in systems_for(w.algo, systems):
                r = run_system(spark, system, w)
                rows.append(
                    {
                        "algo": algo_name,
                        "batch_size": 2 * n,
                        "ratio": ratio,
                        "system": system,
                        "seconds": r["seconds"],
                        "layph_seconds": lay["seconds"],
                        "speedup": round(r["seconds"] / max(lay["seconds"], 1e-9), 2),
                        "act_ratio": round(
                            r["activations"] / max(1, lay["activations"]), 2
                        ),
                    }
                )
                print(f"  {rows[-1]}", flush=True)
    return pd.DataFrame(rows)


def report(df: pd.DataFrame) -> str:
    lines = ["algo batch_size system speedup act_ratio"]
    for _, r in df.iterrows():
        lines.append(
            f"{r.algo} {r.batch_size} {r.system} {r.speedup}x {r.act_ratio}x"
        )
    return "\n".join(lines)
