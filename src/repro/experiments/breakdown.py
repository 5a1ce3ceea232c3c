"""T4 (= Fig. 7): runtime proportion of Layph's four phases on UK."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.common import build_layph, make_workload

PHASES = ["layered_update", "upload", "upper", "assign"]


def run(
    spark: SparkSession,
    *,
    sf: float = 0.02,
    ds: str = "uk_lite",
    algos: list[str] | None = None,
    seed: int = 0,
    tol: float = 1e-6,
) -> pd.DataFrame:
    rows = []
    for algo_name in algos or ["sssp", "bfs", "pagerank", "php"]:
        w = make_workload(ds, algo_name, sf=sf, seed=seed, tol=tol)
        eng = build_layph(spark, w)
        _, stats = eng.run_delta(w.delta)
        total = sum(stats.phase_seconds.get(p, 0.0) for p in PHASES)
        row = {"dataset": ds, "algo": algo_name, "total_seconds": round(total, 3)}
        for p in PHASES:
            sec = stats.phase_seconds.get(p, 0.0)
            row[p] = round(sec, 3)
            row[f"{p}_pct"] = round(100 * sec / max(total, 1e-9), 1)
        rows.append(row)
        print(f"  {row}", flush=True)
    return pd.DataFrame(rows)


def report(df: pd.DataFrame) -> str:
    lines = ["algo total " + " ".join(f"{p}(%)" for p in PHASES)]
    for _, r in df.iterrows():
        lines.append(
            f"{r.algo} {r.total_seconds}s "
            + " ".join(f"{r[p]}s({r[p + '_pct']}%)" for p in PHASES)
        )
    return "\n".join(lines)
