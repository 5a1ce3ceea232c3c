"""T2 (= Fig. 5a–d + Fig. 6): overall performance across systems.

Response time and edge activations of every system on every (dataset,
algorithm) cell, normalized to Layph — the paper's headline comparison.
Also covers T3 (= Fig. 5e) via ``delta_kind='vertices'`` (paper: only
Ingress survives vertex updates, so that mode restricts to ingress+layph).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.common import (
    ALL_SYSTEMS,
    build_layph,
    make_workload,
    normalize,
    run_system,
    systems_for,
)

DATASETS = ["uk_lite", "it_lite", "sk_lite", "wb_lite"]
ALGOS = ["sssp", "bfs", "pagerank", "php"]


def run(
    spark: SparkSession,
    *,
    sf: float = 0.02,
    datasets: list[str] | None = None,
    algos: list[str] | None = None,
    systems: list[str] | None = None,
    delta_kind: str = "edges",
    seed: int = 0,
    tol: float = 1e-6,
) -> pd.DataFrame:
    datasets = datasets or DATASETS
    algos = algos or ALGOS
    systems = systems or ALL_SYSTEMS
    if delta_kind == "vertices":  # Fig. 5e: competitors error out in the paper
        systems = [s for s in systems if s in ("ingress", "layph")]
    rows = []
    for ds in datasets:
        for algo_name in algos:
            w = make_workload(ds, algo_name, sf=sf, seed=seed, delta_kind=delta_kind, tol=tol)
            eng = build_layph(spark, w)
            for system in systems_for(w.algo, systems):
                rows.append(
                    run_system(spark, system, w, layph_engine=eng if system == "layph" else None)
                )
                print(f"  {rows[-1]}", flush=True)
    return normalize(pd.DataFrame(rows))


def report(df: pd.DataFrame) -> str:
    """The Fig. 5/6 shaped table: one row per system per cell."""
    lines = ["dataset algo system seconds norm_time activations norm_acts"]
    for _, r in df.iterrows():
        lines.append(
            f"{r.dataset} {r.algo} {r.system} {r.seconds} {r.norm_time} "
            f"{r.activations} {r.norm_acts}"
        )
    spd = df[df.system != "layph"].groupby("system").norm_time.agg(["min", "mean", "max"])
    lines.append("\nSpeedup of Layph over each system (min/avg/max of norm_time):")
    for s, row in spd.iterrows():
        lines.append(f"  {s}: {row['min']:.2f}x / {row['mean']:.2f}x / {row['max']:.2f}x")
    return "\n".join(lines)
