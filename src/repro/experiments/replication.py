"""T7 (= Fig. 8): effect of vertex replication.

(a) sizes of the original graph, the original (un-replicated) upper layer,
and the reshaped (replicated) upper layer; (b/c) incremental runtimes of
Ingress (original graph), Layph without replication, and Layph with it.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.experiments.common import build_layph, make_workload, run_system


def run(
    spark: SparkSession,
    *,
    sf: float = 0.02,
    datasets: list[str] | None = None,
    algos: list[str] | None = None,
    seed: int = 0,
    tol: float = 1e-6,
) -> pd.DataFrame:
    rows = []
    for ds in datasets or ["uk_lite", "it_lite", "sk_lite", "wb_lite"]:
        for algo_name in algos or ["sssp", "pagerank"]:
            w = make_workload(ds, algo_name, sf=sf, seed=seed, tol=tol)
            eng_rep = build_layph(spark, w, replicate=True)
            eng_no = build_layph(spark, w, replicate=False)
            s_rep, s_no = eng_rep.lg.sizes(), eng_no.lg.sizes()
            t_ing = run_system(spark, "ingress", w)
            t_no = run_system(spark, "layph", w, layph_engine=eng_no)
            t_rep = run_system(spark, "layph", w, layph_engine=eng_rep)
            rows.append(
                {
                    "dataset": ds,
                    "algo": algo_name,
                    "orig_V": s_rep["orig_vertices"],
                    "orig_E": s_rep["orig_edges"],
                    "upper_V_norep": s_no["upper_vertices"],
                    "upper_E_norep": s_no["upper_edges"],
                    "upper_V_rep": s_rep["upper_vertices"],
                    "upper_E_rep": s_rep["upper_edges"],
                    "ingress_s": t_ing["seconds"],
                    "layph_norep_s": t_no["seconds"],
                    "layph_rep_s": t_rep["seconds"],
                }
            )
            print(f"  {rows[-1]}", flush=True)
    return pd.DataFrame(rows)


def report(df: pd.DataFrame) -> str:
    lines = [
        "dataset algo |V| |E| upV(norep) upE(norep) upV(rep) upE(rep) "
        "ingress layph(norep) layph(rep)"
    ]
    for _, r in df.iterrows():
        lines.append(
            f"{r.dataset} {r.algo} {r.orig_V} {r.orig_E} {r.upper_V_norep} "
            f"{r.upper_E_norep} {r.upper_V_rep} {r.upper_E_rep} "
            f"{r.ingress_s}s {r.layph_norep_s}s {r.layph_rep_s}s"
        )
    return "\n".join(lines)
