"""T1 (= Table I): dataset statistics of the synthetic stand-ins."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.generators import DATASET_NAMES, dataset
from repro.graphs.schema import graph_stats


def run(spark: SparkSession | None = None, *, sf: float = 0.02, seed: int = 0) -> pd.DataFrame:
    rows = []
    for name in DATASET_NAMES:
        edges, membership = dataset(name, sf=sf, seed=seed)
        s = graph_stats(edges)
        s.update(
            {
                "dataset": name,
                "sf": sf,
                "planted_communities": int(membership["sub"].nunique()),
                "avg_community_size": round(
                    len(membership) / max(1, membership["sub"].nunique()), 1
                ),
            }
        )
        rows.append(s)
        print(f"  {s}", flush=True)
    cols = [
        "dataset", "sf", "vertices", "edges", "avg_out_deg", "max_out_deg",
        "max_in_deg", "planted_communities", "avg_community_size",
    ]
    return pd.DataFrame(rows)[cols]


def report(df: pd.DataFrame) -> str:
    return df.to_string(index=False)
