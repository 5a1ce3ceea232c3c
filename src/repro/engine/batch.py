"""Global iterative computation as a Spark DataFrame superstep loop.

Each superstep is one Catalyst-planned round: active vertices join the
(prepared, cached) edge relation to generate messages (F), messages are
group-by-aggregated per destination (G), and states fold the aggregate in.
``localCheckpoint`` truncates lineage every superstep so hundred-iteration
runs do not blow up the planner.

This engine is the Restart baseline, computes the initial converged states
every incremental engine starts from, and is reused (via ``run_states``)
by the incremental baselines and Layph's upper-layer loop.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as Fn
from pyspark.sql.types import DoubleType, LongType, StructField, StructType

from repro.engine.algorithms import Algorithm
from repro.graphs.schema import vertex_ids
from repro.metrics import RunStats

STATE_SCHEMA = StructType(
    [
        StructField("id", LongType(), False),
        StructField("x", DoubleType(), True),
        StructField("pend", DoubleType(), True),
    ]
)

#: Shuffle partitions used inside superstep loops — graphs at our SF are
#: small; AQE coalesces further. Overridable for the thread-scaling study.
LOOP_PARTITIONS = 8


def states_to_spark(spark: SparkSession, x: pd.Series, pend: pd.Series) -> DataFrame:
    """Build the (id, x, pend) state relation from id-indexed series.

    ``pend`` is sparse: ids absent from it are inactive (NULL pend).
    """
    pdf = pd.DataFrame({"id": x.index.to_numpy(np.int64), "x": x.to_numpy(float)})
    pdf = pdf.merge(
        pd.DataFrame({"id": pend.index.to_numpy(np.int64), "pend": pend.to_numpy(float)}),
        on="id",
        how="left",
    )
    # NaN must become SQL NULL regardless of whether Arrow is enabled.
    pdf["pend"] = pdf.pend.astype(object).where(pdf.pend.notna(), None)
    return spark.createDataFrame(pdf, schema=STATE_SCHEMA)


def initial_states(spark: SparkSession, edges: pd.DataFrame, algo: Algorithm) -> DataFrame:
    """X⁰ with root messages M⁰ applied and pending (Eq. 1 start)."""
    ids = vertex_ids(edges)
    if algo.source is not None and algo.source not in ids:
        ids = np.unique(np.append(ids, algo.source))
    x0 = algo.initial_states(ids)
    m0 = algo.root_messages(ids)
    if algo.is_min:
        x = x0.copy()
        x.loc[m0.index] = np.minimum(x.loc[m0.index], m0)
        pend = m0[m0 <= x0.reindex(m0.index)]
    else:
        x = x0.add(m0.reindex(x0.index).fillna(0.0))
        pend = m0
    return states_to_spark(spark, x, pend)


def superstep_loop(
    states: DataFrame,
    edges: DataFrame,
    algo: Algorithm,
    *,
    tol: float | None = None,
    max_supersteps: int = 10_000,
    stats: RunStats | None = None,
) -> tuple[DataFrame, RunStats]:
    """Iterate (F, G) until no messages remain. Returns converged states.

    ``edges`` must be prepared and is cached here. Activation accounting:
    ``messages.count()`` per superstep — one row per F application.
    """
    spark = states.sparkSession
    tol = algo.tol if tol is None else tol
    stats = stats or RunStats()
    old_parts = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", str(LOOP_PARTITIONS))
    edges = edges.persist()
    states = states.localCheckpoint(eager=True)
    try:
        for _ in range(max_supersteps):
            active = states.where(Fn.col("pend").isNotNull())
            msg_val = (
                Fn.col("pend") + Fn.col("w") if algo.is_min else Fn.col("pend") * Fn.col("w")
            )
            msgs = (
                active.join(edges, active.id == edges.src)
                .select(Fn.col("dst").alias("mid"), msg_val.alias("m"))
                .persist()
            )
            n_msgs = msgs.count()
            if n_msgs == 0:
                msgs.unpersist()
                break
            stats.activations += n_msgs
            stats.supersteps += 1
            agg_fn = Fn.min("m") if algo.is_min else Fn.sum("m")
            agg = msgs.groupBy("mid").agg(agg_fn.alias("m"))
            j = states.join(agg, states.id == agg.mid, "left")
            if algo.is_min:
                new = j.select(
                    "id",
                    Fn.least(Fn.col("x"), Fn.col("m")).alias("x"),
                    Fn.when(Fn.col("m") < Fn.col("x"), Fn.col("m")).alias("pend"),
                )
            else:
                new = j.select(
                    "id",
                    (Fn.col("x") + Fn.coalesce(Fn.col("m"), Fn.lit(0.0))).alias("x"),
                    Fn.when(Fn.abs(Fn.col("m")) > Fn.lit(tol), Fn.col("m")).alias("pend"),
                )
            states = new.localCheckpoint(eager=True)
            msgs.unpersist()
    finally:
        edges.unpersist()
        spark.conf.set("spark.sql.shuffle.partitions", old_parts)
    return states, stats


def run_batch(
    spark: SparkSession,
    edges: pd.DataFrame,
    algo: Algorithm,
    *,
    tol: float | None = None,
) -> tuple[pd.Series, RunStats]:
    """Batch computation A(G) from scratch (also the Restart baseline).

    Returns converged states as an id-indexed pandas Series plus run stats.
    """
    prepared = algo.prepare(edges)
    states = initial_states(spark, edges, algo)
    edges_df = spark.createDataFrame(
        prepared,
        schema=StructType(
            [
                StructField("src", LongType(), False),
                StructField("dst", LongType(), False),
                StructField("w", DoubleType(), False),
            ]
        ),
    )
    out, stats = superstep_loop(states, edges_df, algo, tol=tol)
    pdf = out.select("id", "x").toPandas()
    return pd.Series(pdf.x.to_numpy(), index=pdf.id.to_numpy(np.int64)).sort_index(), stats


def states_to_series(states: DataFrame) -> pd.Series:
    """Collect a state relation to an id-indexed series (driver-side)."""
    pdf = states.select("id", "x").toPandas()
    return pd.Series(pdf.x.to_numpy(), index=pdf.id.to_numpy(np.int64)).sort_index()
