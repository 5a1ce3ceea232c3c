"""Metrics plumbing + the provided TPC-H-lite generators (with the oracle)."""
import time

import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.metrics import PhaseTimer, RunStats
from repro.oracle import assert_equivalent


def test_runstats_add_phase_accumulates():
    s = RunStats()
    s.add_phase("upper", 1.0)
    s.add_phase("upper", 0.5)
    assert s.phase_seconds["upper"] == 1.5


def test_runstats_merge():
    a = RunStats(activations=5, supersteps=2)
    a.add_phase("x", 1.0)
    b = RunStats(activations=3, supersteps=1)
    b.add_phase("x", 2.0)
    b.add_phase("y", 4.0)
    a.merge(b)
    assert a.activations == 8 and a.supersteps == 3
    assert a.phase_seconds == {"x": 3.0, "y": 4.0}


def test_phase_timer_records_wall_time():
    s = RunStats()
    with PhaseTimer(s, "p"):
        time.sleep(0.01)
    assert s.phase_seconds["p"] >= 0.01
    assert s.wall_seconds >= 0.01


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_lineitem_orders_join_via_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.002)
    o = synth_data.orders(spark, sf=0.002)
    got = li.join(o, li.l_orderkey == o.o_orderkey).groupBy("o_orderpriority").count()
    got = got.withColumnRenamed("count", "n")
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, COUNT(*) AS n
        FROM li JOIN o ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        o=o,
    )


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5).toPandas()
    counts = df.k.value_counts()
    assert counts.iloc[0] > 5 * counts.iloc[-1]


def test_uniform_keys_cover_range(spark):
    df = synth_data.uniform_keys(spark, n=2000, n_keys=50).toPandas()
    assert df.k.min() >= 1 and df.k.max() <= 50
    assert df.k.nunique() > 40


def test_customer_part_shapes(spark):
    c = synth_data.customer(spark, sf=0.002).toPandas()
    p = synth_data.part(spark, sf=0.002).toPandas()
    assert c.c_custkey.is_unique and p.p_partkey.is_unique
    assert set(c.columns) >= {"c_custkey", "c_nationkey", "c_acctbal"}
