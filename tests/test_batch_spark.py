"""Spark superstep engine vs local kernel / references / DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.engine import algorithms as alg
from repro.engine.batch import run_batch
from repro.graphs.generators import fig2_graph, planted_partition
from repro.graphs.schema import degrees, degrees_spark, edges_to_spark
from repro.oracle import assert_equivalent
from repro.reference import (
    assert_states_close,
    bfs_reference,
    pagerank_reference,
    php_reference,
    sssp_reference,
)


def tiny_graph(seed=0, n=30):
    edges, _ = planted_partition(
        n_vertices=n, community_size_lo=6, community_size_hi=9,
        community_fraction=0.8, intra_out_deg=2.5, inter_edge_fraction=0.3, seed=seed,
    )
    return edges


@pytest.mark.parametrize("seed", [0, 1])
def test_spark_sssp_matches_dijkstra(spark, seed):
    edges = tiny_graph(seed)
    states, stats = run_batch(spark, edges, alg.sssp(source=0))
    assert_states_close(states, sssp_reference(edges, 0))
    assert stats.activations > 0 and stats.supersteps > 0


def test_spark_bfs_matches_reference(spark):
    edges = tiny_graph(2)
    states, _ = run_batch(spark, edges, alg.bfs(source=0))
    assert_states_close(states, bfs_reference(edges, 0))


def test_spark_pagerank_matches_linear_solve(spark):
    edges = tiny_graph(3)
    states, _ = run_batch(spark, edges, alg.pagerank(d=0.5, tol=1e-8))
    assert_states_close(states, pagerank_reference(edges, 0.5), atol=1e-4, rtol=1e-4)


def test_spark_php_matches_linear_solve(spark):
    edges = tiny_graph(4)
    states, _ = run_batch(spark, edges, alg.php(source=1, d=0.6, tol=1e-8))
    assert_states_close(states, php_reference(edges, 1, 0.6), atol=1e-4, rtol=1e-4)


def test_spark_fig2_sssp(spark):
    edges, _ = fig2_graph()
    states, _ = run_batch(spark, edges, alg.sssp(source=0))
    expected = pd.Series([0, 1, 4, 1, 2, 5, 6, 7, 7], index=range(9), dtype=float)
    assert_states_close(states, expected)


def test_degrees_spark_matches_duckdb(spark):
    """Degrees are SQL — check the Spark version against the DuckDB oracle."""
    edges = tiny_graph(5)
    got = degrees_spark(edges_to_spark(spark, edges))
    assert_equivalent(
        got,
        """
        WITH o AS (SELECT src AS id, COUNT(*) AS out_deg, SUM(w) AS out_wsum
                   FROM edges GROUP BY src),
             i AS (SELECT dst AS id, COUNT(*) AS in_deg FROM edges GROUP BY dst)
        SELECT COALESCE(o.id, i.id) AS id,
               COALESCE(out_deg, 0) AS out_deg,
               COALESCE(in_deg, 0) AS in_deg,
               COALESCE(out_wsum, 0.0) AS out_wsum
        FROM o FULL OUTER JOIN i ON o.id = i.id
        """,
        edges=edges,
    )


def test_degrees_pandas_matches_spark(spark):
    edges = tiny_graph(6)
    p = degrees(edges)
    s = degrees_spark(edges_to_spark(spark, edges)).toPandas()
    s = s.sort_values("id").reset_index(drop=True)[p.columns]
    pd.testing.assert_frame_equal(p, s, check_dtype=False)


@pytest.mark.parametrize("name", ["sssp", "bfs", "pagerank", "php"])
def test_prepare_spark_matches_pandas(spark, name):
    edges = tiny_graph(7)
    algo = alg.ALGORITHMS[name](source=0, **({"d": 0.7} if name in ("pagerank", "php") else {}))
    p = algo.prepare(edges).sort_values(["src", "dst"]).reset_index(drop=True)
    s = (
        algo.prepare_spark(edges_to_spark(spark, edges))
        .toPandas()
        .sort_values(["src", "dst"])
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(p, s[p.columns], check_dtype=False, atol=1e-12)


def test_pagerank_total_mass(spark):
    """Σ PR_v == n·(1-d) + d·(non-dangling mass) sanity via the oracle's sum."""
    edges = tiny_graph(8)
    states, _ = run_batch(spark, edges, alg.pagerank(d=0.5, tol=1e-9))
    ref = pagerank_reference(edges, 0.5)
    assert abs(states.sum() - ref.sum()) < 1e-3
