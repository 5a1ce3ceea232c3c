"""Layph incremental == batch on the updated graph (Theorems 1 & 2)."""
import numpy as np
import pandas as pd
import pytest

from repro.engine import algorithms as alg
from repro.engine.local import converge
from repro.graphs.generators import dataset, fig2_delta, fig2_graph
from repro.graphs.schema import vertex_ids
from repro.graphs.updates import GraphDelta, apply_delta, random_edge_delta, random_vertex_delta
from repro.layph.engine import LayphEngine
from repro.reference import assert_states_close


def local_batch(edges, algo, extra_ids=(), tol=None):
    ids = vertex_ids(edges)
    for e in list(extra_ids) + ([algo.source] if algo.source is not None else []):
        if e is not None and e not in ids:
            ids = np.unique(np.append(ids, e))
    return converge(
        algo.prepare(edges), algo.initial_states(ids), algo.root_messages(ids),
        algo, tol=tol,
    ).states


def make_algo(name, source=0):
    return {
        "sssp": lambda: alg.sssp(source=source),
        "bfs": lambda: alg.bfs(source=source),
        "pagerank": lambda: alg.pagerank(d=0.5, tol=1e-7),
        "php": lambda: alg.php(source=source, d=0.5, tol=1e-7),
    }[name]()


def check(got, edges, algo, delta, extra=()):
    expected = local_batch(apply_delta(edges, delta), algo, extra_ids=extra, tol=1e-10)
    if len(delta.deleted_vertices):
        expected = expected[~expected.index.isin(delta.deleted_vertices)]
        got = got[got.index.isin(expected.index)]
    if algo.is_min:
        assert_states_close(got, expected, atol=1e-9, rtol=0)
    else:
        assert_states_close(got, expected, atol=5e-4, rtol=1e-3)


# ---------------------------------------------------------------------------
# The paper's running example, end to end (Examples 2-6).
# ---------------------------------------------------------------------------

def test_fig2_full_walkthrough(spark):
    edges, membership = fig2_graph()
    algo = alg.sssp(source=0)
    eng = LayphEngine(spark, edges, algo, membership=membership, replicate=False)
    eng.initialize()

    # Example 4: initial converged states {0,1,4,1,2,5,6,7,7}
    assert_states_close(
        eng.states(), pd.Series([0, 1, 4, 1, 2, 5, 6, 7, 7], index=range(9), dtype=float)
    )
    # entry caches: v0 is the source (cache 0), v5's external support is
    # x_v4 + w(4,5) = 2 + 3 = 5.
    assert eng.caches[0] == 0.0 and eng.caches[5] == 5.0

    added, deleted = fig2_delta()
    got, stats = eng.run_delta(GraphDelta(added=added, deleted=deleted))

    # Example 6 final states: {0,1,3,1,4,7,8,9,9}
    assert_states_close(
        got, pd.Series([0, 1, 3, 1, 4, 7, 8, 9, 9], index=range(9), dtype=float)
    )
    # Example 3: updated shortcuts of G2
    sub2 = eng.lg.structure.sub_of[0]
    sc = eng.lg.shortcuts[
        (eng.lg.shortcuts["sub"] == sub2) & (eng.lg.shortcuts.entry == 0)
    ]
    assert sc.set_index("dst").w.to_dict() == {1: 1.0, 2: 3.0, 3: 1.0, 4: 4.0}
    # all four phases ran and were timed
    for phase in ("layered_update", "upload", "upper", "assign"):
        assert phase in stats.phase_seconds
    assert stats.activations > 0


def test_fig2_only_affected_sub_recomputed(spark):
    """ΔG touches only G2 — G1's shortcut table must be byte-identical."""
    edges, membership = fig2_graph()
    algo = alg.sssp(source=0)
    eng = LayphEngine(spark, edges, algo, membership=membership, replicate=False)
    eng.initialize()
    sub1 = eng.lg.structure.sub_of[5]
    before = eng.lg.shortcuts[eng.lg.shortcuts["sub"] == sub1].reset_index(drop=True)
    added, deleted = fig2_delta()
    eng.run_delta(GraphDelta(added=added, deleted=deleted))
    after = eng.lg.shortcuts[eng.lg.shortcuts["sub"] == sub1].reset_index(drop=True)
    pd.testing.assert_frame_equal(
        before.sort_values(["entry", "dst"]).reset_index(drop=True),
        after.sort_values(["entry", "dst"]).reset_index(drop=True),
    )


# ---------------------------------------------------------------------------
# Randomized equivalence across algorithms / datasets / deltas.
# ---------------------------------------------------------------------------

@pytest.mark.parametrize("name", ["sssp", "bfs", "pagerank", "php"])
@pytest.mark.parametrize("seed", [0, 1])
def test_layph_equals_batch_uk(spark, name, seed):
    edges, membership = dataset("uk_lite", sf=0.003, seed=seed)
    algo = make_algo(name)
    eng = LayphEngine(spark, edges, algo, membership=membership).initialize()
    delta = random_edge_delta(edges, n_add=4, n_del=4, seed=seed + 50)
    got, _ = eng.run_delta(delta)
    check(got, edges, algo, delta)


@pytest.mark.parametrize("ds", ["it_lite", "sk_lite", "wb_lite"])
@pytest.mark.parametrize("name", ["sssp", "pagerank"])
def test_layph_equals_batch_other_datasets(spark, ds, name):
    edges, membership = dataset(ds, sf=0.003, seed=3)
    algo = make_algo(name)
    eng = LayphEngine(spark, edges, algo, membership=membership).initialize()
    delta = random_edge_delta(edges, n_add=5, n_del=5, seed=77)
    got, _ = eng.run_delta(delta)
    check(got, edges, algo, delta)


@pytest.mark.parametrize("name", ["sssp", "pagerank"])
def test_layph_multiple_rounds(spark, name):
    """Nine consecutive ΔG rounds stay correct (the Fig. 11b scenario)."""
    edges, membership = dataset("uk_lite", sf=0.003, seed=9)
    algo = make_algo(name)
    eng = LayphEngine(spark, edges, algo, membership=membership).initialize()
    cur = edges
    for r in range(4):
        delta = random_edge_delta(cur, n_add=3, n_del=3, seed=1000 + r)
        got, _ = eng.run_delta(delta)
        cur = apply_delta(cur, delta)
        check(got, cur, algo, GraphDelta(added=cur.iloc[0:0],
                                         deleted=cur.iloc[0:0][["src", "dst"]]))


@pytest.mark.parametrize("name", ["sssp", "pagerank"])
def test_layph_vertex_updates(spark, name):
    edges, membership = dataset("uk_lite", sf=0.003, seed=5)
    algo = make_algo(name)
    eng = LayphEngine(spark, edges, algo, membership=membership).initialize()
    delta = random_vertex_delta(edges, n_add=3, n_del=2, seed=21)
    got, _ = eng.run_delta(delta)
    check(got, edges, algo, delta, extra=delta.added_vertices)


def test_layph_without_replication(spark):
    edges, membership = dataset("uk_lite", sf=0.003, seed=6)
    algo = alg.sssp(source=0)
    eng = LayphEngine(spark, edges, algo, membership=membership, replicate=False)
    eng.initialize()
    delta = random_edge_delta(edges, n_add=4, n_del=4, seed=8)
    got, _ = eng.run_delta(delta)
    check(got, edges, algo, delta)


def test_layph_pure_insertions(spark):
    edges, membership = dataset("uk_lite", sf=0.003, seed=7)
    algo = alg.sssp(source=0)
    eng = LayphEngine(spark, edges, algo, membership=membership).initialize()
    delta = random_edge_delta(edges, n_add=8, n_del=0, seed=9)
    got, _ = eng.run_delta(delta)
    check(got, edges, algo, delta)


def test_layph_pure_deletions(spark):
    edges, membership = dataset("uk_lite", sf=0.003, seed=8)
    algo = alg.pagerank(d=0.5, tol=1e-7)
    eng = LayphEngine(spark, edges, algo, membership=membership).initialize()
    delta = random_edge_delta(edges, n_add=0, n_del=8, seed=10)
    got, _ = eng.run_delta(delta)
    check(got, edges, algo, delta)
