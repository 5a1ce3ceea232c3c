"""Revision-message deduction (pure pandas — no Spark needed)."""
import numpy as np
import pandas as pd
import pytest

from repro.engine import algorithms as alg
from repro.engine.local import converge
from repro.graphs.generators import fig2_graph, planted_partition
from repro.graphs.schema import vertex_ids
from repro.graphs.updates import GraphDelta, apply_delta, random_edge_delta
from repro.incremental.revision import (
    min_parents,
    min_revision,
    min_trim_set,
    prepared_edge_diff,
    sum_revision,
)
from repro.reference import assert_states_close, pagerank_reference


def small_graph(seed=0, n=40):
    edges, _ = planted_partition(
        n_vertices=n, community_size_lo=6, community_size_hi=10,
        community_fraction=0.8, intra_out_deg=3.0, inter_edge_fraction=0.3, seed=seed,
    )
    return edges


def converged(edges, algo, tol=None):
    ids = vertex_ids(edges)
    if algo.source is not None and algo.source not in ids:
        ids = np.unique(np.append(ids, algo.source))
    return converge(
        algo.prepare(edges), algo.initial_states(ids), algo.root_messages(ids), algo, tol=tol
    ).states


def test_prepared_edge_diff_classifies_adds_deletes_changes():
    old = pd.DataFrame({"src": [0, 1, 2], "dst": [1, 2, 3], "w": [1.0, 2.0, 3.0]})
    new = pd.DataFrame({"src": [0, 2, 3], "dst": [1, 3, 4], "w": [1.0, 5.0, 1.0]})
    d = prepared_edge_diff(old, new).set_index(["src", "dst"])
    assert (1, 2) in d.index and np.isnan(d.loc[(1, 2), "w_new"])  # deleted
    assert (3, 4) in d.index and np.isnan(d.loc[(3, 4), "w_old"])  # added
    assert d.loc[(2, 3), "w_new"] == 5.0  # weight change
    assert (0, 1) not in d.index  # unchanged


def test_min_parents_on_fig2():
    edges, _ = fig2_graph()
    algo = alg.sssp(source=0)
    states = converged(edges, algo)
    parents = min_parents(algo.prepare(edges), states, algo).set_index("id").parent
    # v0 is root-supported -> no parent; everyone else has exactly one.
    assert 0 not in parents.index
    assert parents[1] == 0 and parents[3] == 0
    assert parents[2] == 1
    assert parents[4] == 3  # supported by the (v3, v4) edge of Example 3
    assert parents[5] == 4 and parents[6] == 5


def test_min_trim_set_cascades():
    parents = pd.DataFrame({"id": [2, 3, 4, 5], "parent": [1, 2, 2, 4]})
    reset = min_trim_set(parents, np.array([2]))
    assert list(reset) == [2, 3, 4, 5]


def test_min_trim_set_empty_seed():
    parents = pd.DataFrame({"id": [2], "parent": [1]})
    assert len(min_trim_set(parents, np.array([], dtype=np.int64))) == 0


@pytest.mark.parametrize("seed", range(5))
def test_min_revision_then_local_propagation_matches_batch(seed):
    edges = small_graph(seed)
    algo = alg.sssp(source=0)
    states = converged(edges, algo)
    delta = random_edge_delta(edges, n_add=4, n_del=4, seed=seed + 100)
    new_edges = apply_delta(edges, delta)

    reset, seeds, acts = min_revision(algo.prepare(edges), algo.prepare(new_edges), states, algo)
    x = states.copy()
    x.loc[x.index.isin(set(int(r) for r in reset))] = float("inf")
    run = converge(algo.prepare(new_edges), x, seeds, algo)
    assert_states_close(run.states, converged(new_edges, algo))
    assert acts >= 0


@pytest.mark.parametrize("seed", range(5))
def test_sum_revision_then_local_propagation_matches_batch(seed):
    edges = small_graph(seed)
    algo = alg.pagerank(d=0.8, tol=1e-10)
    states = converged(edges, algo)
    delta = random_edge_delta(edges, n_add=4, n_del=4, seed=seed + 200)
    new_edges = apply_delta(edges, delta)

    inj = sum_revision(algo.prepare(edges), algo.prepare(new_edges), states, algo)
    run = converge(algo.prepare(new_edges), states, inj, algo)
    assert_states_close(run.states, pagerank_reference(new_edges, 0.8), atol=1e-5, rtol=1e-4)


def test_sum_revision_empty_when_no_changes():
    edges = small_graph(1)
    algo = alg.pagerank(d=0.8)
    states = converged(edges, algo)
    inj = sum_revision(algo.prepare(edges), algo.prepare(edges), states, algo)
    assert len(inj) == 0


def test_sum_revision_covers_outdegree_side_effect():
    """Adding one out-edge to u changes the prepared weight of ALL of u's
    out-edges (PageRank d/N). The diff must contain every one of them."""
    edges = pd.DataFrame(
        {"src": [0, 0, 1, 2], "dst": [1, 2, 3, 3], "w": [1.0, 1.0, 1.0, 1.0]}
    )
    algo = alg.pagerank(d=0.5)
    new_edges = apply_delta(
        edges, GraphDelta(added=pd.DataFrame({"src": [0], "dst": [3], "w": [1.0]}),
                          deleted=pd.DataFrame(columns=["src", "dst"])),
    )
    diff = prepared_edge_diff(algo.prepare(edges), algo.prepare(new_edges))
    changed_from_0 = diff[diff.src == 0]
    assert set(changed_from_0.dst) == {1, 2, 3}


def test_php_revision_roundtrip():
    edges = small_graph(2)
    algo = alg.php(source=1, d=0.7, tol=1e-10)
    states = converged(edges, algo)
    delta = random_edge_delta(edges, n_add=3, n_del=3, seed=9)
    new_edges = apply_delta(edges, delta)
    inj = sum_revision(algo.prepare(edges), algo.prepare(new_edges), states, algo)
    run = converge(algo.prepare(new_edges), states, inj, algo)
    from repro.reference import php_reference

    assert_states_close(run.states, php_reference(new_edges, 1, 0.7), atol=1e-5, rtol=1e-4)
