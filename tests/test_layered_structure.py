"""Community discovery, roles, density filter, replication, layered assembly."""
import numpy as np
import pandas as pd
import pytest

from repro.engine import algorithms as alg
from repro.graphs.generators import dataset, fig2_graph, planted_partition
from repro.graphs.schema import vertex_ids
from repro.layph.community import lpa_communities, planted_communities
from repro.layph.layered import build_layered, update_layered
from repro.layph.replication import apply_plan, build_plan
from repro.layph.structure import compute_roles, density_filter, internal_edge_counts
from repro.oracle import assert_equivalent


def test_roles_on_fig2():
    edges, membership = fig2_graph()
    roles = compute_roles(edges, membership)
    t = roles.table.set_index("id")
    # G2 = sub 2: entry v0 (edge v5->v0 from outside), exit v4 (edge v4->v5).
    assert t.loc[0].is_entry and not t.loc[0].is_exit
    assert t.loc[4].is_exit and not t.loc[4].is_entry
    # v1, v2, v3 interior
    for v in (1, 2, 3):
        assert not t.loc[v].is_entry and not t.loc[v].is_exit
    # G1 = sub 1: v5 is both entry (v4->v5) and exit (v5->v0).
    assert t.loc[5].is_entry and t.loc[5].is_exit
    for v in (6, 7, 8):
        assert not t.loc[v].is_entry and not t.loc[v].is_exit


def test_density_filter_on_fig2():
    """Both Fig. 2 subgraphs satisfy |V_I|x|V_O| < |E_i|."""
    edges, membership = fig2_graph()
    roles = compute_roles(edges, membership)
    dense = density_filter(edges, membership, roles)
    assert dense["sub"].nunique() == 2
    assert len(dense) == 9


def test_density_filter_rejects_sparse_sub():
    # A path a->b->c with 2 entries and 2 exits squeezed in: make a sub with
    # many boundary vertices and few edges -> rejected.
    edges = pd.DataFrame(
        {
            "src": [10, 11, 0, 1, 2, 0, 1],
            "dst": [0, 1, 20, 21, 22, 2, 2],
            "w": 1.0,
        }
    )
    membership = pd.DataFrame({"id": [0, 1, 2], "sub": [0, 0, 0]})
    roles = compute_roles(edges, membership)
    # V_I = {0,1}, V_O = {0,1,2}, E_i = {(0,2),(1,2)} -> 6 >= 2 -> reject
    dense = density_filter(edges, membership, roles)
    assert len(dense) == 0


def test_internal_edge_counts_matches_duckdb(spark):
    edges, membership = dataset("uk_lite", sf=0.004, seed=1)
    got = internal_edge_counts(edges, membership)
    got_df = spark.createDataFrame(
        got.rename("n").rename_axis("sub").reset_index()
    )
    assert_equivalent(
        got_df,
        """
        SELECT ms.sub AS sub, COUNT(*) AS n
        FROM edges e
        JOIN member ms ON e.src = ms.id
        JOIN member md ON e.dst = md.id
        WHERE ms.sub = md.sub
        GROUP BY ms.sub
        """,
        edges=edges,
        member=membership,
    )


def test_forced_entries_mark_root():
    edges, membership = fig2_graph()
    roles = compute_roles(edges, membership, forced_entries={2})
    t = roles.table.set_index("id")
    assert t.loc[2].is_entry


def test_replication_reduces_boundary():
    """A hub with 4 edges into a community collapses to one proxy entry."""
    rows = [(100, t, 1.0) for t in (0, 1, 2, 3)]  # hub -> 4 members
    rows += [(0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0), (3, 0, 1.0), (0, 2, 1.0), (1, 3, 1.0)]
    rows += [(3, 200, 1.0)]  # one exit edge
    edges = pd.DataFrame(rows, columns=["src", "dst", "w"])
    membership = pd.DataFrame({"id": [0, 1, 2, 3], "sub": [0, 0, 0, 0]})
    algo = alg.sssp(source=100)
    prepared = algo.prepare(edges)
    plan = build_plan(prepared, membership, threshold=3)
    assert len(plan) == 1 and plan.iloc[0].direction == "in" and plan.iloc[0].host == 100
    layer, mem = apply_plan(prepared, membership, plan, algo.identity)
    roles = compute_roles(layer, mem)
    entries = roles.entries(0)
    # only the proxy is an entry now
    assert list(entries.id) == [plan.iloc[0].proxy]
    # host->proxy link carries the + identity 0
    link = layer[(layer.src == 100) & (layer.dst == plan.iloc[0].proxy)]
    assert len(link) == 1 and link.iloc[0].w == 0.0


def test_replication_out_direction():
    rows = [(t, 100, 1.0) for t in (0, 1, 2)]  # 3 members -> hub
    rows += [(0, 1, 1.0), (1, 2, 1.0), (2, 0, 1.0), (0, 2, 1.0)]
    rows += [(200, 0, 1.0)]  # one entry edge
    edges = pd.DataFrame(rows, columns=["src", "dst", "w"])
    membership = pd.DataFrame({"id": [0, 1, 2], "sub": [0, 0, 0]})
    algo = alg.sssp(source=200)
    prepared = algo.prepare(edges)
    plan = build_plan(prepared, membership, threshold=3)
    assert len(plan) == 1 and plan.iloc[0].direction == "out"
    layer, mem = apply_plan(prepared, membership, plan, algo.identity)
    roles = compute_roles(layer, mem)
    assert list(roles.exits(0).id) == [plan.iloc[0].proxy]


def test_lpa_recovers_planted_blocks(spark):
    edges, truth = planted_partition(
        n_vertices=120, community_size_lo=20, community_size_hi=25,
        community_fraction=1.0, intra_out_deg=6.0, inter_edge_fraction=0.03, seed=5,
    )
    got = lpa_communities(spark, edges, K=60, n_iters=5)
    # Most planted pairs should land in the same discovered community.
    t = truth.set_index("id")["sub"]
    g = got.set_index("id")["sub"].reindex(t.index)
    # sample pairs within each planted block
    same, total = 0, 0
    for _, grp in truth.groupby("sub"):
        ids = grp.id.to_numpy()[:10]
        for a, b in zip(ids[:-1], ids[1:]):
            total += 1
            if pd.notna(g.get(a)) and g.get(a) == g.get(b):
                same += 1
    assert same / total > 0.6


def test_planted_communities_caps_size():
    m = pd.DataFrame({"id": range(100), "sub": [0] * 100})
    capped = planted_communities(m, K=30)
    assert capped.groupby("sub").size().max() <= 30


@pytest.mark.parametrize("name", ["sssp", "pagerank"])
def test_build_layered_fig2(spark, name):
    edges, membership = fig2_graph()
    algo = alg.sssp(source=0) if name == "sssp" else alg.pagerank(d=0.5)
    lg, acts = build_layered(spark, edges, algo, membership=membership, replicate=False)
    sizes = lg.sizes()
    assert sizes["orig_vertices"] == 9 and sizes["orig_edges"] == 10
    assert sizes["upper_vertices"] == 3  # v0, v4, v5
    assert sizes["n_subgraphs"] == 2
    assert acts > 0
    if name == "sssp":
        # Example 2 shortcut weights inside G2 (sub of vertex 0)
        sub2 = lg.structure.sub_of[0]
        sc = lg.shortcuts[(lg.shortcuts["sub"] == sub2) & (lg.shortcuts.entry == 0)]
        assert sc.set_index("dst").w.to_dict() == {1: 1.0, 2: 4.0, 3: 1.0, 4: 2.0}


def test_build_layered_reduces_upper_size(spark):
    edges, membership = dataset("uk_lite", sf=0.004, seed=0)
    algo = alg.sssp(source=0)
    lg, _ = build_layered(spark, edges, algo, membership=membership)
    s = lg.sizes()
    assert s["upper_vertices"] < s["orig_vertices"]
    assert s["upper_edges"] < s["orig_edges"]


def test_update_layered_recomputes_only_affected(spark):
    from repro.graphs.updates import random_edge_delta

    edges, membership = dataset("uk_lite", sf=0.004, seed=0)
    algo = alg.sssp(source=0)
    lg, _ = build_layered(spark, edges, algo, membership=membership)
    delta = random_edge_delta(edges, n_add=2, n_del=2, seed=5)
    new_lg, diff, affected, acts = update_layered(spark, lg, delta)
    assert len(diff) >= delta.size  # at least the unit updates appear
    n_subs = lg.structure.membership["sub"].nunique()
    assert len(affected) < n_subs  # constrained scope
    # unaffected subs keep identical shortcut tables
    old_sc = lg.shortcuts[~lg.shortcuts["sub"].isin(affected)].reset_index(drop=True)
    new_sc = new_lg.shortcuts[~new_lg.shortcuts["sub"].isin(affected)]
    new_sc = new_sc.sort_values(["sub", "entry", "dst"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(
        old_sc.sort_values(["sub", "entry", "dst"]).reset_index(drop=True), new_sc
    )


def test_upper_graph_has_both_edge_types(spark):
    edges, membership = fig2_graph()
    algo = alg.sssp(source=0)
    lg, _ = build_layered(spark, edges, algo, membership=membership, replicate=False)
    up = lg.upper_graph()
    assert set(up.etype.unique()) == {0, 1}
    # Fig 2d: L_up has edges (v4->v5), (v5->v0) and shortcut v0->v4.
    orig = set(zip(up[up.etype == 0].src, up[up.etype == 0].dst))
    assert (4, 5) in orig and (5, 0) in orig
    sc = set(zip(up[up.etype == 1].src, up[up.etype == 1].dst))
    assert (0, 4) in sc
