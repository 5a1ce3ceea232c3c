"""Generator properties across all dataset presets (pure pandas)."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import DATASET_NAMES, SPECS, dataset, planted_partition
from repro.graphs.schema import canonical_edges, degrees, graph_stats, vertex_ids


@pytest.mark.parametrize("name", DATASET_NAMES)
def test_presets_have_valid_schema(name):
    edges, membership = dataset(name, sf=0.005, seed=0)
    assert list(edges.columns) == ["src", "dst", "w"]
    assert (edges.src != edges.dst).all()
    assert not edges.duplicated(["src", "dst"]).any()
    assert (edges.w > 0).all()
    assert membership.id.is_unique


@pytest.mark.parametrize("name", DATASET_NAMES)
def test_presets_scale_with_sf(name):
    small, _ = dataset(name, sf=0.004, seed=0)
    big, _ = dataset(name, sf=0.012, seed=0)
    assert len(big) > 2 * len(small)


def test_web_presets_have_smaller_communities_than_wb():
    _, uk = dataset("uk_lite", sf=0.01, seed=0)
    _, wb = dataset("wb_lite", sf=0.01, seed=0)
    uk_avg = uk.groupby("sub").size().mean()
    wb_avg = wb.groupby("sub").size().mean()
    assert wb_avg > 2 * uk_avg  # the paper's WB regime: large subgraphs


def test_hubs_present_in_presets():
    edges, _ = dataset("wb_lite", sf=0.01, seed=0)
    d = degrees(edges)
    assert d.out_deg.max() >= SPECS["wb_lite"].hub_subs * SPECS["wb_lite"].hub_edges_per_sub * 0.5


def test_intra_edges_dominate():
    edges, membership = dataset("uk_lite", sf=0.01, seed=0)
    sub_of = membership.set_index("id")["sub"]
    s = sub_of.reindex(edges.src).to_numpy(float)
    d = sub_of.reindex(edges.dst).to_numpy(float)
    intra = ((~np.isnan(s)) & (s == d)).mean()
    assert intra > 0.5


def test_membership_blocks_are_contiguous_ids():
    _, membership = dataset("it_lite", sf=0.01, seed=0)
    for _, grp in membership.groupby("sub"):
        ids = np.sort(grp.id.to_numpy())
        assert ids[-1] - ids[0] == len(ids) - 1  # generator carves id blocks


def test_planted_partition_no_communities():
    edges, membership = planted_partition(
        n_vertices=50, community_size_lo=60, community_size_hi=80,
        community_fraction=0.0, intra_out_deg=2.0, inter_edge_fraction=0.5, seed=1,
    )
    assert len(membership) == 0
    assert len(edges) > 0


def test_graph_stats_consistent():
    edges, _ = dataset("sk_lite", sf=0.005, seed=2)
    s = graph_stats(edges)
    assert s["vertices"] == len(vertex_ids(edges))
    assert s["edges"] == len(edges)
    assert s["max_out_deg"] >= s["avg_out_deg"]


def test_canonical_edges_sorted():
    edges, _ = dataset("uk_lite", sf=0.004, seed=3)
    again = canonical_edges(edges.sample(frac=1.0, random_state=0))
    pd.testing.assert_frame_equal(edges, again)
