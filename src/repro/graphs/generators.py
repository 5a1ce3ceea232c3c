"""Synthetic graph generators standing in for the paper's datasets.

The paper evaluates on three web graphs (UK-2005, IT-2004, SK-2005) and one
social network (Sinaweibo) — 16–33 GB each, unavailable offline and beyond a
single local Spark session. We substitute **planted-partition graphs** whose
structure drives the same Layph effects (see DESIGN.md §5.1):

* ``uk_lite`` / ``it_lite`` / ``sk_lite``: many *small dense* communities with
  sparse cross edges — the web-graph regime where the paper's layered graph
  shrinks the skeleton dramatically.
* ``wb_lite``: few *large* communities plus high-degree hubs — the social
  regime where the paper reports Layph's weakest numbers (large subgraphs →
  expensive shortcut updates; replication can hurt SSSP).

Every generator is deterministic in ``seed`` and returns
``(edges, membership)`` where ``membership`` maps vertex id → planted
community id (the community-discovery module can either recover communities
itself or be handed the planted truth).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.graphs.schema import canonical_edges


@dataclass(frozen=True)
class GraphSpec:
    """Parameters of one planted-partition dataset (scaled by ``sf``)."""

    name: str
    n_vertices: int  # at sf=1.0
    community_size_lo: int
    community_size_hi: int
    community_fraction: float  # fraction of vertices inside communities
    intra_out_deg: float  # mean out-degree inside a community
    inter_edge_fraction: float  # cross edges as a fraction of intra edges
    portals_per_comm: int  # boundary "portal" vertices per community
    n_hubs: int  # high-degree vertices spraying edges into communities
    hub_subs: int  # communities each hub touches
    hub_edges_per_sub: int  # edges a hub sends into / takes from each


#: Dataset presets. Vertex counts at sf=1.0 are ~1/200 of the real graphs;
#: benchmarks run them at sf≈0.1 (a few thousand vertices) and tests at
#: sf≈0.01. Web graphs (uk/it/sk): small dense communities, few portals.
#: Social graph (wb): large communities, many portals, heavy hubs — the
#: regime where the paper reports Layph's weakest numbers.
SPECS: dict[str, GraphSpec] = {
    "uk_lite": GraphSpec("uk_lite", 200_000, 20, 60, 0.85, 6.0, 0.15, 3, 30, 4, 5),
    "it_lite": GraphSpec("it_lite", 220_000, 25, 70, 0.85, 7.0, 0.15, 3, 30, 4, 5),
    "sk_lite": GraphSpec("sk_lite", 260_000, 20, 80, 0.88, 8.0, 0.12, 2, 40, 5, 6),
    "wb_lite": GraphSpec("wb_lite", 290_000, 250, 700, 0.75, 6.0, 0.12, 10, 60, 6, 6),
}

DATASET_NAMES = list(SPECS)


def _dense_block(rng: np.random.Generator, members: np.ndarray, out_deg: float) -> tuple[np.ndarray, np.ndarray]:
    """Random intra-community edges: ~``out_deg`` per member, plus a directed
    ring so the community is strongly connected (messages can always cross it,
    matching the "dense subgraph" intuition of the paper)."""
    k = len(members)
    n_rand = int(out_deg * k)
    src = rng.choice(members, size=n_rand)
    dst = rng.choice(members, size=n_rand)
    ring_src = members
    ring_dst = np.roll(members, -1)
    return np.concatenate([src, ring_src]), np.concatenate([dst, ring_dst])


def planted_partition(
    *,
    n_vertices: int,
    community_size_lo: int,
    community_size_hi: int,
    community_fraction: float,
    intra_out_deg: float,
    inter_edge_fraction: float,
    portals_per_comm: int = 3,
    n_hubs: int = 0,
    hub_subs: int = 0,
    hub_edges_per_sub: int = 0,
    w_lo: float = 1.0,
    w_hi: float = 10.0,
    seed: int = 0,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Generate a directed weighted planted-partition graph.

    Cross-community edges only touch each community's few *portal* vertices
    (as in web graphs, where most pages link within their site) — this is
    what keeps |V_I|·|V_O| < |E_i| (Def. 2) true for planted communities.
    Hub vertices additionally spray several edges into random members of a
    few communities each (the Fig. 4 pattern that vertex replication fixes).

    Returns ``(edges, membership)``; ``membership`` has columns ``id, sub``
    and only covers vertices planted inside a community.
    """
    rng = np.random.default_rng(seed)
    ids = np.arange(n_vertices, dtype=np.int64)
    n_comm_vertices = int(n_vertices * community_fraction)

    # Carve community blocks out of the id space.
    sizes = []
    used = 0
    while used < n_comm_vertices:
        s = int(rng.integers(community_size_lo, community_size_hi + 1))
        s = min(s, n_comm_vertices - used)
        if s < max(3, community_size_lo // 2):
            break
        sizes.append(s)
        used += s
    srcs, dsts, mem_ids, mem_subs = [], [], [], []
    portals_in, portals_out, blocks = [], [], []
    pos = 0
    for sub, s in enumerate(sizes):
        members = ids[pos : pos + s]
        pos += s
        bs, bd = _dense_block(rng, members, intra_out_deg)
        srcs.append(bs)
        dsts.append(bd)
        mem_ids.append(members)
        mem_subs.append(np.full(s, sub, dtype=np.int64))
        k = min(portals_per_comm, s)
        portals_in.append(rng.choice(members, size=k, replace=False))
        portals_out.append(rng.choice(members, size=k, replace=False))
        blocks.append(members)
    outliers = ids[pos:]

    n_intra = int(sum(len(x) for x in srcs))
    # Cross edges between portal pools and outliers.
    in_pool = np.concatenate(portals_in + [outliers]) if blocks else outliers
    out_pool = np.concatenate(portals_out + [outliers]) if blocks else outliers
    n_inter = max(1, int(n_intra * inter_edge_fraction)) + 2 * len(outliers)
    crng = np.random.default_rng(seed + 1)
    srcs.append(crng.choice(out_pool, size=n_inter))
    dsts.append(crng.choice(in_pool, size=n_inter))

    # Hubs: chosen among outliers when possible; each touches a few
    # communities with several edges into/out of *random* members.
    if n_hubs and blocks:
        hub_pool = outliers if len(outliers) >= n_hubs else ids
        hrng = np.random.default_rng(seed + 3)
        hubs = hrng.choice(hub_pool, size=min(n_hubs, len(hub_pool)), replace=False)
        hsrc, hdst = [], []
        for h in hubs:
            tgt_subs = hrng.choice(len(blocks), size=min(hub_subs, len(blocks)), replace=False)
            for t in tgt_subs:
                m = hrng.choice(blocks[t], size=min(hub_edges_per_sub, len(blocks[t])))
                hsrc += [h] * len(m)
                hdst += list(m)
            rcv_subs = hrng.choice(len(blocks), size=min(hub_subs, len(blocks)), replace=False)
            for t in rcv_subs:
                m = hrng.choice(blocks[t], size=min(hub_edges_per_sub, len(blocks[t])))
                hsrc += list(m)
                hdst += [h] * len(m)
        srcs.append(np.array(hsrc, dtype=np.int64))
        dsts.append(np.array(hdst, dtype=np.int64))

    src = np.concatenate(srcs)
    dst = np.concatenate(dsts)
    w = np.random.default_rng(seed + 5).uniform(w_lo, w_hi, size=len(src)).round(3)
    edges = canonical_edges(pd.DataFrame({"src": src, "dst": dst, "w": w}))
    if mem_ids:
        membership = pd.DataFrame(
            {"id": np.concatenate(mem_ids), "sub": np.concatenate(mem_subs)}
        ).astype(np.int64)
    else:
        membership = pd.DataFrame({"id": [], "sub": []}).astype(np.int64)
    return edges, membership


def dataset(name: str, *, sf: float = 0.01, seed: int = 0) -> tuple[pd.DataFrame, pd.DataFrame]:
    """One of the four dataset presets at scale factor ``sf``.

    Community sizes stay constant across ``sf`` (as in the real graphs — a
    bigger crawl has *more* communities, not bigger ones), vertex counts
    scale linearly.
    """
    spec = SPECS[name]
    n = max(200, int(spec.n_vertices * sf))
    return planted_partition(
        n_vertices=n,
        community_size_lo=min(spec.community_size_lo, max(4, n // 20)),
        community_size_hi=min(spec.community_size_hi, max(6, n // 10)),
        community_fraction=spec.community_fraction,
        intra_out_deg=spec.intra_out_deg,
        inter_edge_fraction=spec.inter_edge_fraction,
        portals_per_comm=spec.portals_per_comm,
        n_hubs=min(spec.n_hubs, max(2, n // 120)),
        hub_subs=spec.hub_subs,
        hub_edges_per_sub=spec.hub_edges_per_sub,
        seed=seed,
    )


def fig2_graph() -> tuple[pd.DataFrame, pd.DataFrame]:
    """The paper's running example (Fig. 2a), reconstructed from Examples 2–6.

    Vertices v0..v8; subgraph G2 = {v0..v4} (entry v0, exit v4), subgraph
    G1 = {v5..v8} (v5 both entry and exit). Edge weights are chosen so every
    number in the paper's walk-through is reproduced exactly:
    SSSP from v0 converges to {0,1,4,1,2,5,6,7,7} and the G2 shortcuts from
    v0 are {v1:1, v2:4, v3:1, v4:2}.
    """
    rows = [
        # G2 interior structure
        (0, 1, 1.0),
        (0, 3, 1.0),
        (1, 2, 3.0),
        (3, 4, 1.0),
        (2, 4, 1.0),
        # G2 -> G1
        (4, 5, 3.0),
        # G1 interior structure
        (5, 6, 1.0),
        (6, 7, 1.0),
        (6, 8, 1.0),
        # G1 -> G2 (back edge making v5 an exit and v0 an entry)
        (5, 0, 2.0),
    ]
    edges = canonical_edges(pd.DataFrame(rows, columns=["src", "dst", "w"]))
    membership = pd.DataFrame(
        {"id": [0, 1, 2, 3, 4, 5, 6, 7, 8], "sub": [2, 2, 2, 2, 2, 1, 1, 1, 1]}
    ).astype(np.int64)
    return edges, membership


def fig2_delta() -> tuple[pd.DataFrame, pd.DataFrame]:
    """Fig. 2b's ΔG: delete edge (v3, v4), add edge (v3, v2) with weight 2."""
    added = pd.DataFrame({"src": [3], "dst": [2], "w": [2.0]})
    deleted = pd.DataFrame({"src": [3], "dst": [4]})
    return added, deleted
