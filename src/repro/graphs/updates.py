"""ΔG generation and application.

Following §II-B, a batch update ΔG is a set of *unit updates*: single-edge
insertions and deletions (a weight change is a delete followed by an add).
Vertex updates (Fig. 5e) are expressed through their incident edges plus an
explicit vertex set so engines know which ids gained/lost root messages.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.graphs.schema import canonical_edges, vertex_ids


@dataclass
class GraphDelta:
    """A batch of unit updates.

    ``added``: edges to insert, columns ``src, dst, w``.
    ``deleted``: edges to remove, columns ``src, dst``.
    ``added_vertices`` / ``deleted_vertices``: vertex ids for vertex-update
    batches (empty for pure edge batches). Deleted vertices' incident edges
    must all appear in ``deleted``.
    """

    added: pd.DataFrame
    deleted: pd.DataFrame
    added_vertices: np.ndarray = field(default_factory=lambda: np.empty(0, np.int64))
    deleted_vertices: np.ndarray = field(default_factory=lambda: np.empty(0, np.int64))

    @property
    def size(self) -> int:
        return len(self.added) + len(self.deleted)

    def touched_vertices(self) -> np.ndarray:
        """All vertex ids that appear in any unit update."""
        parts = [
            self.added.src.to_numpy(np.int64),
            self.added.dst.to_numpy(np.int64),
            self.deleted.src.to_numpy(np.int64),
            self.deleted.dst.to_numpy(np.int64),
            self.added_vertices,
            self.deleted_vertices,
        ]
        return np.unique(np.concatenate(parts)) if parts else np.empty(0, np.int64)


def apply_delta(edges: pd.DataFrame, delta: GraphDelta) -> pd.DataFrame:
    """Return ``G ⊕ ΔG``: deletions first, then insertions (insert wins on
    re-added pairs, giving weight-change semantics)."""
    key = edges.src.to_numpy() * (2**32) + edges.dst.to_numpy()
    del_key = delta.deleted.src.to_numpy(np.int64) * (2**32) + delta.deleted.dst.to_numpy(np.int64)
    kept = edges[~np.isin(key, del_key)]
    out = pd.concat([kept, delta.added], ignore_index=True)
    return canonical_edges(out)


def random_edge_delta(
    edges: pd.DataFrame, *, n_add: int, n_del: int, seed: int = 0,
    w_lo: float = 1.0, w_hi: float = 10.0,
) -> GraphDelta:
    """Random ΔG as in §VI-A: ``n_add`` new edges between existing vertices
    and ``n_del`` removed existing edges, all chosen uniformly."""
    rng = np.random.default_rng(seed)
    ids = vertex_ids(edges)

    n_del = min(n_del, len(edges))
    del_idx = rng.choice(len(edges), size=n_del, replace=False) if n_del else []
    deleted = edges.iloc[list(del_idx)][["src", "dst"]].reset_index(drop=True)

    existing = set(zip(edges.src.to_numpy(), edges.dst.to_numpy()))
    src, dst = [], []
    attempts = 0
    while len(src) < n_add and attempts < 50 * max(1, n_add):
        attempts += 1
        u, v = rng.choice(ids), rng.choice(ids)
        if u != v and (u, v) not in existing:
            existing.add((u, v))
            src.append(u)
            dst.append(v)
    added = pd.DataFrame(
        {
            "src": np.array(src, np.int64),
            "dst": np.array(dst, np.int64),
            "w": rng.uniform(w_lo, w_hi, size=len(src)).round(3),
        }
    )
    return GraphDelta(added=added, deleted=deleted)


def random_vertex_delta(
    edges: pd.DataFrame, *, n_add: int, n_del: int, edges_per_vertex: int = 4,
    seed: int = 0, w_lo: float = 1.0, w_hi: float = 10.0,
) -> GraphDelta:
    """Vertex-update ΔG (Fig. 5e): ``n_del`` existing vertices removed with
    all incident edges; ``n_add`` fresh vertices wired to random existing
    vertices with ``edges_per_vertex`` out- and in-edges each."""
    rng = np.random.default_rng(seed)
    ids = vertex_ids(edges)

    del_vs = rng.choice(ids, size=min(n_del, len(ids) // 4), replace=False).astype(np.int64)
    del_mask = edges.src.isin(del_vs) | edges.dst.isin(del_vs)
    deleted = edges[del_mask][["src", "dst"]].reset_index(drop=True)

    new_ids = (ids.max() + 1 + np.arange(n_add)).astype(np.int64)
    survivors = ids[~np.isin(ids, del_vs)]
    src, dst = [], []
    for v in new_ids:
        outs = rng.choice(survivors, size=edges_per_vertex)
        ins = rng.choice(survivors, size=edges_per_vertex)
        src += [v] * edges_per_vertex + list(ins)
        dst += list(outs) + [v] * edges_per_vertex
    added = pd.DataFrame(
        {
            "src": np.array(src, np.int64),
            "dst": np.array(dst, np.int64),
            "w": rng.uniform(w_lo, w_hi, size=len(src)).round(3),
        }
    )
    added = added[added.src != added.dst].drop_duplicates(["src", "dst"])
    return GraphDelta(
        added=added.reset_index(drop=True),
        deleted=deleted,
        added_vertices=new_ids,
        deleted_vertices=np.sort(del_vs),
    )
