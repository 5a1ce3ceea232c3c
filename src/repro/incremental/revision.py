"""Revision-message deduction (§II-B, §V) from memoized converged states.

Two algorithm classes, mirroring Ingress's memoization policies:

* **sum** (accumulative, invertible — PageRank, PHP): in the accumulative
  model a converged vertex ``u`` has forwarded total mass ``x*_u − x0_u``
  along each out-edge per unit of prepared weight. A prepared-weight change
  ``w_old → w_new`` on ``(u,v)`` is therefore revised by one injected delta
  ``(x*_u − x0_u) · (w_new − w_old)`` at ``v`` (cancellation when negative,
  compensation when positive). Diffing *prepared* edges captures PageRank's
  out-degree side effects for free. New vertices contribute their root
  messages.

* **min** (selective, non-invertible — SSSP, BFS): deletions cannot be
  inverted; instead we derive the dependency tree from the converged states
  (parent = the support edge achieving ``x*_v``), trim the subtree under any
  vertex whose chosen parent edge disappeared or grew (KickStarter-style),
  and seed re-relaxation from intact in-neighbors plus inserted edges.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.engine.algorithms import Algorithm

INF = float("inf")
_EPS = 1e-9


# --------------------------------------------------------------------------
# sum workloads
# --------------------------------------------------------------------------

def prepared_edge_diff(old_prepared: pd.DataFrame, new_prepared: pd.DataFrame) -> pd.DataFrame:
    """Per-(src,dst) prepared-weight diff.

    Columns ``src, dst, w_old, w_new`` (NaN on the missing side) restricted
    to pairs whose weight changed, appeared, or disappeared.
    """
    m = old_prepared.merge(
        new_prepared, on=["src", "dst"], how="outer", suffixes=("_old", "_new")
    )
    changed = (
        m.w_old.isna()
        | m.w_new.isna()
        | ((m.w_new - m.w_old).abs() > _EPS)
    )
    return m[changed][["src", "dst", "w_old", "w_new"]].reset_index(drop=True)


def sum_revision(
    old_prepared: pd.DataFrame,
    new_prepared: pd.DataFrame,
    states: pd.Series,
    algo: Algorithm,
    *,
    new_vertices: np.ndarray | None = None,
) -> pd.Series:
    """Injected revision deltas, id-indexed and aggregated per target."""
    diff = prepared_edge_diff(old_prepared, new_prepared)
    dw = diff.w_new.fillna(0.0).to_numpy() - diff.w_old.fillna(0.0).to_numpy()
    mass = (states - algo.zero_state).reindex(diff.src).fillna(0.0).to_numpy()
    inj = pd.Series(mass * dw, index=diff.dst.to_numpy(np.int64))
    if new_vertices is not None and len(new_vertices):
        roots = algo.root_messages(np.asarray(new_vertices, np.int64))
        roots = roots[roots.index.isin(new_vertices)]
        inj = pd.concat([inj, roots])
    return inj.groupby(level=0).sum()


# --------------------------------------------------------------------------
# min workloads
# --------------------------------------------------------------------------

def min_parents(prepared: pd.DataFrame, states: pd.Series, algo: Algorithm) -> pd.DataFrame:
    """Dependency tree: chosen parent edge per vertex (columns id, parent).

    A vertex supported by its root message has no parent and is never
    trimmed. Among in-edges achieving ``x_u + w == x_v`` the smallest src id
    is chosen (deterministic, KickStarter-style single dependency).
    """
    x_src = states.reindex(prepared.src).to_numpy()
    x_dst = states.reindex(prepared.dst).to_numpy()
    with np.errstate(invalid="ignore"):  # inf-state vertices compare to NaN
        achieves = np.abs(x_src + prepared.w.to_numpy() - x_dst) <= _EPS
    achieves &= np.isfinite(x_dst)
    cand = prepared[achieves][["src", "dst"]]
    parents = (
        cand.groupby("dst").src.min().rename("parent").rename_axis("id").reset_index()
    )
    for v, m0 in algo.roots.items():
        if v in states.index and abs(states[v] - m0) <= _EPS:
            parents = parents[parents.id != v]
    return parents.reset_index(drop=True)


def min_trim_set(parents: pd.DataFrame, seeds: np.ndarray) -> np.ndarray:
    """All dependency-tree descendants of ``seeds`` (inclusive)."""
    reset = set(int(s) for s in seeds)
    frontier = set(reset)
    child_of = parents.groupby("parent").id.apply(list).to_dict()
    while frontier:
        nxt = set()
        for p in frontier:
            for c in child_of.get(p, []):
                if c not in reset:
                    reset.add(int(c))
                    nxt.add(int(c))
        frontier = nxt
    return np.array(sorted(reset), dtype=np.int64)


def min_revision(
    old_prepared: pd.DataFrame,
    new_prepared: pd.DataFrame,
    states: pd.Series,
    algo: Algorithm,
    *,
    extra_seeds: np.ndarray | None = None,
) -> tuple[np.ndarray, pd.Series, int]:
    """Trim set + re-relaxation seed messages + activation count.

    Returns ``(reset_ids, seed_messages, activations)``. Seed messages are
    min-aggregated candidates ``x_u + w`` over new-graph edges from intact
    vertices into the reset region, plus candidates along inserted /
    lowered edges, plus root messages of reset roots. Each candidate
    evaluation is one F application and is counted.
    """
    diff = prepared_edge_diff(old_prepared, new_prepared)
    # Edge deleted or weight increased -> the old support may be invalid.
    worse = diff[diff.w_new.isna() | (diff.w_new > diff.w_old)]
    parents = min_parents(old_prepared, states, algo)
    pkey = parents.set_index("id").parent
    dep = worse.merge(parents, left_on=["src", "dst"], right_on=["parent", "id"])
    seeds = dep.dst.unique().astype(np.int64)
    if extra_seeds is not None and len(extra_seeds):
        # Conservative extra invalidation roots (e.g. vertices whose layered
        # role changed so their old supports are no longer represented).
        seeds = np.union1d(seeds, np.asarray(extra_seeds, np.int64))
    reset = min_trim_set(parents, seeds) if len(seeds) else np.empty(0, np.int64)
    reset_set = set(int(r) for r in reset)

    x = states.copy()
    x.loc[x.index.isin(reset_set)] = INF

    # Support edges from intact vertices into the reset region.
    into = new_prepared[
        new_prepared.dst.isin(reset_set) & ~new_prepared.src.isin(reset_set)
    ]
    # Edge inserted or weight lowered anywhere (improvement candidates).
    better = diff[diff.w_old.isna() | (diff.w_new < diff.w_old)]
    low = new_prepared.merge(better[["src", "dst"]], on=["src", "dst"])
    low = low[~low.src.isin(reset_set)]
    cand = pd.concat([into, low], ignore_index=True)
    acts = len(cand)
    m = (x.reindex(cand.src).to_numpy() + cand.w.to_numpy())
    seed_msgs = pd.Series(m, index=cand.dst.to_numpy(np.int64))
    seed_msgs = seed_msgs[np.isfinite(seed_msgs.to_numpy())]
    root_rows = pd.Series(
        {v: m0 for v, m0 in algo.roots.items() if v in reset_set}, dtype=float
    )
    seed_msgs = pd.concat([seed_msgs, root_rows])
    seed_msgs = seed_msgs.groupby(level=0).min()
    _ = pkey  # retained for debuggability
    return reset, seed_msgs, acts
