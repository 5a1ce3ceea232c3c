"""Layered graph: offline construction (§IV-A) and incremental update (§IV-B).

A :class:`LayeredGraph` owns
  * the real graph (``base_edges``) and its prepared weights,
  * the replicated ``layer_edges`` (prepared weights rerouted through
    proxies — the physical graph all propagation runs on),
  * the structure (membership incl. proxies, boundary roles, replication
    plan, forced root entries),
  * the split into upper-layer original edges (cross edges) and
    intra-subgraph edges, and
  * the shortcut tables (entry → every subgraph vertex).

Community membership is frozen across ΔG batches (DESIGN.md §5.3); roles,
layer edges, and the shortcuts of affected subgraphs are recomputed
incrementally.
"""
from __future__ import annotations

from dataclasses import dataclass, replace as dc_replace

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.engine.algorithms import Algorithm
from repro.graphs.schema import vertex_ids
from repro.graphs.updates import GraphDelta, apply_delta
from repro.incremental.revision import prepared_edge_diff
from repro.layph.community import lpa_communities, planted_communities
from repro.layph.replication import apply_plan, build_plan
from repro.layph.shortcuts import compute_shortcuts, update_shortcuts
from repro.layph.structure import Structure, compute_roles, density_filter


@dataclass
class LayeredGraph:
    algo: Algorithm
    base_edges: pd.DataFrame
    prepared: pd.DataFrame
    layer_edges: pd.DataFrame
    structure: Structure
    up_edges: pd.DataFrame  # cross edges (upper-layer originals)
    intra_edges: pd.DataFrame  # src, dst, w, sub
    shortcuts: pd.DataFrame  # sub, entry, dst, w

    # ---- derived views ---------------------------------------------------
    def boundary_ids(self) -> np.ndarray:
        return self.structure.roles.boundary().id.to_numpy(np.int64)

    def interior_ids(self) -> np.ndarray:
        return self.structure.roles.interior().id.to_numpy(np.int64)

    def upper_vertex_ids(self) -> np.ndarray:
        """L_up vertices: boundary members plus every non-member endpoint."""
        all_ids = vertex_ids(self.layer_edges)
        members = self.structure.membership.id.to_numpy(np.int64)
        outliers = np.setdiff1d(all_ids, members)
        return np.union1d(outliers, self.boundary_ids())

    def upper_shortcut_edges(self) -> pd.DataFrame:
        """Shortcut rows whose target is boundary — these live on L_up."""
        b = set(self.boundary_ids())
        sc = self.shortcuts
        return sc[sc.dst.isin(b)].reset_index(drop=True)

    def assignment_shortcuts(self) -> pd.DataFrame:
        """Shortcut rows whose target is interior — the cross-layer table."""
        i = set(self.interior_ids())
        sc = self.shortcuts
        return sc[sc.dst.isin(i)].reset_index(drop=True)

    def upper_graph(self) -> pd.DataFrame:
        """Combined L_up propagation graph: columns src, dst, w, etype
        (0 = original cross edge, 1 = shortcut)."""
        o = self.up_edges.assign(etype=0)[["src", "dst", "w", "etype"]]
        sc = self.upper_shortcut_edges()
        s = pd.DataFrame(
            {"src": sc.entry, "dst": sc.dst, "w": sc.w, "etype": 1}
        )
        if self.algo.is_min:  # a min self-shortcut can never improve anything
            s = s[s.src != s.dst]
        return pd.concat([o, s], ignore_index=True).reset_index(drop=True)

    def sizes(self) -> dict:
        """Size report backing Fig. 8a and Fig. 11a."""
        upv = self.upper_vertex_ids()
        up_sc = self.upper_shortcut_edges()
        return {
            "orig_vertices": int(len(vertex_ids(self.base_edges))),
            "orig_edges": int(len(self.base_edges)),
            "upper_vertices": int(len(upv)),
            "upper_edges": int(len(self.up_edges) + len(up_sc)),
            "n_subgraphs": int(self.structure.membership["sub"].nunique()),
            "n_proxies": int(len(self.structure.plan)),
            "shortcut_rows": int(len(self.shortcuts)),
            "extra_space_ratio": float(len(self.shortcuts) / max(1, len(self.base_edges))),
        }


def build_layered(
    spark: SparkSession,
    edges: pd.DataFrame,
    algo: Algorithm,
    *,
    membership: pd.DataFrame | None = None,
    K: int = 1000,
    replicate: bool = True,
    rep_threshold: int = 3,
    lpa_iters: int = 4,
    tol: float | None = None,
) -> tuple[LayeredGraph, int]:
    """Offline layering (§IV-A): discovery → density filter → replication →
    roles → shortcut deduction. Returns the layered graph and the number of
    activations spent on shortcut deduction.

    ``membership``: pass the generator's planted communities to skip LPA
    (tests/benchmarks), or None to run discovery.
    """
    if membership is None:
        membership = lpa_communities(spark, edges, K=K, n_iters=lpa_iters)
    else:
        membership = planted_communities(membership, K=K)

    prepared = algo.prepare(edges)
    forced = {algo.source} if (algo.source is not None and algo.is_min) else set()

    # Replication is planned on every candidate community first; the Def. 2
    # density test then runs on the *reshaped* graph (§IV-A1: replication is
    # what makes high-degree-boundary communities keep few entries/exits).
    plan_all = (
        build_plan(prepared, membership, threshold=rep_threshold, exclude=forced)
        if replicate
        else pd.DataFrame(columns=["host", "sub", "direction", "proxy"])
    )
    layer0, mem0 = apply_plan(prepared, membership, plan_all, algo.identity)
    roles0 = compute_roles(layer0, mem0, forced_entries=forced)
    dense0 = density_filter(layer0, mem0, roles0, relabel=False)
    kept = set(dense0["sub"].unique())
    dense = membership[membership["sub"].isin(kept)].reset_index(drop=True)
    plan = plan_all[plan_all["sub"].isin(kept)].reset_index(drop=True)
    layer_edges, mem = apply_plan(prepared, dense, plan, algo.identity)
    roles = compute_roles(layer_edges, mem, forced_entries=forced)
    structure = Structure(mem, roles, plan, forced)
    up_edges, intra = structure.split_edges(layer_edges)
    entries = roles.entries()[["id", "sub"]]
    shortcuts, acts = compute_shortcuts(spark, intra, entries, algo, tol=tol)
    lg = LayeredGraph(
        algo=algo, base_edges=edges, prepared=prepared, layer_edges=layer_edges,
        structure=structure, up_edges=up_edges, intra_edges=intra, shortcuts=shortcuts,
    )
    return lg, acts


def update_layered(
    spark: SparkSession,
    lg: LayeredGraph,
    delta: GraphDelta,
    *,
    tol: float | None = None,
) -> tuple[LayeredGraph, pd.DataFrame, np.ndarray, int]:
    """Apply ΔG to the layered graph (§IV-B).

    Keeps membership frozen, re-applies the replication plan to the new
    prepared edges, recomputes roles, and recomputes shortcut tables for
    *affected subgraphs only* (internal edges or entry set changed).
    Returns ``(new_lg, layer_diff, affected_subs, activations)`` where
    ``layer_diff`` is the prepared-weight diff on the layer graph.
    """
    algo = lg.algo
    new_base = apply_delta(lg.base_edges, delta)
    new_prepared = algo.prepare(new_base)

    real_mem = lg.structure.membership[
        ~lg.structure.membership.id.isin(lg.structure.proxy_ids)
    ]
    if len(delta.deleted_vertices):
        real_mem = real_mem[~real_mem.id.isin(delta.deleted_vertices)]
    new_layer, new_mem = apply_plan(
        new_prepared, real_mem.reset_index(drop=True), lg.structure.plan, algo.identity
    )
    roles = compute_roles(new_layer, new_mem, forced_entries=lg.structure.forced_entries)
    structure = Structure(new_mem, roles, lg.structure.plan, lg.structure.forced_entries)
    up_edges, intra = structure.split_edges(new_layer)

    diff = prepared_edge_diff(lg.layer_edges, new_layer)

    # Structurally affected subs: internal edge changed, or entry set changed.
    sub_of = structure.sub_of
    old_sub_of = lg.structure.sub_of
    ds = sub_of.reindex(diff.src).to_numpy(float)
    dd = sub_of.reindex(diff.dst).to_numpy(float)
    internal_changed = ds[(~np.isnan(ds)) & (ds == dd)].astype(np.int64)
    new_entries = roles.entries()[["id", "sub"]]
    # Any boundary-role change (entry OR exit set) marks the sub affected:
    # entry changes alter the shortcut table, exit changes move vertices
    # between L_up and the interior.
    old_b = lg.structure.roles.table[["id", "sub", "is_entry", "is_exit"]]
    new_b = roles.table[["id", "sub", "is_entry", "is_exit"]]
    m = old_b.merge(new_b, how="outer", indicator=True)
    entry_changed = m[m._merge != "both"]["sub"].to_numpy(np.int64)
    # Subs that lost members (vertex deletion) also need recomputation.
    gone = lg.structure.membership[
        ~lg.structure.membership.id.isin(new_mem.id)
    ]["sub"].to_numpy(np.int64)
    affected = np.unique(np.concatenate([internal_changed, entry_changed, gone]))

    keep = lg.shortcuts[~lg.shortcuts["sub"].isin(affected)]
    # Changed intra edges per affected sub (both endpoints in the same sub,
    # judged on the NEW membership — role moves are covered by the
    # boundary-change test above).
    chg = diff.copy()
    # Classify with the OLD membership as fallback: a deleted member's intra
    # edges must still reach its subgraph's shortcut-update kernel.
    cs = np.where(
        np.isnan(sub_of.reindex(chg.src).to_numpy(float)),
        old_sub_of.reindex(chg.src).to_numpy(float),
        sub_of.reindex(chg.src).to_numpy(float),
    )
    cd = np.where(
        np.isnan(sub_of.reindex(chg.dst).to_numpy(float)),
        old_sub_of.reindex(chg.dst).to_numpy(float),
        sub_of.reindex(chg.dst).to_numpy(float),
    )
    same_c = (~np.isnan(cs)) & (cs == cd)
    chg = chg[same_c].assign(sub=cs[same_c].astype(np.int64))
    fresh, acts = update_shortcuts(
        spark, intra, new_entries, lg.shortcuts, chg, algo, subs=affected, tol=tol
    )
    shortcuts = pd.concat([keep, fresh], ignore_index=True)

    new_lg = dc_replace(
        lg,
        base_edges=new_base,
        prepared=new_prepared,
        layer_edges=new_layer,
        structure=structure,
        up_edges=up_edges,
        intra_edges=intra,
        shortcuts=shortcuts,
    )
    return new_lg, diff, affected, acts
