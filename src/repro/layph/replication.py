"""Vertex replication (§IV-A1): proxy vertices that shrink the skeleton.

A host vertex ``v`` with ≥ ``threshold`` prepared edges into (resp. out of)
a dense subgraph ``G_i`` gets a proxy ``v'`` planted inside ``G_i``:

* direction 'in'  (v → many members):  edges become  v → v' (⊗-identity)
  and v' → t (original prepared weight) — v' is the sole entry for v.
* direction 'out' (many members → v):  edges become  s → v' (weight) and
  v' → v (⊗-identity) — v' is the sole exit toward v.

Because the identity weight is 0 for '+' and 1 for '·', rerouting through a
proxy is semantics-preserving on *prepared* weights (PageRank's d/N_u was
already baked in before rerouting). The plan (host, sub, direction, proxy)
is frozen at build time and re-applied to every updated edge list, so the
layered structure stays stable across small ΔG (as in the paper).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.graphs.schema import canonical_edges

#: Reserved id range for proxy vertices — far above any real vertex id so
#: ΔG-inserted vertices can never collide with a proxy.
PROXY_ID_BASE = np.int64(1) << 40


def build_plan(
    prepared: pd.DataFrame,
    membership: pd.DataFrame,
    *,
    threshold: int = 3,
    exclude: set[int] = frozenset(),
) -> pd.DataFrame:
    """Choose (host, sub, direction) triples worth replicating.

    ``exclude`` hosts (algorithm roots) are never replicated so root
    messages always enter the layered system at a real upper-layer vertex.
    Proxy ids are allocated after the current max vertex id.
    """
    sub_of = membership.set_index("id")["sub"]
    s = sub_of.reindex(prepared.src).to_numpy(float)
    d = sub_of.reindex(prepared.dst).to_numpy(float)

    # §IV-A1: replicate when the number of DISTINCT entry (resp. exit)
    # vertices sharing this host exceeds the threshold — a host hammering a
    # single portal gains nothing from a proxy.
    cross_in = prepared[(~np.isnan(d)) & ((np.isnan(s)) | (s != d))]
    d_in = d[(~np.isnan(d)) & ((np.isnan(s)) | (s != d))].astype(np.int64)
    into = (
        pd.DataFrame(
            {"host": cross_in.src.to_numpy(np.int64), "sub": d_in,
             "tgt": cross_in.dst.to_numpy(np.int64)}
        )
        .groupby(["host", "sub"])["tgt"].nunique().rename("n").reset_index()
    )
    into = into[into.n >= threshold][["host", "sub"]]
    into["direction"] = "in"

    cross_out = prepared[(~np.isnan(s)) & ((np.isnan(d)) | (s != d))]
    s_out = s[(~np.isnan(s)) & ((np.isnan(d)) | (s != d))].astype(np.int64)
    outof = (
        pd.DataFrame(
            {"host": cross_out.dst.to_numpy(np.int64), "sub": s_out,
             "tgt": cross_out.src.to_numpy(np.int64)}
        )
        .groupby(["host", "sub"])["tgt"].nunique().rename("n").reset_index()
    )
    outof = outof[outof.n >= threshold][["host", "sub"]]
    outof["direction"] = "out"

    plan = pd.concat([into, outof], ignore_index=True)
    plan = plan[~plan.host.isin(exclude)]
    # A host that is itself a member of the target sub needs no proxy.
    host_sub = sub_of.reindex(plan.host).to_numpy(float)
    plan = plan[np.isnan(host_sub) | (host_sub != plan["sub"].to_numpy())]
    plan = plan.sort_values(["host", "sub", "direction"]).reset_index(drop=True)
    # Proxies live in a reserved high id range so they can never collide
    # with vertices inserted later by ΔG batches.
    plan["proxy"] = PROXY_ID_BASE + np.arange(len(plan), dtype=np.int64)
    return plan


def apply_plan(
    prepared: pd.DataFrame,
    membership: pd.DataFrame,
    plan: pd.DataFrame,
    identity: float,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Reroute a prepared edge list through the plan's proxies.

    Returns ``(layer_edges, membership_with_proxies)``. Host↔proxy link
    edges carry the ⊗-identity weight; a proxy with no remaining rerouted
    edges simply disappears from the edge list.
    """
    if len(plan) == 0:
        return prepared.reset_index(drop=True), membership.copy()
    sub_of = membership.set_index("id")["sub"]
    e = prepared.copy()
    s_sub = sub_of.reindex(e.src).to_numpy(float)
    d_sub = sub_of.reindex(e.dst).to_numpy(float)

    pin = plan[plan.direction == "in"].set_index(["host", "sub"]).proxy
    pout = plan[plan.direction == "out"].set_index(["host", "sub"]).proxy

    # 'in' reroute: (host -> t in sub) where host outside sub
    key_in = pd.MultiIndex.from_arrays(
        [e.src.to_numpy(np.int64), np.nan_to_num(d_sub, nan=-1).astype(np.int64)]
    )
    prx_in = pin.reindex(key_in).to_numpy(float)
    is_cross = np.isnan(s_sub) | (s_sub != d_sub)
    m_in = (~np.isnan(prx_in)) & (~np.isnan(d_sub)) & is_cross

    # 'out' reroute: (s in sub -> host) where host outside sub
    key_out = pd.MultiIndex.from_arrays(
        [e.dst.to_numpy(np.int64), np.nan_to_num(s_sub, nan=-1).astype(np.int64)]
    )
    prx_out = pout.reindex(key_out).to_numpy(float)
    m_out = (~np.isnan(prx_out)) & (~np.isnan(s_sub)) & is_cross & ~m_in

    parts = [e[~(m_in | m_out)]]
    if m_in.any():
        r = e[m_in].copy()
        r["src"] = prx_in[m_in].astype(np.int64)  # proxy -> target (weight kept)
        parts.append(r)
        links = pd.DataFrame(
            {"src": e.src.to_numpy()[m_in], "dst": prx_in[m_in].astype(np.int64)}
        ).drop_duplicates()
        links["w"] = identity  # host -> proxy
        parts.append(links)
    if m_out.any():
        r = e[m_out].copy()
        r["dst"] = prx_out[m_out].astype(np.int64)  # source -> proxy (weight kept)
        parts.append(r)
        links = pd.DataFrame(
            {"src": prx_out[m_out].astype(np.int64), "dst": e.dst.to_numpy()[m_out]}
        ).drop_duplicates()
        links["w"] = identity  # proxy -> host
        parts.append(links)

    layer = canonical_edges(pd.concat(parts, ignore_index=True))
    mem = pd.concat(
        [membership, plan.rename(columns={"proxy": "id"})[["id", "sub"]]],
        ignore_index=True,
    ).astype(np.int64)
    return layer, mem
