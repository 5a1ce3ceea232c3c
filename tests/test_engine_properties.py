"""Property-based checks of the local vertex-centric kernel (hypothesis)."""
import numpy as np
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.engine import algorithms as alg
from repro.engine.local import converge
from repro.graphs.schema import canonical_edges, vertex_ids
from repro.reference import assert_states_close, pagerank_reference, sssp_reference


@st.composite
def random_graph(draw, max_n=14):
    n = draw(st.integers(3, max_n))
    m = draw(st.integers(2, 3 * n))
    src = draw(st.lists(st.integers(0, n - 1), min_size=m, max_size=m))
    dst = draw(st.lists(st.integers(0, n - 1), min_size=m, max_size=m))
    w = draw(st.lists(st.floats(0.5, 9.5), min_size=m, max_size=m))
    pdf = canonical_edges(pd.DataFrame({"src": src, "dst": dst, "w": np.round(w, 2)}))
    return pdf


@settings(max_examples=40, deadline=None)
@given(edges=random_graph())
def test_min_engine_matches_dijkstra(edges):
    if len(edges) == 0:
        return
    algo = alg.sssp(source=int(edges.src.iloc[0]))
    ids = vertex_ids(edges)
    run = converge(algo.prepare(edges), algo.initial_states(ids),
                   algo.root_messages(ids), algo)
    assert_states_close(run.states, sssp_reference(edges, algo.source))


@settings(max_examples=25, deadline=None)
@given(edges=random_graph(), d=st.sampled_from([0.3, 0.6, 0.85]))
def test_sum_engine_matches_linear_solve(edges, d):
    if len(edges) == 0:
        return
    algo = alg.pagerank(d=d, tol=1e-11)
    ids = vertex_ids(edges)
    run = converge(algo.prepare(edges), algo.initial_states(ids),
                   algo.root_messages(ids), algo)
    assert_states_close(run.states, pagerank_reference(edges, d), atol=1e-6, rtol=1e-5)


@settings(max_examples=25, deadline=None)
@given(edges=random_graph(), scale=st.floats(0.1, 3.0))
def test_sum_engine_is_linear_in_injections(edges, scale):
    """Doubling the injected delta doubles the state delta (invertibility —
    the property Ingress-style cancellation relies on)."""
    if len(edges) == 0:
        return
    algo = alg.pagerank(d=0.5, tol=1e-12)
    ids = vertex_ids(edges)
    x0 = pd.Series(0.0, index=ids)
    tgt = int(ids[0])
    one = converge(algo.prepare(edges), x0, pd.Series({tgt: 1.0}), algo).states
    scaled = converge(algo.prepare(edges), x0, pd.Series({tgt: scale}), algo).states
    assert_states_close(scaled, one * scale, atol=1e-6 * max(1, scale), rtol=1e-5)


@settings(max_examples=25, deadline=None)
@given(edges=random_graph())
def test_min_engine_idempotent_on_reinjection(edges):
    """Re-injecting the converged states changes nothing (min idempotence —
    why Layph needs no message provenance for traversal workloads)."""
    if len(edges) == 0:
        return
    algo = alg.sssp(source=int(edges.src.iloc[0]))
    ids = vertex_ids(edges)
    first = converge(algo.prepare(edges), algo.initial_states(ids),
                     algo.root_messages(ids), algo)
    again = converge(
        algo.prepare(edges), first.states,
        first.states[np.isfinite(first.states.to_numpy(float))], algo,
    )
    assert_states_close(again.states, first.states)


@settings(max_examples=20, deadline=None)
@given(edges=random_graph())
def test_activation_count_bounded_by_edges_times_iters(edges):
    if len(edges) == 0:
        return
    algo = alg.bfs(source=int(edges.src.iloc[0]))
    ids = vertex_ids(edges)
    run = converge(algo.prepare(edges), algo.initial_states(ids),
                   algo.root_messages(ids), algo)
    assert 0 <= run.activations <= len(edges) * max(1, run.iterations)
