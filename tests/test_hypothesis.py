"""Property-based tests (hypothesis) for the optimization core."""
import hypothesis.strategies as st
import pytest
from hypothesis import given, settings

from repro.core.cd import init_state, local_kkt, objective
from repro.core.dcsad import dcs_greedy
from repro.core.greedy import greedy_peel
from repro.core.metrics import is_positive_clique
from repro.core.refine import refine
from repro.core.seacd import seacd

from tests.helpers import graph_from_triples


@st.composite
def small_graphs(draw, max_n=8, positive=False):
    n = draw(st.integers(min_value=2, max_value=max_n))
    triples = []
    lo = 0.1 if positive else -4.0
    for i in range(n):
        for j in range(i + 1, n):
            if draw(st.booleans()):
                w = draw(
                    st.floats(
                        min_value=lo, max_value=5.0,
                        allow_nan=False, allow_infinity=False,
                    )
                )
                if abs(w) > 1e-6:
                    triples.append((i, j, w))
    return graph_from_triples(triples, n=n)


@settings(max_examples=40, deadline=None)
@given(small_graphs())
def test_greedy_density_is_achievable(g):
    S, rho = greedy_peel(g)
    assert rho == pytest.approx(2.0 * g.subgraph_weight(S) / len(S))


@settings(max_examples=40, deadline=None)
@given(small_graphs())
def test_dcsad_result_connected(g):
    r = dcs_greedy(g)
    if len(r.S) > 1:
        assert len(g.connected_components_of(r.S)) == 1


@settings(max_examples=30, deadline=None)
@given(small_graphs(positive=True))
def test_seacd_on_simplex(g):
    u = next((v for v in range(g.n) if g.adj[v]), None)
    if u is None:
        return
    x, p, _ = seacd(g, start_vertex=u)
    assert sum(x.values()) == pytest.approx(1.0, abs=1e-6)
    assert all(v >= 0 for v in x.values())


@settings(max_examples=30, deadline=None)
@given(small_graphs(positive=True))
def test_refine_yields_positive_clique(g):
    u = next((v for v in range(g.n) if g.adj[v]), None)
    if u is None:
        return
    x, p, _ = seacd(g, start_vertex=u)
    f0 = objective(x, p)
    refine(g, x, p)
    assert is_positive_clique(g, sorted(x))
    assert objective(x, p) >= f0 - 1e-6


@settings(max_examples=30, deadline=None)
@given(small_graphs(positive=True), st.integers(min_value=0, max_value=7))
def test_local_kkt_never_decreases(g, start):
    if start >= g.n or not g.adj[start]:
        return
    S = [v for v in range(g.n) if g.adj[v]]
    x, p = init_state(g, {start: 1.0})
    f0 = objective(x, p)
    local_kkt(g, x, p, S)
    assert objective(x, p) >= f0 - 1e-9
