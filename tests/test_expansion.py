"""SEA Expansion operation: candidates, simplex invariant, improvement."""
import pytest

from repro.core.cd import init_state, local_kkt, objective
from repro.core.expansion import expand, expansion_candidates

from tests.helpers import graph_from_triples, random_positive_graph


def test_candidates_on_star():
    g = graph_from_triples([(0, 1, 2.0), (0, 2, 3.0)])
    x, p = init_state(g, {0: 1.0})
    # f = 0; both neighbors have (Dx) > 0.
    assert set(expansion_candidates(g, x, p)) == {1, 2}


def test_candidates_exclude_support():
    g = graph_from_triples([(0, 1, 2.0)])
    x, p = init_state(g, {0: 0.5, 1: 0.5})
    assert expansion_candidates(g, x, p) == []


def test_expand_preserves_simplex():
    g = graph_from_triples([(0, 1, 4.0), (1, 2, 2.0), (0, 2, 2.0), (2, 3, 3.0)])
    x, p = init_state(g, {0: 0.5, 1: 0.5})
    Z = expansion_candidates(g, x, p)
    if Z:
        expand(g, x, p, Z)
    assert sum(x.values()) == pytest.approx(1.0)
    assert all(v >= -1e-12 for v in x.values())


@pytest.mark.parametrize("seed", range(8))
def test_expand_from_exact_kkt_never_decreases(seed):
    """From an *exact* local KKT point, expansion cannot reduce f —
    the property whose violation (under loose convergence) the paper
    counts as SEA errors."""
    g = random_positive_graph(9, 0.5, seed)
    if g.m < 4:
        pytest.skip("sparse sample")
    # Local KKT on a half-size support, tight tolerance.
    S = list(range(g.n // 2 + 1))
    x, p = init_state(g, {i: 1.0 / len(S) for i in S})
    local_kkt(g, x, p, S, tol=1e-12)
    f0 = objective(x, p)
    Z = expansion_candidates(g, x, p)
    if not Z:
        pytest.skip("nothing to expand")
    expand(g, x, p, Z)
    assert objective(x, p) >= f0 - 1e-8


def test_expand_grows_support():
    g = graph_from_triples([(0, 1, 1.0), (0, 2, 5.0), (1, 2, 5.0)])
    x, p = init_state(g, {0: 0.5, 1: 0.5})
    Z = expansion_candidates(g, x, p)
    assert Z == [2]
    expand(g, x, p, Z)
    assert x.get(2, 0.0) > 0.0
