"""Refinement (Algorithm 4): positive-clique output, non-decreasing f."""
import pytest

from repro.core.cd import init_state, objective
from repro.core.metrics import is_positive_clique
from repro.core.refine import refine
from repro.core.seacd import seacd

from tests.helpers import graph_from_triples, random_positive_graph


def test_path_refined_to_edge():
    # A path 0-1-2 is not a clique; refinement must land on one edge.
    g = graph_from_triples([(0, 1, 2.0), (1, 2, 3.0)])
    x, p = init_state(g, {0: 0.25, 1: 0.5, 2: 0.25})
    f0 = objective(x, p)
    refine(g, x, p)
    S = sorted(x)
    assert is_positive_clique(g, S)
    assert objective(x, p) >= f0 - 1e-9
    assert S == [1, 2]  # the heavier edge


def test_clique_untouched():
    g = graph_from_triples([(0, 1, 1.0), (1, 2, 1.0), (0, 2, 1.0)])
    x, p = init_state(g, {i: 1.0 / 3 for i in range(3)})
    refine(g, x, p)
    assert sorted(x) == [0, 1, 2]


def test_singleton_is_trivially_clique():
    g = graph_from_triples([(0, 1, 1.0)], n=3)
    x, p = init_state(g, {2: 1.0})
    refine(g, x, p)
    assert sorted(x) == [2]


@pytest.mark.parametrize("seed", range(10))
def test_refine_after_seacd(seed):
    """The NewSEA pipeline invariant: SEACD + Refinement always produces a
    positive-clique solution without losing objective."""
    g = random_positive_graph(12, 0.35, seed + 7)
    starts = [u for u in range(g.n) if g.adj[u]]
    if not starts:
        pytest.skip("empty sample")
    for u in starts[:4]:
        x, p, _ = seacd(g, start_vertex=u)
        f0 = objective(x, p)
        refine(g, x, p)
        assert is_positive_clique(g, sorted(x))
        assert objective(x, p) >= f0 - 1e-6
        assert sum(x.values()) == pytest.approx(1.0)


def test_support_only_shrinks():
    g = graph_from_triples(
        [(0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0), (3, 0, 1.0)]
    )  # 4-cycle: no triangle
    x, p = init_state(g, {i: 0.25 for i in range(4)})
    before = set(x)
    refine(g, x, p)
    assert set(x) <= before
    assert is_positive_clique(g, sorted(x))
