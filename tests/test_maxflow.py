"""Goldberg max-flow exact densest subgraph (test oracle) self-checks."""
import pytest

from repro.core.maxflow import _Dinic, exact_densest

from tests.helpers import brute_force_densest, graph_from_triples, random_positive_graph


def test_dinic_simple_path():
    net = _Dinic(4)
    net.add(0, 1, 3.0)
    net.add(1, 2, 2.0)
    net.add(2, 3, 5.0)
    assert net.max_flow(0, 3) == pytest.approx(2.0)


def test_dinic_parallel_paths():
    net = _Dinic(4)
    net.add(0, 1, 1.0)
    net.add(0, 2, 1.0)
    net.add(1, 3, 1.0)
    net.add(2, 3, 1.0)
    assert net.max_flow(0, 3) == pytest.approx(2.0)


def test_dinic_bottleneck():
    net = _Dinic(4)
    net.add(0, 1, 10.0)
    net.add(1, 2, 1.0)
    net.add(0, 2, 1.0)
    net.add(2, 3, 10.0)
    assert net.max_flow(0, 3) == pytest.approx(2.0)


def test_exact_densest_single_edge():
    g = graph_from_triples([(0, 1, 4.0)])
    S, dens = exact_densest(g)
    assert S == [0, 1]
    assert dens == pytest.approx(2.0)


def test_exact_densest_triangle():
    g = graph_from_triples(
        [(0, 1, 1.0), (1, 2, 1.0), (0, 2, 1.0), (2, 3, 0.1)]
    )
    S, dens = exact_densest(g)
    assert S == [0, 1, 2]
    assert dens == pytest.approx(1.0)


@pytest.mark.parametrize("seed", range(10))
def test_exact_densest_matches_brute_force(seed):
    g = random_positive_graph(9, 0.45, seed)
    if g.m == 0:
        pytest.skip("empty sample")
    _, dens = exact_densest(g)
    _, opt = brute_force_densest(g)  # double-counted
    assert 2.0 * dens == pytest.approx(opt, rel=1e-6)
