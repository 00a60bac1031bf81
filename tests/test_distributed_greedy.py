"""Distributed batched peeling vs. the exact driver greedy."""
import pandas as pd
import pytest

from repro.core.distributed_greedy import distributed_peel
from repro.core.greedy import greedy_peel
from repro.core.maxflow import exact_densest
from repro.graph.local import from_edge_pandas

from tests.helpers import random_positive_graph, random_signed_graph


def _pdf(g):
    triples = [
        (i, j, w) for i in range(g.n) for j, w in g.adj[i].items() if i < j
    ]
    return pd.DataFrame(triples, columns=["src", "dst", "weight"])


def test_planted_block(spark):
    rows = [(i, j, 4.0) for i in range(5) for j in range(i + 1, 5)]
    rows += [(10 + i, 10 + i + 1, 0.5) for i in range(8)]
    pdf = pd.DataFrame(rows, columns=["src", "dst", "weight"])
    S, rho = distributed_peel(spark.createDataFrame(pdf))
    assert set(S) >= set(range(5))
    assert rho >= 16.0 - 1e-9  # clique rho = 4*(5-1)


@pytest.mark.parametrize("seed", range(3))
def test_2eps_approximation_on_positive(spark, seed):
    g = random_positive_graph(20, 0.3, seed + 500)
    if g.m < 3:
        pytest.skip("sparse sample")
    S, rho = distributed_peel(spark.createDataFrame(_pdf(g)), eps=0.1)
    _, opt_single = exact_densest(g)
    opt = 2.0 * opt_single
    assert rho >= opt / (2 * 1.1) - 1e-9
    assert rho <= opt + 1e-9


def test_reported_rho_matches_set(spark):
    g = random_signed_graph(15, 0.4, 77)
    if g.m < 3:
        pytest.skip("sparse sample")
    pdf = _pdf(g)
    S, rho = distributed_peel(spark.createDataFrame(pdf), eps=0.2)
    gl = from_edge_pandas(pdf)
    idx = [gl.index[v] for v in S]
    assert rho == pytest.approx(
        2.0 * gl.subgraph_weight(idx) / len(idx), rel=1e-9
    )


def test_negative_graph_terminates(spark):
    pdf = pd.DataFrame(
        {"src": [0, 1, 2], "dst": [1, 2, 3], "weight": [-1.0, 2.0, -3.0]}
    )
    S, rho = distributed_peel(spark.createDataFrame(pdf))
    assert rho >= 2.0 - 1e-9  # at least the positive pair


def test_wiki_difference_graph_end_to_end(spark):
    """The distributed peeling tracks the exact driver greedy on a real
    (signed) difference graph from the dataset registry."""
    from repro.core.dcsad import dcs_greedy
    from repro.datasets import get_dataset

    ds = get_dataset(spark, "wiki", "consistent", "test")
    S, rho = distributed_peel(ds.edges, eps=0.1)
    exact = dcs_greedy(ds.local)
    assert rho >= exact.rho * 0.8  # neither heuristic dominates; close


def test_close_to_exact_greedy(spark):
    g = random_positive_graph(25, 0.25, 901)
    if g.m < 5:
        pytest.skip("sparse sample")
    _, rho_exact = greedy_peel(g)
    _, rho_dist = distributed_peel(spark.createDataFrame(_pdf(g)), eps=0.05)
    # Batched peeling with small eps tracks the exact greedy closely.
    assert rho_dist >= rho_exact / 1.3
