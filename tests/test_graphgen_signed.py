"""Wiki-style signed networks: planted weights and difference structure."""
import pytest
from pyspark.sql import functions as F

from repro.graph.difference import difference
from repro.graphgen import signed


@pytest.fixture(scope="module")
def nets(spark):
    g1, g2, ranges = signed.interaction_graphs(
        spark, n=500, bg_edges=800, n_big_cons=120, n_big_conf=60
    )
    return g1.cache(), g2.cache(), ranges


def test_planted_ranges_disjoint(nets):
    _, _, ranges = nets
    seen = set()
    for ids in ranges.values():
        assert not seen.intersection(ids)
        seen.update(ids)


def test_consistent_clique_difference(spark, nets):
    g1, g2, _ = nets
    gd = difference(g2, g1)  # consistent view: G1 - G2
    ids = signed.CONSISTENT_CLIQUE
    rows = gd.where(F.col("src").isin(ids) & F.col("dst").isin(ids)).collect()
    assert len(rows) == 10
    mean = sum(r["weight"] for r in rows) / 10
    # target affinity 6.901 = mean * 4/5
    assert mean * 4 / 5 == pytest.approx(6.901, abs=0.05)


def test_conflict_clique_difference(spark, nets):
    g1, g2, _ = nets
    gd = difference(g1, g2)  # conflicting view: G2 - G1
    ids = signed.CONFLICT_CLIQUE
    rows = gd.where(F.col("src").isin(ids) & F.col("dst").isin(ids)).collect()
    mean = sum(r["weight"] for r in rows) / 15
    assert mean * 5 / 6 == pytest.approx(6.456, abs=0.1)


def test_extreme_edges_present(spark, nets):
    g1, g2, _ = nets
    mx1 = g1.agg(F.max("weight")).collect()[0][0]
    mx2 = g2.agg(F.max("weight")).collect()[0][0]
    assert mx1 == pytest.approx(9.62)
    assert mx2 == pytest.approx(12.46)


def test_big_groups_not_positive_cliques(spark, nets):
    """The big communities carry a few opposite-sign edges (Table X)."""
    g1, g2, ranges = nets
    gd = difference(g2, g1)
    ids = ranges["consistent-big"]
    neg = gd.where(
        F.col("src").isin(ids) & F.col("dst").isin(ids) & (F.col("weight") < 0)
    ).count()
    assert neg > 0


def test_big_group_density_scale(spark, nets):
    g1, g2, ranges = nets
    gd = difference(g2, g1)
    ids = ranges["consistent-big"]
    agg = gd.where(F.col("src").isin(ids) & F.col("dst").isin(ids)).agg(
        F.sum("weight")
    ).collect()[0][0]
    rho = 2.0 * agg / len(ids)
    clique_rho = 2 * 10 * 8.63 / 5  # planted 5-clique
    assert rho > clique_rho  # big community must win DCSAD
