"""Tables II, VII and XIV harnesses (test scale)."""
import pytest

from repro.tables import table02, table07, table14


@pytest.fixture(scope="module")
def t2(spark):
    return table02.run(spark, scale="test")


@pytest.fixture(scope="module")
def t7_small(spark):
    # SEA+Refine on every config is the expensive part; restrict the unit
    # test to two families (the full sweep runs in the benchmarks).
    return table07.run(spark, scale="test", families=["dblp", "dm"])


@pytest.fixture(scope="module")
def t14(spark):
    return table14.run(spark, scale="test")


def test_table2_has_16_rows(t2):
    assert len(t2) == 16


def test_table2_extremes(t2):
    by = {(r["data"], r["config"]): r for r in t2}
    assert by[("dblp", "weighted-emerging")]["max_w"] == 46.0
    assert by[("dblp", "weighted-emerging")]["min_w"] == -100.0
    assert by[("dblpc", "weighted")]["max_w"] == 400.0
    assert by[("actor", "weighted")]["max_w"] == 216.0
    assert by[("actor", "weighted")]["m_neg"] == 0  # Table II: m- = 0


def test_table2_flip_symmetry(t2):
    by = {(r["data"], r["config"]): r for r in t2}
    em = by[("dblp", "weighted-emerging")]
    dis = by[("dblp", "weighted-disappearing")]
    assert em["m_pos"] == dis["m_neg"] and em["m_neg"] == dis["m_pos"]
    assert em["max_w"] == -dis["min_w"]


def test_table2_discrete_asymmetry(t2):
    """Small positive diffs are dropped by the Discrete rule, so
    m+ < m- on the emerging side — the Table II DBLP pattern."""
    by = {(r["data"], r["config"]): r for r in t2}
    r = by[("dblp", "discrete-emerging")]
    assert r["m_pos"] < r["m_neg"]


def test_table7_newsea_fastest(t7_small):
    for r in t7_small:
        assert r["t_newsea"] <= r["t_seacd_refine"]
        assert r["t_seacd_refine"] <= r["t_sea_refine"] * 2.0


def test_table7_quality_preserved(t7_small):
    """Smart initialization never loses solution quality (Section V-D)."""
    for r in t7_small:
        assert r["f_newsea"] >= r["f_seacd"] - 1e-6


def test_table7_seacd_never_errs(t7_small):
    for r in t7_small:
        assert r["errors_seacd"] == 0


def test_table14_weighted_tiny_discrete_clique(t14):
    by = {(r["data"], r["gd_type"]): r for r in t14}
    assert by[("dblpc", "weighted")]["size"] == 2  # paper: 2
    assert by[("dblpc", "weighted")]["affinity_diff"] == pytest.approx(200.0)
    assert by[("dblpc", "discrete")]["size"] == 26  # paper: 26
    assert by[("dblpc", "discrete")]["affinity_diff"] == pytest.approx(
        2 * 25 / 26, rel=1e-3
    )  # paper: 1.919
    assert by[("actor", "weighted")]["size"] == 3  # paper: 3
    assert by[("actor", "weighted")]["affinity_diff"] == pytest.approx(
        108.1, abs=0.5
    )  # paper: 108.25
    assert by[("actor", "discrete")]["size"] == 21  # paper: 21
