"""Tables X–XIII: Wiki and Douban shapes (test scale)."""
import pytest

from repro.tables import table10_13


@pytest.fixture(scope="module")
def wiki_ad(spark):
    return table10_13.run_avg_degree(spark, ["wiki"], scale="test")


@pytest.fixture(scope="module")
def wiki_ga(spark):
    return table10_13.run_affinity(spark, ["wiki"], scale="test")


@pytest.fixture(scope="module")
def douban_ad(spark):
    return table10_13.run_avg_degree(spark, ["movie", "book"], scale="test")


@pytest.fixture(scope="module")
def douban_ga(spark):
    return table10_13.run_affinity(spark, ["movie", "book"], scale="test")


def _row(rows, data, gd_type):
    for r in rows:
        if r["data"] == data and r["gd_type"] == gd_type:
            return r
    raise KeyError((data, gd_type))


def test_wiki_ad_groups_are_big_non_cliques(wiki_ad):
    for r in wiki_ad:
        assert r["dcsg_size"] >= 30  # paper: 937 / 222
        assert not r["dcsg_pos_clique"]  # Table X: "No" everywhere
        assert not r["gd_pos_clique"] and not r["gdp_pos_clique"]


def test_wiki_ad_ratio_near_two(wiki_ad):
    for r in wiki_ad:
        assert r["dcsg_ratio"] == pytest.approx(2.0, abs=0.4)  # paper 2.06-2.13


def test_wiki_dcsg_at_least_as_good_as_variants(wiki_ad):
    for r in wiki_ad:
        assert r["dcsg_rho"] >= r["gd_rho"] - 1e-9
        assert r["dcsg_rho"] >= r["gdp_rho"] - 1e-9


def test_wiki_ga_small_cliques(wiki_ga):
    cons = _row(wiki_ga, "wiki", "consistent")
    conf = _row(wiki_ga, "wiki", "conflicting")
    assert cons["size"] == 5 and conf["size"] == 6  # paper: 5 / 6
    assert cons["affinity_diff"] == pytest.approx(6.901, abs=0.05)
    assert conf["affinity_diff"] == pytest.approx(6.456, abs=0.1)


def test_wiki_ga_much_smaller_than_ad(wiki_ad, wiki_ga):
    for ga in wiki_ga:
        ad = _row(wiki_ad, ga["data"], ga["gd_type"])
        assert ga["size"] * 5 <= ad["dcsg_size"]


def test_douban_ga_exact_clique_sizes(douban_ga):
    expect = {
        ("movie", "interest-social"): (32, 31 / 32),
        ("movie", "social-interest"): (18, 17 / 18),
        ("book", "interest-social"): (14, 13 / 14),
        ("book", "social-interest"): (22, 21 / 22),
    }
    for (data, gd_type), (size, f) in expect.items():
        r = _row(douban_ga, data, gd_type)
        assert r["size"] == size  # paper: 32/18/14/22
        assert r["affinity_diff"] == pytest.approx(f, rel=1e-3)
        assert r["edge_density_diff"] == pytest.approx(f, rel=1e-3)


def test_douban_ad_big_groups(douban_ad):
    for r in douban_ad:
        assert r["dcsg_size"] >= 100  # paper: 610-4175


def test_movie_interest_denser_book_opposite(douban_ad):
    """The paper's headline Douban finding (Section B-2)."""
    movie_is = _row(douban_ad, "movie", "interest-social")["dcsg_rho"]
    movie_si = _row(douban_ad, "movie", "social-interest")["dcsg_rho"]
    book_is = _row(douban_ad, "book", "interest-social")["dcsg_rho"]
    book_si = _row(douban_ad, "book", "social-interest")["dcsg_rho"]
    assert movie_is > movie_si  # paper: 176 > 68
    assert book_is < book_si  # paper: 43 < 71
