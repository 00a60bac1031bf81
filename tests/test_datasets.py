"""Dataset registry: configs, caching, universe padding, Table II sanity."""
import pytest
from pyspark.sql import functions as F

from repro.datasets import CONFIGS, DCSDataset, all_configs, get_dataset


def test_all_configs_count():
    assert len(all_configs()) == 16  # the 16 rows of Table II


def test_config_families():
    assert set(CONFIGS) == {
        "dblp", "dm", "wiki", "movie", "book", "dblpc", "actor"
    }


def test_cache_returns_same_object(spark):
    a = get_dataset(spark, "dblp", "weighted-emerging", "test")
    b = get_dataset(spark, "dblp", "weighted-emerging", "test")
    assert a is b


def test_local_graph_padded_to_n(spark):
    ds = get_dataset(spark, "dblp", "weighted-emerging", "test")
    assert ds.local.n == ds.n


def test_flip_pairs_are_mirrors(spark):
    em = get_dataset(spark, "dblp", "weighted-emerging", "test")
    dis = get_dataset(spark, "dblp", "weighted-disappearing", "test")
    s1 = em.edges.agg(F.sum("weight")).collect()[0][0]
    s2 = dis.edges.agg(F.sum("weight")).collect()[0][0]
    assert s1 == pytest.approx(-s2)


def test_discrete_weights_in_range(spark):
    ds = get_dataset(spark, "dblp", "discrete-emerging", "test")
    vals = {r["weight"] for r in ds.edges.select("weight").distinct().collect()}
    assert vals <= {-2.0, -1.0, 1.0, 2.0}


def test_actor_has_no_negative_edges(spark):
    ds = get_dataset(spark, "actor", "weighted", "test")
    assert ds.edges.where(F.col("weight") <= 0).count() == 0


def test_planted_indices_resolve(spark):
    ds = get_dataset(spark, "dblp", "weighted-emerging", "test")
    idx = ds.planted_indices("uta-ml")
    assert len(idx) == 4
    assert ds.local.to_ids(idx) == ds.planted["uta-ml"]


def test_dm_vertices_are_words(spark):
    ds = get_dataset(spark, "dm", "emerging", "test")
    assert isinstance(ds.local.ids[0], str)


def test_dataset_dataclass_fields(spark):
    ds = get_dataset(spark, "wiki", "consistent", "test")
    assert isinstance(ds, DCSDataset)
    assert ds.family == "wiki" and ds.config == "consistent"
    assert ds.scale == "test"
