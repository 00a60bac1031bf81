"""Smart-initialization bounds: Spark job vs. exact driver fallback."""
import pandas as pd
import pytest

from repro.core.kbounds import collect_bounds, smart_init_bounds_local
from repro.graph.local import from_edge_pandas

from tests.helpers import random_signed_graph


def _positive_pdf(g):
    triples = [
        (i, j, w)
        for i in range(g.n)
        for j, w in g.adj[i].items()
        if i < j and w > 0
    ]
    return pd.DataFrame(triples, columns=["src", "dst", "weight"])


@pytest.mark.parametrize("seed", range(3))
def test_spark_bounds_match_local(spark, seed):
    g = random_signed_graph(30, 0.15, seed + 600, w_lo=0.5, w_hi=8.0)
    pdf = _positive_pdf(g)
    if pdf.empty:
        pytest.skip("empty sample")
    gl = from_edge_pandas(pdf)
    local = smart_init_bounds_local(gl)
    via_spark = collect_bounds(spark.createDataFrame(pdf), gl)
    assert set(via_spark) == set(local)
    for k in local:
        assert via_spark[k] == pytest.approx(local[k])


def test_bounds_formula():
    # Triangle of weight 6: tau=2, w_u=6 -> mu = 2*6/3 = 4.
    pdf = pd.DataFrame(
        {"src": [0, 0, 1], "dst": [1, 2, 2], "weight": [6.0, 6.0, 6.0]}
    )
    gl = from_edge_pandas(pdf)
    mu = smart_init_bounds_local(gl)
    assert all(v == pytest.approx(4.0) for v in mu.values())
