"""Smart-initialization upper bounds ``mu_u`` (paper Section V-D).

``mu_u = tau_u * w_u / (tau_u + 1)`` upper-bounds the affinity of any
positive-clique embedding whose support contains ``u`` (Theorem 6 with
``k_u <= tau_u + 1``, ``tau_u`` = core number in G_D+). The Spark path
computes ``tau_u`` with the distributed h-index iteration and ``w_u``
with the ego-net max-weight job; the local path is the exact driver
fallback used by unit tests and small runs.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..graph.egonet import egonet_max_weight, egonet_max_weight_local
from ..graph.kcore import core_numbers_exact, core_numbers_spark
from ..graph.local import LocalGraph


def smart_init_bounds_local(gdp: LocalGraph) -> dict:
    """{internal index: mu_u} for every non-isolated vertex of G_D+."""
    tau = core_numbers_exact(gdp)
    w = egonet_max_weight_local(gdp)
    return {
        u: tau[u] * w[u] / (tau[u] + 1.0) for u in tau if u in w
    }


def smart_init_bounds_spark(gdp_edges: DataFrame) -> DataFrame:
    """Spark version over a canonical positive edge DataFrame.

    Returns columns ``v, mu``; collect and remap through
    ``LocalGraph.index`` before feeding :func:`repro.core.newsea.newsea`.
    """
    tau = core_numbers_spark(gdp_edges)
    w = egonet_max_weight(gdp_edges)
    return tau.join(w, "v").select(
        "v",
        (
            F.col("core") * F.col("w_u") / (F.col("core") + F.lit(1.0))
        ).alias("mu"),
    )


def collect_bounds(gdp_edges: DataFrame, g: LocalGraph) -> dict:
    """Run the Spark bound job and remap vertex ids to internal indices."""
    pdf = smart_init_bounds_spark(gdp_edges).toPandas()
    return {
        g.index[v]: float(mu)
        for v, mu in zip(pdf["v"], pdf["mu"])
        if v in g.index
    }
