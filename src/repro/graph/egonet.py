"""Ego-net weight bounds for NewSEA's smart initialization (Section V-D).

``w_u`` is an upper bound on the maximum edge weight in the closed ego net
``G_D+(T_u)`` of ``u``: the max weight over edges with at least one
endpoint in ``T_u = {u} ∪ N(u)``. Computed in two Spark rounds:
first ``m_v`` = max incident weight per vertex, then
``w_u = max(m_u, max_{v in N(u)} m_v)``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .degrees import max_incident_weight
from .local import LocalGraph


def egonet_max_weight(edges: DataFrame) -> DataFrame:
    """Columns ``v, w_u`` for every non-isolated vertex of a positive graph."""
    m = max_incident_weight(edges)  # v, max_w
    both = edges.select(F.col("src").alias("u"), F.col("dst").alias("v")).unionAll(
        edges.select(F.col("dst").alias("u"), F.col("src").alias("v"))
    )
    nbr_max = (
        both.join(m, "v")
        .groupBy(F.col("u").alias("v"))
        .agg(F.max("max_w").alias("nbr_max"))
    )
    return (
        m.join(nbr_max, "v", "left")
        .select(
            "v",
            F.greatest("max_w", F.coalesce("nbr_max", F.col("max_w"))).alias("w_u"),
        )
    )


def egonet_max_weight_local(g: LocalGraph) -> dict:
    """Driver fallback of :func:`egonet_max_weight`; {index: w_u}."""
    m = {
        i: max(g.adj[i].values()) for i in range(g.n) if g.adj[i]
    }
    out = {}
    for i, mi in m.items():
        w = mi
        for j in g.adj[i]:
            if m.get(j, 0.0) > w:
                w = m[j]
        out[i] = w
    return out
