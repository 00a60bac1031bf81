"""Connected components as an iterative DataFrame computation.

Min-label propagation: every vertex starts with label = its own id and
repeatedly takes the minimum label in its closed neighborhood until a
fixpoint. ``localCheckpoint`` truncates lineage each round so Catalyst
plans stay bounded. Suitable for the moderate graph sizes of this
reproduction; exactness is cross-checked against a driver-side BFS in
tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def connected_components(edges: DataFrame, max_iter: int = 200) -> DataFrame:
    """Label each non-isolated vertex with its component id (min vertex id).

    Returns columns ``v, component``.
    """
    both = edges.select(F.col("src").alias("u"), F.col("dst").alias("v")).unionAll(
        edges.select(F.col("dst").alias("u"), F.col("src").alias("v"))
    )
    both = both.localCheckpoint(eager=True)
    labels = (
        both.groupBy(F.col("u").alias("v"))
        .agg(F.min(F.col("v")).alias("nbr_min"))
        .select("v", F.least("v", "nbr_min").alias("component"))
        .localCheckpoint(eager=True)
    )
    for _ in range(max_iter):
        nbr = (
            both.join(labels, both["v"] == labels["v"], "inner")
            .select(both["u"].alias("v"), F.col("component"))
            .groupBy("v")
            .agg(F.min("component").alias("nbr_component"))
        )
        new_labels = (
            labels.join(nbr, "v", "left")
            .select(
                "v",
                F.least(
                    "component", F.coalesce("nbr_component", F.col("component"))
                ).alias("component"),
            )
            .localCheckpoint(eager=True)
        )
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), "v")
            .where(F.col("n.component") != F.col("o.component"))
            .limit(1)
            .count()
        )
        labels = new_labels
        if changed == 0:
            break
    return labels
