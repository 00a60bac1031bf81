"""Vertex degree computations over canonical edge DataFrames (Spark)."""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def incident(edges: DataFrame) -> DataFrame:
    """One row per (vertex, incident edge weight): union of both endpoints."""
    return edges.select(F.col("src").alias("v"), "weight").unionAll(
        edges.select(F.col("dst").alias("v"), "weight")
    )


def weighted_degrees(edges: DataFrame) -> DataFrame:
    """Weighted degree per vertex: columns ``v, degree``."""
    return incident(edges).groupBy("v").agg(F.sum("weight").alias("degree"))


def unweighted_degrees(edges: DataFrame) -> DataFrame:
    """Number of incident edges per vertex: columns ``v, degree``."""
    return incident(edges).groupBy("v").agg(F.count("*").alias("degree"))


def max_incident_weight(edges: DataFrame) -> DataFrame:
    """Max incident edge weight per vertex: columns ``v, max_w``."""
    return incident(edges).groupBy("v").agg(F.max("weight").alias("max_w"))
