"""Table XIV — DCS w.r.t. graph affinity on the DBLP-C and Actor graphs."""
from __future__ import annotations

from pyspark.sql import SparkSession

from .table10_13 import COLUMNS_GA, run_affinity

COLUMNS = COLUMNS_GA


def run(spark: SparkSession, scale: str = "bench") -> list:
    return run_affinity(spark, ["dblpc", "actor"], scale)
