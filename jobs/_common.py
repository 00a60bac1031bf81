"""Shared CLI plumbing for the per-table spark-submit jobs.

Each job builds (or reuses) a SparkSession, runs one table harness at the
requested scale and prints the rows as a plain-text table, mirroring the
corresponding table in the paper (paper-vs-measured diff: EXPERIMENTS.md).
"""
from __future__ import annotations

import argparse
import sys

from pyspark.sql import SparkSession

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/src")


def session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def parse_scale(default: str = "bench") -> str:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=["test", "bench"], default=default)
    return ap.parse_args().scale


def emit(title: str, rows: list, columns: list) -> None:
    from repro.tables.common import fmt_table

    print(f"\n== {title} ==")
    print(fmt_table(rows, columns))
