"""Benchmark output helper.

Prints each table's rows (visible with ``pytest -s``) and appends them to
``bench_tables.txt`` at the repo root, so the numbers recorded in
EXPERIMENTS.md survive pytest's output capturing during a plain
``pytest benchmarks/ --benchmark-only`` run.
"""
from __future__ import annotations

import pathlib

_OUT = pathlib.Path(__file__).resolve().parent.parent / "bench_tables.txt"


def print_rows(title: str, rows, columns) -> None:
    from repro.tables.common import fmt_table

    block = f"\n== {title} ==\n" + fmt_table(rows, columns) + "\n"
    print(block, end="")
    with _OUT.open("a") as fh:
        fh.write(block)
