"""Benchmark-local fixtures (the session SparkSession comes from the
root conftest; table rows are printed via benchmarks._util.print_rows so
EXPERIMENTS.md numbers can be re-derived from the bench log)."""
import pytest


@pytest.fixture(scope="session")
def bench_scale() -> str:
    return "bench"
