"""Table V benchmark: top-5 emerging/disappearing topics (SEACD+Refine)."""
from benchmarks._util import print_rows

from repro.datasets import get_dataset
from repro.tables import table05_06


def test_table05(benchmark, spark, bench_scale):
    for cfg in ("emerging", "disappearing"):
        get_dataset(spark, "dm", cfg, bench_scale).local
    rows = benchmark.pedantic(
        lambda: table05_06.run_table5(spark, bench_scale),
        rounds=1, iterations=1,
    )
    print_rows("Table V (bench)", rows, table05_06.COLUMNS)
    assert len(rows) == 10
