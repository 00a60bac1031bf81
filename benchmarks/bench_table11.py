"""Table XI benchmark: DCSGA on Wiki."""
from benchmarks._util import print_rows

from repro.tables import table10_13


def test_table11(benchmark, spark, bench_scale):
    rows = benchmark.pedantic(
        lambda: table10_13.run_affinity(spark, ["wiki"], bench_scale),
        rounds=1, iterations=1,
    )
    print_rows("Table XI (bench)", rows, table10_13.COLUMNS_GA)
    assert len(rows) == 2
