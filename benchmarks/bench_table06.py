"""Table VI benchmark: top-5 topics in the single keyword graphs."""
from benchmarks._util import print_rows

from repro.tables import table05_06


def test_table06(benchmark, spark, bench_scale):
    rows = benchmark.pedantic(
        lambda: table05_06.run_table6(spark, bench_scale),
        rounds=1, iterations=1,
    )
    print_rows("Table VI (bench)", rows, table05_06.COLUMNS)
    assert len(rows) == 10
