"""Table II benchmark: difference-graph statistics for all 16 configs."""
from benchmarks._util import print_rows

from repro.tables import table02


def test_table02(benchmark, spark, bench_scale):
    rows = benchmark.pedantic(
        lambda: table02.run(spark, bench_scale), rounds=1, iterations=1
    )
    print_rows("Table II (bench)", rows, table02.COLUMNS)
    assert len(rows) == 16
