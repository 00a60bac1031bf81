"""Table X benchmark: DCSAD on Wiki."""
from benchmarks._util import print_rows

from repro.datasets import CONFIGS, get_dataset
from repro.tables import table10_13


def test_table10(benchmark, spark, bench_scale):
    for cfg in CONFIGS["wiki"]:
        get_dataset(spark, "wiki", cfg, bench_scale).local
    rows = benchmark.pedantic(
        lambda: table10_13.run_avg_degree(spark, ["wiki"], bench_scale),
        rounds=1, iterations=1,
    )
    print_rows("Table X (bench)", rows, table10_13.COLUMNS_AD)
    assert len(rows) == 2
