"""Table XII benchmark: DCSAD on Douban."""
from benchmarks._util import print_rows

from repro.datasets import CONFIGS, get_dataset
from repro.tables import table10_13


def test_table12(benchmark, spark, bench_scale):
    for fam in ("movie", "book"):
        for cfg in CONFIGS[fam]:
            get_dataset(spark, fam, cfg, bench_scale).local
    rows = benchmark.pedantic(
        lambda: table10_13.run_avg_degree(
            spark, ["movie", "book"], bench_scale
        ),
        rounds=1, iterations=1,
    )
    print_rows("Table XII (bench)", rows, table10_13.COLUMNS_AD)
    assert len(rows) == 4
