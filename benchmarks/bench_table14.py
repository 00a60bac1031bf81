"""Table XIV benchmark: DCSGA on DBLP-C and Actor."""
from benchmarks._util import print_rows

from repro.datasets import CONFIGS, get_dataset
from repro.tables import table14


def test_table14(benchmark, spark, bench_scale):
    for fam in ("dblpc", "actor"):
        for cfg in CONFIGS[fam]:
            get_dataset(spark, fam, cfg, bench_scale).local
    rows = benchmark.pedantic(
        lambda: table14.run(spark, bench_scale), rounds=1, iterations=1
    )
    print_rows("Table XIV (bench)", rows, table14.COLUMNS)
    assert len(rows) == 4
