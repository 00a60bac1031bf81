"""Tables VIII & IX benchmark: EgoScan comparison on DBLP."""
from benchmarks._util import print_rows

from repro.datasets import CONFIGS, get_dataset
from repro.tables import table08_09


def test_table08_09(benchmark, spark, bench_scale):
    for cfg in CONFIGS["dblp"]:
        get_dataset(spark, "dblp", cfg, bench_scale).local
    t8, t9 = benchmark.pedantic(
        lambda: table08_09.run(spark, bench_scale), rounds=1, iterations=1
    )
    print_rows("Table VIII (bench)", t8, table08_09.COLUMNS_T8)
    print_rows("Table IX (bench)", t9, table08_09.COLUMNS_T9)
    assert len(t9) == 4
