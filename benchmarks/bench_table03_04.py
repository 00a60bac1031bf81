"""Tables III & IV benchmark: DBLP co-author group mining."""
from benchmarks._util import print_rows

from repro.datasets import CONFIGS, get_dataset
from repro.tables import table03_04


def test_table03_04(benchmark, spark, bench_scale):
    for cfg in CONFIGS["dblp"]:  # pre-build datasets outside the timing
        get_dataset(spark, "dblp", cfg, bench_scale).local
    t3, t4 = benchmark.pedantic(
        lambda: table03_04.run(spark, bench_scale), rounds=1, iterations=1
    )
    print_rows("Table III (bench)", t3, table03_04.COLUMNS_T3)
    print_rows("Table IV (bench)", t4, table03_04.COLUMNS_T4)
    assert len(t4) == 8
