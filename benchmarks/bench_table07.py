"""Table VII benchmark: DCSGA running-time comparison per dataset family.

One benchmark per family so the per-dataset timings (the table's content)
are visible in the pytest-benchmark report; each run prints its rows.
The timing columns *inside* the rows are the per-algorithm wall times of
NewSEA / SEACD+Refine / SEA+Refine, which are the actual Table VII
quantities; the benchmark wrapper time is their sum plus bookkeeping.
"""
import pytest
from benchmarks._util import print_rows

from repro.datasets import CONFIGS, get_dataset
from repro.tables import table07

FAMILIES = ["dblp", "dm", "wiki", "movie", "book", "dblpc", "actor"]


@pytest.mark.parametrize("family", FAMILIES)
def test_table07_family(benchmark, spark, bench_scale, family):
    for cfg in CONFIGS[family]:
        get_dataset(spark, family, cfg, bench_scale).local
    rows = benchmark.pedantic(
        lambda: table07.run(spark, bench_scale, families=[family]),
        rounds=1, iterations=1,
    )
    print_rows(f"Table VII (bench, {family})", rows, table07.COLUMNS)
    for r in rows:
        assert r["errors_seacd"] == 0  # the paper's SEACD claim
        assert r["f_newsea"] >= r["f_seacd"] - 1e-6
