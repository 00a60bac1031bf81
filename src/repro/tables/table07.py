"""Table VII — running time of the DCSGA algorithms + SEA expansion errors.

For every difference graph: NewSEA (smart initialization), SEACD+Refine
(every-vertex initialization) and the original SEA+Refine baseline
(replicator shrink with the loose ``|Δf| <= 1e-6`` convergence test).
``errors_sea`` counts expansions that decreased the objective — the
phenomenon of Section VI-A; the coordinate-descent algorithms must show
zero errors. Absolute times are Python-driver times on synthetic graphs,
so only the *ordering* (NewSEA ≪ SEACD+Refine < SEA+Refine) and the
error counts are comparable with the paper.
"""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from ..core.newsea import newsea, sea_refine_full, seacd_refine_full
from ..datasets import all_configs, get_dataset

COLUMNS = [
    "data", "config", "t_newsea", "t_seacd_refine", "t_sea_refine",
    "errors_sea", "errors_seacd", "f_newsea", "f_seacd", "f_sea",
]


def run(spark: SparkSession, scale: str = "bench",
        families: list | None = None, skip_sea: bool = False) -> list:
    rows = []
    for fam, cfg in all_configs():
        if families is not None and fam not in families:
            continue
        ds = get_dataset(spark, fam, cfg, scale)
        gdp = ds.local.positive_part()

        t0 = time.perf_counter()
        r_new = newsea(gdp)
        t_new = time.perf_counter() - t0

        t0 = time.perf_counter()
        r_cd = seacd_refine_full(gdp)
        t_cd = time.perf_counter() - t0

        if skip_sea:
            t_sea, r_sea = None, None
        else:
            t0 = time.perf_counter()
            r_sea = sea_refine_full(gdp)
            t_sea = time.perf_counter() - t0

        rows.append(
            {
                "data": fam,
                "config": cfg,
                "t_newsea": t_new,
                "t_seacd_refine": t_cd,
                "t_sea_refine": t_sea,
                "errors_sea": r_sea.expansion_errors if r_sea else None,
                "errors_seacd": r_cd.expansion_errors,
                "f_newsea": r_new.f,
                "f_seacd": r_cd.f,
                "f_sea": r_sea.f if r_sea else None,
            }
        )
    return rows
