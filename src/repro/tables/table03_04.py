"""Tables III & IV — co-author groups found on the DBLP difference graphs.

For each of the four DBLP configurations, DCSGreedy gives the
average-degree DCS and NewSEA the graph-affinity DCS; each solution is
mapped back to the planted group it recovers, with the densities and
diagnostics of Table IV. Table III rows list the member names with their
simplex weights for the affinity solutions.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..core.dcsad import dcs_greedy
from ..core.newsea import newsea
from ..datasets import CONFIGS, get_dataset
from .common import solution_row

COLUMNS_T4 = [
    "setting", "gd_type", "measure", "group", "size", "positive_clique",
    "avg_degree_diff", "approx_ratio", "affinity_diff", "edge_density_diff",
]
COLUMNS_T3 = ["setting", "gd_type", "measure", "members"]


def run(spark: SparkSession, scale: str = "bench") -> tuple[list, list]:
    """Returns (table3_rows, table4_rows)."""
    t3, t4 = [], []
    for cfg in CONFIGS["dblp"]:
        setting, gd_type = cfg.split("-")
        ds = get_dataset(spark, "dblp", cfg, scale)
        g = ds.local

        ad = dcs_greedy(g)
        row = solution_row(ds, ad.S)
        t4.append(
            {
                "setting": setting, "gd_type": gd_type,
                "measure": "avg-degree", "approx_ratio": ad.ratio,
                "affinity_diff": None, **row,
            }
        )
        t3.append(
            {
                "setting": setting, "gd_type": gd_type,
                "measure": "avg-degree",
                "members": sorted(ds.labels[v] for v in g.to_ids(ad.S)),
            }
        )

        ga = newsea(g.positive_part())
        row = solution_row(ds, list(ga.x), x=ga.x)
        t4.append(
            {
                "setting": setting, "gd_type": gd_type,
                "measure": "graph-affinity", "approx_ratio": None, **row,
            }
        )
        t3.append(
            {
                "setting": setting, "gd_type": gd_type,
                "measure": "graph-affinity",
                "members": sorted(
                    (ds.labels[g.ids[i]], round(w, 4)) for i, w in ga.x.items()
                ),
            }
        )
    return t3, t4
