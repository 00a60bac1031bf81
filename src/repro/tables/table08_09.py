"""Tables VIII & IX — comparison with the EgoScan baseline on DBLP.

Table VIII: statistics of the subgraphs EgoScan (which maximizes the
*total* edge-weight difference W_D(S)) finds on the four DBLP difference
graphs. Table IX: W_D(S) of the DCSGreedy, NewSEA and EgoScan solutions
side by side — EgoScan wins on its own objective while losing badly on
average degree / edge density, as in the paper.
"""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from ..baselines.egoscan import egoscan
from ..core.dcsad import dcs_greedy
from ..core.metrics import total_degree
from ..core.newsea import newsea
from ..datasets import CONFIGS, get_dataset
from .common import solution_row

COLUMNS_T8 = [
    "setting", "gd_type", "size", "n_edges", "positive_clique",
    "avg_degree_diff", "edge_density_diff", "t_egoscan",
]
COLUMNS_T9 = ["setting", "gd_type", "w_dcsgreedy", "w_newsea", "w_egoscan"]


def run(spark: SparkSession, scale: str = "bench") -> tuple[list, list]:
    t8, t9 = [], []
    for cfg in CONFIGS["dblp"]:
        setting, gd_type = cfg.split("-")
        ds = get_dataset(spark, "dblp", cfg, scale)
        g = ds.local

        t0 = time.perf_counter()
        es = egoscan(g)
        t_es = time.perf_counter() - t0
        row = solution_row(ds, es.S)
        t8.append(
            {
                "setting": setting, "gd_type": gd_type, "size": len(es.S),
                "n_edges": es.n_edges,
                "positive_clique": row["positive_clique"],
                "avg_degree_diff": row["avg_degree_diff"],
                "edge_density_diff": row["edge_density_diff"],
                "t_egoscan": t_es,
            }
        )

        ad = dcs_greedy(g)
        ga = newsea(g.positive_part())
        t9.append(
            {
                "setting": setting, "gd_type": gd_type,
                "w_dcsgreedy": total_degree(g, ad.S),
                "w_newsea": total_degree(g, list(ga.x)),
                "w_egoscan": es.total_weight,
            }
        )
    return t8, t9
