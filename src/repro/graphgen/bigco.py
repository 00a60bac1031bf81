"""Synthetic DBLP-C and Actor collaboration networks (Appendix B-3).

DBLP-C: timestamped co-authorship events split at the median timestamp
into G1/G2; planted pair with weight difference 400 (weighted affinity
200, as in Table XIV), a 26-clique of raw difference 6 (discrete weight
2 → affinity 50/26 ≈ 1.92) and an extreme negative pair (−186, Table II).

Actor: an all-positive collaboration network used directly as the
difference graph; weights ≈ 1 + Poisson (mean ≈ 1.1 as in Table II);
planted dominant triangle (216, 112, 112) → weighted affinity ≈ 108,
and a 21-clique of uniform raw weight 12 → capped affinity 10·20/21 ≈
9.52 beating any capped pair (5) or capped triangle (20/3), matching
Table XIV's winner structure (weighted DCS = tiny heavy group, discrete
DCS = the 21-clique).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .background import chung_lu_pairs, clique_edges

DBLPC_PLANTED = {
    "heavy-pair": [0, 1],
    "neg-pair": [2, 3],
    "disc-clique": list(range(10, 36)),  # 26 authors
}

ACTOR_PLANTED = {
    "heavy-triangle": [0, 1, 2],
    "disc-clique": list(range(10, 31)),  # 21 actors
}


def dblpc_events(n: int, bg_pairs: int, seed: int = 19) -> pd.DataFrame:
    """Columns src, dst, t (timestamp in [0,1]), one row per paper."""
    g = np.random.default_rng(seed)
    bg = chung_lu_pairs(n - 40, bg_pairs, seed=seed, id_offset=40)
    c = 1 + g.poisson(1.0, len(bg))
    rows = []
    for (s, d), k in zip(bg.itertuples(index=False), c):
        for t in g.uniform(0.0, 1.0, k):
            rows.append((s, d, float(t)))

    def planted_pair(u, v, n1, n2):
        for t in g.uniform(0.0, 0.5, n1):
            rows.append((u, v, float(t)))
        for t in g.uniform(0.5, 1.0, n2):
            rows.append((u, v, float(t)))

    planted_pair(0, 1, 5, 405)  # diff +400
    planted_pair(2, 3, 188, 2)  # diff -186
    cq = DBLPC_PLANTED["disc-clique"]
    for i in range(len(cq)):
        for j in range(i + 1, len(cq)):
            planted_pair(cq[i], cq[j], 1, 7)  # diff +6 -> discrete 2
    return pd.DataFrame(rows, columns=["src", "dst", "t"])


def dblpc_graphs(spark: SparkSession, n: int, bg_pairs: int,
                 seed: int = 19) -> tuple[DataFrame, DataFrame]:
    """Split events at t=0.5 and aggregate the two co-author graphs."""
    ev = spark.createDataFrame(dblpc_events(n, bg_pairs, seed=seed))
    agg = ev.groupBy(
        "src", "dst", (F.col("t") >= 0.5).alias("late")
    ).agg(F.count("*").cast("double").alias("weight"))
    g1 = agg.where(~F.col("late")).drop("late")
    g2 = agg.where(F.col("late")).drop("late")
    return g1, g2


def actor_edges(n: int, bg_pairs: int, seed: int = 23) -> pd.DataFrame:
    """The Actor collaboration network, used directly as G_D."""
    g = np.random.default_rng(seed)
    bg = chung_lu_pairs(n - 40, bg_pairs, seed=seed, id_offset=40)
    w = (1 + g.poisson(0.12, len(bg))).astype(float)
    parts = [
        pd.DataFrame({"src": bg["src"], "dst": bg["dst"], "weight": w}),
        clique_edges([0, 1, 2], weights=[216.0, 112.0, 112.0]),
        # 21-clique of uniform raw weight 12: above the Discrete cap of
        # 10, so capped affinity 10*20/21 ≈ 9.52 is maximized by the
        # *full* clique (any sub-clique scores 10*(k-1)/k < it), while
        # the weighted affinity 12*20/21 stays far below the triangle's.
        clique_edges(ACTOR_PLANTED["disc-clique"], weight=12.0),
    ]
    return pd.concat(parts, ignore_index=True)


def actor_graph(spark: SparkSession, n: int, bg_pairs: int,
                seed: int = 23) -> DataFrame:
    return spark.createDataFrame(actor_edges(n, bg_pairs, seed=seed))
