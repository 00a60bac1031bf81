"""Distributed batched greedy peeling (Bahmani et al., PVLDB 2012).

The DataFrame counterpart of Charikar's greedy: each pass removes *every*
vertex whose weighted degree is at most ``(1 + eps)`` times the current
average degree, giving a ``2(1+eps)``-approximation in ``O(log n)``
passes on non-negative graphs. On difference graphs with negative
weights the guarantee vanishes (Theorem 1 — the problem is
inapproximable) but the pass structure is unchanged and the best
intermediate set is still a useful candidate; DCSGreedy's driver-side
exact greedy remains the reference implementation.

Removal rounds are recorded on the driver (one small collect per pass) so
the best prefix can be reconstructed exactly.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..graph.degrees import weighted_degrees


def distributed_peel(edges: DataFrame, eps: float = 0.1,
                     max_rounds: int = 200) -> tuple[list, float]:
    """Batched peeling over a canonical edge DataFrame.

    Returns ``(S, rho)`` with rho = W(S)/|S| in the double-counted
    convention (sum of degrees / |S|).
    """
    cur = edges.localCheckpoint(eager=True)
    best_S: list = []
    best_rho = -float("inf")
    for _ in range(max_rounds):
        deg = weighted_degrees(cur).localCheckpoint(eager=True)
        agg = deg.agg(
            F.sum("degree").alias("w"), F.count("*").alias("n")
        ).collect()[0]
        n_cur = int(agg["n"] or 0)
        if n_cur == 0:
            break
        rho = float(agg["w"]) / n_cur
        if rho > best_rho:
            best_rho = rho
            # Snapshot the current vertex set; vertices isolated by
            # earlier removals have already dropped out of ``deg``.
            best_S = [r["v"] for r in deg.select("v").collect()]
        thr = (1.0 + eps) * rho
        doomed = deg.where(F.col("degree") <= F.lit(thr))
        doomed_ids = [r["v"] for r in doomed.select("v").collect()]
        if not doomed_ids:
            # Negative-weight graphs can stall (threshold below every
            # degree); force-remove the single min-degree vertex.
            doomed_ids = [
                deg.orderBy(F.col("degree").asc()).limit(1).collect()[0]["v"]
            ]
        if len(doomed_ids) == n_cur:
            break
        doomed_df = cur.sparkSession.createDataFrame(
            [(v,) for v in doomed_ids], ["v"]
        )
        cur = (
            cur.join(doomed_df, cur["src"] == doomed_df["v"], "left_anti")
            .join(doomed_df, F.col("dst") == doomed_df["v"], "left_anti")
            .localCheckpoint(eager=True)
        )
    return sorted(best_S), best_rho
