"""Core numbers (k-core decomposition) — distributed and exact variants.

NewSEA's smart initialization needs the core number ``tau_u`` of every
vertex in ``G_D+`` (Section V-D). The distributed variant iterates the
neighbor h-index operator (Lü et al., "The H-index of a network node",
Nature Comm. 2016): starting from degrees, repeatedly set
``c_u <- H({c_v : v in N(u)})``; the fixpoint is exactly the core number.
Each round is a join + a windowed rank in Spark SQL. The exact
bucket-peeling variant runs on a LocalGraph and is used both as the unit
test oracle and as the driver fallback.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from .local import LocalGraph


def core_numbers_spark(edges: DataFrame, max_iter: int = 100) -> DataFrame:
    """Core numbers of all non-isolated vertices; columns ``v, core``."""
    both = edges.select(F.col("src").alias("u"), F.col("dst").alias("v")).unionAll(
        edges.select(F.col("dst").alias("u"), F.col("src").alias("v"))
    )
    both = both.localCheckpoint(eager=True)
    core = (
        both.groupBy(F.col("u").alias("v"))
        .agg(F.count("*").alias("core"))
        .localCheckpoint(eager=True)
    )
    w = Window.partitionBy("u").orderBy(F.desc("nbr_core"))
    for _ in range(max_iter):
        # h-index of the multiset of neighbor core values:
        # max over neighbors ranked desc of min(rank, core_value).
        h = (
            both.join(core, both["v"] == core["v"], "inner")
            .select(both["u"], F.col("core").alias("nbr_core"))
            .withColumn("rank", F.row_number().over(w))
            .select("u", F.least("rank", F.col("nbr_core").cast("int")).alias("h"))
            .groupBy(F.col("u").alias("v"))
            .agg(F.max("h").alias("h"))
        )
        new_core = (
            core.join(h, "v")
            .select("v", F.least("core", "h").alias("core"))
            .localCheckpoint(eager=True)
        )
        changed = (
            new_core.alias("n")
            .join(core.alias("o"), "v")
            .where(F.col("n.core") != F.col("o.core"))
            .limit(1)
            .count()
        )
        core = new_core
        if changed == 0:
            break
    return core


def core_numbers_exact(g: LocalGraph) -> dict:
    """Exact core numbers by bucket peeling; {internal index: core}."""
    deg = {i: len(g.adj[i]) for i in range(g.n) if g.adj[i]}
    if not deg:
        return {}
    max_deg = max(deg.values())
    buckets: list = [set() for _ in range(max_deg + 1)]
    for v, d in deg.items():
        buckets[d].add(v)
    core: dict = {}
    cur = dict(deg)
    k = 0
    removed = set()
    for d in range(max_deg + 1):
        while buckets[d]:
            v = buckets[d].pop()
            if v in removed:
                continue
            k = max(k, cur[v])
            core[v] = k
            removed.add(v)
            for u in g.adj[v]:
                if u in removed or u not in cur:
                    continue
                if cur[u] > cur[v]:
                    buckets[cur[u]].discard(u)
                    cur[u] -= 1
                    buckets[cur[u]].add(u)
            # vertices demoted below d are revisited because bucket d's
            # loop continues until empty and lower buckets were drained;
            # demotion never goes below cur[v] so bucket order is safe.
    return core
