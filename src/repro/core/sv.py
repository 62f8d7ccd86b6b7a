"""Simplified S-V connected components (paper §II, Fig. 2) — a PPA.

Shiloach-Vishkin without star hooking: every vertex keeps a parent
pointer D[v] (roots self-loop). Each round:

1–2. grandparent lookup: v asks w = D[v] for D[w] (request + response
     supersteps);
3.   tree hooking: for each edge (u,v), if w = D[u] is a root and
     D[v] < w, hook w onto D[v] (edge-exchange + hook messages; min per
     root keeps the update monotone);
4.   shortcutting: D[v] ← D[D[v]]; an aggregator checks whether any
     D[v] changed — if none, every star is a CC and the root is the
     smallest ID in the component.

Each round is counted as 4 supersteps. O(log n) rounds.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.pregel.engine import PregelStats, materialize


def sv_components(
    spark: SparkSession,
    vertices: DataFrame,
    edges: DataFrame,
    stats: PregelStats,
    max_rounds: int = 64,
) -> DataFrame:
    """Connected components → ``(id, label)`` with label = min ID in CC.

    ``vertices``: ``(id)``; ``edges``: undirected ``(u, v)`` (each edge
    listed once; both orientations are generated internally).
    """
    d = materialize(vertices.select("id", F.col("id").alias("p")))
    both = edges.select("u", "v").unionByName(
        edges.select(F.col("v").alias("u"), F.col("u").alias("v"))
    )
    both = materialize(both)
    n = d.count()
    m2 = both.count()
    for _ in range(max_rounds):
        # supersteps 1-2: v requests D[D[v]] from its parent
        gp = (
            d.alias("a")
            .join(
                d.select(F.col("id").alias("p"), F.col("p").alias("gp")).alias("b"),
                "p",
            )
            .select("id", "p", "gp")
        )
        gp = materialize(gp)
        stats.messages += 2 * n  # request + response per vertex

        # superstep 3: edge exchange (D[v] across each directed edge),
        # then hook root parents onto smaller D[v]
        dv = both.join(
            d.select(F.col("id").alias("v"), F.col("p").alias("d_v")), "v"
        )
        cand = (
            dv.join(gp.select(F.col("id").alias("u"), "p", "gp"), "u")
            .filter((F.col("gp") == F.col("p")) & (F.col("d_v") < F.col("p")))
            .select(F.col("p").alias("w"), F.col("d_v").alias("x"))
        )
        hooks = materialize(cand.groupBy("w").agg(F.min("x").alias("hook")))
        stats.messages += m2 + hooks.count()

        # superstep 4: apply hooking (roots) or shortcutting (others)
        nxt = (
            gp.join(hooks.withColumnRenamed("w", "id"), "id", "left")
            .select(
                "id",
                F.col("p").alias("old_p"),
                F.coalesce("hook", "gp").alias("p"),
            )
        )
        nxt = materialize(nxt)
        changed = nxt.filter(F.col("p") != F.col("old_p")).count()
        stats.supersteps += 4
        stats.rounds += 1
        d = materialize(nxt.select("id", "p"))
        if changed == 0:
            break
    return d.select("id", F.col("p").alias("label"))
