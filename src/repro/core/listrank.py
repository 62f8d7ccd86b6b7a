"""Bidirectional list ranking (paper §IV-B ②, Fig. 11) — a BPPA.

Each unambiguous vertex keeps a pair of predecessor IDs (one per
sequencing direction), initialised to its two neighbours with edges to
ambiguous vertices / dead ends replaced by the *flipped* self ID
(bit 62 set). Each round is 2 supersteps:

1. every active vertex sends a request to each unfinished slot target;
2. the target replies with the element of its own pair that is not the
   requester (pointer doubling: after r rounds a slot points exactly
   2^r hops away, so the target's opposite-direction slot is exactly
   the requester), and the requester overwrites the slot. A slot is
   finished when it holds a flipped contig-end ID.

Runs in O(log ℓ_max) rounds. Cycles of ⟨1-1⟩ vertices never reach an
end, so (as the paper prescribes) they are handed to the simplified
S-V algorithm once list ranking stops making progress. The paper
detects this as "the number of active vertices does not decrease",
but that misfires on plain paths, where the active count legitimately
plateaus mid-doubling (no vertex halts until pointers span the whole
path). The robust equivalent used here: the total number of *flipped
slots* increases every round while any path vertex is active (the
flipped frontier doubles from each end and slot distances are
contiguous), and never increases on cycles — so "flipped-slot count
unchanged while vertices remain active" identifies exactly the
cycle-only state.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.sv import sv_components
from repro.pregel.engine import PregelStats, materialize

#: bit-62 test that works for both positive (k-mer) and negative
#: (contig) 64-bit IDs under Spark's arithmetic shift
_FLIPPED = "((shiftright({c}, 62) & 1) = 1)"


def _is_flipped(col: str):
    return F.expr(_FLIPPED.format(c=col))


def list_rank(
    spark: SparkSession,
    pairs: DataFrame,
    edges: DataFrame,
    stats: PregelStats,
    max_rounds: int = 64,
) -> DataFrame:
    """Label each vertex with ``least`` of its two contig-end IDs.

    ``pairs``: ``(id, s0, s1)`` initial predecessor pairs (flipped IDs
    mark ends). ``edges``: undirected internal edges ``(u, v)`` among
    the unambiguous vertices — only used by the S-V cycle fallback.
    Returns ``(id, label)``.
    """
    cur = materialize(pairs.select("id", "s0", "s1"))
    prev_flipped: int | None = None
    for _ in range(max_rounds):
        done = _is_flipped("s0") & _is_flipped("s1")
        counts = cur.select(
            F.sum((~done).cast("long")).alias("active"),
            F.sum(
                _is_flipped("s0").cast("long") + _is_flipped("s1").cast("long")
            ).alias("flipped"),
        ).collect()[0]
        n_active, n_flipped = counts.active or 0, counts.flipped or 0
        active = cur.filter(~done)
        if n_active == 0:
            break
        if prev_flipped is not None and n_flipped <= prev_flipped:
            # cycles of ⟨1-1⟩ vertices never reach an end: S-V fallback
            remaining = active.select("id")
            sub_edges = (
                edges.join(remaining.withColumnRenamed("id", "u"), "u")
                .join(remaining.withColumnRenamed("id", "v"), "v")
                .select("u", "v")
            )
            cc = sv_components(spark, remaining, sub_edges, stats)
            finished = cur.filter(done).select("id", F.least("s0", "s1").alias("label"))
            return finished.unionByName(cc)
        prev_flipped = n_flipped

        # superstep A: requests along each unfinished slot
        req0 = active.filter(~_is_flipped("s0")).select(
            F.col("s0").alias("dst"), F.col("id").alias("src"), F.lit(0).alias("slot")
        )
        req1 = active.filter(~_is_flipped("s1")).select(
            F.col("s1").alias("dst"), F.col("id").alias("src"), F.lit(1).alias("slot")
        )
        requests = materialize(req0.unionByName(req1))
        n_req = requests.count()

        # superstep B: each target returns its pair element != requester
        resp = requests.join(cur.withColumnRenamed("id", "dst"), "dst").select(
            F.col("src").alias("id"),
            "slot",
            F.when(F.col("s0") == F.col("src"), F.col("s1"))
            .otherwise(F.col("s0"))
            .alias("val"),
        )
        upd = resp.groupBy("id").agg(
            F.max(F.when(F.col("slot") == 0, F.col("val"))).alias("v0"),
            F.max(F.when(F.col("slot") == 1, F.col("val"))).alias("v1"),
        )
        nxt = (
            cur.join(upd, "id", "left")
            .select(
                "id",
                F.coalesce("v0", "s0").alias("s0"),
                F.coalesce("v1", "s1").alias("s1"),
            )
        )
        cur = materialize(nxt, prev=cur)
        stats.supersteps += 2
        stats.rounds += 1
        stats.messages += 2 * n_req  # each request begets one response
    return cur.select("id", F.least("s0", "s1").alias("label"))
