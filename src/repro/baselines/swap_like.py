"""SWAP-Assembler-like baseline: greedy local edge-merging surrogate.

SWAP's "edge merging" resolves graph structure locally, per partition,
without global consistency checks, and its default small-genome
configuration applies no coverage prefilter. The surrogate reproduces
the mechanisms behind its Table-IV signature:

* θ = 0 — every observed (k+1)-mer enters the DBG, errors included
  (error bases survive into contigs → high mismatch rate);
* each ambiguous vertex is resolved *greedily*: only its max-coverage
  in-item and max-coverage out-item survive (an edge survives only if
  both endpoints keep it) — chimeric joins across repeats follow
  (misassemblies);
* paths are broken wherever adjacent edge coverages differ by more
  than ``cov_jump``× (SWAP's local merging refuses inconsistent
  evidence), and at a deterministic 1-in-``frag_mod`` subset of
  vertices, modelling the partition-boundary artifacts of SWAP's
  distributed edge merging (fragmentation → small contigs, low genome
  fraction);
* no bubble filtering, no tip removing, single round.

Table IV signature reproduced: many misassemblies, the worst mismatch
rate, small contigs, low genome fraction.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.dbg import build_dbg
from repro.core.pipeline import AssemblyResult, assemble
from repro.pregel.engine import materialize, shuffle_partitions


def _resolve_greedy(items: DataFrame) -> DataFrame:
    """Keep only each vertex's max-coverage in-item and out-item; an
    edge survives only if kept by both endpoints (mirror rule: same
    ``lab``, ``dir`` flips iff lab == L)."""
    w = Window.partitionBy("id", "dir").orderBy(F.col("cov").desc(), F.col("nb"))
    kept = items.withColumn("rk", F.row_number().over(w)).filter(F.col("rk") == 1).drop("rk")
    mirror = kept.select(
        F.col("nb").alias("id"),
        F.col("id").alias("nb"),
        F.when(F.col("lab") == 0, 1 - F.col("dir")).otherwise(F.col("dir")).alias("dir"),
        "lab",
    )
    return kept.join(mirror, ["id", "nb", "dir", "lab"], "left_semi")


def swap_assemble(
    spark: SparkSession,
    reads: DataFrame,
    *,
    k: int = 31,
    tip_len: int = 80,
    cov_jump: float = 3.0,
    frag_mod: int = 300,
    partitions: int = 8,
) -> AssemblyResult:
    """Greedy-resolution single-round assembly over the unfiltered DBG."""
    with shuffle_partitions(spark, partitions):
        _, items = build_dbg(reads, k, theta=0)
        items = materialize(items)
        resolved = materialize(_resolve_greedy(items))
        per_vertex = resolved.groupBy("id").agg(
            F.max("cov").alias("mx"), F.min("cov").alias("mn")
        )
        jumps = per_vertex.filter(
            (F.col("mx") > cov_jump * F.col("mn"))
            | (F.col("id") % frag_mod == 0)
        ).select("id")
    return assemble(
        spark,
        None,
        k=k,
        tip_len=tip_len,
        items=resolved,
        force_mn=jumps,
        rounds=1,
        bubble=False,
        tips=False,
        partitions=partitions,
    )
