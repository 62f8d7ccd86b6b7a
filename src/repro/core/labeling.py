"""② Contig labeling (paper §IV-B): mark every maximal unambiguous
path with a unique label, via bidirectional list ranking (default) or
the simplified S-V algorithm.

Common prelude (2 supersteps, counted in the stats):

1. every ⟨m-n⟩ vertex broadcasts its ID to all neighbours and halts;
2. each unambiguous vertex recognizes itself as a contig-end (type ⟨1⟩,
   or ⟨1-1⟩ with an ambiguous neighbour) and replaces each edge to an
   ambiguous vertex / dead end with a self-loop on its own *flipped* ID
   (bit 62 set, paper Fig. 11).

Then either:

* **LR** — predecessor-pair pointer doubling (``repro.core.listrank``),
  O(log ℓ_max) rounds of 2 supersteps, with the S-V fallback for pure
  ⟨1-1⟩ cycles; labels are the smaller flipped contig-end ID;
* **S-V** — connected components over the isolated unambiguous paths
  (``repro.core.sv``), O(log n) rounds of 4 supersteps; labels are the
  smallest vertex ID in the path.

The returned stats (supersteps, messages, runtime) are the quantities
compared in paper Tables II and III.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.adjacency import vertex_types
from repro.core.listrank import list_rank
from repro.core.sv import sv_components
from repro.dna.codec import FLIP_BIT, NULL_ID
from repro.pregel.engine import PregelStats, materialize


@dataclass
class LabelingResult:
    """Output of ② contig labeling."""

    labels: DataFrame  # (id, label) for unambiguous vertices
    amb_ids: DataFrame  # (id) of ⟨m-n⟩ vertices
    unamb_items: DataFrame  # (id, nb, dir, lab, cov, external) original nbs
    stats: PregelStats


def label_contigs(
    spark: SparkSession,
    items: DataFrame,
    algorithm: str = "lr",
    force_mn: DataFrame | None = None,
) -> LabelingResult:
    """Run contig labeling over a normalized ``items`` graph.

    ``force_mn`` optionally marks extra vertex IDs as ambiguous (used by
    the SWAP-like baseline's coverage-jump path breaking).
    """
    if algorithm not in ("lr", "sv"):
        raise ValueError(f"unknown labeling algorithm: {algorithm}")
    stats = PregelStats(algorithm=algorithm)
    stats.start()

    types = vertex_types(items)
    if force_mn is not None:
        forced = force_mn.select("id").withColumn("forced", F.lit(True))
        types = (
            types.join(forced, "id", "left")
            .select("id", F.when(F.col("forced"), "mn").otherwise(F.col("vtype")).alias("vtype"))
        )
    types = materialize(types)
    amb_ids = materialize(types.filter(F.col("vtype") == "mn").select("id"))

    # superstep 1: ambiguous vertices broadcast their ID to neighbours
    amb_msgs = items.join(amb_ids, "id").filter(
        (F.col("nb") != NULL_ID) & (F.col("nb") != F.col("id"))
    )
    stats.messages += amb_msgs.count()
    stats.supersteps += 1

    # superstep 2: contig-end recognition + edge replacement (no messages)
    unamb_ids = types.filter(F.col("vtype") != "mn").select("id")
    amb_as_nb = amb_ids.withColumnRenamed("id", "nb").withColumn("nb_amb", F.lit(True))
    unamb_items = (
        items.join(unamb_ids, "id")
        .join(amb_as_nb, "nb", "left")
        .select(
            "id",
            "nb",
            "dir",
            "lab",
            "cov",
            (F.coalesce("nb_amb", F.lit(False)) | (F.col("nb") == NULL_ID)).alias("external"),
        )
    )
    unamb_items = materialize(unamb_items)
    stats.supersteps += 1

    flip_self = F.expr(f"id | {FLIP_BIT}")
    pairs = (
        unamb_items.withColumn(
            "nb2", F.when(F.col("external"), flip_self).otherwise(F.col("nb"))
        )
        .groupBy("id")
        .agg(
            F.max(F.when(F.col("dir") == 0, F.col("nb2"))).alias("m0"),
            F.max(F.when(F.col("dir") == 1, F.col("nb2"))).alias("m1"),
        )
        .select(
            "id",
            F.coalesce("m0", flip_self).alias("s0"),
            F.coalesce("m1", flip_self).alias("s1"),
        )
    )
    edges = (
        unamb_items.filter(~F.col("external"))
        .select(F.least("id", "nb").alias("u"), F.greatest("id", "nb").alias("v"))
        .distinct()
    )

    if algorithm == "lr":
        labels = list_rank(spark, pairs, edges, stats)
    else:
        labels = sv_components(spark, pairs.select("id"), edges, stats)
    labels = materialize(labels)
    labels.count()  # force computation inside the timed region
    stats.stop()
    return LabelingResult(labels=labels, amb_ids=amb_ids, unamb_items=unamb_items, stats=stats)
