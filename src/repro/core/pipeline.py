"""The assembly workflow ①②③④⑤⑥②③ (paper Fig. 10 and §V).

``assemble`` runs: DBG construction → contig labeling → contig merging
→ bubble filtering → tip removing → (rebuild the mixed k-mer/contig
graph) → contig labeling → contig merging. Both labeling runs record
Pregel stats — round 1 is the paper's Table II workload (labeling
unambiguous k-mers), round 2 is Table III (labeling contigs).

The round-2 graph treats each surviving contig as a vertex whose two
adjacency items point at its (ambiguous k-mer) end vertices, and gives
each surviving ambiguous k-mer items pointing at its adjacent contigs
and at adjacent ambiguous k-mers — error correction may have turned
some previously ambiguous vertices into ⟨1-1⟩/⟨1⟩, which is what lets
contigs grow (the paper reports N50 doubling from this round).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.adjacency import ITEMS_SCHEMA
from repro.core.bubble import filter_bubbles
from repro.core.dbg import build_dbg
from repro.core.labeling import LabelingResult, label_contigs
from repro.core.merging import merge_contigs
from repro.core.tips import remove_tips
from repro.dna.codec import NULL_ID
from repro.pregel.engine import PregelStats, materialize, shuffle_partitions


@dataclass
class AssemblyResult:
    """Final contigs plus instrumentation for the evaluation tables."""

    contigs: DataFrame  # (cid, seq, cov, ...) final contigs
    stats_label_kmers: PregelStats  # Table II workload
    stats_label_contigs: PregelStats | None  # Table III workload
    counts: dict = field(default_factory=dict)
    label_inputs: dict = field(default_factory=dict)  # captured items for re-runs


def _round2_items(
    items: DataFrame,
    amb_ids: DataFrame,
    contigs: DataFrame,
    deleted: DataFrame,
) -> DataFrame:
    """Build the mixed contig/ambiguous-k-mer item graph for round 2."""
    # direct ambiguous-ambiguous k-mer edges, minus deleted vertices
    amb_nb = amb_ids.withColumnRenamed("id", "nb")
    direct = (
        items.join(amb_ids, "id")
        .join(amb_nb, "nb")
        .join(deleted, "id", "left_anti")
        .join(deleted.withColumnRenamed("id", "nb"), "nb", "left_anti")
        .select("id", "nb", "dir", "lab", "cov")
    )
    # contig vertices: two items each (dead ends stored as NULL rows)
    c_in = contigs.select(
        F.col("cid").alias("id"),
        F.col("nb_in").alias("nb"),
        F.lit(0).alias("dir"),
        F.col("nb_in_lab").alias("lab"),
        F.col("nb_in_cov").alias("cov"),
    )
    c_out = contigs.select(
        F.col("cid").alias("id"),
        F.col("nb_out").alias("nb"),
        F.lit(1).alias("dir"),
        F.col("nb_out_lab").alias("lab"),
        F.col("nb_out_cov").alias("cov"),
    )
    # ambiguous k-mer side of each contig edge, normalized to self-L:
    # edge (a→c)⟨la:L⟩ at a: la==L → (c,out,L); la==H → (c,in,H)
    a_side = contigs.filter(F.col("nb_in") != NULL_ID).select(
        F.col("nb_in").alias("id"),
        F.col("cid").alias("nb"),
        F.when(F.col("nb_in_lab") == 0, 1).otherwise(0).alias("dir"),
        F.col("nb_in_lab").alias("lab"),
        F.col("nb_in_cov").alias("cov"),
    )
    # edge (c→b)⟨L:lb⟩ at b: lb==L → (c,in,L); lb==H → (c,out,H)
    b_side = contigs.filter(F.col("nb_out") != NULL_ID).select(
        F.col("nb_out").alias("id"),
        F.col("cid").alias("nb"),
        F.when(F.col("nb_out_lab") == 0, 0).otherwise(1).alias("dir"),
        F.col("nb_out_lab").alias("lab"),
        F.col("nb_out_cov").alias("cov"),
    )
    out = direct
    for part in (c_in, c_out, a_side, b_side):
        out = out.unionByName(part.select("id", "nb", "dir", "lab", "cov"))
    return out.select(
        F.col("id").cast("long"),
        F.col("nb").cast("long"),
        F.col("dir").cast("int"),
        F.col("lab").cast("int"),
        F.col("cov").cast("long"),
    )


def assemble(
    spark: SparkSession,
    reads: DataFrame | None,
    *,
    k: int = 31,
    theta: int = 1,
    tip_len: int = 80,
    edit_threshold: int = 5,
    algorithm: str = "lr",
    rounds: int = 2,
    bubble: bool = True,
    tips: bool = True,
    items: DataFrame | None = None,
    force_mn: DataFrame | None = None,
    partitions: int = 8,
) -> AssemblyResult:
    """Run the paper's workflow and return final contigs + stats.

    ``items`` overrides ① with a pre-built normalized item graph (used
    by the ABySS-like baseline); ``force_mn`` injects extra ambiguous
    vertices (SWAP-like baseline); ``bubble``/``tips``/``rounds``
    select which error-correction operations run.
    """
    counts: dict = {}
    with shuffle_partitions(spark, partitions):
        if items is None:
            if reads is None:
                raise ValueError("need reads or a pre-built items graph")
            _, items = build_dbg(reads, k, theta)
        items = materialize(items)
        counts["n_vertices"] = items.select("id").distinct().count()

        # ② + ③, round 1 (Table II labeling workload)
        lab1 = label_contigs(spark, items, algorithm, force_mn=force_mn)
        counts["n_ambiguous"] = lab1.amb_ids.count()
        contigs = materialize(merge_contigs(lab1, k, tip_len=tip_len))
        counts["n_contigs_round1"] = contigs.count()

        # ④ bubble filtering
        if bubble:
            before = counts["n_contigs_round1"]
            contigs = materialize(filter_bubbles(contigs, edit_threshold))
            counts["n_bubbles_pruned"] = before - contigs.count()

        # ⑤ tip removing
        deleted = spark.createDataFrame([], "id long")
        if tips:
            amb_nb = lab1.amb_ids.withColumnRenamed("id", "nb")
            amb_direct = (
                items.join(lab1.amb_ids, "id").join(amb_nb, "nb").select("id", "nb")
            )
            tr = remove_tips(spark, amb_direct, contigs, k, tip_len=tip_len)
            contigs = tr.contigs
            deleted = tr.deleted_vertices
            counts["n_tip_vertices_deleted"] = deleted.count()
            counts["n_tip_contigs_deleted"] = tr.n_deleted_contigs

        stats2 = None
        if rounds >= 2:
            # ⑥②③: rebuild mixed graph, relabel (Table III), remerge
            items2 = materialize(_round2_items(items, lab1.amb_ids, contigs, deleted))
            lab2 = label_contigs(spark, items2, algorithm)
            node_seqs = contigs.select(
                F.col("cid").alias("id"), "seq", F.col("cov").alias("node_cov")
            )
            contigs = materialize(
                merge_contigs(lab2, k, node_seqs=node_seqs, tip_len=tip_len)
            )
            stats2 = lab2.stats
        else:
            items2 = None

        counts["n_contigs_final"] = contigs.count()
    return AssemblyResult(
        contigs=contigs,
        stats_label_kmers=lab1.stats,
        stats_label_contigs=stats2,
        counts=counts,
        label_inputs={"round1": items, "round2": items2},
    )
