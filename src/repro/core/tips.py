"""⑤ Tip removing (paper §IV-B) — multi-phase vertex-centric pruning.

Operates on the *condensed* graph: vertices are the ambiguous k-mers,
and each merged contig is a labelled edge between its two end vertices
(or to a dead end). Per the paper, contigs ship their (ID, length) to
their neighbours in 2 supersteps; after that only path lengths matter.

In each phase, every vertex of condensed degree 1 (type ⟨1⟩) starts a
REQUEST with cumulative length k plus the first edge's contig part
(``len(contig) - (k-1)``; 0 for a direct k-mer edge); each relaying
⟨1-1⟩ vertex adds 1 for itself plus the contig part of the edge it
relays over — so a terminal receives exactly the assembled length of
the dangling path. A REQUEST ends at a ⟨m-n⟩ or ⟨1⟩ vertex, which
triggers deletion of the dangling path if the received cumulative
length is at most the tip-length threshold (⟨1⟩ terminals are deleted
with the path: the chain is an isolated short contig).

Substitution (documented in DESIGN.md): instead of relaying a DELETE
message backwards, the REQUEST carries the path (vertex + contig IDs)
and the terminal deletes the whole set — message size is bounded by the
tip threshold, the deleted set is identical, and the supersteps halve.

Deleting tips can turn ⟨m-n⟩ vertices into ⟨1⟩, so phases repeat until
a phase deletes nothing.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.dna.codec import NULL_ID
from repro.pregel.engine import PregelStats, materialize


@dataclass
class TipResult:
    """Output of ⑤ tip removing."""

    contigs: DataFrame  # surviving contigs (ends nulled if neighbour deleted)
    deleted_vertices: DataFrame  # (id) of deleted ambiguous k-mers
    n_deleted_contigs: int = 0
    stats: PregelStats = field(default_factory=lambda: PregelStats(algorithm="tips"))


def _condensed(amb_direct: DataFrame, contigs: DataFrame) -> DataFrame:
    """Condensed adjacency: (id, nb, via, via_len).

    Direct ambiguous-ambiguous k-mer edges have ``via`` NULL; contig
    edges carry the contig ID and its sequence length.
    """
    direct = amb_direct.select(
        "id", "nb", F.lit(None).cast("long").alias("via"), F.lit(0).cast("long").alias("via_len")
    )
    a_rows = contigs.filter(F.col("nb_in") != NULL_ID).select(
        F.col("nb_in").alias("id"),
        F.col("nb_out").alias("nb"),
        F.col("cid").alias("via"),
        F.length("seq").cast("long").alias("via_len"),
    )
    b_rows = contigs.filter(F.col("nb_out") != NULL_ID).select(
        F.col("nb_out").alias("id"),
        F.col("nb_in").alias("nb"),
        F.col("cid").alias("via"),
        F.length("seq").cast("long").alias("via_len"),
    )
    return direct.unionByName(a_rows).unionByName(b_rows)


def _contig_part(via_col: str, len_col: str, k: int):
    """Length a condensed edge adds beyond its endpoint k-mers."""
    return F.when(
        F.col(via_col).isNotNull(), F.col(len_col) - F.lit(k - 1)
    ).otherwise(F.lit(0))


def remove_tips(
    spark: SparkSession,
    amb_direct: DataFrame,
    contigs: DataFrame,
    k: int,
    tip_len: int = 80,
    max_phases: int = 8,
    max_supersteps_per_phase: int = 40,
) -> TipResult:
    """Run multi-phase tip removing; returns surviving contigs and the
    set of deleted ambiguous vertices."""
    res = TipResult(
        contigs=materialize(contigs),
        deleted_vertices=materialize(spark.createDataFrame([], "id long")),
    )
    res.stats.start()
    amb_direct = materialize(amb_direct)

    for _phase in range(max_phases):
        cond = materialize(_condensed(amb_direct, res.contigs))
        # 2 supersteps: contigs ship (ID, length) to their neighbours
        res.stats.supersteps += 2
        res.stats.messages += cond.filter(F.col("via").isNotNull()).count()
        deg = materialize(cond.groupBy("id").agg(F.count("*").alias("deg")))

        phase_dv: list[DataFrame] = []  # eagerly materialized fragments
        phase_dc: list[DataFrame] = []

        def _collect(dv: DataFrame, dc: DataFrame) -> None:
            phase_dv.append(materialize(dv))
            phase_dc.append(materialize(dc))

        # phase initiation from type-⟨1⟩ vertices (condensed degree 1)
        init = (
            cond.join(deg.filter(F.col("deg") == 1), "id")
            .withColumn("cum", F.lit(k) + _contig_part("via", "via_len", k))
        )
        blob = init.filter((F.col("nb") == NULL_ID) & (F.col("cum") <= tip_len))
        _collect(
            blob.select("id"),
            blob.filter(F.col("via").isNotNull()).select(F.col("via").alias("cid")),
        )
        msgs = materialize(
            init.filter((F.col("nb") != NULL_ID) & (F.col("cum") <= tip_len)).select(
                F.col("nb").alias("dst"),
                "cum",
                F.array("id").alias("path"),
                F.when(F.col("via").isNotNull(), F.array("via"))
                .otherwise(F.array().cast("array<long>"))
                .alias("cpath"),
                F.col("via").alias("last_via"),
            )
        )

        for _step in range(max_supersteps_per_phase):
            n_msgs = msgs.count()
            if n_msgs == 0:
                break
            res.stats.supersteps += 1
            res.stats.messages += n_msgs
            m = msgs.withColumn("mid", F.monotonically_increasing_id()).withColumn(
                "sender", F.element_at("path", -1)
            )
            md = m.join(deg.withColumnRenamed("id", "dst"), "dst")

            # terminal at a ⟨1⟩ vertex: delete the whole chain incl. dst
            t1 = md.filter((F.col("deg") == 1) & (F.col("cum") <= tip_len))
            _collect(
                t1.select(F.explode("path").alias("id")).unionByName(
                    t1.select(F.col("dst").alias("id"))
                ),
                t1.select(F.explode("cpath").alias("cid")),
            )
            # terminal at a ⟨m-n⟩ vertex: delete the dangling path only
            tm = md.filter((F.col("deg") >= 3) & (F.col("cum") <= tip_len))
            _collect(
                tm.select(F.explode("path").alias("id")),
                tm.select(F.explode("cpath").alias("cid")),
            )

            # relay through ⟨1-1⟩ vertices: exit via the non-entry item
            relay = md.filter(F.col("deg") == 2).join(
                cond.select(
                    F.col("id").alias("dst"),
                    F.col("nb").alias("o_nb"),
                    F.col("via").alias("o_via"),
                    F.col("via_len").alias("o_len"),
                ),
                "dst",
            )
            is_entry = (F.col("o_nb") == F.col("sender")) & F.col("o_via").eqNullSafe(
                F.col("last_via")
            )
            w = Window.partitionBy("mid").orderBy(
                F.col("is_entry").desc(), F.col("o_via").asc_nulls_first(), F.col("o_nb")
            )
            exits = (
                relay.withColumn("is_entry", is_entry)
                .withColumn("rk", F.row_number().over(w))
                .filter(F.col("rk") == 2)  # the "other" item
                .withColumn(
                    "cum2",
                    F.col("cum") + F.lit(1) + _contig_part("o_via", "o_len", k),
                )
            )

            # dead-end exit (contig to nowhere): evaluate in place
            dead = exits.filter((F.col("o_nb") == NULL_ID) & (F.col("cum2") <= tip_len))
            _collect(
                dead.select(F.explode("path").alias("id")).unionByName(
                    dead.select(F.col("dst").alias("id"))
                ),
                dead.select(F.explode("cpath").alias("cid")).unionByName(
                    dead.filter(F.col("o_via").isNotNull()).select(
                        F.col("o_via").alias("cid")
                    )
                ),
            )

            nxt = exits.filter(
                (F.col("o_nb") != NULL_ID) & (F.col("cum2") <= tip_len)
            ).select(
                F.col("o_nb").alias("dst"),
                F.col("cum2").alias("cum"),
                F.concat("path", F.array("dst")).alias("path"),
                F.when(
                    F.col("o_via").isNotNull(), F.concat("cpath", F.array("o_via"))
                )
                .otherwise(F.col("cpath"))
                .alias("cpath"),
                F.col("o_via").alias("last_via"),
            )
            msgs = materialize(nxt, prev=msgs)

        dv = spark.createDataFrame([], "id long")
        for d in phase_dv:
            dv = dv.unionByName(d)
        dv = materialize(dv.distinct())
        dc = spark.createDataFrame([], "cid long")
        for d in phase_dc:
            dc = dc.unionByName(d)
        dc = materialize(dc.distinct())
        n_dv, n_dc = dv.count(), dc.count()
        if n_dv == 0 and n_dc == 0:
            break

        # apply deletions at phase end
        res.deleted_vertices = materialize(
            res.deleted_vertices.unionByName(dv).distinct()
        )
        res.n_deleted_contigs += n_dc
        amb_direct = materialize(
            amb_direct.join(dv, "id", "left_anti")
            .join(dv.withColumnRenamed("id", "nb"), "nb", "left_anti")
            .select(*amb_direct.columns)
        )
        surv = res.contigs.join(dc, "cid", "left_anti")
        # null-out contig ends whose neighbour vertex was deleted
        dv_in = dv.withColumnRenamed("id", "nb_in").withColumn("din", F.lit(True))
        dv_out = dv.withColumnRenamed("id", "nb_out").withColumn("dout", F.lit(True))
        surv = (
            surv.join(dv_in, "nb_in", "left")
            .join(dv_out, "nb_out", "left")
            .withColumn(
                "nb_in", F.when(F.col("din"), F.lit(NULL_ID)).otherwise(F.col("nb_in"))
            )
            .withColumn(
                "nb_out", F.when(F.col("dout"), F.lit(NULL_ID)).otherwise(F.col("nb_out"))
            )
            .drop("din", "dout")
            .select(*res.contigs.columns)
        )
        res.contigs = materialize(surv)
    res.stats.stop()
    return res
