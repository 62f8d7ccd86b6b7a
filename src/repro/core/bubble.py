"""④ Bubble filtering (paper §IV-B) — mini-MapReduce over contigs.

map(.): each contig whose two neighbours nb₁ < nb₂ are both ambiguous
keys itself by (nb₁, nb₂). reduce(.): all contigs sharing both ends are
compared pairwise; if the edit distance between a pair's sequences
(reverse-complemented when their directions disagree) is at most the
threshold, the lower-coverage contig is pruned. Contigs that are not
bubble candidates pass through unchanged.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.dna.codec import NULL_ID, revcomp
from repro.dna.seq import edit_distance


def _filter_group(pdf: pd.DataFrame, threshold: int) -> pd.DataFrame:
    rows = pdf.sort_values("cid").to_dict("records")
    pruned = [False] * len(rows)
    for i in range(len(rows)):
        if pruned[i]:
            continue
        for j in range(i + 1, len(rows)):
            if pruned[j]:
                continue
            ci, cj = rows[i], rows[j]
            same_dir = ci["nb_in"] == cj["nb_in"]
            sj = cj["seq"] if same_dir else revcomp(cj["seq"])
            if edit_distance(ci["seq"], sj, limit=threshold) <= threshold:
                # prune the lower-coverage one (ties: the larger cid)
                if (ci["cov"], -ci["cid"]) < (cj["cov"], -cj["cid"]):
                    pruned[i] = True
                    break
                pruned[j] = True
    keep = [r for r, p in zip(rows, pruned) if not p]
    return pd.DataFrame(keep, columns=pdf.columns) if keep else pdf.iloc[0:0]


def filter_bubbles(contigs: DataFrame, threshold: int = 5) -> DataFrame:
    """Prune low-coverage near-duplicate contigs sharing both ends."""
    is_candidate = (F.col("nb_in") != NULL_ID) & (F.col("nb_out") != NULL_ID)
    cand = contigs.filter(is_candidate).withColumn(
        "bkey",
        F.struct(
            F.least("nb_in", "nb_out").alias("k1"),
            F.greatest("nb_in", "nb_out").alias("k2"),
        ),
    )
    survivors = (
        cand.groupBy("bkey")
        .applyInPandas(
            lambda pdf: _filter_group(pdf.drop(columns=["bkey"]), threshold),
            schema=contigs.schema,
        )
    )
    return contigs.filter(~is_candidate).unionByName(survivors)
