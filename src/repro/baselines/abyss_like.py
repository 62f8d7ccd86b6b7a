"""ABySS-like baseline: existence-based DBG edges.

Paper §V: "ABySS builds the DBG by letting each k-mer send messages to
its 8 possible neighbours (with A/T/G/C prepended/appended) to
establish edges. This increases ambiguity (and hence reduces contig
length) since an edge will be created [between k-mers] even though the
(k+1)-mer does not exist in the DNA molecule."

This baseline reproduces exactly that mechanism: vertices are the
canonical k-mers observed in reads (coverage-filtered); an edge exists
between u and v whenever *both k-mers exist* and v is one of u's 8
possible extensions — no (k+1)-mer evidence required. Edge coverage is
the min of the two k-mer counts. Labeling, merging and tip removal are
shared with PPA-assembler; per ABySS's fixed single-pass workflow the
contig-regrowth loop (⑥②③) and the bubble-filtering pass are not run —
which reproduces its Table-IV signature (N50 at PPA's round-1 level,
more contigs, weaker error correction).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.adjacency import ITEMS_SCHEMA
from repro.core.dbg import count_k1mers
from repro.core.pipeline import AssemblyResult, assemble
from repro.dna.codec import rc_int_batch
from repro.pregel.engine import shuffle_partitions


def _candidates(pdf_iter: Iterator[pd.DataFrame], k: int) -> Iterator[pd.DataFrame]:
    """Each k-mer vertex emits its 8 possible neighbours (4 appended ×
    out, 4 prepended × in), canonicalised, with its own coverage."""
    mask = np.uint64((1 << (2 * k)) - 1)
    for pdf in pdf_iter:
        if pdf.empty:
            continue
        v = pdf["km"].to_numpy(np.int64).view(np.uint64)
        cov = pdf["cnt"].to_numpy(np.int64)
        outs = []
        for nt in range(4):
            nbo = ((v << np.uint64(2)) | np.uint64(nt)) & mask
            rc = rc_int_batch(nbo, k)
            lab = (rc < nbo).astype(np.int32)
            outs.append(
                pd.DataFrame(
                    {
                        "id": v.view(np.int64),
                        "nb": np.minimum(nbo, rc).view(np.int64),
                        "dir": np.int32(1),
                        "lab": lab,
                        "cov": cov,
                    }
                )
            )
            nbi = (np.uint64(nt) << np.uint64(2 * (k - 1))) | (v >> np.uint64(2))
            rci = rc_int_batch(nbi, k)
            labi = (rci < nbi).astype(np.int32)
            outs.append(
                pd.DataFrame(
                    {
                        "id": v.view(np.int64),
                        "nb": np.minimum(nbi, rci).view(np.int64),
                        "dir": np.int32(0),
                        "lab": labi,
                        "cov": cov,
                    }
                )
            )
        yield pd.concat(outs, ignore_index=True)


def build_abyss_items(spark: SparkSession, reads: DataFrame, k: int, theta: int = 1) -> DataFrame:
    """Normalized item graph with existence-based edges."""
    kmers = count_k1mers(reads, k - 1, theta)  # counts canonical k-mers
    cand = kmers.mapInPandas(lambda it: _candidates(it, k), schema=ITEMS_SCHEMA)
    exists = kmers.select(F.col("km").alias("nb"), F.col("cnt").alias("nb_cnt"))
    items = (
        cand.join(exists, "nb")
        .withColumn("cov", F.least("cov", "nb_cnt"))
        .select("id", "nb", "dir", "lab", "cov")
        .groupBy("id", "nb", "dir", "lab")
        .agg(F.max("cov").alias("cov"))
    )
    return items.select("id", "nb", "dir", "lab", "cov")


def abyss_assemble(
    spark: SparkSession,
    reads: DataFrame,
    *,
    k: int = 31,
    theta: int = 1,
    tip_len: int = 80,
    edit_threshold: int = 5,
    partitions: int = 8,
) -> AssemblyResult:
    """Single-round pipeline over the existence-based DBG."""
    with shuffle_partitions(spark, partitions):
        items = build_abyss_items(spark, reads, k, theta)
    return assemble(
        spark,
        None,
        k=k,
        theta=theta,
        tip_len=tip_len,
        edit_threshold=edit_threshold,
        items=items,
        rounds=1,
        bubble=False,
        tips=True,
        partitions=partitions,
    )
