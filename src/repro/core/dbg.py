"""① DBG construction (paper §IV-B, two mini-MapReduce phases).

Phase (i): reads → canonical (k+1)-mers with counts; low-coverage
(k+1)-mers (``count <= theta``) are filtered as likely read errors.
A (k+1)-mer and its reverse complement denote the same DNA position
(paper §III "Directionality"), so counting is over canonical forms.

Phase (ii): each surviving (k+1)-mer emits two adjacency-list items —
one at its prefix k-mer vertex and one at its suffix k-mer vertex —
with edge polarity ⟨X:Y⟩ where X/Y mark whether prefix/suffix needed
reverse-complementing to become canonical. Items are combined per
vertex into the 32-bit-bitmap adjacency map of §IV-A.

Reads are split at 'N' bases before k-mer extraction, and reads (or
fragments) shorter than k+1 contribute nothing — both per the paper.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.adjacency import items_from_vertices
from repro.dna.codec import encode_kmers_batch, rc_int_batch

# ASCII → 2-bit code; 255 marks non-ACGT (i.e. 'N' split points)
_CODE = np.full(256, 255, dtype=np.uint8)
for _i, _c in enumerate(b"ACGT"):
    _CODE[_c] = _i


def _read_kmer_counts(pdf_iter: Iterator[pd.DataFrame], k1: int) -> Iterator[pd.DataFrame]:
    """map(.) of phase (i): emit locally pre-aggregated canonical
    (k+1)-mer counts per Arrow batch (the paper's per-worker counting)."""
    for pdf in pdf_iter:
        chunks: list[np.ndarray] = []
        for seq in pdf["seq"]:
            codes = _CODE[np.frombuffer(seq.encode(), dtype=np.uint8)]
            # split at N: process maximal runs of valid codes
            bad = np.flatnonzero(codes == 255)
            prev = 0
            for b in list(bad) + [len(codes)]:
                if b - prev >= k1:
                    chunks.append(encode_kmers_batch(codes[prev:b], k1))
                prev = b + 1
        if not chunks:
            continue
        kms = np.concatenate(chunks)
        kms = np.minimum(kms, rc_int_batch(kms, k1))  # canonical form
        uniq, cnt = np.unique(kms, return_counts=True)
        yield pd.DataFrame({"km": uniq.view(np.int64), "cnt": cnt.astype(np.int64)})


def count_k1mers(reads: DataFrame, k: int, theta: int = 1) -> DataFrame:
    """Phase (i): canonical (k+1)-mer coverage, filtered by ``cnt > theta``."""
    k1 = k + 1
    local = reads.mapInPandas(lambda it: _read_kmer_counts(it, k1), schema="km long, cnt long")
    return local.groupBy("km").agg(F.sum("cnt").alias("cnt")).filter(F.col("cnt") > theta)


def _edge_items(pdf_iter: Iterator[pd.DataFrame], k: int) -> Iterator[pd.DataFrame]:
    """map(.) of phase (ii): (k+1)-mer → two (vertex, bit, cov) rows.

    All in ID space: for (k+1)-mer value m, prefix p = m >> 2 and suffix
    s = m & mask; polarity labels come from canonicalising p and s.
    ``bit = pol*8 + dir*4 + nt`` per ``repro.core.adjacency``.
    """
    mask = np.uint64((1 << (2 * k)) - 1)
    for pdf in pdf_iter:
        if pdf.empty:
            continue
        m = pdf["km"].to_numpy(np.int64).view(np.uint64)
        cov = pdf["cnt"].to_numpy(np.int64)
        p = m >> np.uint64(2)
        s = m & mask
        nt_last = (m & np.uint64(3)).astype(np.int64)
        nt_first = ((m >> np.uint64(2 * k)) & np.uint64(3)).astype(np.int64)
        p_rc = rc_int_batch(p, k)
        s_rc = rc_int_batch(s, k)
        x = (p_rc < p).astype(np.int64)  # 1 = prefix needed rc (label H)
        y = (s_rc < s).astype(np.int64)
        cp = np.minimum(p, p_rc).view(np.int64)
        cs = np.minimum(s, s_rc).view(np.int64)
        pol = x * 2 + y
        out = pd.DataFrame(
            {
                "id": np.concatenate([cp, cs]),
                "bit": np.concatenate([pol * 8 + 4 + nt_last, pol * 8 + nt_first]),
                "cov": np.concatenate([cov, cov]),
            }
        )
        yield out


def build_vertices(k1mers: DataFrame, k: int) -> DataFrame:
    """Phase (ii): k-mer vertices with compact bitmap adjacency.

    Returns ``(id long, adj map<int,long>)`` — the paper's Fig. 8a
    format with the coverage list keyed by bit index.
    """
    rows = k1mers.mapInPandas(lambda it: _edge_items(it, k), schema="id long, bit int, cov long")
    # a (vertex, bit) pair identifies one DBG edge side; distinct
    # canonical (k+1)-mers never collide here, but sum defensively
    per_bit = rows.groupBy("id", "bit").agg(F.sum("cov").alias("cov"))
    return per_bit.groupBy("id").agg(
        F.map_from_entries(F.collect_list(F.struct("bit", "cov"))).alias("adj")
    )


def build_dbg(
    reads: DataFrame, k: int, theta: int = 1
) -> tuple[DataFrame, DataFrame]:
    """① DBG construction: reads → (vertices, normalized items).

    ``vertices`` is the compact-bitmap form; ``items`` the normalized
    exploded form consumed by operations ②–⑤. ``k`` must be odd so a
    k-mer is never its own reverse complement.
    """
    if k % 2 == 0:
        raise ValueError("k must be odd (a palindromic k-mer would be its own rc)")
    if k > 31:
        raise ValueError("k must be <= 31 for 64-bit vertex IDs")
    k1 = count_k1mers(reads, k, theta)
    vertices = build_vertices(k1, k)
    return vertices, items_from_vertices(vertices, k)
