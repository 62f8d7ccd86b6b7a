"""Vertex & edge formats (paper §IV-A, Fig. 8) and their normalization.

Two representations are used:

1. **Compact bitmap** (the paper's Fig. 8a): each k-mer vertex stores a
   32-bit bitmap — one bit per (polarity ⟨X:Y⟩, direction, nucleotide)
   combination — plus a per-set-bit coverage count. Bit layout here::

       bit = pol * 8 + dir * 4 + nt
       pol = X * 2 + Y     (X = source-side label, Y = target-side; L=0, H=1)
       dir = 1 if this vertex is the edge source ("out"), 0 if target
       nt  = the 2-bit nucleotide appended (out) / prepended (in) to this
             vertex's *oriented* sequence to form the neighbour

   where the vertex's oriented sequence is its canonical sequence if its
   own side label is L, else the reverse complement.

2. **Normalized items** — the exploded, join-friendly form used by every
   downstream operation: one row per (vertex, adjacency item) with the
   vertex-side label forced to L via Property 1 (edge (u,v)⟨X:Y⟩ ≡
   (v,u)⟨Ȳ:X̄⟩). Normalization rule: if the vertex-side label is H,
   the direction flips and the stored neighbour-side label complements.
   Mirror property (used by contig merging): the same edge seen from the
   other endpoint has the same ``lab``, and opposite ``dir`` iff
   ``lab == L``.

Schema: ``items(id long, nb long, dir int, lab int, cov long)`` with
``nb = NULL_ID`` for dummy dead-end neighbours (contig vertices only).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.dna.codec import NULL_ID, rc_int, rc_int_batch

ITEMS_SCHEMA = "id long, nb long, dir int, lab int, cov long"


def item_bit(x_lab: int, y_lab: int, is_out: int, nt: int) -> int:
    """Pack (polarity ⟨X:Y⟩, direction, nucleotide) into a bitmap index."""
    return (x_lab * 2 + y_lab) * 8 + is_out * 4 + nt


def bit_fields(bit: int) -> tuple[int, int, int, int]:
    """Inverse of :func:`item_bit` → (X, Y, dir, nt)."""
    pol, rest = divmod(bit, 8)
    d, nt = divmod(rest, 4)
    return pol >> 1, pol & 1, d, nt


def neighbor_from_bit(vid: int, k: int, bit: int) -> tuple[int, int, int]:
    """Decode one adjacency bit of vertex ``vid`` → (nb, norm_dir, lab).

    Pure-python single-item version of :func:`items_from_vertices`
    (used by tests and driver-side checks).
    """
    x, y, d, nt = bit_fields(bit)
    self_lab = x if d == 1 else y
    nb_lab = y if d == 1 else x
    mask = (1 << (2 * k)) - 1
    ori = vid if self_lab == 0 else rc_int(vid, k)
    if d == 1:  # out: append nt to the oriented suffix
        nb_ori = ((ori << 2) | nt) & mask
    else:  # in: prepend nt to the oriented prefix
        nb_ori = (nt << (2 * (k - 1))) | (ori >> 2)
    nb = nb_ori if nb_lab == 0 else rc_int(nb_ori, k)
    if self_lab == 1:  # Property-1 normalization to self-side L
        return nb, 1 - d, 1 - nb_lab
    return nb, d, nb_lab


def items_from_vertices(vertices: DataFrame, k: int) -> DataFrame:
    """Explode the compact bitmap vertices into normalized items.

    ``vertices`` has schema ``(id long, adj map<int,long>)`` (bit →
    coverage). The neighbour-ID reconstruction is vectorised in numpy
    inside ``mapInPandas``.
    """
    exploded = vertices.select("id", F.explode("adj").alias("bit", "cov"))

    def _decode(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        mask = np.uint64((1 << (2 * k)) - 1)
        for pdf in batches:
            if pdf.empty:
                continue
            vid = pdf["id"].to_numpy(np.int64).view(np.uint64)
            bit = pdf["bit"].to_numpy(np.int64)
            x = (bit >> 4) & 1
            y = (bit >> 3) & 1
            d = (bit >> 2) & 1
            nt = (bit & 3).astype(np.uint64)
            self_lab = np.where(d == 1, x, y)
            nb_lab = np.where(d == 1, y, x)
            rc = rc_int_batch(vid, k)
            ori = np.where(self_lab == 0, vid, rc)
            out_nb = ((ori << np.uint64(2)) | nt) & mask
            in_nb = (nt << np.uint64(2 * (k - 1))) | (ori >> np.uint64(2))
            nb_ori = np.where(d == 1, out_nb, in_nb)
            nb = np.where(nb_lab == 0, nb_ori, rc_int_batch(nb_ori, k))
            norm_dir = np.where(self_lab == 1, 1 - d, d)
            norm_lab = np.where(self_lab == 1, 1 - nb_lab, nb_lab)
            yield pd.DataFrame(
                {
                    "id": vid.view(np.int64),
                    "nb": nb.astype(np.uint64).view(np.int64),
                    "dir": norm_dir.astype(np.int32),
                    "lab": norm_lab.astype(np.int32),
                    "cov": pdf["cov"].to_numpy(np.int64),
                }
            )

    return exploded.mapInPandas(_decode, schema=ITEMS_SCHEMA)


def vertex_types(items: DataFrame) -> DataFrame:
    """Classify vertices (paper §IV-A "Vertex Types") → ``(id, vtype)``.

    * ``'mn'`` — ambiguous: ≥3 real neighbours, two neighbours whose
      normalized directions disagree with ⟨1-1⟩, or a self-loop;
    * ``'11'`` — exactly two real neighbours, one normalized-in and one
      normalized-out (unambiguous pass-through);
    * ``'1'``  — exactly one real neighbour (dead end);
    * ``'0'``  — no real neighbour (isolated; contig vertices only).
    """
    real = F.col("nb") != F.lit(NULL_ID)
    agg = items.groupBy("id").agg(
        F.sum(real.cast("int")).alias("n_real"),
        F.sum(F.when(real, F.col("dir")).otherwise(0)).alias("n_out"),
        F.max((F.col("nb") == F.col("id")).cast("int")).alias("self_loop"),
    )
    return agg.select(
        "id",
        F.when(F.col("self_loop") == 1, "mn")
        .when(F.col("n_real") == 0, "0")
        .when(F.col("n_real") == 1, "1")
        .when((F.col("n_real") == 2) & (F.col("n_out") == 1), "11")
        .otherwise("mn")
        .alias("vtype"),
    )
