"""③ Contig merging (paper §IV-B) — mini-MapReduce group-by-label.

All vertices sharing a contig label are shuffled into one reduce group
(``groupBy(label).applyInPandas``). Inside the group a hash table over
the vertices supports the ordering walk: start from a contig-end vertex
(one whose internal degree ≤ 1; if none, the contig is a cycle and we
start anywhere), then repeatedly hop to "the other neighbour".

Orientation bookkeeping (paper Fig. 9 / Property 1): a vertex is
traversed *forward* iff it is entered through its normalized in-item;
forward vertices contribute their canonical sequence, backward ones the
reverse complement. Consecutive contributions overlap by k-1 bases, so
every vertex after the first appends exactly its oriented tail. The
mirror rule for normalized items (same ``lab``; ``dir`` flips iff
``lab`` = L) identifies the entry item at each hop.

Contig coverage is the minimum edge coverage merged (plus component
contig coverages in round 2). The two contig ends record the external
(ambiguous or NULL) neighbour with the neighbour-side polarity label,
keeping the contig-side label L by construction.

A dangling contig (an end with no neighbour) whose length is at most
the tip-length threshold is dropped here, as in the paper's reduce.
"""
from __future__ import annotations

from typing import Iterable

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.labeling import LabelingResult
from repro.dna.codec import NULL_ID, decode_kmer, revcomp

MERGED_SCHEMA = (
    "label long, seq string, cov long, n_nodes int, "
    "nb_in long, nb_in_lab int, nb_in_cov long, "
    "nb_out long, nb_out_lab int, nb_out_cov long, circular boolean"
)

#: final contig schema (after cid assignment)
CONTIG_COLS = [
    "cid", "seq", "cov", "n_nodes",
    "nb_in", "nb_in_lab", "nb_in_cov",
    "nb_out", "nb_out_lab", "nb_out_cov", "circular",
]


def _pick_external(items: list, want_dir: int):
    for e in items:
        if e[4] and e[1] == want_dir:
            return e
    return None


def _merge_group(pdf: pd.DataFrame, k: int) -> pd.DataFrame:
    """reduce(.): stitch one contig group into a single sequence."""
    label = int(pdf["label"].iloc[0])
    nodes: dict[int, dict] = {}
    for r in pdf.itertuples(index=False):
        nd = nodes.setdefault(
            int(r.id), {"items": [], "seq": r.seq, "ncov": r.node_cov}
        )
        nd["items"].append(
            (int(r.nb), int(r.dir), int(r.lab), int(r.cov), bool(r.external))
        )

    def seq_of(vid: int) -> str:
        s = nodes[vid]["seq"]
        return s if isinstance(s, str) and s else decode_kmer(vid, k)

    # pick a start vertex: internal degree <= 1 (contig end); else cycle
    start = None
    for vid in sorted(nodes):
        if sum(1 for it in nodes[vid]["items"] if not it[4]) <= 1:
            start = vid
            break
    circular = start is None
    if circular:
        start = min(nodes)

    internal0 = [it for it in nodes[start]["items"] if not it[4]]
    exit_it = internal0[0] if internal0 else None
    o = 1 if (exit_it is None or exit_it[1] == 1) else 0

    order: list[tuple[int, int]] = [(start, o)]
    edge_covs: list[int] = []
    cur, exit_cur = start, exit_it
    seen = {start}
    while exit_cur is not None:
        nxt = exit_cur[0]
        edge_covs.append(exit_cur[3])
        if circular and nxt == start:
            break
        if nxt in seen or nxt not in nodes:
            raise ValueError(f"malformed contig group {label}: revisit {nxt}")
        # mirror rule: entry item at nxt has same lab; dir flips iff lab==L
        d_ent = (1 - exit_cur[1]) if exit_cur[2] == 0 else exit_cur[1]
        lab_ent = exit_cur[2]
        o_nxt = 1 if d_ent == 0 else 0
        its = nodes[nxt]["items"]
        ent = None
        for e in its:
            if not e[4] and e[0] == cur and e[1] == d_ent and e[2] == lab_ent:
                ent = e
                break
        others = [e for e in its if not e[4] and e is not ent]
        order.append((nxt, o_nxt))
        seen.add(nxt)
        cur, exit_cur = nxt, (others[0] if others else None)

    parts: list[str] = []
    prev_tail = None
    for i, (vid, ov) in enumerate(order):
        s = seq_of(vid)
        s = s if ov == 1 else revcomp(s)
        if i == 0:
            parts.append(s)
        else:
            if prev_tail != s[: k - 1]:
                raise ValueError(
                    f"stitch mismatch in contig {label} at vertex {vid}: "
                    f"{prev_tail!r} vs {s[:k-1]!r}"
                )
            parts.append(s[k - 1 :])
        prev_tail = s[-(k - 1) :]
    seq = "".join(parts)

    # coverage: min over merged edges and member-contig coverages
    cands: list[int] = list(edge_covs)
    cands += [int(nodes[v]["ncov"]) for v, _ in order if pd.notna(nodes[v]["ncov"])]
    if not cands:
        cands = [it[3] for it in nodes[start]["items"] if it[4]] or [1]
    cov = int(min(cands))

    if circular:
        nb_in = nb_out = NULL_ID
        li = lo = 0
        ci = co = 0
    else:
        v1, o1 = order[0]
        vk, ok = order[-1]
        e_up = _pick_external(nodes[v1]["items"], 0 if o1 == 1 else 1)
        e_dn = _pick_external(nodes[vk]["items"], 1 if ok == 1 else 0)
        nb_in = e_up[0] if e_up else NULL_ID
        li = (e_up[2] if o1 == 1 else 1 - e_up[2]) if e_up else 0
        ci = e_up[3] if e_up else 0
        nb_out = e_dn[0] if e_dn else NULL_ID
        lo = (e_dn[2] if ok == 1 else 1 - e_dn[2]) if e_dn else 0
        co = e_dn[3] if e_dn else 0

    return pd.DataFrame(
        [
            {
                "label": label,
                "seq": seq,
                "cov": cov,
                "n_nodes": len(order),
                "nb_in": nb_in,
                "nb_in_lab": li,
                "nb_in_cov": ci,
                "nb_out": nb_out,
                "nb_out_lab": lo,
                "nb_out_cov": co,
                "circular": circular,
            }
        ]
    )


def merge_contigs(
    labeling: LabelingResult,
    k: int,
    *,
    node_seqs: DataFrame | None = None,
    tip_len: int = 80,
) -> DataFrame:
    """Merge labeled unambiguous vertices into contigs.

    ``node_seqs`` (``id, seq, node_cov``) supplies sequences/coverages
    for contig *nodes* in the second merging round; k-mer nodes decode
    their sequence from the vertex ID. Returns contigs with assigned
    ``cid`` (bit-63 IDs from ``monotonically_increasing_id``, the
    paper's worker‖sequence scheme); dangling contigs with
    ``len <= tip_len`` are dropped (tips at merge).
    """
    rows = labeling.unamb_items.join(labeling.labels, "id")
    if node_seqs is not None:
        rows = rows.join(node_seqs, "id", "left")
    else:
        rows = rows.withColumn("seq", F.lit(None).cast("string")).withColumn(
            "node_cov", F.lit(None).cast("long")
        )
    merged = rows.groupBy("label").applyInPandas(
        lambda pdf: _merge_group(pdf, k), schema=MERGED_SCHEMA
    )
    dangling = (F.col("nb_in") == NULL_ID) | (F.col("nb_out") == NULL_ID)
    kept = merged.filter(~(dangling & (F.length("seq") <= tip_len)))
    return kept.withColumn(
        "cid",
        F.expr("(monotonically_increasing_id() + 1) | shiftleft(cast(1 as bigint), 63)"),
    ).select(*CONTIG_COLS)


def contig_seqs(contigs: DataFrame) -> Iterable[str]:
    """Collect contig sequences to the driver (for metrics)."""
    return [r.seq for r in contigs.select("seq").collect()]
