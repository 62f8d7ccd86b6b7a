"""QUAST-lite assembly quality metrics (paper §V, Tables IV/V).

Reference-free metrics: number of contigs (≥ ``min_len``, QUAST counts
≥500 bp), total length, N50, largest contig, GC%.

Reference-based metrics (Table IV) use an anchor-chain aligner in place
of QUAST's nucmer backend (see DESIGN.md): unique k-mers of the
reference (default 21-mers) are indexed; each contig's anchors are
chained into colinear segments (same strand, consistent diagonal);
breakpoints between segments that jump more than ``break_dist`` on the
reference or flip strand count as misassemblies (QUAST's relocation /
inversion events). Genome fraction is the fraction of reference
positions covered by aligned segments; mismatches/indels are counted by
comparing segment texts (banded edit script); unaligned length counts
contig bases outside any aligned segment.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.dna.codec import canonical, revcomp
from repro.dna.seq import gc_fraction


@dataclass
class QualityReport:
    """Metric bundle mirroring the rows of paper Tables IV and V."""

    n_contigs: int = 0
    total_length: int = 0
    n50: int = 0
    largest_contig: int = 0
    gc_pct: float = 0.0
    # reference-based (None when no reference given — Table V)
    n_misassemblies: int | None = None
    misassembled_length: int | None = None
    unaligned_length: int | None = None
    genome_fraction_pct: float | None = None
    mismatches_per_100kbp: float | None = None
    indels_per_100kbp: float | None = None
    largest_alignment: int | None = None
    rows: dict = field(default_factory=dict)


def n50(lengths: list[int]) -> int:
    """Length of the contig holding the middle base of the sorted
    concatenation (paper's definition of N50)."""
    if not lengths:
        return 0
    lengths = sorted(lengths, reverse=True)
    half = sum(lengths) / 2
    acc = 0
    for ln in lengths:
        acc += ln
        if acc >= half:
            return ln
    return lengths[-1]


def _anchor_index(ref: str, ka: int) -> dict[int, tuple[int, int]]:
    """canonical ka-mer hash → (ref position, strand) for *unique*
    canonical ka-mers of the reference (non-unique anchors are dropped:
    they are repeats and cannot place a contig)."""
    idx: dict = {}
    dead = set()
    for i in range(len(ref) - ka + 1):
        s = ref[i : i + ka]
        if "N" in s:
            continue
        cs, lab = canonical(s)
        if cs in dead:
            continue
        if cs in idx:
            del idx[cs]
            dead.add(cs)
        else:
            idx[cs] = (i, lab)
    return idx


def _segments(
    contig: str, idx: dict, ka: int, break_dist: int
) -> list[tuple[int, int, int, int]]:
    """Chain contig anchors into colinear segments.

    Returns (contig_start, contig_end, ref_start, ref_end) half-open
    intervals, in contig order. Strand handled by orienting each
    anchor: a match where the contig ka-mer's canonical label differs
    from the reference's means the contig runs on the opposite strand
    at that point; such anchors chain among themselves (anti-diagonal).
    """
    anchors = []  # (cpos, rpos, strand)
    for i in range(len(contig) - ka + 1):
        s = contig[i : i + ka]
        cs, lab = canonical(s)
        hit = idx.get(cs)
        if hit is None:
            continue
        rpos, rlab = hit
        anchors.append((i, rpos, 0 if lab == rlab else 1))
    if not anchors:
        return []
    segs = []
    scpos, srpos, sstrand = anchors[0]
    prev = anchors[0]
    for a in anchors[1:]:
        cpos, rpos, strand = a
        dc = cpos - prev[0]
        dr = rpos - prev[1] if strand == 0 else prev[1] - rpos
        colinear = strand == prev[2] and abs(dr - dc) <= 50 and dc <= break_dist
        if not colinear:
            segs.append((scpos, prev[0] + ka, srpos, prev[1], sstrand))
            scpos, srpos, sstrand = a
        prev = a
    segs.append((scpos, prev[0] + ka, srpos, prev[1], sstrand))
    out = []
    for cs_, ce, rs, re_, st in segs:
        if st == 0:
            out.append((cs_, ce, rs, re_ + ka, st))
        else:  # reverse strand: ref interval runs backwards
            out.append((cs_, ce, re_, rs + ka, st))
    return out


def _count_diffs(a: str, b: str) -> tuple[int, int]:
    """(mismatches, indels) between two segment texts via a small
    banded alignment; equal-length fast path is a hamming count."""
    if len(a) == len(b):
        return sum(1 for x, y in zip(a, b) if x != y), 0
    band = min(64, abs(len(a) - len(b)) + 16)
    la, lb = len(a), len(b)
    big = la + lb
    prev = {j: j for j in range(0, min(lb, band) + 1)}
    for i in range(1, la + 1):
        cur = {}
        lo, hi = max(0, i - band), min(lb, i + band)
        for j in range(lo, hi + 1):
            best = big
            if j > 0 and (j - 1) in cur:
                best = min(best, cur[j - 1] + 1)
            if j in prev:
                best = min(best, prev[j] + 1)
            if j > 0 and (j - 1) in prev:
                best = min(best, prev[j - 1] + (a[i - 1] != b[j - 1]))
            if j == 0:
                best = min(best, i)
            cur[j] = best
        prev = cur
    dist = prev.get(lb, big)
    indels = abs(la - lb)
    mism = max(0, dist - indels)
    return mism, indels


def evaluate(
    contig_seqs: list[str],
    reference: str | None = None,
    *,
    min_len: int = 500,
    ka: int = 21,
    break_dist: int = 500,
) -> QualityReport:
    """Compute the Table IV/V metrics for a contig set."""
    seqs = [s for s in contig_seqs if len(s) >= min_len]
    rep = QualityReport(
        n_contigs=len(seqs),
        total_length=sum(len(s) for s in seqs),
        n50=n50([len(s) for s in seqs]),
        largest_contig=max((len(s) for s in seqs), default=0),
        gc_pct=100.0 * gc_fraction(seqs),
    )
    if reference is None:
        return rep

    idx = _anchor_index(reference, ka)
    covered = set()
    n_mis = mis_len = unaligned = mism = indels = largest_aln = 0
    for s in seqs:
        segs = _segments(s, idx, ka, break_dist)
        if not segs:
            unaligned += len(s)
            continue
        aligned_c = 0
        broke = False
        prev_seg = None
        for cs_, ce, rs, re_, st in segs:
            aligned_c += ce - cs_
            covered.update(range(rs, re_))
            largest_aln = max(largest_aln, ce - cs_)
            ctext = s[cs_:ce] if st == 0 else revcomp(s[cs_:ce])
            rtext = reference[rs:re_]
            dm, di = _count_diffs(ctext, rtext)
            mism += dm
            indels += di
            if prev_seg is not None:
                pcs, pce, prs, pre_, pst = prev_seg
                gap_r = min(abs(rs - pre_), abs(prs - re_))
                if pst != st or gap_r > break_dist:
                    broke = True
            prev_seg = (cs_, ce, rs, re_, st)
        unaligned += max(0, len(s) - aligned_c)
        if broke:
            n_mis += 1
            mis_len += len(s)
    denom = max(1, rep.total_length)
    rep.n_misassemblies = n_mis
    rep.misassembled_length = mis_len
    rep.unaligned_length = unaligned
    rep.genome_fraction_pct = 100.0 * len(covered) / max(1, len(reference))
    rep.mismatches_per_100kbp = 1e5 * mism / denom
    rep.indels_per_100kbp = 1e5 * indels / denom
    rep.largest_alignment = largest_aln
    return rep
