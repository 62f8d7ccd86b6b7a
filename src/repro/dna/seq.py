"""Sequence-level utilities: banded edit distance (bubble filtering,
paper §IV-B ④) and GC content (QUAST metric, paper Table IV)."""
from __future__ import annotations


def edit_distance(a: str, b: str, limit: int | None = None) -> int:
    """Levenshtein distance, optionally banded.

    With ``limit`` set, returns ``limit + 1`` as soon as the distance
    provably exceeds ``limit`` (Ukkonen band of half-width ``limit``) —
    bubble filtering only needs "≤ threshold?", not the exact value.
    """
    if a == b:
        return 0
    la, lb = len(a), len(b)
    if limit is not None and abs(la - lb) > limit:
        return limit + 1
    if la == 0 or lb == 0:
        return max(la, lb)
    big = la + lb  # effectively infinity
    prev = list(range(lb + 1))
    for i in range(1, la + 1):
        if limit is None:
            lo, hi = 1, lb
            cur = [i] + [0] * lb
        else:
            lo = max(1, i - limit)
            hi = min(lb, i + limit)
            cur = [i if lo == 1 else big] + [big] * lb
        ca = a[i - 1]
        best = cur[lo - 1]
        for j in range(lo, hi + 1):
            c = min(
                prev[j] + 1,
                cur[j - 1] + 1,
                prev[j - 1] + (ca != b[j - 1]),
            )
            cur[j] = c
            if c < best:
                best = c
        if limit is not None and best > limit:
            return limit + 1
        prev = cur
    return prev[lb]


def gc_fraction(seqs: list[str]) -> float:
    """Fraction of G/C bases over all sequences (0.0 if empty input)."""
    gc = total = 0
    for s in seqs:
        gc += s.count("G") + s.count("C")
        total += len(s)
    return gc / total if total else 0.0
