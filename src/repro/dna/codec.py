"""2-bit DNA codec and 64-bit integer vertex IDs (paper §IV-A, Fig. 7).

Encoding follows the paper exactly:

* each nucleotide is 2 bits — A=00, C=01, G=10, T=11;
* a k-mer (k ≤ 31) is right-aligned in a 64-bit integer, upper bits 0,
  so plain k-mer IDs are non-negative and < 2**62;
* the dummy ``NULL`` neighbour is the ID with only the most significant
  bit set (the most negative int64);
* contig IDs set the most significant bit (so they are negative int64
  and can never collide with a k-mer ID); the paper concatenates a
  32-bit worker id with a 32-bit per-worker sequence number — Spark's
  ``monotonically_increasing_id`` has exactly that partition-id ‖ row-id
  layout, so :func:`make_contig_id` wraps it;
* bit 62 (second most significant) is the contig-end *flip* marker used
  by contig labeling (paper Fig. 11): it is never part of a k-mer
  sequence nor of the ID-type discrimination.

All functions use plain Python ints (which Spark stores as LongType);
batch variants use numpy uint64 bit-twiddling for the hot paths.
"""
from __future__ import annotations

import numpy as np

#: nucleotide → 2-bit code (paper: A 00, C 01, G 10, T 11)
NT2BITS = {"A": 0, "C": 1, "G": 2, "T": 3}
#: 2-bit code → nucleotide
BITS2NT = "ACGT"
#: complement code: A<->T (0<->3), C<->G (1<->2) — i.e. ``3 - code``
_COMPLEMENT = {"A": "T", "T": "A", "C": "G", "G": "C"}

#: dummy neighbour ID: only bit 63 set (most negative 64-bit integer)
NULL_ID = -(1 << 63)
#: contig-end marker bit (second most significant bit of the 64-bit ID)
FLIP_BIT = 1 << 62

_I64 = 1 << 64


def _to_signed(u: int) -> int:
    """Interpret a value mod 2**64 as a signed 64-bit integer."""
    u %= _I64
    return u - _I64 if u >= (1 << 63) else u


def encode_kmer(s: str) -> int:
    """Pack a DNA string (≤31 nt, alphabet ACGT) into its integer ID."""
    if len(s) > 31:
        raise ValueError(f"k-mer too long for 64-bit ID: {len(s)}")
    x = 0
    for ch in s:
        x = (x << 2) | NT2BITS[ch]
    return x


def decode_kmer(x: int, k: int) -> str:
    """Inverse of :func:`encode_kmer` for a k-mer ID (ignores flip bit)."""
    x = unflip(x)
    if x < 0:
        raise ValueError(f"not a k-mer ID: {x}")
    out = []
    for i in range(k):
        out.append(BITS2NT[(x >> (2 * (k - 1 - i))) & 3])
    return "".join(out)


def revcomp(s: str) -> str:
    """Reverse complement of a DNA string (paper §III, *rc(s)*)."""
    return "".join(_COMPLEMENT[c] for c in reversed(s))


def rc_int(x: int, k: int) -> int:
    """Reverse complement of a k-mer ID, in ID space.

    Complement is XOR with 2k ones (A=00 ↔ T=11, C=01 ↔ G=10); reversal
    swaps the 2-bit groups end-to-end.
    """
    x ^= (1 << (2 * k)) - 1
    out = 0
    for _ in range(k):
        out = (out << 2) | (x & 3)
        x >>= 2
    return out


# numpy masks for reversing 2-bit groups inside a uint64
_M2 = np.uint64(0x3333333333333333)
_M4 = np.uint64(0x0F0F0F0F0F0F0F0F)


def rc_int_batch(xs: np.ndarray, k: int) -> np.ndarray:
    """Vectorised :func:`rc_int` over a uint64 array."""
    x = xs.astype(np.uint64)
    x = x ^ np.uint64((1 << (2 * k)) - 1)
    # reverse bytes, then reverse the 2-bit groups within each byte
    x = x.byteswap()
    x = ((x & _M4) << np.uint64(4)) | ((x >> np.uint64(4)) & _M4)
    x = ((x & _M2) << np.uint64(2)) | ((x >> np.uint64(2)) & _M2)
    # the 2k significant bits are now left-aligned; shift them back
    return x >> np.uint64(64 - 2 * k)


def canonical(s: str) -> tuple[str, int]:
    """(canonical sequence, label) where label 0=L (``s`` is canonical)
    or 1=H (the reverse complement is)."""
    r = revcomp(s)
    return (s, 0) if s <= r else (r, 1)


def canonical_int(x: int, k: int) -> tuple[int, int]:
    """ID-space :func:`canonical`. Lexicographic order of ACGT strings
    equals numeric order of their 2-bit encodings, so ``min`` works."""
    r = rc_int(x, k)
    return (x, 0) if x <= r else (r, 1)


def encode_kmers_batch(seq_codes: np.ndarray, k: int) -> np.ndarray:
    """All k-mer IDs of a 2-bit coded sequence (uint8 array) as uint64.

    Returns an array of length ``len(seq_codes) - k + 1`` (empty if the
    sequence is shorter than k). Vectorised: k shifted adds.
    """
    n = len(seq_codes) - k + 1
    if n <= 0:
        return np.empty(0, dtype=np.uint64)
    acc = np.zeros(n, dtype=np.uint64)
    c = seq_codes.astype(np.uint64)
    for j in range(k):
        acc = (acc << np.uint64(2)) | c[j : j + n]
    return acc


def is_flipped(x: int) -> bool:
    """True if the contig-end flip bit (bit 62) is set."""
    return bool((x >> 62) & 1)


def flip(x: int) -> int:
    """Set the contig-end flip bit, staying in signed-64 space."""
    return _to_signed((x % _I64) | FLIP_BIT)


def unflip(x: int) -> int:
    """Clear the contig-end flip bit, staying in signed-64 space."""
    return _to_signed((x % _I64) & ~FLIP_BIT)


def is_contig_id(x: int) -> bool:
    """True for contig IDs (bit 63 set), excluding the NULL sentinel."""
    return x < 0 and unflip(x) != NULL_ID


def make_contig_id(mono_id: int) -> int:
    """Contig ID from ``monotonically_increasing_id()`` (paper Fig. 7c).

    The monotonic id is partition-id ‖ per-partition row-id, matching
    the paper's worker-id ‖ sequence-number scheme; +1 avoids colliding
    with ``NULL_ID`` (which is bit 63 alone), and bit 63 is set to mark
    the ID as a contig.
    """
    m = mono_id + 1
    if m >= FLIP_BIT:
        raise ValueError("contig id overflows into the flip bit")
    return _to_signed(m | (1 << 63))
