"""Unit tests for the 2-bit DNA codec and 64-bit vertex IDs (§IV-A)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.dna.codec import (
    BITS2NT,
    FLIP_BIT,
    NULL_ID,
    canonical,
    canonical_int,
    decode_kmer,
    encode_kmer,
    encode_kmers_batch,
    flip,
    is_contig_id,
    is_flipped,
    make_contig_id,
    rc_int,
    rc_int_batch,
    revcomp,
    unflip,
)

dna = st.text(alphabet="ACGT", min_size=1, max_size=31)


class TestEncodeDecode:
    @pytest.mark.parametrize(
        "s,expect",
        [
            ("A", 0),
            ("C", 1),
            ("G", 2),
            ("T", 3),
            ("AA", 0),
            ("AT", 3),
            ("TA", 0b1100),
            ("ATTGC", 0b00_11_11_10_01),  # paper Fig. 7(a)
        ],
    )
    def test_known_encodings(self, s, expect):
        assert encode_kmer(s) == expect

    @given(dna)
    @settings(max_examples=200)
    def test_roundtrip(self, s):
        assert decode_kmer(encode_kmer(s), len(s)) == s

    def test_max_k(self):
        s = "ACGT" * 7 + "ACG"  # 31-mer
        assert decode_kmer(encode_kmer(s), 31) == s
        assert encode_kmer(s) < (1 << 62)

    def test_too_long_raises(self):
        with pytest.raises(ValueError):
            encode_kmer("A" * 32)

    def test_lexicographic_order_matches_numeric(self):
        # canonical-min in ID space must match string-level canonical
        kmers = ["AAA", "ACG", "CGT", "GGG", "TTT", "ATA", "TAT"]
        for a in kmers:
            for b in kmers:
                assert (a < b) == (encode_kmer(a) < encode_kmer(b))


class TestRevComp:
    @pytest.mark.parametrize(
        "s,r", [("A", "T"), ("ACGT", "ACGT"), ("AAGT", "ACTT"), ("ATTGC", "GCAAT")]
    )
    def test_known(self, s, r):
        assert revcomp(s) == r

    @given(dna)
    @settings(max_examples=200)
    def test_involution(self, s):
        assert revcomp(revcomp(s)) == s

    @given(dna)
    @settings(max_examples=200)
    def test_rc_int_matches_string(self, s):
        k = len(s)
        assert rc_int(encode_kmer(s), k) == encode_kmer(revcomp(s))

    @given(st.lists(dna.filter(lambda s: len(s) == 9), min_size=1, max_size=50))
    @settings(max_examples=50)
    def test_rc_int_batch(self, seqs):
        k = 9
        xs = np.array([encode_kmer(s) for s in seqs], dtype=np.uint64)
        got = rc_int_batch(xs, k)
        want = np.array([rc_int(int(x), k) for x in xs], dtype=np.uint64)
        assert (got == want).all()

    @pytest.mark.parametrize("k", [1, 3, 5, 15, 21, 31])
    def test_rc_int_batch_many_k(self, k):
        rng = np.random.default_rng(k)
        xs = rng.integers(0, 1 << (2 * k), size=64, dtype=np.uint64)
        got = rc_int_batch(xs, k)
        for x, g in zip(xs, got):
            assert int(g) == rc_int(int(x), k)


class TestCanonical:
    @given(dna)
    @settings(max_examples=200)
    def test_canonical_is_min(self, s):
        cs, lab = canonical(s)
        assert cs == min(s, revcomp(s))
        assert lab == (0 if s <= revcomp(s) else 1)

    @given(dna)
    @settings(max_examples=200)
    def test_canonical_int_matches(self, s):
        k = len(s)
        ci, lab = canonical_int(encode_kmer(s), k)
        cs, labs = canonical(s)
        assert decode_kmer(ci, k) == cs
        assert lab == labs

    def test_odd_k_never_self_rc(self):
        # an odd-length k-mer cannot be its own reverse complement
        for s in ["ACA", "GTG", "AAT", "CCC"]:
            assert revcomp(s) != s


class TestBatchExtraction:
    @given(st.text(alphabet="ACGT", min_size=0, max_size=60), st.integers(1, 9))
    @settings(max_examples=100)
    def test_matches_naive(self, s, k):
        codes = np.array([{"A": 0, "C": 1, "G": 2, "T": 3}[c] for c in s], dtype=np.uint8)
        got = encode_kmers_batch(codes, k)
        want = [encode_kmer(s[i : i + k]) for i in range(len(s) - k + 1)]
        assert [int(x) for x in got] == want


class TestIdSpace:
    def test_null_id(self):
        assert NULL_ID == -(1 << 63)
        assert not is_contig_id(NULL_ID)
        assert not is_flipped(NULL_ID)

    @pytest.mark.parametrize("x", [0, 1, 5, (1 << 62) - 1])
    def test_flip_kmer_ids(self, x):
        f = flip(x)
        assert is_flipped(f) and not is_flipped(x)
        assert unflip(f) == x
        assert f == x + FLIP_BIT

    def test_flip_contig_ids(self):
        cid = make_contig_id(12345)
        assert cid < 0 and is_contig_id(cid)
        f = flip(cid)
        assert is_flipped(f) and not is_flipped(cid)
        assert unflip(f) == cid
        assert is_contig_id(f)

    def test_contig_id_distinct_from_null_and_kmers(self):
        ids = {make_contig_id(i) for i in range(100)}
        assert len(ids) == 100
        assert all(i < 0 and i != NULL_ID for i in ids)

    def test_contig_id_overflow(self):
        with pytest.raises(ValueError):
            make_contig_id(1 << 62)

    def test_flip_bit_not_used_by_kmers(self):
        # a 31-mer uses 62 bits; bit 62 must stay clear
        x = encode_kmer("T" * 31)
        assert not is_flipped(x)
