"""Unit tests for the 32-bit adjacency bitmap and item normalization."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.adjacency import bit_fields, item_bit, neighbor_from_bit
from repro.dna.codec import canonical, decode_kmer, encode_kmer, revcomp

dna9 = st.text(alphabet="ACGT", min_size=9, max_size=9)


class TestBitLayout:
    def test_roundtrip_all_32(self):
        seen = set()
        for x in (0, 1):
            for y in (0, 1):
                for d in (0, 1):
                    for nt in range(4):
                        b = item_bit(x, y, d, nt)
                        assert 0 <= b < 32
                        assert bit_fields(b) == (x, y, d, nt)
                        seen.add(b)
        assert len(seen) == 32

    def test_out_bit_is_4(self):
        assert item_bit(0, 0, 1, 0) - item_bit(0, 0, 0, 0) == 4


def _expected_edge_items(m: str):
    """String-level derivation of the two normalized items of a
    canonical (k+1)-mer edge (independent of the bit math)."""
    k = len(m) - 1
    p, s = m[:k], m[1:]
    cp, x = canonical(p)
    cs, y = canonical(s)
    it_p = (cs, 1, y) if x == 0 else (cs, 0, 1 - y)
    it_s = (cp, 0, x) if y == 0 else (cp, 1, 1 - x)
    return cp, it_p, cs, it_s


class TestNeighborFromBit:
    @given(st.text(alphabet="ACGT", min_size=4, max_size=10))
    @settings(max_examples=300)
    def test_matches_string_level(self, m):
        """For every (k+1)-mer edge: packing at the prefix and suffix
        vertices and decoding must reproduce the string-level items."""
        k = len(m) - 1
        cm, _ = canonical(m)
        cp, it_p, cs, it_s = _expected_edge_items(cm)
        p, s = cm[:k], cm[1:]
        x = 0 if p == canonical(p)[0] else 1
        y = 0 if s == canonical(s)[0] else 1
        nt_last = {"A": 0, "C": 1, "G": 2, "T": 3}[cm[-1]]
        nt_first = {"A": 0, "C": 1, "G": 2, "T": 3}[cm[0]]
        # prefix vertex: out-edge, append last nucleotide
        bit = item_bit(x, y, 1, nt_last)
        nb, d, lab = neighbor_from_bit(encode_kmer(cp), k, bit)
        assert (decode_kmer(nb, k), d, lab) == it_p
        # suffix vertex: in-edge, prepend first nucleotide
        bit = item_bit(x, y, 0, nt_first)
        nb, d, lab = neighbor_from_bit(encode_kmer(cs), k, bit)
        assert (decode_kmer(nb, k), d, lab) == it_s

    def test_paper_fig8b_example(self):
        """Fig. 8(b): 4-mer 'ACGG' with polarity ⟨H:H⟩ in-edge G-prepend
        gives neighbour 'CGGC'."""
        v = encode_kmer("ACGG")
        bit = item_bit(1, 1, 0, 2)  # ⟨H:H⟩, in, G
        nb, d, lab = neighbor_from_bit(v, 4, bit)
        assert decode_kmer(nb, 4) == "CGGC"
        # normalization: self side H (in-edge → Y=H) → dir flips, lab complements
        assert (d, lab) == (1, 0)


class TestMirrorRule:
    @given(st.text(alphabet="ACGT", min_size=4, max_size=8))
    @settings(max_examples=300)
    def test_mirror(self, m):
        """Same edge from both endpoints: same lab; dir flips iff lab=L.
        (The rule contig merging uses to find the entry item.)"""
        cm, _ = canonical(m)
        cp, (nb_p, d_p, lab_p), cs, (nb_s, d_s, lab_s) = _expected_edge_items(cm)
        assert nb_p == cs and nb_s == cp
        assert lab_p == lab_s
        if lab_p == 0:
            assert d_s == 1 - d_p
        else:
            assert d_s == d_p
