"""Unit tests for edit distance and GC content."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.dna.seq import edit_distance, gc_fraction

dna = st.text(alphabet="ACGT", min_size=0, max_size=30)


def _naive_lev(a: str, b: str) -> int:
    prev = list(range(len(b) + 1))
    for i in range(1, len(a) + 1):
        cur = [i]
        for j in range(1, len(b) + 1):
            cur.append(
                min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (a[i - 1] != b[j - 1]))
            )
        prev = cur
    return prev[len(b)]


class TestEditDistance:
    @pytest.mark.parametrize(
        "a,b,d",
        [
            ("", "", 0),
            ("A", "", 1),
            ("", "ACGT", 4),
            ("ACGT", "ACGT", 0),
            ("ACGT", "AGGT", 1),
            ("ACGT", "CGT", 1),
            ("ACGT", "TGCA", 4),
            ("AAAA", "TTTT", 4),
            ("ACGTACGT", "ACGACGT", 1),
        ],
    )
    def test_known(self, a, b, d):
        assert edit_distance(a, b) == d

    @given(dna, dna)
    @settings(max_examples=150)
    def test_matches_naive(self, a, b):
        assert edit_distance(a, b) == _naive_lev(a, b)

    @given(dna, dna, st.integers(0, 8))
    @settings(max_examples=150)
    def test_banded_consistent(self, a, b, limit):
        d = _naive_lev(a, b)
        got = edit_distance(a, b, limit=limit)
        if d <= limit:
            assert got == d
        else:
            assert got > limit

    @given(dna, dna)
    @settings(max_examples=100)
    def test_symmetry(self, a, b):
        assert edit_distance(a, b) == edit_distance(b, a)

    def test_limit_early_exit_large(self):
        a, b = "A" * 500, "T" * 500
        assert edit_distance(a, b, limit=3) == 4


class TestGc:
    def test_empty(self):
        assert gc_fraction([]) == 0.0
        assert gc_fraction([""]) == 0.0

    @pytest.mark.parametrize(
        "seqs,f",
        [
            (["GGCC"], 1.0),
            (["AATT"], 0.0),
            (["ACGT"], 0.5),
            (["AC", "GT"], 0.5),
            (["G", "AAA"], 0.25),
        ],
    )
    def test_known(self, seqs, f):
        assert gc_fraction(seqs) == pytest.approx(f)
