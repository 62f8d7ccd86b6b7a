"""QUAST-lite metric tests (driver-side, no Spark)."""
import pytest

from repro.core.metrics import evaluate, n50
from repro.dna.codec import revcomp
from repro.genome.simulate import random_genome


class TestN50:
    @pytest.mark.parametrize(
        "lengths,want",
        [
            ([], 0),
            ([100], 100),
            ([100, 100], 100),
            ([1, 1, 1, 10], 10),  # 10 covers the middle of total 13
            ([5, 4, 3, 2, 1], 4),  # total 15, half 7.5: 5+4 >= 7.5
            ([8, 8, 8, 8], 8),
        ],
    )
    def test_cases(self, lengths, want):
        assert n50(lengths) == want


class TestReferenceFree:
    def test_basic_stats(self):
        rep = evaluate(["A" * 600, "G" * 800, "C" * 100], min_len=500)
        assert rep.n_contigs == 2  # the 100bp contig is below min_len
        assert rep.total_length == 1400
        assert rep.largest_contig == 800
        assert rep.n50 == 800
        assert rep.gc_pct == pytest.approx(100 * 800 / 1400)
        assert rep.genome_fraction_pct is None  # no reference given


class TestReferenceBased:
    @pytest.fixture(scope="class")
    def ref(self):
        return random_genome(20_000, seed=91)

    def test_perfect_contigs(self, ref):
        contigs = [ref[:6000], ref[6000:12000], ref[12000:]]
        rep = evaluate(contigs, ref)
        assert rep.genome_fraction_pct > 99.0
        assert rep.n_misassemblies == 0
        assert rep.mismatches_per_100kbp == 0
        assert rep.indels_per_100kbp == 0
        assert rep.unaligned_length < 100  # anchor edge effects only
        assert rep.largest_alignment >= 5900

    def test_reverse_complement_contig_aligns(self, ref):
        rep = evaluate([revcomp(ref[2000:9000])], ref)
        assert rep.genome_fraction_pct > 30.0
        assert rep.n_misassemblies == 0
        assert rep.mismatches_per_100kbp == 0

    def test_chimeric_contig_is_misassembly(self, ref):
        """Joining two distant reference windows = 1 misassembly."""
        chimera = ref[1000:3000] + ref[15000:17000]
        rep = evaluate([chimera], ref)
        assert rep.n_misassemblies == 1
        assert rep.misassembled_length == len(chimera)

    def test_strand_flip_is_misassembly(self, ref):
        chimera = ref[1000:3000] + revcomp(ref[3000:5000])
        rep = evaluate([chimera], ref)
        assert rep.n_misassemblies == 1

    def test_adjacent_segments_not_misassembly(self, ref):
        """A contig exactly matching the reference must not be split."""
        rep = evaluate([ref[4000:10000]], ref)
        assert rep.n_misassemblies == 0

    def test_mismatch_counting(self, ref):
        s = list(ref[5000:7000])
        # 4 substitutions well apart (anchors resync between them)
        for p in (400, 800, 1200, 1600):
            s[p] = {"A": "C", "C": "A", "G": "T", "T": "G"}[s[p]]
        rep = evaluate(["".join(s)], ref)
        assert rep.n_misassemblies == 0
        got = rep.mismatches_per_100kbp * 2000 / 1e5
        assert 3 <= round(got) <= 5

    def test_unaligned_random_contig(self, ref):
        junk = random_genome(1500, seed=99)  # different seed: unrelated
        rep = evaluate([junk], ref)
        assert rep.unaligned_length >= 1400
        assert rep.genome_fraction_pct < 1.0

    def test_genome_fraction_partial(self, ref):
        rep = evaluate([ref[:5000]], ref)
        assert 24 <= rep.genome_fraction_pct <= 26

    def test_min_len_filters(self, ref):
        rep = evaluate([ref[:400], ref[5000:5400]], ref, min_len=500)
        assert rep.n_contigs == 0
        assert rep.total_length == 0
