"""Unit tests for the genome/read simulator (ART + dataset substitute)."""
import numpy as np
import pytest

from repro.dna.codec import revcomp
from repro.genome.simulate import (
    DATASETS,
    random_genome,
    simulate_reads,
)


class TestRandomGenome:
    def test_length_and_alphabet(self):
        g = random_genome(5000, seed=1)
        assert len(g) == 5000
        assert set(g) <= set("ACGT")

    def test_deterministic(self):
        assert random_genome(1000, seed=3) == random_genome(1000, seed=3)
        assert random_genome(1000, seed=3) != random_genome(1000, seed=4)

    def test_gc_content(self):
        g = random_genome(200_000, seed=2, gc=0.41)
        gc = (g.count("G") + g.count("C")) / len(g)
        assert abs(gc - 0.41) < 0.01

    def test_repeats_planted(self):
        g = random_genome(20_000, seed=5, n_repeat_families=4, repeat_len=150)
        # at least one 150-mer occurs twice (forward or reverse complement)
        seen = {}
        found = False
        for i in range(0, len(g) - 150 + 1):
            s = g[i : i + 150]
            key = min(s, revcomp(s))
            if key in seen:
                found = True
                break
            seen[key] = i
        assert found

    def test_no_repeats_by_default(self):
        g = random_genome(10_000, seed=6)
        kmers = [g[i : i + 31] for i in range(len(g) - 30)]
        assert len(set(kmers)) == len(kmers)


class TestSimulateReads:
    def test_shapes(self):
        g = random_genome(2000, seed=0)
        reads = simulate_reads(g, n_reads=50, read_len=100, seed=1)
        assert list(reads.columns) == ["read_id", "seq"]
        assert len(reads) == 50
        assert all(len(s) == 100 for s in reads["seq"])

    def test_error_free_reads_are_genome_substrings(self):
        g = random_genome(2000, seed=0)
        reads = simulate_reads(g, n_reads=80, read_len=60, error_rate=0.0, n_rate=0.0, seed=2)
        rc = revcomp(g)
        fwd = rev = 0
        for s in reads["seq"]:
            if s in g:
                fwd += 1
            elif s in rc:
                rev += 1
            else:
                pytest.fail(f"read not a substring of either strand: {s}")
        # both strands are sampled (fair coin)
        assert fwd > 10 and rev > 10

    def test_error_rate(self):
        g = random_genome(5000, seed=0)
        reads = simulate_reads(g, n_reads=500, read_len=100, error_rate=0.02, n_rate=0.0, seed=3)
        rc = revcomp(g)
        # count total mismatches vs the best-matching strand placement
        # cheaper check: fraction of reads containing at least one error
        clean = sum(1 for s in reads["seq"] if s in g or s in rc)
        p_clean = (1 - 0.02) ** 100
        assert abs(clean / 500 - p_clean) < 0.1

    def test_n_rate(self):
        g = random_genome(5000, seed=0)
        reads = simulate_reads(g, n_reads=200, read_len=100, error_rate=0.0, n_rate=0.01, seed=4)
        n_total = sum(s.count("N") for s in reads["seq"])
        assert 100 < n_total < 320  # E=200, loose binomial bounds

    def test_deterministic(self):
        g = random_genome(1000, seed=0)
        a = simulate_reads(g, n_reads=20, read_len=50, seed=9)
        b = simulate_reads(g, n_reads=20, read_len=50, seed=9)
        assert list(a["seq"]) == list(b["seq"])

    def test_too_short_genome_raises(self):
        with pytest.raises(ValueError):
            simulate_reads("ACGT", n_reads=1, read_len=10)


class TestDatasetRegistry:
    def test_registry_matches_paper_shape(self):
        # Table I ordering: increasing data volume; read lengths kept
        assert DATASETS["hc2"].read_len == 100
        assert DATASETS["hcx"].read_len == 100
        assert DATASETS["hc14"].read_len == 101
        assert DATASETS["bi"].read_len == 155
        vol = {n: s.n_reads * s.read_len for n, s in DATASETS.items()}
        assert vol["hc2"] < vol["hcx"] < vol["hc14"] < vol["bi"]

    def test_depths_match_paper(self):
        # paper depths: hc2 ~10x, hcx ~9.6x, hc14 ~21x
        assert abs(DATASETS["hc2"].depth() - 10.0) < 0.5
        assert abs(DATASETS["hcx"].depth() - 9.6) < 0.5
        assert abs(DATASETS["hc14"].depth() - 21.0) < 1.0

    def test_ref_length_ratio(self):
        # HC-X reference is ~2x HC-2, as in Table I
        r = DATASETS["hcx"].ref_len / DATASETS["hc2"].ref_len
        assert 1.9 < r < 2.1


class TestMakeDataset:
    def test_make_dataset_scaled(self, spark):
        from repro.genome.simulate import make_dataset

        genome, reads = make_dataset(spark, "hc2", scale=0.02)
        assert len(genome) == int(48_170 * 0.02)
        n = reads.count()
        assert n == max(50, int(4_810 * 0.02))
        row = reads.limit(1).collect()[0]
        assert len(row.seq) == 100
