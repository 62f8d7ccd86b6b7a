"""① DBG construction tests: (k+1)-mer counting (checked against the
DuckDB oracle), vertex/adjacency construction, vertex typing."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.adjacency import items_from_vertices, vertex_types
from repro.core.dbg import build_dbg, count_k1mers
from repro.dna.codec import canonical, decode_kmer, encode_kmer
from repro.genome.simulate import random_genome, reads_df, simulate_reads
from repro.oracle import assert_equivalent
from tests._reference import ref_adjacency, ref_k1mers, ref_types


def _reads(spark, seqs):
    return reads_df(spark, pd.DataFrame({"read_id": range(len(seqs)), "seq": seqs}))


class TestCountK1mers:
    def test_against_duckdb_oracle(self, spark):
        """The mini-MapReduce count must equal a SQL GROUP BY over the
        exploded canonical (k+1)-mer table (run on DuckDB)."""
        g = random_genome(800, seed=1)
        reads = simulate_reads(g, n_reads=60, read_len=50, error_rate=0.01, seed=2)
        k = 5
        exploded = pd.DataFrame(
            {
                "km": [
                    encode_kmer(canonical(s[i : i + k + 1])[0])
                    for s in reads["seq"]
                    for frag in [s]
                    for i in range(len(frag) - k)
                    if "N" not in frag[i : i + k + 1]
                ]
            }
        )
        got = count_k1mers(_reads(spark, list(reads["seq"])), k, theta=0)
        assert_equivalent(
            got.select("km", "cnt"),
            "SELECT km, COUNT(*) AS cnt FROM km1 GROUP BY km",
            km1=exploded,
        )

    def test_theta_filter(self, spark):
        # 'ACGTA' appears twice, 'CGTAC' once
        got = count_k1mers(_reads(spark, ["ACGTA", "ACGTAC"]), 4, theta=1)
        rows = {decode_kmer(r.km, 5): r.cnt for r in got.collect()}
        assert rows == {canonical("ACGTA")[0]: 2}

    def test_reverse_complement_reads_count_together(self, spark):
        """A read and its reverse complement describe the same molecule
        position; canonical counting must merge them."""
        s = "ACGGTTCA"
        from repro.dna.codec import revcomp

        got = count_k1mers(_reads(spark, [s, revcomp(s)]), 4, theta=0)
        for r in got.collect():
            assert r.cnt == 2

    def test_n_splitting(self, spark):
        got = count_k1mers(_reads(spark, ["ACGTNACGT"]), 3, theta=0)
        # each fragment 'ACGT' yields one 4-mer; canonical('ACGT')='ACGT'
        rows = {decode_kmer(r.km, 4): r.cnt for r in got.collect()}
        assert rows == {"ACGT": 2}

    def test_short_reads_ignored(self, spark):
        got = count_k1mers(_reads(spark, ["ACG", "AC", "A"]), 4, theta=0)
        assert got.count() == 0

    def test_matches_reference_impl(self, spark):
        g = random_genome(600, seed=3)
        reads = simulate_reads(g, n_reads=60, read_len=40, error_rate=0.02, n_rate=0.01, seed=4)
        seqs = list(reads["seq"])
        k = 7
        want = ref_k1mers(seqs, k, theta=1)
        got = {
            decode_kmer(r.km, k + 1): r.cnt
            for r in count_k1mers(_reads(spark, seqs), k, theta=1).collect()
        }
        assert got == dict(want)


class TestBuildDbg:
    def test_validation(self, spark):
        r = _reads(spark, ["ACGT"])
        with pytest.raises(ValueError):
            build_dbg(r, 4)  # even k
        with pytest.raises(ValueError):
            build_dbg(r, 33)  # too large

    def test_figure4_style_path(self, spark):
        """Overlapping reads stitch into a single DBG path (the paper's
        Fig. 4 scenario, with a sequence whose canonical 3-mers are all
        distinct — the figure's own 'ATTGCAAGT' self-collides under
        canonicalization since TTG = rc(CAA)): two ⟨1⟩ ends, all
        interior vertices ⟨1-1⟩."""
        path = "TTAGTTGTG"
        reads = [path[:5], path[2:8], path[4:]]  # cover every 4-window
        _, items = build_dbg(_reads(spark, reads), 3, theta=0)
        types = {decode_kmer(r.id, 3): r.vtype for r in vertex_types(items).collect()}
        want_vertices = {canonical(path[i : i + 3])[0] for i in range(len(path) - 2)}
        assert set(types) == want_vertices
        ends = sorted(v for v, t in types.items() if t == "1")
        mids = [v for v, t in types.items() if t == "11"]
        assert ends == sorted(
            [canonical(path[:3])[0], canonical(path[-3:])[0]]
        )
        assert len(mids) == len(want_vertices) - 2

    def test_paper_figure4_sequence_is_degenerate(self, spark):
        """The literal Fig. 4 reads: 'TTG' and 'CAA' canonicalize to the
        same vertex (and 'TTGC'/'GCAA' to the same edge), so the
        canonical DBG has fewer than the figure's 7 vertices — the
        figure ignores directionality. Types must still match the
        string-level reference implementation exactly."""
        reads = ["ATTG", "TTGCAA", "AAGT"]
        _, items = build_dbg(_reads(spark, reads), 3, theta=0)
        types = {decode_kmer(r.id, 3): r.vtype for r in vertex_types(items).collect()}
        assert canonical("TTG")[0] == canonical("CAA")[0] == "CAA"
        assert len(types) < 7
        assert types == ref_types(ref_adjacency(ref_k1mers(reads, 3, 0), 3))

    def test_items_match_reference_adjacency(self, spark):
        """Normalized items from the bit-packed vertices must equal the
        string-level reference adjacency (same normalization rules)."""
        g = random_genome(400, seed=7)
        reads = simulate_reads(g, n_reads=80, read_len=40, error_rate=0.01, seed=8)
        seqs = list(reads["seq"])
        k = 7
        _, items = build_dbg(_reads(spark, seqs), k, theta=0)
        got = {
            (decode_kmer(r.id, k), decode_kmer(r.nb, k), r.dir, r.lab, r.cov)
            for r in items.collect()
        }
        want = {
            (v, nb, d, lab, cov)
            for v, its in ref_adjacency(ref_k1mers(seqs, k, 0), k).items()
            for (nb, d, lab, cov) in its
        }
        assert got == want

    def test_vertex_types_match_reference(self, spark):
        g = random_genome(500, seed=9)
        reads = simulate_reads(g, n_reads=100, read_len=40, error_rate=0.02, seed=10)
        seqs = list(reads["seq"])
        k = 5  # small k → collisions → ambiguous vertices exercised
        _, items = build_dbg(_reads(spark, seqs), k, theta=0)
        got = {decode_kmer(r.id, k): r.vtype for r in vertex_types(items).collect()}
        adj = ref_adjacency(ref_k1mers(seqs, k, 0), k)
        want = ref_types(adj)
        assert got == want
        assert "mn" in set(want.values())  # the test actually exercises ambiguity

    def test_bitmap_vertices_roundtrip(self, spark):
        """items_from_vertices(build_vertices(...)) must agree with the
        adjacency map cardinality (each set bit = one item)."""
        vertices, items = build_dbg(_reads(spark, ["ACGTTGCA", "GTTGCATT"]), 3, theta=0)
        n_bits = vertices.select(F.sum(F.size("adj"))).collect()[0][0]
        assert n_bits == items.count()

    def test_coverage_threshold_removes_error_kmers(self, spark):
        g = random_genome(300, seed=11)
        clean = simulate_reads(g, n_reads=120, read_len=40, error_rate=0.0, seed=12)
        _, items0 = build_dbg(_reads(spark, list(clean["seq"])), 7, theta=0)
        noisy = simulate_reads(g, n_reads=120, read_len=40, error_rate=0.03, seed=12)
        _, items_t0 = build_dbg(_reads(spark, list(noisy["seq"])), 7, theta=0)
        _, items_t1 = build_dbg(_reads(spark, list(noisy["seq"])), 7, theta=1)
        clean_v = {r.id for r in items0.select("id").distinct().collect()}
        spurious0 = {r.id for r in items_t0.select("id").distinct().collect()} - clean_v
        spurious1 = {r.id for r in items_t1.select("id").distinct().collect()} - clean_v
        # θ=1 must eliminate the vast majority of error-induced vertices
        assert len(spurious0) > 100
        assert len(spurious1) < 0.2 * len(spurious0)
