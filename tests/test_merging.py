"""③ Contig merging tests: stitching correctness against the genome
and against the pure-python reference assembler."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.dbg import build_dbg
from repro.core.labeling import label_contigs
from repro.core.merging import merge_contigs
from repro.dna.codec import NULL_ID, canonical, decode_kmer, revcomp
from repro.genome.simulate import random_genome, reads_df, simulate_reads
from tests._reference import ref_assemble


def _reads_df(spark, seqs):
    return reads_df(spark, pd.DataFrame({"read_id": range(len(seqs)), "seq": seqs}))


def _round1_contigs(spark, seqs, k, theta=0, tip_len=0):
    _, items = build_dbg(_reads_df(spark, seqs), k, theta)
    lab = label_contigs(spark, items, "lr")
    return lab, merge_contigs(lab, k, tip_len=tip_len)


def _canon_seqs(contigs):
    return sorted(canonical(r.seq)[0] for r in contigs.select("seq").collect())


class TestSimplePath:
    def test_single_read_single_contig(self, spark):
        path = "TTAGTTGTGATCC"
        _, contigs = _round1_contigs(spark, [path], 5)
        got = _canon_seqs(contigs)
        assert got == [canonical(path)[0]]

    def test_overlapping_reads_reconstruct_sequence(self, spark):
        g = random_genome(400, seed=31)
        # reads tile the genome completely (last read ends at 400)
        reads = [g[i : i + 60] for i in range(0, 341, 20)] + [g[340:]]
        _, contigs = _round1_contigs(spark, reads, 21)
        assert _canon_seqs(contigs) == [canonical(g)[0]]

    def test_both_strand_reads_stitch(self, spark):
        """Reads from opposite strands must merge into one contig
        (canonical k-mers + polarity, paper Fig. 6)."""
        g = random_genome(300, seed=32)
        fwd = [g[i : i + 50] for i in range(0, 251, 10)]
        rev = [revcomp(g[i : i + 50]) for i in range(5, 251, 10)]
        _, contigs = _round1_contigs(spark, fwd + rev, 15)
        assert _canon_seqs(contigs) == [canonical(g)[0]]


class TestAgainstReference:
    @pytest.mark.parametrize("seed,k", [(1, 7), (2, 9), (3, 11), (4, 7)])
    def test_contig_multiset_matches_reference(self, spark, seed, k):
        g = random_genome(800, seed=seed, n_repeat_families=2, repeat_len=60)
        reads = simulate_reads(g, n_reads=150, read_len=50, error_rate=0.01, seed=seed + 50)
        seqs = list(reads["seq"])
        _, contigs = _round1_contigs(spark, seqs, k)
        assert _canon_seqs(contigs) == ref_assemble(seqs, k)

    def test_error_free_contigs_are_genome_substrings(self, spark):
        g = random_genome(1000, seed=6, n_repeat_families=3, repeat_len=60)
        reads = simulate_reads(g, n_reads=300, read_len=50, error_rate=0.0, seed=7)
        _, contigs = _round1_contigs(spark, list(reads["seq"]), 15)
        rc = revcomp(g)
        for s in (r.seq for r in contigs.select("seq").collect()):
            assert s in g or s in rc


class TestEnds:
    def test_ends_reference_ambiguous_vertices(self, spark):
        """Contig nb_in/nb_out must be ambiguous vertex IDs or NULL, and
        coverage must be the min merged edge coverage."""
        g = random_genome(900, seed=41, n_repeat_families=3, repeat_len=50)
        reads = simulate_reads(g, n_reads=250, read_len=50, error_rate=0.0, seed=42)
        lab, contigs = _round1_contigs(spark, list(reads["seq"]), 9)
        amb = {r.id for r in lab.amb_ids.collect()}
        rows = contigs.collect()
        assert rows
        n_with_amb_end = 0
        for r in rows:
            for nb in (r.nb_in, r.nb_out):
                assert nb == NULL_ID or nb in amb
                if nb != NULL_ID:
                    n_with_amb_end += 1
            assert r.cov >= 1
        assert n_with_amb_end > 0  # repeats produce ambiguous boundaries

    def test_tip_dropped_at_merge(self, spark):
        """A dangling contig at most tip_len long must be dropped."""
        path = "TTAGTTGTGATCC"  # 13 bp, dangling both sides
        _, short = _round1_contigs(spark, [path], 5, tip_len=20)
        assert short.count() == 0
        _, kept = _round1_contigs(spark, [path], 5, tip_len=10)
        assert kept.count() == 1


class TestCycle:
    def test_cyclic_contig(self, spark):
        """A circular sequence yields a single cycle contig labeled via
        the S-V fallback, with NULL ends and circular=true."""
        g = random_genome(80, seed=51)
        circ = g + g[:30]  # wrap-around reads cover the junction
        reads = [circ[i : i + 25] for i in range(0, 80, 5)]
        _, contigs = _round1_contigs(spark, reads, 11)
        rows = contigs.collect()
        assert len(rows) == 1
        assert rows[0].circular
        assert rows[0].nb_in == NULL_ID and rows[0].nb_out == NULL_ID
        # linear representation of a cycle: one tour + (k-1) wrap overlap
        assert len(rows[0].seq) == 80 + 10
        assert rows[0].seq[:10] == rows[0].seq[-10:]


class TestContigIds:
    def test_cids_unique_and_negative(self, spark):
        g = random_genome(800, seed=61, n_repeat_families=3, repeat_len=50)
        reads = simulate_reads(g, n_reads=200, read_len=50, seed=62)
        _, contigs = _round1_contigs(spark, list(reads["seq"]), 9)
        cids = [r.cid for r in contigs.select("cid").collect()]
        assert len(set(cids)) == len(cids)
        assert all(c < 0 and c != NULL_ID for c in cids)
