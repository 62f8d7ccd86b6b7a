"""④ Bubble filtering tests.

A bubble is created the way sequencing errors create them (paper
Fig. 5): a high-coverage main path and a low-coverage variant that
differs by one substitution between two shared flanks.
"""
import pandas as pd
import pytest

from repro.core.bubble import filter_bubbles
from repro.core.dbg import build_dbg
from repro.core.labeling import label_contigs
from repro.core.merging import merge_contigs
from repro.dna.codec import NULL_ID, canonical, revcomp
from repro.genome.simulate import random_genome, reads_df


def _contigs(spark, seqs, k):
    df = reads_df(spark, pd.DataFrame({"read_id": range(len(seqs)), "seq": seqs}))
    _, items = build_dbg(df, k, theta=0)
    lab = label_contigs(spark, items, "lr")
    return merge_contigs(lab, k, tip_len=0)


def _bubble_reads(k=9, seed=71):
    """Main sequence + variant with one SNP in the middle; the main
    path is covered by 6 'reads', the variant by 1 (low coverage)."""
    g = random_genome(220, seed=seed)
    mid = 110
    sub = {"A": "C", "C": "A", "G": "T", "T": "G"}[g[mid]]
    var = g[:mid] + sub + g[mid + 1 :]
    return g, var, [g] * 6 + [var]


class TestBubbleFiltering:
    def test_bubble_pruned_low_coverage(self, spark):
        g, var, reads = _bubble_reads()
        contigs = _contigs(spark, reads, 9)
        n_before = contigs.count()
        kept = filter_bubbles(contigs, threshold=5)
        n_after = kept.count()
        assert n_before == n_after + 1  # exactly the variant branch pruned
        # the surviving bubble branch carries the main (high) coverage
        both_ended = kept.filter(
            (kept.nb_in != NULL_ID) & (kept.nb_out != NULL_ID)
        ).collect()
        assert both_ended
        assert all(r.cov >= 6 for r in both_ended)

    def test_distant_branches_kept(self, spark):
        """Two branches that differ by more than the threshold must both
        survive (not a bubble, a genuine variant)."""
        g = random_genome(220, seed=72)
        mid = 110
        # replace a 12 bp window with its reverse complement (big edit)
        var = g[:mid] + revcomp(g[mid : mid + 12]) + g[mid + 12 :]
        contigs = _contigs(spark, [g] * 6 + [var] * 6, 9)
        kept = filter_bubbles(contigs, threshold=5)
        assert kept.count() == contigs.count()

    def test_threshold_zero_keeps_all(self, spark):
        _, _, reads = _bubble_reads(seed=73)
        contigs = _contigs(spark, reads, 9)
        assert filter_bubbles(contigs, threshold=0).count() == contigs.count()

    def test_non_candidates_pass_through(self, spark):
        """Contigs with a NULL end are never bubble candidates."""
        g = random_genome(150, seed=74)
        contigs = _contigs(spark, [g] * 3, 15)  # single dangling contig
        kept = filter_bubbles(contigs, threshold=5)
        assert sorted(r.seq for r in kept.collect()) == sorted(
            r.seq for r in contigs.collect()
        )

    def test_coverage_tie_prunes_one(self, spark):
        """Equal-coverage bubble branches: exactly one survives."""
        g, var, _ = _bubble_reads(seed=75)
        contigs = _contigs(spark, [g] * 4 + [var] * 4, 9)
        kept = filter_bubbles(contigs, threshold=5)
        assert kept.count() == contigs.count() - 1
