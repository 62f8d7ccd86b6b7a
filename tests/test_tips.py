"""⑤ Tip removing tests.

Tips are created the way read errors create them (paper Fig. 5): an
error near a read end produces a short dangling branch off the main
path.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.dbg import build_dbg
from repro.core.labeling import label_contigs
from repro.core.merging import merge_contigs
from repro.core.tips import remove_tips
from repro.dna.codec import canonical
from repro.genome.simulate import random_genome, reads_df


def _setup(spark, seqs, k, tip_len):
    df = reads_df(spark, pd.DataFrame({"read_id": range(len(seqs)), "seq": seqs}))
    _, items = build_dbg(df, k, theta=0)
    lab = label_contigs(spark, items, "lr")
    contigs = merge_contigs(lab, k, tip_len=tip_len)
    amb_nb = lab.amb_ids.withColumnRenamed("id", "nb")
    amb_direct = items.join(lab.amb_ids, "id").join(amb_nb, "nb").select("id", "nb")
    return items, lab, contigs, amb_direct


def _tip_reads(k=9, seed=81, n_cov=6):
    """Main path + one read whose last base is wrong → short dangling
    branch (tip) at an interior position."""
    g = random_genome(200, seed=seed)
    pos = 100
    read = g[pos - 30 : pos]
    sub = {"A": "C", "C": "A", "G": "T", "T": "G"}[read[-1]]
    bad = read[:-1] + sub
    return g, [g] * n_cov + [bad]


class TestTipRemoving:
    def test_short_tip_contig_deleted(self, spark):
        g, reads = _tip_reads()
        k, tip_len = 9, 40
        items, lab, contigs, amb_direct = _setup(spark, reads, k, tip_len)
        # the erroneous branch was merged into a short dangling contig
        # or dropped at merge; after tip removal no short dangling
        # contig attached to an ambiguous vertex remains
        res = remove_tips(spark, amb_direct, contigs, k, tip_len=tip_len)
        from repro.dna.codec import NULL_ID

        for r in res.contigs.collect():
            dangling = r.nb_in == NULL_ID or r.nb_out == NULL_ID
            assert not (dangling and len(r.seq) <= tip_len)

    def test_long_dangling_contig_kept(self, spark):
        """A long dangling path is a real contig (dead end = coverage
        gap), not a tip."""
        g = random_genome(200, seed=82)
        k, tip_len = 9, 40
        items, lab, contigs, amb_direct = _setup(spark, [g] * 5, k, tip_len)
        n0 = contigs.count()
        res = remove_tips(spark, amb_direct, contigs, k, tip_len=tip_len)
        assert res.contigs.count() == n0
        assert res.n_deleted_contigs == 0

    def test_stats_and_deleted_sets_consistent(self, spark):
        g, reads = _tip_reads(seed=83)
        k, tip_len = 9, 40
        items, lab, contigs, amb_direct = _setup(spark, reads, k, tip_len)
        res = remove_tips(spark, amb_direct, contigs, k, tip_len=tip_len)
        deleted = {r.id for r in res.deleted_vertices.collect()}
        amb = {r.id for r in lab.amb_ids.collect()}
        assert deleted <= amb  # only ambiguous k-mers are deleted
        assert res.stats.supersteps >= 2

    def test_error_correction_enables_growth(self, spark):
        """After the tip is removed, the flanking ambiguous vertices
        become unambiguous — the round-2 relabeling must produce fewer
        ambiguous vertices than round 1 (paper's motivation for ⑥)."""
        from repro.core.pipeline import _round2_items

        g, reads = _tip_reads(seed=84)
        k, tip_len = 9, 40
        items, lab, contigs, amb_direct = _setup(spark, reads, k, tip_len)
        n_amb_1 = lab.amb_ids.count()
        assert n_amb_1 > 0
        res = remove_tips(spark, amb_direct, contigs, k, tip_len=tip_len)
        items2 = _round2_items(items, lab.amb_ids, res.contigs, res.deleted_vertices)
        lab2 = label_contigs(spark, items2, "lr")
        assert lab2.amb_ids.count() < n_amb_1
