"""② Contig labeling tests: LR vs S-V equivalence, contig-end
recognition, stats accounting."""
import pandas as pd
import pytest

from repro.core.dbg import build_dbg
from repro.core.labeling import label_contigs
from repro.dna.codec import is_flipped
from repro.genome.simulate import random_genome, reads_df, simulate_reads


def _items(spark, seqs, k, theta=0):
    df = reads_df(spark, pd.DataFrame({"read_id": range(len(seqs)), "seq": seqs}))
    return build_dbg(df, k, theta)[1]


def _partition(labeling):
    """label → frozenset of member ids."""
    groups = {}
    for r in labeling.labels.collect():
        groups.setdefault(r.label, set()).add(r.id)
    return {frozenset(v) for v in groups.values()}


@pytest.fixture(scope="module")
def genome_items(spark):
    g = random_genome(1500, seed=21, n_repeat_families=2, repeat_len=80)
    reads = simulate_reads(g, n_reads=250, read_len=60, error_rate=0.005, seed=22)
    return _items(spark, list(reads["seq"]), 11, theta=0)


class TestAlgorithms:
    def test_lr_and_sv_agree(self, spark, genome_items):
        """Both labeling algorithms must induce the same partition of
        the unambiguous vertices into contigs."""
        lr = label_contigs(spark, genome_items, "lr")
        sv = label_contigs(spark, genome_items, "sv")
        assert _partition(lr) == _partition(sv)

    def test_stats_shape(self, spark, genome_items):
        """Table II shape: LR uses fewer supersteps and messages."""
        lr = label_contigs(spark, genome_items, "lr")
        sv = label_contigs(spark, genome_items, "sv")
        assert lr.stats.supersteps < sv.stats.supersteps
        assert lr.stats.messages < sv.stats.messages
        assert lr.stats.supersteps >= 4  # prelude + >=1 round
        assert sv.stats.supersteps % 4 == 2  # prelude(2) + 4/round

    def test_unknown_algorithm(self, spark, genome_items):
        with pytest.raises(ValueError):
            label_contigs(spark, genome_items, "bogus")


class TestStructure:
    def test_every_unambiguous_vertex_labeled(self, spark, genome_items):
        lab = label_contigs(spark, genome_items, "lr")
        labeled = {r.id for r in lab.labels.collect()}
        unamb = {r.id for r in lab.unamb_items.select("id").distinct().collect()}
        assert labeled == unamb

    def test_ambiguous_disjoint_from_labeled(self, spark, genome_items):
        lab = label_contigs(spark, genome_items, "lr")
        amb = {r.id for r in lab.amb_ids.collect()}
        labeled = {r.id for r in lab.labels.collect()}
        assert not (amb & labeled)

    def test_lr_labels_are_flipped_end_ids(self, spark):
        """On a pure path (no cycles), every LR label is a flipped ID."""
        path = "TTAGTTGTGATCCGGACT"
        items = _items(spark, [path[i : i + 8] for i in range(len(path) - 7)], 5)
        lab = label_contigs(spark, items, "lr")
        for r in lab.labels.collect():
            assert is_flipped(r.label)

    def test_force_mn(self, spark, genome_items):
        """force_mn must move vertices from the unambiguous to the
        ambiguous set (SWAP-like baseline hook)."""
        base = label_contigs(spark, genome_items, "lr")
        some = base.labels.limit(3).select("id")
        forced = label_contigs(spark, genome_items, "lr", force_mn=some)
        amb0 = {r.id for r in base.amb_ids.collect()}
        amb1 = {r.id for r in forced.amb_ids.collect()}
        assert {r.id for r in some.collect()} <= amb1
        assert amb0 <= amb1
