"""End-to-end workflow tests (①②③④⑤⑥②③, paper Fig. 10 / §V)."""
import pytest
from pyspark.sql import functions as F

from repro.core.metrics import evaluate
from repro.core.pipeline import assemble
from repro.dna.codec import canonical, revcomp
from repro.genome.simulate import random_genome, reads_df, simulate_reads


def _seqs(res):
    return [r.seq for r in res.contigs.select("seq").collect()]


@pytest.fixture(scope="module")
def noisy_dataset(spark):
    g = random_genome(4000, seed=101, n_repeat_families=3, repeat_len=100)
    reads = simulate_reads(g, n_reads=500, read_len=100, error_rate=0.005, seed=102)
    return g, reads_df(spark, reads)


class TestEndToEnd:
    def test_error_free_single_contig(self, spark):
        g = random_genome(1200, seed=103)  # no repeats
        reads = simulate_reads(g, n_reads=400, read_len=80, error_rate=0.0, n_rate=0.0, seed=104)
        res = assemble(spark, reads_df(spark, reads), k=21, theta=0, tip_len=60)
        seqs = _seqs(res)
        assert len(seqs) == 1
        # uniform read starts rarely cover the genome's first/last few
        # bases, so the contig is a (near-full-length) exact substring
        s = seqs[0]
        assert s in g or s in revcomp(g)
        assert len(s) >= len(g) - 60

    def test_noisy_assembly_quality(self, spark, noisy_dataset):
        g, rdf = noisy_dataset
        res = assemble(spark, rdf, k=21, theta=1, tip_len=60)
        rep = evaluate(_seqs(res), g, min_len=100)
        assert rep.genome_fraction_pct > 70
        assert rep.n_misassemblies == 0
        assert rep.mismatches_per_100kbp < 50

    def test_second_round_grows_contigs(self, spark, noisy_dataset):
        """The paper reports N50 roughly doubling after ⑥②③."""
        g, rdf = noisy_dataset
        r1 = assemble(spark, rdf, k=21, theta=1, tip_len=60, rounds=1)
        r2 = assemble(spark, rdf, k=21, theta=1, tip_len=60, rounds=2)
        n50_1 = evaluate(_seqs(r1), min_len=100).n50
        n50_2 = evaluate(_seqs(r2), min_len=100).n50
        assert n50_2 >= n50_1
        assert r2.stats_label_contigs is not None
        # Table III workload is much smaller than Table II's
        assert (
            r2.stats_label_contigs.messages < r2.stats_label_kmers.messages
        )

    def test_lr_and_sv_identical_contigs(self, spark, noisy_dataset):
        _, rdf = noisy_dataset
        lr = assemble(spark, rdf, k=21, theta=1, tip_len=60, algorithm="lr")
        sv = assemble(spark, rdf, k=21, theta=1, tip_len=60, algorithm="sv")
        canon = lambda res: sorted(canonical(s)[0] for s in _seqs(res))
        assert canon(lr) == canon(sv)

    def test_counts_recorded(self, spark, noisy_dataset):
        _, rdf = noisy_dataset
        res = assemble(spark, rdf, k=21, theta=1, tip_len=60)
        for key in (
            "n_vertices",
            "n_ambiguous",
            "n_contigs_round1",
            "n_bubbles_pruned",
            "n_tip_vertices_deleted",
            "n_contigs_final",
        ):
            assert key in res.counts
        assert res.counts["n_vertices"] > 0
        assert res.counts["n_ambiguous"] < res.counts["n_vertices"]

    def test_vertex_reduction_like_paper(self, spark, noisy_dataset):
        """Paper §V: 46.97M DBG vertices → 1.00M after merging → 68k
        after round 2. Check the same strong-ordering at our scale."""
        _, rdf = noisy_dataset
        res = assemble(spark, rdf, k=21, theta=1, tip_len=60)
        assert (
            res.counts["n_contigs_final"]
            <= res.counts["n_contigs_round1"] + res.counts["n_ambiguous"]
        )
        assert res.counts["n_contigs_round1"] < res.counts["n_vertices"] / 10

    def test_requires_input(self, spark):
        with pytest.raises(ValueError):
            assemble(spark, None)
