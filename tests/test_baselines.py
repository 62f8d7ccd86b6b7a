"""Baseline assembler analogue tests (ABySS / Ray / SWAP substitutes)."""
import pytest
from pyspark.sql import functions as F

from repro.baselines.abyss_like import abyss_assemble, build_abyss_items
from repro.baselines.ray_like import ray_assemble
from repro.baselines.swap_like import _resolve_greedy, swap_assemble
from repro.core.dbg import build_dbg
from repro.core.metrics import evaluate
from repro.core.pipeline import assemble
from repro.genome.simulate import random_genome, reads_df, simulate_reads


@pytest.fixture(scope="module")
def dataset(spark):
    g = random_genome(3000, seed=111, n_repeat_families=3, repeat_len=90)
    reads = simulate_reads(g, n_reads=450, read_len=100, error_rate=0.005, seed=112)
    return g, reads_df(spark, reads)


def _seqs(res):
    return [r.seq for r in res.contigs.select("seq").collect()]


class TestAbyssLike:
    def test_items_superset_of_true_edges(self, spark, dataset):
        """Existence-based edges must include every observed-(k+1)-mer
        edge (the spurious edges only ever ADD ambiguity, paper §V)."""
        _, rdf = dataset
        k = 15
        _, true_items = build_dbg(rdf, k, theta=1)
        ab = build_abyss_items(spark, rdf, k, theta=1)
        t = {(r.id, r.nb, r.dir, r.lab) for r in true_items.collect()}
        a = {(r.id, r.nb, r.dir, r.lab) for r in ab.collect()}
        assert t <= a

    def test_assembles(self, spark, dataset):
        g, rdf = dataset
        res = abyss_assemble(spark, rdf, k=15, theta=1, tip_len=60)
        rep = evaluate(_seqs(res), g, min_len=100)
        assert rep.n_contigs > 0
        assert rep.genome_fraction_pct > 30


class TestRayLike:
    def test_conservative_shape(self, spark, dataset):
        """Ray's Table-IV signature: lower yield than PPA, accurate."""
        g, rdf = dataset
        ppa = assemble(spark, rdf, k=15, theta=1, tip_len=60)
        ray = ray_assemble(spark, rdf, k=15, theta=4, tip_len=60)
        rep_p = evaluate(_seqs(ppa), g, min_len=100)
        rep_r = evaluate(_seqs(ray), g, min_len=100)
        assert rep_r.total_length <= rep_p.total_length
        assert rep_r.genome_fraction_pct <= rep_p.genome_fraction_pct
        assert rep_r.n_misassemblies <= 1


class TestSwapLike:
    def test_greedy_resolution_degree_bound(self, spark, dataset):
        """After greedy resolution no vertex keeps more than one item
        per direction."""
        _, rdf = dataset
        _, items = build_dbg(rdf, 15, theta=0)
        resolved = _resolve_greedy(items)
        worst = (
            resolved.groupBy("id", "dir")
            .count()
            .agg(F.max("count"))
            .collect()[0][0]
        )
        assert worst == 1

    def test_resolution_keeps_mirror_symmetry(self, spark, dataset):
        """Every surviving edge must still be present from both ends."""
        _, rdf = dataset
        _, items = build_dbg(rdf, 15, theta=0)
        resolved = _resolve_greedy(items)
        rows = {(r.id, r.nb, r.dir, r.lab) for r in resolved.collect()}
        for (u, v, d, lab) in rows:
            md = (1 - d) if lab == 0 else d
            assert (v, u, md, lab) in rows

    def test_assembles(self, spark, dataset):
        g, rdf = dataset
        res = swap_assemble(spark, rdf, k=15, tip_len=60)
        assert res.counts["n_contigs_final"] > 0
