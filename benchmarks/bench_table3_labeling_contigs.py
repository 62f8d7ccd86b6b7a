"""Benchmark + reproduction of paper Table III: LR vs S-V for labeling
contigs (the round-2 mixed contig/k-mer graph).

The four-dataset table comes from the shared session fixture; the
benchmark times the Table-III workload on the HC-2 lite dataset.
"""
from repro.core.labeling import label_contigs
from repro.core.pipeline import assemble
from repro.experiments.paper_numbers import PAPER_TABLE3
from repro.experiments.tables import format_table
from repro.genome.simulate import make_dataset
from repro.pregel.engine import shuffle_partitions

from benchmarks.conftest import BENCH_K, BENCH_SCALE


def test_table3_labeling_contigs(benchmark, spark, table23_rows):
    t2, t3 = table23_rows

    _, reads = make_dataset(spark, "hc2", scale=BENCH_SCALE)
    res = assemble(spark, reads, k=BENCH_K, theta=1)
    items2 = res.label_inputs["round2"]

    def run_both():
        with shuffle_partitions(spark, 8):
            return (
                label_contigs(spark, items2, "lr").stats,
                label_contigs(spark, items2, "sv").stats,
            )

    lr, sv = benchmark.pedantic(run_both, rounds=1, iterations=1)
    print()
    print(format_table(t3, f"Table III (lite, scale={BENCH_SCALE})"))
    print(f"paper Table III: {PAPER_TABLE3}")
    for row in t3:
        assert row["supersteps_lr"] < row["supersteps_sv"]
        assert row["messages_lr"] < row["messages_sv"]
    # Table III workload is far smaller than Table II's (contigs, not
    # k-mers): messages drop by orders of magnitude, as in the paper
    for r2, r3 in zip(t2, t3):
        assert r3["messages_lr"] < r2["messages_lr"] / 10
    assert lr.messages < sv.messages
