"""Benchmark + reproduction of paper Table II: LR vs S-V for labeling
unambiguous k-mers.

The full four-dataset table comes from the shared session fixture; the
benchmark itself times the Table-II workload (round-1 labeling, both
algorithms) on the HC-2 lite dataset.
"""
from repro.core.labeling import label_contigs
from repro.core.pipeline import assemble
from repro.experiments.paper_numbers import PAPER_TABLE2
from repro.experiments.tables import format_table
from repro.genome.simulate import make_dataset
from repro.pregel.engine import shuffle_partitions

from benchmarks.conftest import BENCH_K, BENCH_SCALE


def test_table2_labeling_kmers(benchmark, spark, table23_rows):
    t2, _ = table23_rows

    _, reads = make_dataset(spark, "hc2", scale=BENCH_SCALE)
    res = assemble(spark, reads, k=BENCH_K, theta=1)
    items = res.label_inputs["round1"]

    def run_both():
        with shuffle_partitions(spark, 8):
            return (
                label_contigs(spark, items, "lr").stats,
                label_contigs(spark, items, "sv").stats,
            )

    lr, sv = benchmark.pedantic(run_both, rounds=1, iterations=1)
    print()
    print(format_table(t2, f"Table II (lite, scale={BENCH_SCALE})"))
    print(f"paper Table II: {PAPER_TABLE2}")
    # the paper's shape: LR beats S-V on every dataset, on every metric
    for row in t2:
        assert row["supersteps_lr"] < row["supersteps_sv"]
        assert row["messages_lr"] < row["messages_sv"]
        assert row["runtime_lr_s"] < row["runtime_sv_s"]
    assert lr.supersteps < sv.supersteps
    assert lr.messages < sv.messages
