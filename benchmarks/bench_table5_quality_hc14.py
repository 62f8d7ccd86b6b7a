"""Benchmark + reproduction of paper Table V: reference-free quality
of the four assemblers on HC-14 (lite)."""
from repro.experiments.paper_numbers import PAPER_TABLE5
from repro.experiments.tables import format_table, table5

from benchmarks.conftest import BENCH_K, BENCH_SCALE


def test_table5_quality_hc14(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table5(spark, scale=BENCH_SCALE, k=BENCH_K), rounds=1, iterations=1
    )
    print()
    print(format_table(rows, f"Table V (lite, scale={BENCH_SCALE})"))
    print(f"paper Table V: {PAPER_TABLE5}")
    by = {r["assembler"]: r for r in rows}
    # the paper's shape on HC-14: PPA has the largest N50 and largest
    # contig; all four produce a substantial assembly
    assert by["PPA"]["n50"] >= max(r["n50"] for r in rows)
    assert by["PPA"]["largest_contig"] >= by["Ray"]["largest_contig"]
    for r in rows:
        assert r["n_contigs"] > 0
