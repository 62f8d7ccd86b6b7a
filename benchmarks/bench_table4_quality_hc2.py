"""Benchmark + reproduction of paper Table IV: sequencing quality of
PPA-assembler vs the three baseline analogues on HC-2 (lite), with
reference-based QUAST-lite metrics."""
from repro.experiments.paper_numbers import PAPER_TABLE4
from repro.experiments.tables import format_table, table4

from benchmarks.conftest import BENCH_K, BENCH_SCALE


def test_table4_quality_hc2(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table4(spark, scale=BENCH_SCALE, k=BENCH_K), rounds=1, iterations=1
    )
    print()
    print(format_table(rows, f"Table IV (lite, scale={BENCH_SCALE})"))
    print(f"paper Table IV: {PAPER_TABLE4}")
    by = {r["assembler"]: r for r in rows}
    # the paper's headline shape on HC-2:
    # PPA wins N50 and genome fraction, with (near-)zero misassemblies
    assert by["PPA"]["n50"] >= max(r["n50"] for r in rows)
    assert by["PPA"]["genome_fraction_pct"] >= by["Ray"]["genome_fraction_pct"]
    assert by["PPA"]["genome_fraction_pct"] >= by["SWAP"]["genome_fraction_pct"]
    assert by["PPA"]["n_misassemblies"] <= 1
    # SWAP's signature: worst mismatch rate and most misassemblies
    assert by["SWAP"]["mismatches_per_100kbp"] >= max(
        by[a]["mismatches_per_100kbp"] for a in ("PPA", "Ray")
    )
    assert by["SWAP"]["n_misassemblies"] >= by["PPA"]["n_misassemblies"]
    # Ray's signature: conservative (low yield, accurate)
    assert by["Ray"]["total_length"] <= by["PPA"]["total_length"]
    assert by["Ray"]["n_misassemblies"] <= 1
