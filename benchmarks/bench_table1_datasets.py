"""Benchmark + reproduction of paper Table I (dataset generation)."""
from repro.experiments.paper_numbers import PAPER_TABLE1
from repro.experiments.tables import format_table, table1


def test_table1_datasets(benchmark, spark, bench_scale):
    rows = benchmark.pedantic(
        lambda: table1(spark, scale=bench_scale), rounds=1, iterations=1
    )
    print()
    print(format_table(rows, f"Table I (lite, scale={bench_scale})"))
    # lite datasets keep the paper's ordering by data volume
    vol = {r["dataset"]: r["n_reads"] * r["avg_read_len"] for r in rows}
    assert vol["hc2"] < vol["hcx"] < vol["hc14"] < vol["bi"]
    for r in rows:
        assert r["avg_read_len"] == PAPER_TABLE1[r["dataset"]]["read_len"]
