"""Benchmark-local fixtures.

``BENCH_SCALE`` (env) scales the lite datasets; 1.0 reproduces the
DESIGN.md sizes (~1/1000 of the paper's Table I).

``table23_rows`` runs the Table II/III experiment once per session —
each of the two bench files prints its table from the shared run and
separately times a representative labeling workload, so the expensive
full-pipeline setup is not billed to either benchmark.
"""
import os

import pytest

BENCH_SCALE = float(os.environ.get("BENCH_SCALE", "1.0"))
BENCH_K = int(os.environ.get("BENCH_K", "31"))


@pytest.fixture(scope="session")
def bench_scale() -> float:
    return BENCH_SCALE


@pytest.fixture(scope="session")
def table23_rows(spark):
    from repro.experiments.tables import table2_and_3

    return table2_and_3(spark, scale=BENCH_SCALE, k=BENCH_K)
