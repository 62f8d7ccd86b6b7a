"""Harnesses reproducing the paper's evaluation tables (§V)."""

from repro.experiments.tables import (  # noqa: F401
    table1,
    table2_and_3,
    table4,
    table5,
    format_table,
)
