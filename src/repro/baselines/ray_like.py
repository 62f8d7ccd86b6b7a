"""Ray-like baseline: conservative greedy seed-and-extend surrogate.

Ray extends seeds greedily and stops at any ambiguity, preferring
short-but-accurate output. The surrogate realises the same trade-off
with the shared machinery: a high coverage cutoff (aggressively drops
(k+1)-mers that real Ray's heuristics would refuse to extend through),
no bubble filtering and a single merging round (no contig growth after
error correction). Table IV signature reproduced: small total length /
genome fraction, short contigs, very few misassemblies.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.core.pipeline import AssemblyResult, assemble


def ray_assemble(
    spark: SparkSession,
    reads: DataFrame,
    *,
    k: int = 31,
    theta: int = 2,
    tip_len: int = 80,
    partitions: int = 8,
) -> AssemblyResult:
    """Single-round, high-cutoff, no-bubble assembly."""
    return assemble(
        spark,
        reads,
        k=k,
        theta=theta,
        tip_len=tip_len,
        algorithm="lr",
        rounds=1,
        bubble=False,
        tips=True,
        partitions=partitions,
    )
