"""Vertex-centric BSP (Pregel) substrate over Spark DataFrames.

Replaces the paper's Pregel+ backend: superstep loop, vote-to-halt,
message counting (for Tables II/III), aggregator-style convergence
checks, and the paper's two API extensions — in-memory job
concatenation and mini-MapReduce graph loading (`minimr`).
"""

from repro.pregel.engine import PregelStats, shuffle_partitions, materialize  # noqa: F401
from repro.pregel.minimr import flat_map  # noqa: F401
