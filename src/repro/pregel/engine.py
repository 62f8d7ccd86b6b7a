"""BSP loop plumbing shared by the Pregel programs in ``repro.core``.

Each PPA (list ranking, simplified S-V, tip removing) drives its own
round loop in DataFrame operations; this module provides the pieces the
Pregel+ runtime provided in the paper:

* :class:`PregelStats` — superstep / message / wall-clock accounting
  (the quantities reported in Tables II and III);
* :func:`materialize` — the per-superstep state barrier. Implemented as
  a parquet write/read round-trip on local disk: measured on this
  Spark 4.1 build, chained ``localCheckpoint``/``checkpoint`` calls
  fail to truncate the driver-side DAG (per-round cost grows
  exponentially after ~20 rounds even though jobs/stages stay
  constant), while the parquet barrier stays flat at ~0.3 s/round.
  Files live in a per-process temp dir removed at exit; they are never
  deleted mid-session because the returned DataFrames read lazily.
* :func:`shuffle_partitions` — scoped override of
  ``spark.sql.shuffle.partitions``: BSP rounds over laptop-scale graphs
  drown in task-launch overhead at the session default of 64.
"""
from __future__ import annotations

import atexit
import itertools
import shutil
import tempfile
import time
from contextlib import contextmanager
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession

_BARRIER_DIR = tempfile.mkdtemp(prefix="repro-bsp-")
_BARRIER_SEQ = itertools.count()
atexit.register(shutil.rmtree, _BARRIER_DIR, ignore_errors=True)


@dataclass
class PregelStats:
    """Counters for one Pregel program run (paper Tables II/III).

    Superstep accounting follows the paper: a list-ranking round is 2
    supersteps (request, respond+update); a simplified-S-V round is 4
    (grandparent request, grandparent response, edge exchange + hooking,
    shortcut + convergence aggregator); contig-end recognition is 2.
    Messages are counted as rows of the message DataFrames actually
    exchanged between vertices.
    """

    algorithm: str = ""
    supersteps: int = 0
    messages: int = 0
    runtime_s: float = 0.0
    rounds: int = 0
    _t0: float = field(default=0.0, repr=False)

    def start(self) -> None:
        self._t0 = time.perf_counter()

    def stop(self) -> None:
        self.runtime_s += time.perf_counter() - self._t0

    def add(self, other: "PregelStats") -> None:
        self.supersteps += other.supersteps
        self.messages += other.messages
        self.runtime_s += other.runtime_s
        self.rounds += other.rounds


def materialize(df: DataFrame, prev: DataFrame | None = None) -> DataFrame:
    """Compute ``df`` once and return a lineage-free DataFrame.

    ``prev`` is accepted for call-site symmetry but needs no cleanup:
    barrier files are tiny and removed at process exit.
    """
    path = f"{_BARRIER_DIR}/b{next(_BARRIER_SEQ)}"
    df.write.mode("overwrite").parquet(path)
    return df.sparkSession.read.parquet(path)


@contextmanager
def shuffle_partitions(spark: SparkSession, n: int):
    """Temporarily set ``spark.sql.shuffle.partitions`` to ``n``."""
    key = "spark.sql.shuffle.partitions"
    old = spark.conf.get(key)
    spark.conf.set(key, str(n))
    try:
        yield
    finally:
        spark.conf.set(key, old)
