"""Mini-MapReduce extension (paper §II, "Our Extensions to Pregel API").

The paper extends Pregel+ with a map → shuffle-by-key → sorted reduce
procedure used during graph loading (and by contig merging / bubble
filtering). On Spark SQL this is ``mapInPandas`` (map) followed by
``groupBy`` (shuffle) and an aggregate or ``applyInPandas`` (reduce);
the helpers here keep the call sites declarative. The paper's other
extension — in-memory conversion between consecutive jobs instead of an
HDFS round-trip — is the native behaviour of chained DataFrames.
"""
from __future__ import annotations

from typing import Callable, Iterator

import pandas as pd
from pyspark.sql import DataFrame


def flat_map(
    df: DataFrame,
    fn: Callable[[pd.DataFrame], Iterator[pd.DataFrame]],
    schema: str,
) -> DataFrame:
    """The ``map(.)`` UDF of the paper's mini-MapReduce: each input row
    may emit zero or more output rows. ``fn`` receives partition-sized
    pandas batches and yields output batches (Arrow-backed)."""
    return df.mapInPandas(fn, schema=schema)
