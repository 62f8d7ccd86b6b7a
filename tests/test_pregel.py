"""Tests for the Pregel substrate: stats, barrier, mini-MapReduce."""
import time

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.pregel.engine import PregelStats, materialize, shuffle_partitions
from repro.pregel.minimr import flat_map


class TestPregelStats:
    def test_accumulation(self):
        a = PregelStats("lr", supersteps=4, messages=100, rounds=2)
        b = PregelStats("lr", supersteps=2, messages=50, rounds=1)
        a.add(b)
        assert (a.supersteps, a.messages, a.rounds) == (6, 150, 3)

    def test_timer(self):
        s = PregelStats("x")
        s.start()
        time.sleep(0.01)
        s.stop()
        assert s.runtime_s > 0


class TestMaterialize:
    def test_preserves_rows_and_schema(self, spark):
        df = spark.range(100).select(
            F.col("id"), (F.col("id") * 2).alias("v"), F.array("id").alias("a")
        )
        out = materialize(df)
        # names and types survive; nullability flags may legitimately
        # differ across the parquet round-trip
        assert [(f.name, f.dataType.simpleString()) for f in out.schema.fields] == [
            (f.name, f.dataType.simpleString()) for f in df.schema.fields
        ]
        assert out.count() == 100
        assert out.agg(F.sum("v")).collect()[0][0] == 9900

    def test_empty_dataframe(self, spark):
        df = spark.createDataFrame([], "id long, xs array<long>")
        out = materialize(df)
        assert out.count() == 0
        assert [f.name for f in out.schema.fields] == ["id", "xs"]

    def test_iteration_stays_fast(self, spark):
        """The barrier must keep per-round cost flat — this is the
        regression test for the Spark 4.1 chained-checkpoint blowup
        documented in repro.pregel.engine."""
        df = materialize(spark.range(500).select("id", F.col("id").alias("p")))
        times = []
        for _ in range(25):
            t = time.time()
            b = df.select(F.col("id").alias("p"), F.col("p").alias("gp"))
            df = materialize(df.join(b, "p").select("id", F.col("gp").alias("p")))
            times.append(time.time() - t)
        assert max(times[-5:]) < 10 * max(0.2, min(times[:5]))


class TestShufflePartitions:
    def test_scoped_override(self, spark):
        key = "spark.sql.shuffle.partitions"
        before = spark.conf.get(key)
        with shuffle_partitions(spark, 3):
            assert spark.conf.get(key) == "3"
        assert spark.conf.get(key) == before

    def test_restores_on_error(self, spark):
        key = "spark.sql.shuffle.partitions"
        before = spark.conf.get(key)
        with pytest.raises(RuntimeError):
            with shuffle_partitions(spark, 5):
                raise RuntimeError("boom")
        assert spark.conf.get(key) == before


class TestMiniMapReduce:
    def test_flat_map_expansion(self, spark):
        """map(.) may emit zero or more rows per input (paper §II)."""
        df = spark.createDataFrame([(1,), (2,), (3,)], "n int")

        def fn(batches):
            for pdf in batches:
                out = []
                for n in pdf["n"]:
                    out.extend({"k": int(n), "v": i} for i in range(int(n)))
                yield pd.DataFrame(out, columns=["k", "v"])

        res = flat_map(df, fn, "k int, v int")
        assert res.count() == 6  # 1 + 2 + 3
        # shuffle + reduce: the standard groupBy completes the minimr
        agg = {r.k: r.s for r in res.groupBy("k").agg(F.sum("v").alias("s")).collect()}
        assert agg == {1: 0, 2: 1, 3: 3}
