"""DuckDB-oracle checks for the relational (mini-MapReduce) stages.

Graph traversals have no SQL equivalent, but every group-by/count stage
of the assembler does — these tests pin the Spark results against
DuckDB executing the same SQL over the same inputs.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.dbg import build_dbg, count_k1mers
from repro.core.adjacency import vertex_types
from repro.genome.simulate import random_genome, reads_df, simulate_reads
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def small(spark):
    g = random_genome(700, seed=121)
    reads = simulate_reads(g, n_reads=80, read_len=60, error_rate=0.01, seed=122)
    rdf = reads_df(spark, reads)
    vertices, items = build_dbg(rdf, 7, theta=0)
    items_pdf = items.toPandas()
    return rdf, vertices, items, items_pdf


class TestOracleChecks:
    def test_kmer_count_distribution(self, spark, small):
        """Histogram of (k+1)-mer coverages: Spark groupBy vs DuckDB."""
        rdf, *_ = small
        counts = count_k1mers(rdf, 7, theta=0)
        got = counts.groupBy("cnt").agg(F.count("*").alias("n"))
        assert_equivalent(
            got,
            "SELECT cnt, COUNT(*) AS n FROM k1 GROUP BY cnt",
            k1=counts.toPandas(),
        )

    def test_degree_distribution(self, spark, small):
        """Vertex degree histogram over the normalized items."""
        _, _, items, items_pdf = small
        got = (
            items.groupBy("id")
            .agg(F.count("*").alias("deg"))
            .groupBy("deg")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT deg, COUNT(*) AS n FROM "
            "(SELECT id, COUNT(*) AS deg FROM items GROUP BY id) GROUP BY deg",
            items=items_pdf,
        )

    def test_vertex_type_counts(self, spark, small):
        """The ⟨1⟩/⟨1-1⟩/⟨m-n⟩ classification re-expressed in SQL."""
        _, _, items, items_pdf = small
        got = vertex_types(items).groupBy("vtype").agg(F.count("*").alias("n"))
        sql = """
        SELECT CASE
                 WHEN self_loop > 0 THEN 'mn'
                 WHEN n_real = 0 THEN '0'
                 WHEN n_real = 1 THEN '1'
                 WHEN n_real = 2 AND n_out = 1 THEN '11'
                 ELSE 'mn'
               END AS vtype,
               COUNT(*) AS n
        FROM (
          SELECT id,
                 SUM(CASE WHEN nb <> -9223372036854775808 THEN 1 ELSE 0 END) AS n_real,
                 SUM(CASE WHEN nb <> -9223372036854775808 THEN dir ELSE 0 END) AS n_out,
                 SUM(CASE WHEN nb = id THEN 1 ELSE 0 END) AS self_loop
          FROM items GROUP BY id
        ) GROUP BY 1
        """
        assert_equivalent(got, sql, items=items_pdf)

    def test_coverage_sum_conservation(self, spark, small):
        """Each (k+1)-mer contributes its count to exactly two item
        rows, so sum(items.cov) = 2 * sum(k1.cnt)."""
        rdf, _, items, items_pdf = small
        k1 = count_k1mers(rdf, 7, theta=0).toPandas()
        got = items.agg((F.sum("cov") / 2).alias("half_cov"))
        assert_equivalent(
            got,
            "SELECT CAST(SUM(cnt) AS DOUBLE) AS half_cov FROM k1",
            k1=k1,
        )
