"""Throwaway smoke test for the full pipeline (deleted before ship)."""
import os, sys, time
sys.path.insert(0, "/root/repo")
import conftest  # sets PYSPARK_SUBMIT_ARGS
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.genome.simulate import random_genome, simulate_reads, reads_df
from repro.core.pipeline import assemble
from repro.core.metrics import evaluate

t0 = time.time()
genome = random_genome(5000, seed=7, n_repeat_families=3, repeat_len=120)
reads = simulate_reads(genome, n_reads=600, read_len=100, error_rate=0.005, seed=8)
rdf = reads_df(spark, reads)
res = assemble(spark, rdf, k=21, theta=1, tip_len=60, algorithm="lr", rounds=2)
print("counts:", res.counts)
print("stats kmers:", res.stats_label_kmers)
print("stats contigs:", res.stats_label_contigs)
seqs = [r.seq for r in res.contigs.select("seq").collect()]
rep = evaluate(seqs, genome, min_len=100)
print("report:", rep)
print("elapsed", time.time() - t0)
spark.stop()
