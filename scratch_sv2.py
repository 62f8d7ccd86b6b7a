import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("svdbg2")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from repro.genome.simulate import random_genome, simulate_reads, reads_df
from repro.core.dbg import build_dbg
from repro.core.labeling import label_contigs
from repro.pregel.engine import shuffle_partitions, materialize

genome = random_genome(5000, seed=7, n_repeat_families=3, repeat_len=120)
reads = simulate_reads(genome, n_reads=600, read_len=100, error_rate=0.005, seed=8)
rdf = reads_df(spark, reads)
with shuffle_partitions(spark, 8):
    t=time.time(); _, items = build_dbg(rdf, 21, 1); items = materialize(items)
    print("dbg", time.time()-t, flush=True)
    t=time.time(); lab = label_contigs(spark, items, "sv")
    print("sv labeling", time.time()-t, lab.stats, flush=True)
spark.stop()
