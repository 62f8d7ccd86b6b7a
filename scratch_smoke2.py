import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("smoke2")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from repro.genome.simulate import random_genome, simulate_reads, reads_df
from repro.core.pipeline import assemble
from repro.core.metrics import evaluate
from repro.baselines import abyss_assemble, ray_assemble, swap_assemble

genome = random_genome(5000, seed=7, n_repeat_families=3, repeat_len=120)
reads = simulate_reads(genome, n_reads=600, read_len=100, error_rate=0.005, seed=8)
rdf = reads_df(spark, reads).cache()

t=time.time()
res_sv = assemble(spark, rdf, k=21, theta=1, tip_len=60, algorithm="sv", rounds=2)
print("SV:", res_sv.counts, res_sv.stats_label_kmers, f"{time.time()-t:.1f}s")

for name, fn in [("abyss", abyss_assemble), ("ray", ray_assemble), ("swap", swap_assemble)]:
    t=time.time()
    kw = dict(k=21, tip_len=60)
    if name == "ray": kw["theta"]=4
    r = fn(spark, rdf, **kw)
    seqs=[x.seq for x in r.contigs.select("seq").collect()]
    rep = evaluate(seqs, genome, min_len=100)
    print(name, r.counts.get("n_contigs_final"), "n50", rep.n50, "gf", rep.genome_fraction_pct,
          "mis", rep.n_misassemblies, "mm/100k", round(rep.mismatches_per_100kbp,1), f"{time.time()-t:.1f}s")
spark.stop()
