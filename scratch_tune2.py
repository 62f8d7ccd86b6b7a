import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("tune2")
    .config("spark.sql.shuffle.partitions", "16")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from repro.genome.simulate import random_genome, simulate_reads, reads_df, DATASETS
from repro.core.pipeline import assemble
from repro.core.metrics import evaluate
from repro.baselines.swap_like import swap_assemble
from repro.baselines.abyss_like import build_abyss_items

spec = DATASETS["hc2"]
g = random_genome(spec.ref_len, seed=spec.seed, n_repeat_families=spec.n_repeat_families)
reads = simulate_reads(g, n_reads=spec.n_reads, read_len=spec.read_len, error_rate=0.005, seed=spec.seed+1)
rdf = reads_df(spark, reads).cache(); rdf.count()

def ev(res):
    seqs=[r.seq for r in res.contigs.select("seq").collect()]
    rep = evaluate(seqs, g, min_len=500)
    return f"nc={rep.n_contigs} tot={rep.total_length} n50={rep.n50} gf={rep.genome_fraction_pct:.1f} mis={rep.n_misassemblies} mm={rep.mismatches_per_100kbp:.1f} largest={rep.largest_contig}"

t=time.time(); r = assemble(spark, rdf, k=31, theta=0, rounds=1, partitions=16)
print(f"PPA t0 r1: {ev(r)} ({time.time()-t:.0f}s)", flush=True)
t=time.time(); r = assemble(spark, rdf, k=31, theta=0, rounds=2, partitions=16)
print(f"PPA t0 r2: {ev(r)} ({time.time()-t:.0f}s)", flush=True)

# ABySS-like: existence edges, single round, no bubble filtering
items = build_abyss_items(spark, rdf, 31, theta=1)
r = assemble(spark, None, k=31, items=items, rounds=1, bubble=False, tips=True, partitions=16)
print(f"ABYSS t1 r1 nb: {ev(r)}", flush=True)
items0 = build_abyss_items(spark, rdf, 31, theta=0)
r = assemble(spark, None, k=31, items=items0, rounds=1, bubble=False, tips=True, partitions=16)
print(f"ABYSS t0 r1 nb: {ev(r)}", flush=True)

for cj in (2.0, 3.0):
    r = swap_assemble(spark, rdf, k=31, cov_jump=cj, partitions=16)
    print(f"SWAP cj{cj}: {ev(r)}", flush=True)
spark.stop()
