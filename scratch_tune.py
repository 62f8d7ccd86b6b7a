import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("tune")
    .config("spark.sql.shuffle.partitions", "16")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from repro.genome.simulate import random_genome, simulate_reads, reads_df, DATASETS
from repro.core.pipeline import assemble
from repro.core.metrics import evaluate
from repro.baselines.swap_like import swap_assemble

spec = DATASETS["hc2"]
def mk(err):
    g = random_genome(spec.ref_len, seed=spec.seed, n_repeat_families=spec.n_repeat_families)
    reads = simulate_reads(g, n_reads=spec.n_reads, read_len=spec.read_len, error_rate=err, seed=spec.seed+1)
    return g, reads_df(spark, reads)

def ev(g, res):
    seqs=[r.seq for r in res.contigs.select("seq").collect()]
    rep = evaluate(seqs, g, min_len=500)
    return f"nc={rep.n_contigs} tot={rep.total_length} n50={rep.n50} gf={rep.genome_fraction_pct:.1f} mis={rep.n_misassemblies} mm={rep.mismatches_per_100kbp:.1f}"

for err in (0.005, 0.002):
    g, rdf = mk(err); rdf = rdf.cache(); rdf.count()
    t=time.time(); r2 = assemble(spark, rdf, k=31, theta=1, partitions=16)
    print(f"err={err} PPA r2 : {ev(g, r2)}  ({time.time()-t:.0f}s)", flush=True)
    r1 = assemble(spark, rdf, k=31, theta=1, rounds=1, partitions=16)
    print(f"err={err} PPA r1 : {ev(g, r1)}", flush=True)
    for th in (2, 3):
        rr = assemble(spark, rdf, k=31, theta=th, rounds=1, bubble=False, partitions=16)
        print(f"err={err} RAY t{th}: {ev(g, rr)}", flush=True)
    for cj in (1.5,):
        rs = swap_assemble(spark, rdf, k=31, cov_jump=cj, partitions=16)
        print(f"err={err} SWAPcj{cj}: {ev(g, rs)}", flush=True)
    rdf.unpersist()
spark.stop()
