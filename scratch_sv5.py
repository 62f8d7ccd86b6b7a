import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("svdbg5")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
import numpy as np
from pyspark.sql import functions as F

def mat(df, prev=None):
    out = df.localCheckpoint(eager=True)
    if prev is not None: prev.unpersist(blocking=True)
    return out

n = 2000
rng = np.random.default_rng(0)
ids = rng.permutation(n).astype("int64")
verts = spark.createDataFrame([(int(i),) for i in ids], "id long")
edges = spark.createDataFrame([(int(ids[i]), int(ids[i+1])) for i in range(n-1)], "u long, v long")
d = mat(verts.select("id", F.col("id").alias("p")))
both = mat(edges.unionByName(edges.select(F.col("v").alias("u"), F.col("u").alias("v"))))
for rnd in range(12):
    t = time.time()
    t1=time.time(); gp = mat(d.alias("a").join(d.select(F.col("id").alias("p"), F.col("p").alias("gp")).alias("b"), "p").select("id","p","gp")); tg=time.time()-t1
    dv = both.join(d.select(F.col("id").alias("v"), F.col("p").alias("d_v")), "v")
    cand = dv.join(gp.select(F.col("id").alias("u"), "p", "gp"), "u").filter((F.col("gp")==F.col("p")) & (F.col("d_v")<F.col("p"))).select(F.col("p").alias("w"), F.col("d_v").alias("x"))
    t1=time.time(); hooks = mat(cand.groupBy("w").agg(F.min("x").alias("hook"))); th=time.time()-t1
    t1=time.time(); nxt = mat(gp.join(hooks.withColumnRenamed("w","id"), "id", "left").select("id", F.col("p").alias("old_p"), F.coalesce("hook","gp").alias("p"))); tn=time.time()-t1
    changed = nxt.filter(F.col("p")!=F.col("old_p")).count()
    dold = d
    d = mat(nxt.select("id","p"))
    nparts = d.rdd.getNumPartitions()
    ndrows = d.count()
    plan_len = len(d._jdf.queryExecution().toString())
    for x in (gp, hooks, nxt, dold): x.unpersist(blocking=True)
    print(f"round {rnd} changed={changed} rows={ndrows} parts={nparts} plan={plan_len} tg={tg:.2f} th={th:.2f} tn={tn:.2f} tot={time.time()-t:.2f}", flush=True)
    if changed == 0: break
spark.stop()
