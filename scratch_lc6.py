import sys, time, shutil, os
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("lc6")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from pyspark.sql import functions as F
base = "/tmp/iterbar"; shutil.rmtree(base, ignore_errors=True); os.makedirs(base)
cnt = 0
def bar(df):
    global cnt
    cnt += 1
    p = f"{base}/{cnt % 2}_{cnt}"
    df.write.mode("overwrite").parquet(p)
    return spark.read.parquet(p)
df = bar(spark.range(1000).select(F.col("id"), F.col("id").alias("p")))
for i in range(30):
    t=time.time()
    b = df.select(F.col("id").alias("p"), F.col("p").alias("gp"))
    nxt = df.join(b, "p").select("id", F.col("gp").alias("p"))
    df = bar(nxt)
    print(f"parquet iter {i} t={time.time()-t:.2f}", flush=True)
spark.stop()
