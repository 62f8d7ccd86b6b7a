import sys, time, os
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
mode = sys.argv[1]
b = (SparkSession.builder.appName("lc2")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.autoBroadcastJoinThreshold", -1))
if mode == "noaqe":
    b = b.config("spark.sql.adaptive.enabled", "false")
spark = b.getOrCreate()
spark.sparkContext.setLogLevel("ERROR")
if mode == "disk":
    spark.sparkContext.setCheckpointDir("/tmp/spark-ckpt")
from pyspark.sql import functions as F

def ckpt(df):
    if mode == "disk":
        return df.checkpoint(eager=True)
    return df.localCheckpoint(eager=True)

df = ckpt(spark.range(1000).select(F.col("id"), F.col("id").alias("p")))
for i in range(25):
    t=time.time()
    nxt = df.alias("a").join(df.select(F.col("id").alias("p"), F.col("p").alias("gp")).alias("b"), "p").select("id", F.col("gp").alias("p"))
    df = ckpt(nxt)
    print(f"{mode} iter {i} t={time.time()-t:.2f}", flush=True)
spark.stop()
