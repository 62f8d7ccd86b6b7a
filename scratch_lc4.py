import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
mode = sys.argv[1]
spark = (SparkSession.builder.appName("lc4")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from pyspark.sql import functions as F

df = spark.range(1000).select(F.col("id"), F.col("id").alias("p")).localCheckpoint(eager=True)
for i in range(25):
    t=time.time()
    if mode == "noalias":
        b = df.select(F.col("id").alias("p"), F.col("p").alias("gp"))
        nxt = df.join(b, "p").select("id", F.col("gp").alias("p"))
    elif mode == "twockpt":
        b = df.select(F.col("id").alias("p"), F.col("p").alias("gp")).localCheckpoint(eager=True)
        nxt = df.join(b, "p").select("id", F.col("gp").alias("p"))
    df = nxt.localCheckpoint(eager=True)
    print(f"{mode} iter {i} t={time.time()-t:.2f}", flush=True)
spark.stop()
