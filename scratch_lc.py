import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("lc")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from pyspark.sql import functions as F
df = spark.range(1000).select(F.col("id"), F.col("id").alias("p")).localCheckpoint(eager=True)
for i in range(25):
    t=time.time()
    # self-join like S-V's gp computation
    nxt = df.alias("a").join(df.select(F.col("id").alias("p"), F.col("p").alias("gp")).alias("b"), "p").select("id", F.col("gp").alias("p"))
    df = nxt.localCheckpoint(eager=True)
    rddinfo = df.rdd.toDebugString().decode().count("\n")
    print(f"iter {i} t={time.time()-t:.2f} rdd_lines={rddinfo}", flush=True)
spark.stop()
