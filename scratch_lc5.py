import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("lc5")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
sc = spark.sparkContext
sc.setLogLevel("ERROR")
from pyspark.sql import functions as F
tracker = sc.statusTracker()
df = spark.range(1000).select(F.col("id"), F.col("id").alias("p")).localCheckpoint(eager=True)
prev_jobs = len(tracker.getJobIdsForGroup() or [])
for i in range(24):
    t=time.time()
    b = df.select(F.col("id").alias("p"), F.col("p").alias("gp"))
    nxt = df.join(b, "p").select("id", F.col("gp").alias("p"))
    df = nxt.localCheckpoint(eager=True)
    jobs = len(tracker.getJobIdsForGroup() or [])
    # count total tasks of last job via jobinfo
    jid = (tracker.getJobIdsForGroup() or [None])[0]
    info = tracker.getJobInfo(jid) if jid is not None else None
    nstages = len(info.stageIds) if info else -1
    print(f"iter {i} t={time.time()-t:.2f} jobs_delta={jobs-prev_jobs} last_job_stages={nstages}", flush=True)
    prev_jobs = jobs
spark.stop()
