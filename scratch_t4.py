import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("t4")
    .config("spark.sql.shuffle.partitions", "16")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from repro.experiments.tables import table4, format_table
t0=time.time()
rows = table4(spark)
print(format_table(rows, "Table IV (hc2-lite)"))
print("total", time.time()-t0, flush=True)
spark.stop()
