import sys, time
sys.path.insert(0, "/root/repo")
import conftest
from pyspark.sql import SparkSession
spark = (SparkSession.builder.appName("svdbg")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
from repro.core.sv import sv_components
from repro.pregel.engine import PregelStats

# path 1-2-3-4-5, plus component {10,11}, singleton 20
verts = spark.createDataFrame([(i,) for i in [1,2,3,4,5,10,11,20]], "id long")
edges = spark.createDataFrame([(1,2),(2,3),(3,4),(4,5),(10,11)], "u long, v long")
st = PregelStats("sv"); st.start()
t=time.time()
labels = sv_components(spark, verts, edges, st)
print(sorted([(r.id, r.label) for r in labels.collect()]))
print(st, time.time()-t)
spark.stop()
