"""Quick end-to-end smoke: generate micro KB pair, run MinoanER, print PRF."""
import os
import sys
import time

sys.path.insert(0, "/root/repo")
import conftest  # noqa: F401  (sets PYSPARK_SUBMIT_ARGS pre-import)
from pyspark.sql import SparkSession

from repro.core import DEFAULT_CONFIG, run_minoaner
from repro.kbgen import MICRO, generate_kb_pair

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("WARN")

t0 = time.time()
pair = generate_kb_pair(spark, MICRO, seed=7)
print("triples1:", pair.triples1.count(), "triples2:", pair.triples2.count())
res = run_minoaner(pair.triples1, pair.triples2, pair.gt, DEFAULT_CONFIG)
print("name_attrs1:", res.graph.name_attrs1, "name_attrs2:", res.graph.name_attrs2)
print("purge_threshold:", res.graph.purge_threshold)
print("PRF:", res.prf)
from pyspark.sql import functions as F  # noqa: E402

ok = pair.gt.withColumn("hit", F.lit(1))
res.matches.join(ok, ["eid1", "eid2"], "left").groupBy("rule").agg(
    F.count("*").alias("n"), F.sum(F.coalesce("hit", F.lit(0))).alias("correct")
).show()
print(f"elapsed: {time.time()-t0:.1f}s")
spark.stop()
