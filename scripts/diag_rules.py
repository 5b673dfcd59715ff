"""Per-rule diagnosis of MinoanER false positives on a profile."""
import sys

sys.path.insert(0, "/root/repo")
import conftest  # noqa: F401

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core import DEFAULT_CONFIG, run_minoaner
from repro.kbgen import PROFILES, generate_kb_pair
from repro.kbgen.profiles import scaled

prof_name = sys.argv[1] if len(sys.argv) > 1 else "restaurant"
sf = float(sys.argv[2]) if len(sys.argv) > 2 else 0.5

spark = (
    SparkSession.builder.appName("diag")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

pair = generate_kb_pair(spark, scaled(PROFILES[prof_name], sf), seed=7)
res = run_minoaner(pair.triples1, pair.triples2, pair.gt, DEFAULT_CONFIG)
print("PRF:", res.prf)
ok = pair.gt.withColumn("hit", F.lit(1))
res.matches.join(ok, ["eid1", "eid2"], "left").groupBy("rule").agg(
    F.count("*").alias("n"), F.sum(F.coalesce("hit", F.lit(0))).alias("correct")
).show()
false = (
    res.matches.join(pair.gt, ["eid1", "eid2"], "left_anti")
    .join(res.graph.beta_out1.select("eid1", "eid2", "beta"), ["eid1", "eid2"], "left")
    .join(res.graph.gamma_out1.select("eid1", "eid2", "gamma"), ["eid1", "eid2"], "left")
)
false.orderBy("rule", "eid1").show(40)
spark.stop()
