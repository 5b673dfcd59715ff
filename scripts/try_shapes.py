"""Bench-scale validation of Table 3 shapes on selected profiles."""
import sys
import time

sys.path.insert(0, "/root/repo")
import conftest  # noqa: F401

from pyspark.sql import SparkSession

from repro.tables.fmt import format_rows
from repro.tables.table3 import table3_rows

profiles = sys.argv[1:] or ["bbc_dbpedia", "yago_imdb"]
spark = (
    SparkSession.builder.appName("shapes")
    .config("spark.sql.shuffle.partitions", "16")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")
for prof in profiles:
    t0 = time.time()
    rows = table3_rows(spark, profiles=[prof])
    print(format_rows(f"table3 {prof} (bench scale)", rows), flush=True)
    print(f"{prof}: {time.time()-t0:.0f}s", flush=True)
spark.stop()
