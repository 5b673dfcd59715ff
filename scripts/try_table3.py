"""Quick validation of the table3 path on a downscaled restaurant profile."""
import sys
import time

sys.path.insert(0, "/root/repo")
import conftest  # noqa: F401

from pyspark.sql import SparkSession

from repro.tables.table3 import table3_rows
from repro.tables.fmt import format_rows

spark = (
    SparkSession.builder.appName("try3")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")
t0 = time.time()
rows = table3_rows(spark, profiles=["restaurant"], sf=0.5, bsl_ns=(1,))
print(format_rows("table3 restaurant@sf0.5", rows))
print(f"elapsed {time.time()-t0:.1f}s")
spark.stop()
