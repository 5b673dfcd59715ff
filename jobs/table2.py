"""spark-submit entrypoint for Table 2 (block statistics)."""
from pyspark.sql import SparkSession

from repro.tables.table2 import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("table2")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    print(main(spark))
    spark.stop()
