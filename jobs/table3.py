"""spark-submit entrypoint for Table 3 (MinoanER vs baselines)."""
from pyspark.sql import SparkSession

from repro.tables.table3 import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("table3")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    print(main(spark))
    spark.stop()
