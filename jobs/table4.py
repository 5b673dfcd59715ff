"""spark-submit entrypoint for Table 4 (matching-rule ablation)."""
from pyspark.sql import SparkSession

from repro.tables.table4 import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("table4")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    print(main(spark))
    spark.stop()
