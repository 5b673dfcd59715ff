"""spark-submit entrypoint for Table 1 (dataset statistics).

Usage: spark-submit jobs/table1.py [sf]
"""
import sys

from pyspark.sql import SparkSession

from repro.tables.table1 import main


def get_spark(name: str) -> SparkSession:
    return (
        SparkSession.builder.appName(name)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


if __name__ == "__main__":
    spark = get_spark("table1")
    print(main(spark))
    spark.stop()
