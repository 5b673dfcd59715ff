"""Run every table harness and print all four tables.

Usage: spark-submit jobs/run_all.py
"""
from pyspark.sql import SparkSession

from repro.tables import format_rows, table1_rows, table2_rows, table3_rows, table4_rows

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("run_all")
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    print(format_rows("Table 1 — dataset statistics", table1_rows(spark)))
    print(format_rows("Table 2 — block statistics", table2_rows(spark)))
    print(format_rows("Table 3 — effectiveness", table3_rows(spark)))
    print(format_rows("Table 4 — rule ablation", table4_rows(spark)))
    spark.stop()
