"""Benchmark fixtures: tame shuffle fan-out for bench-scale data."""
from __future__ import annotations

import pytest


@pytest.fixture(scope="session", autouse=True)
def _bench_spark(spark):
    spark.conf.set("spark.sql.shuffle.partitions", "16")
    spark.sparkContext.setLogLevel("ERROR")
    return spark
