"""Helpers for building handcrafted KBs in tests."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.kbgen.generator import TRIPLE_SCHEMA


def kb(spark: SparkSession, rows: list[tuple]) -> DataFrame:
    """Build a triples DataFrame from (eid, attr, val, obj) tuples.

    ``val`` is None for relation rows, ``obj`` is None for literal rows.
    """
    pdf = pd.DataFrame(rows, columns=["eid", "attr", "val", "obj"])
    pdf["obj"] = [
        None if o is None or (isinstance(o, float) and pd.isna(o)) else int(o)
        for o in pdf["obj"]
    ]
    pdf["val"] = pdf["val"].astype(object).where(pdf["val"].notna(), None)
    return spark.createDataFrame(pdf, schema=TRIPLE_SCHEMA)


def gt_df(spark: SparkSession, pairs: list[tuple[int, int]]) -> DataFrame:
    from repro.kbgen.generator import GT_SCHEMA

    return spark.createDataFrame(
        pd.DataFrame(pairs, columns=["eid1", "eid2"]), schema=GT_SCHEMA
    )
