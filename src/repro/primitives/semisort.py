"""Semisort: group equal keys together with no inter-group order (§2, §4.1).

The paper's key observation for work-efficient grid construction is that
points only need to be *grouped* by cell id, not sorted — a semisort.  Spark's
shuffle ``groupBy`` is exactly a distributed semisort: rows are hash-
partitioned by key and grouped within partitions, with no global order.
``semisort_count`` also returns the number of distinct groups, as the paper's
semisort does.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def semisort_collect(df: DataFrame, key_col: str, value_col: str) -> DataFrame:
    """Group values by key: one row per key with the list of its values."""
    return df.groupBy(key_col).agg(F.collect_list(value_col).alias("values"))


def semisort_count(df: DataFrame, key_col: str) -> tuple[DataFrame, int]:
    """Per-key counts plus the number of distinct groups."""
    counts = df.groupBy(key_col).agg(F.count("*").alias("cnt"))
    return counts, counts.count()
