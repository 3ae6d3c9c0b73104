"""Data-parallel scan primitives (paper Table 1) expressed in Spark SQL.

The paper builds everything on PBBS prefix-sum/filter; in Spark the same
roles are played by window cumulative aggregates and ``where``.  These
wrappers exist so the mapping paper-primitive → Spark-construct is explicit
and unit-tested, and ``prefix_sum`` is reused by tests that validate counts.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F


def prefix_sum(df: DataFrame, value_col: str, order_col: str, out_col: str = "psum") -> DataFrame:
    """Exclusive prefix sum of ``value_col`` in the order of ``order_col``.

    Matches the paper's definition: row i receives sum of values of rows
    strictly before it.  O(n log n) work in Spark's window implementation,
    O(n) in PBBS — the asymptotic slack is irrelevant at our scales and
    documented in DESIGN.md.
    """
    w = Window.orderBy(order_col).rowsBetween(Window.unboundedPreceding, -1)
    return df.withColumn(out_col, F.coalesce(F.sum(value_col).over(w), F.lit(0)))


def par_filter(df: DataFrame, predicate: Column) -> DataFrame:
    """Parallel filter — Spark's ``where`` (kept for the primitive mapping)."""
    return df.where(predicate)
