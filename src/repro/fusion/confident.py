"""Confident correspondences: entries maximal along both their row and
column ("largest both along the row and the column", Section V).

``confident_pairs`` is the NumPy reference. ``confident_pairs_spark``
computes the same set from a long-format similarity DataFrame with window
maxima and an equality join — the form the DuckDB oracle verifies in tests.

Tie policy: maxima are compared with equality against the row/column max,
so a tied entry on both axes still qualifies; the generated matrices are
continuous so exact ties only occur in adversarial tests.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def confident_pairs(m: np.ndarray) -> list[tuple[int, int]]:
    """All ``(i, j)`` with ``m[i, j] == max(row i) == max(col j)``."""
    row_max = m.max(axis=1, keepdims=True)
    col_max = m.max(axis=0, keepdims=True)
    ii, jj = np.nonzero((m == row_max) & (m == col_max))
    return list(zip(ii.tolist(), jj.tolist()))


def confident_pairs_spark(long_df: DataFrame) -> DataFrame:
    """Spark variant over ``(si, ti, sim)``: rows where ``sim`` equals both
    the per-``si`` max and the per-``ti`` max."""
    by_src = Window.partitionBy("si")
    by_tgt = Window.partitionBy("ti")
    return (
        long_df.withColumn("row_max", F.max("sim").over(by_src))
        .withColumn("col_max", F.max("sim").over(by_tgt))
        .where((F.col("sim") == F.col("row_max")) & (F.col("sim") == F.col("col_max")))
        .select("si", "ti", "sim")
    )
