"""Normalized adjacency ``Â`` from KG triples, as a Spark dataflow.

Following GCN-Align's construction (paper Section IV-A, "A is constructed
according to [25]") in its undirected-connectivity form: an edge exists
between ``i`` and ``j`` if any triple connects them in either direction;
self-loops are added; and the result is symmetrically normalized,
``Â = D^{-1/2} (A + I) D^{-1/2}`` where ``D`` is the degree of ``A + I``.

The whole degree/normalization pipeline is DataFrame ops (distinct, union,
groupBy, joins) so the DuckDB oracle can check it row-for-row. Baseline
proxies reuse the same edge list under different normalizations
(``variant='rw'`` row-stochastic, ``'mix'`` their average).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def _undirected_edges(spark: SparkSession, triples: pd.DataFrame, n: int) -> DataFrame:
    """Distinct undirected edges incl. self-loops: ``(i, j)`` both directions."""
    t = spark.createDataFrame(triples[["h", "t"]])
    fwd = t.select(F.col("h").alias("i"), F.col("t").alias("j"))
    bwd = t.select(F.col("t").alias("i"), F.col("h").alias("j"))
    loops = spark.range(n).select(
        F.col("id").alias("i"), F.col("id").alias("j")
    )
    return fwd.union(bwd).union(loops).distinct()


def degrees(spark: SparkSession, triples: pd.DataFrame, n: int) -> DataFrame:
    """Per-node degree of ``A + I`` as ``(i, deg)`` — oracle-checkable."""
    return (
        _undirected_edges(spark, triples, n)
        .groupBy("i")
        .agg(F.count("*").alias("deg"))
    )


def adjacency_long(
    spark: SparkSession, triples: pd.DataFrame, n: int, *, variant: str = "sym"
) -> DataFrame:
    """Long-format normalized adjacency ``(i, j, w)``.

    ``variant='sym'``: ``w = 1/sqrt(deg_i · deg_j)`` (GCN);
    ``'rw'``: ``w = 1/deg_i`` (row-stochastic); ``'mix'``: their mean.
    """
    edges = _undirected_edges(spark, triples, n)
    deg = edges.groupBy("i").agg(F.count("*").alias("deg"))
    di = deg.select(F.col("i"), F.col("deg").alias("deg_i"))
    dj = deg.select(F.col("i").alias("j"), F.col("deg").alias("deg_j"))
    joined = edges.join(di, "i").join(dj, "j")
    if variant == "sym":
        w = 1.0 / F.sqrt(F.col("deg_i") * F.col("deg_j"))
    elif variant == "rw":
        w = F.lit(1.0) / F.col("deg_i")
    elif variant == "mix":
        w = (1.0 / F.sqrt(F.col("deg_i") * F.col("deg_j")) + F.lit(1.0) / F.col("deg_i")) / 2.0
    else:
        raise ValueError(f"unknown adjacency variant: {variant}")
    return joined.select("i", "j", w.alias("w"))


def adjacency_dense(
    spark: SparkSession, triples: pd.DataFrame, n: int, *, variant: str = "sym"
) -> np.ndarray:
    """Dense ``(n, n)`` ``Â`` collected from the Spark dataflow."""
    pdf = adjacency_long(spark, triples, n, variant=variant).toPandas()
    a = np.zeros((n, n), dtype=np.float64)
    a[pdf["i"].to_numpy(), pdf["j"].to_numpy()] = pdf["w"].to_numpy()
    return a


def adjacency_dense_numpy(triples: pd.DataFrame, n: int, *, variant: str = "sym") -> np.ndarray:
    """Driver-side reference for :func:`adjacency_dense` (used in tests and
    by baselines that do not need the Spark path)."""
    a = np.zeros((n, n), dtype=bool)
    h = triples["h"].to_numpy()
    t = triples["t"].to_numpy()
    a[h, t] = True
    a[t, h] = True
    np.fill_diagonal(a, True)
    deg = a.sum(axis=1).astype(np.float64)
    out = np.zeros((n, n), dtype=np.float64)
    if variant == "sym":
        d = 1.0 / np.sqrt(deg)
        out[a] = np.outer(d, d)[a]
    elif variant == "rw":
        out[a] = np.broadcast_to((1.0 / deg)[:, None], (n, n))[a]
    elif variant == "mix":
        d = 1.0 / np.sqrt(deg)
        out[a] = ((np.outer(d, d) + np.broadcast_to((1.0 / deg)[:, None], (n, n))) / 2.0)[a]
    else:
        raise ValueError(f"unknown adjacency variant: {variant}")
    return out
