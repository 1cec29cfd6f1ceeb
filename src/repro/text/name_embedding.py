"""Spark dataflow for the semantic feature's name encoder.

``name_vectors_long`` is the oracle-checkable core: explode names to tokens,
inner-join the embedding table (the join drops OOV tokens), posexplode the
vectors and average per ``(id, pos)`` — all Catalyst-planned DataFrame ops.
``name_vectors_spark`` materializes that long result into the dense ``(n, d)``
matrix the similarity layer consumes (zero rows for all-OOV names).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.text.embeddings import embedding_dim


def name_vectors_long(
    spark: SparkSession, names: pd.DataFrame, emb: pd.DataFrame
) -> DataFrame:
    """Long-format averaged name embeddings ``(id, pos, val)``.

    Only entities with at least one in-vocabulary token appear. Repeated
    tokens in one name each contribute to the average (``ne = (1/l) Σ w_i``
    counts duplicates), which the explode naturally preserves.
    """
    names_df = spark.createDataFrame(names[["id", "name"]])
    emb_df = spark.createDataFrame(emb[["token", "vector"]])
    toks = names_df.select(
        "id", F.explode(F.split(F.col("name"), r"\s+")).alias("token")
    ).where(F.col("token") != "")
    joined = toks.join(emb_df, "token", "inner")
    long = joined.select("id", F.posexplode("vector").alias("pos", "val"))
    return long.groupBy("id", "pos").agg(F.avg("val").alias("val"))


def name_vectors_spark(
    spark: SparkSession, names: pd.DataFrame, emb: pd.DataFrame
) -> np.ndarray:
    """Dense ``(n, d)`` name-embedding matrix computed via the Spark path."""
    d = embedding_dim(emb)
    out = np.zeros((len(names), d), dtype=np.float64)
    rows = name_vectors_long(spark, names, emb).collect()
    for r in rows:
        out[r["id"], r["pos"]] = r["val"]
    return out
