"""String similarity matrix ``M^l`` (Levenshtein ratio) as a Spark dataflow.

The string feature is a full similarity join between source and target test
entity names. ``string_matrix_spark`` distributes source names and evaluates
each row block against the broadcast target name list with the vectorized
LCS-form ratio (``repro.sim.levenshtein.ratio_batch``); ``string_matrix_numpy``
is the driver-side reference over the same batch kernel, which is itself
tested against the pure-Python DP.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.sim.levenshtein import ratio_batch


def string_matrix_numpy(src_names: list[str], tgt_names: list[str]) -> np.ndarray:
    """Dense ``(len(src), len(tgt))`` Levenshtein-ratio matrix."""
    ns, nt = len(src_names), len(tgt_names)
    if ns == 0 or nt == 0:
        return np.zeros((ns, nt), dtype=np.float64)
    a = [s for s in src_names for _ in range(nt)]
    b = tgt_names * ns
    return ratio_batch(a, b).reshape(ns, nt)


def string_matrix_spark(
    spark: SparkSession,
    src_names: list[str],
    tgt_names: list[str],
    *,
    block: int = 128,
) -> DataFrame:
    """Long-format ``(si, ti, sim)`` Levenshtein-ratio matrix.

    ``si``/``ti`` index into the given name lists.
    """
    bcast = spark.sparkContext.broadcast(list(tgt_names))
    src_pdf = pd.DataFrame({"si": np.arange(len(src_names)), "name": list(src_names)})
    n_parts = max(1, min(16, (len(src_names) + block - 1) // block))
    src_df = spark.createDataFrame(src_pdf).repartition(n_parts)

    def compute(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        tgt = bcast.value
        nt = len(tgt)
        for pdf in batches:
            if len(pdf) == 0 or nt == 0:
                continue
            names = pdf["name"].tolist()
            a = [s for s in names for _ in range(nt)]
            b = tgt * len(names)
            sims = ratio_batch(a, b)
            si = np.repeat(pdf["si"].to_numpy(), nt)
            ti = np.tile(np.arange(nt), len(pdf))
            yield pd.DataFrame({"si": si, "ti": ti, "sim": sims})

    return src_df.mapInPandas(compute, schema="si long, ti long, sim double")
