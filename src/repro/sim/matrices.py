"""Similarity matrices between source and target test entities.

``SimMatrix`` is the common currency of the feature, fusion, and matching
layers: a dense ``(n, n)`` score matrix whose row ``i`` / column ``j`` are the
``i``-th source and ``j``-th target *test* entities (the standard EA protocol
ranks candidates within the test split, so gold is the identity permutation
by construction of :class:`repro.kgdata.model.KGPair`).

Spark path: ``cosine_matrix_spark`` ships the (small) target block to the
executors via a broadcast variable and computes row-blocks of the cosine
product with ``mapInPandas`` — a blocked similarity join in long format
``(si, ti, sim)`` — then ``to_dense`` pivots it back for the driver-side
algorithms. NumPy ``cosine_matrix`` is the reference it is tested against.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass
class SimMatrix:
    """Dense similarity matrix over the test split.

    ``src_ids[i]`` / ``tgt_ids[j]`` are local entity ids in KG1/KG2; ``m[i, j]``
    is their similarity. Gold alignment is ``src_ids[i] ↔ tgt_ids[i]``.
    """

    src_ids: np.ndarray
    tgt_ids: np.ndarray
    m: np.ndarray

    @property
    def n(self) -> int:
        return self.m.shape[0]

    def copy_with(self, m: np.ndarray) -> "SimMatrix":
        return SimMatrix(self.src_ids, self.tgt_ids, m)


def l2_normalize(x: np.ndarray) -> np.ndarray:
    """Row-normalize; all-zero rows stay zero (their cosine is defined as 0)."""
    norm = np.linalg.norm(x, axis=1, keepdims=True)
    return x / np.where(norm > 0, norm, 1.0)


def cosine_matrix(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Reference pairwise cosine similarity, ``(len(a), len(b))``."""
    return l2_normalize(a) @ l2_normalize(b).T


def cosine_matrix_spark(
    spark: SparkSession,
    a: np.ndarray,
    b: np.ndarray,
    *,
    block: int = 256,
) -> DataFrame:
    """Blocked cosine similarity as a long-format DataFrame ``(si, ti, sim)``.

    Source rows are distributed; each partition multiplies its row block
    against the broadcast normalized target matrix. ``si``/``ti`` are row and
    column indices into ``a``/``b`` (positions, not entity ids).
    """
    an = l2_normalize(np.asarray(a, dtype=np.float64))
    bn = l2_normalize(np.asarray(b, dtype=np.float64))
    bcast = spark.sparkContext.broadcast(bn)

    src_pdf = pd.DataFrame(
        {"si": np.arange(len(an)), "vec": [row.tolist() for row in an]}
    )
    n_parts = max(1, min(16, (len(an) + block - 1) // block))
    src_df = spark.createDataFrame(src_pdf).repartition(n_parts)

    def compute(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        tgt = bcast.value
        nt = tgt.shape[0]
        for pdf in batches:
            if len(pdf) == 0:
                continue
            block_a = np.array([np.asarray(v) for v in pdf["vec"]], dtype=np.float64)
            sims = block_a @ tgt.T
            si = np.repeat(pdf["si"].to_numpy(), nt)
            ti = np.tile(np.arange(nt), len(pdf))
            yield pd.DataFrame({"si": si, "ti": ti, "sim": sims.ravel()})

    return src_df.mapInPandas(compute, schema="si long, ti long, sim double")


def to_dense(long_df: DataFrame, n_src: int, n_tgt: int, *, fill: float = 0.0) -> np.ndarray:
    """Collect a long-format ``(si, ti, sim)`` DataFrame into a dense matrix."""
    pdf = long_df.toPandas()
    out = np.full((n_src, n_tgt), fill, dtype=np.float64)
    out[pdf["si"].to_numpy(), pdf["ti"].to_numpy()] = pdf["sim"].to_numpy()
    return out
