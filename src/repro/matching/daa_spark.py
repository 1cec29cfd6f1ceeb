"""Deferred acceptance as an iterative Spark dataflow.

The calibration hint asks for stable matching "as an iterative RDD
algorithm"; we express it at the DataFrame layer in Pregel style: the
preference table (all ``(si, ti, sim)`` with per-source ranks) is a cached
distributed DataFrame, and each superstep runs as Spark jobs —

1. every unmatched source joins its next-preference row (equality join of
   the driver-small proposal-pointer table against the cached prefs),
2. proposals are unioned with the provisional matches, and
3. each target keeps the best contender (window ``row_number`` over
   ``ti`` ordered by ``sim`` desc, ``si`` asc — the same tie policy as the
   NumPy reference).

The per-round *state* (one row per source: next rank, provisional match) is
collected to the driver between supersteps. That is the standard
driver-coordinated loop for iterative dataflows (it also truncates lineage);
the O(n²) preference relation — the data that actually grows — stays
distributed. Tested for exact agreement with ``repro.matching.daa``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession, Window
from pyspark.sql import functions as F


def deferred_acceptance_spark(
    spark: SparkSession, m: np.ndarray, *, max_rounds: int | None = None
) -> np.ndarray:
    """Stable matching of the square similarity matrix ``m`` (sources
    propose). Returns ``match[i] = j``, identical to
    :func:`repro.matching.daa.deferred_acceptance`."""
    n_src, n_tgt = m.shape
    if n_src > n_tgt:
        raise ValueError("every source must be matchable: need n_src <= n_tgt")
    si = np.repeat(np.arange(n_src), n_tgt)
    ti = np.tile(np.arange(n_tgt), n_src)
    long = spark.createDataFrame(
        pd.DataFrame({"si": si, "ti": ti, "sim": m.ravel()})
    )
    by_src = Window.partitionBy("si").orderBy(F.desc("sim"), F.asc("ti"))
    prefs = long.withColumn("rank", F.row_number().over(by_src)).cache()
    prefs.count()  # materialize once; reused every superstep

    next_rank = np.ones(n_src, dtype=np.int64)
    src_match = np.full(n_src, -1, dtype=np.int64)
    rounds = 0
    limit = max_rounds if max_rounds is not None else n_src * n_tgt + 1
    try:
        while (src_match < 0).any():
            rounds += 1
            if rounds > limit:
                raise RuntimeError("DAA did not converge within the round limit")
            unmatched = np.nonzero(src_match < 0)[0]
            ptr = spark.createDataFrame(
                pd.DataFrame({"si": unmatched, "rank": next_rank[unmatched]})
            )
            proposals = prefs.join(ptr, ["si", "rank"]).select("si", "ti", "sim")
            matched_src = np.nonzero(src_match >= 0)[0]
            current = spark.createDataFrame(
                pd.DataFrame(
                    {
                        "si": matched_src,
                        "ti": src_match[matched_src],
                        "sim": m[matched_src, src_match[matched_src]],
                    }
                ),
                schema="si long, ti long, sim double",
            )
            contenders = proposals.unionByName(current)
            by_tgt = Window.partitionBy("ti").orderBy(F.desc("sim"), F.asc("si"))
            winners = (
                contenders.withColumn("pos", F.row_number().over(by_tgt))
                .where(F.col("pos") == 1)
                .select("si", "ti")
                .toPandas()
            )
            next_rank[unmatched] += 1
            src_match[:] = -1
            src_match[winners["si"].to_numpy()] = winners["ti"].to_numpy()
    finally:
        prefs.unpersist()
    return src_match
