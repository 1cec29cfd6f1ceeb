"""Similarity-feature layer: Levenshtein string similarity, cosine
similarity matrices, and their Spark dataflows. All distributed/vectorized
paths have pure-Python or NumPy references they are tested against."""
from repro.sim.levenshtein import lev, lev_star, lcs_len, ratio, ratio_batch
from repro.sim.matrices import SimMatrix, cosine_matrix, cosine_matrix_spark, to_dense
from repro.sim.string_matrix import string_matrix_numpy, string_matrix_spark

__all__ = [
    "lev",
    "lev_star",
    "lcs_len",
    "ratio",
    "ratio_batch",
    "SimMatrix",
    "cosine_matrix",
    "cosine_matrix_spark",
    "to_dense",
    "string_matrix_numpy",
    "string_matrix_spark",
]
