"""Similarity matrices: NumPy cosine reference properties, the blocked
Spark cosine join, the Spark string-similarity join, and the DuckDB oracle
over the long formats."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.sim.levenshtein import ratio
from repro.sim.matrices import SimMatrix, cosine_matrix, cosine_matrix_spark, l2_normalize, to_dense
from repro.sim.string_matrix import string_matrix_numpy, string_matrix_spark


# ---- NumPy references ---------------------------------------------------


def test_cosine_self_similarity():
    rng = np.random.default_rng(0)
    a = rng.standard_normal((10, 4))
    m = cosine_matrix(a, a)
    np.testing.assert_allclose(np.diag(m), 1.0, atol=1e-12)
    assert (m <= 1 + 1e-12).all() and (m >= -1 - 1e-12).all()


def test_cosine_zero_rows_define_zero():
    a = np.array([[0.0, 0.0], [1.0, 0.0]])
    b = np.array([[1.0, 1.0]])
    m = cosine_matrix(a, b)
    assert m[0, 0] == 0.0


def test_l2_normalize_keeps_zero_rows():
    x = np.array([[0.0, 0.0], [3.0, 4.0]])
    out = l2_normalize(x)
    np.testing.assert_allclose(out, [[0.0, 0.0], [0.6, 0.8]])


def test_cosine_scale_invariant():
    rng = np.random.default_rng(1)
    a = rng.standard_normal((5, 3))
    b = rng.standard_normal((7, 3))
    np.testing.assert_allclose(cosine_matrix(a, b), cosine_matrix(10 * a, 0.5 * b), atol=1e-12)


def test_string_matrix_numpy_values():
    m = string_matrix_numpy(["abc", "xy"], ["abc", "abd", "q"])
    assert m.shape == (2, 3)
    assert m[0, 0] == 1.0
    assert m[0, 1] == ratio("abc", "abd")
    assert m[1, 2] == 0.0


def test_string_matrix_numpy_empty():
    assert string_matrix_numpy([], ["a"]).shape == (0, 1)


def test_sim_matrix_dataclass():
    sm = SimMatrix(np.array([5, 6]), np.array([7, 8]), np.eye(2))
    assert sm.n == 2
    sm2 = sm.copy_with(np.zeros((2, 2)))
    assert sm2.m.sum() == 0 and sm2.src_ids is sm.src_ids


# ---- Spark paths --------------------------------------------------------


def test_cosine_spark_matches_numpy(spark):
    rng = np.random.default_rng(2)
    a = rng.standard_normal((40, 8))
    b = rng.standard_normal((30, 8))
    long = cosine_matrix_spark(spark, a, b)
    dense = to_dense(long, 40, 30)
    np.testing.assert_allclose(dense, cosine_matrix(a, b), atol=1e-9)


def test_cosine_spark_long_oracle(spark):
    """The long-format cosine join vs DuckDB computing the same product
    from normalized long-format vectors."""
    rng = np.random.default_rng(3)
    a = rng.standard_normal((12, 4))
    b = rng.standard_normal((9, 4))
    an, bn = l2_normalize(a), l2_normalize(b)

    def long_pdf(x):
        return pd.DataFrame(
            [(i, p, float(v)) for i, row in enumerate(x) for p, v in enumerate(row)],
            columns=["idx", "pos", "val"],
        )

    got = cosine_matrix_spark(spark, a, b)
    assert_equivalent(
        got,
        """
        SELECT a.idx AS si, b.idx AS ti, sum(a.val * b.val) AS sim
        FROM a JOIN b ON a.pos = b.pos
        GROUP BY a.idx, b.idx
        """,
        a=long_pdf(an),
        b=long_pdf(bn),
    )


def test_string_matrix_spark_matches_numpy(spark, fr_pair):
    names1 = fr_pair.kg1.names["name"].tolist()[:25]
    names2 = fr_pair.kg2.names["name"].tolist()[:20]
    dense = to_dense(string_matrix_spark(spark, names1, names2), 25, 20)
    np.testing.assert_allclose(dense, string_matrix_numpy(names1, names2), atol=1e-12)


def test_string_matrix_spark_cjk(spark, zh_pair):
    names1 = zh_pair.kg1.names["name"].tolist()[:10]
    names2 = zh_pair.kg2.names["name"].tolist()[:10]
    dense = to_dense(string_matrix_spark(spark, names1, names2), 10, 10)
    np.testing.assert_allclose(dense, string_matrix_numpy(names1, names2), atol=1e-12)


def test_to_dense_fill():
    import pandas as pd
    from pyspark.sql import SparkSession

    spark = SparkSession.getActiveSession()
    if spark is None:
        pytest.skip("needs active session")
    df = spark.createDataFrame(pd.DataFrame({"si": [0], "ti": [1], "sim": [0.5]}))
    out = to_dense(df, 2, 2, fill=-1.0)
    assert out[0, 1] == 0.5 and out[1, 0] == -1.0
