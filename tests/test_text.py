"""Textual substrate: tokenization, embedding helpers, and the Spark name
encoder vs both the NumPy reference and the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.text.embeddings import embedding_dim, emb_long_format, name_vectors_numpy
from repro.text.name_embedding import name_vectors_long, name_vectors_spark
from repro.text.tokenize import tokens


# ---- tokenize -----------------------------------------------------------


@pytest.mark.parametrize(
    "name,expected",
    [
        ("alpha beta", ["alpha", "beta"]),
        ("single", ["single"]),
        ("  padded   words  ", ["padded", "words"]),
        ("", []),
        ("   ", []),
        ("丈丑 且丏", ["丈丑", "且丏"]),
    ],
)
def test_tokens(name, expected):
    assert tokens(name) == expected


# ---- embedding helpers --------------------------------------------------


def _emb(table: dict[str, list[float]]) -> pd.DataFrame:
    return pd.DataFrame({"token": list(table), "vector": list(table.values())})


def test_embedding_dim():
    assert embedding_dim(_emb({"a": [1.0, 2.0, 3.0]})) == 3


def test_embedding_dim_empty_raises():
    with pytest.raises(ValueError):
        embedding_dim(pd.DataFrame({"token": [], "vector": []}))


def test_emb_long_format():
    long = emb_long_format(_emb({"a": [1.0, 2.0], "b": [3.0, 4.0]}))
    assert len(long) == 4
    assert long.loc[(long.token == "b") & (long.pos == 1), "val"].iloc[0] == 4.0


def test_name_vectors_numpy_average_and_oov():
    emb = _emb({"a": [1.0, 0.0], "b": [0.0, 1.0]})
    names = pd.DataFrame({"id": [0, 1, 2, 3], "name": ["a b", "a", "zz", "a zz"]})
    out = name_vectors_numpy(names, emb)
    np.testing.assert_allclose(out[0], [0.5, 0.5])
    np.testing.assert_allclose(out[1], [1.0, 0.0])
    np.testing.assert_allclose(out[2], [0.0, 0.0])  # all OOV -> zero vector
    np.testing.assert_allclose(out[3], [1.0, 0.0])  # OOV token skipped


def test_name_vectors_numpy_counts_duplicates():
    emb = _emb({"a": [1.0, 0.0], "b": [0.0, 1.0]})
    names = pd.DataFrame({"id": [0], "name": ["a a b"]})
    out = name_vectors_numpy(names, emb)
    np.testing.assert_allclose(out[0], [2 / 3, 1 / 3])


# ---- Spark path ---------------------------------------------------------


def test_spark_matches_numpy_reference(spark, fr_pair):
    ref = name_vectors_numpy(fr_pair.kg1.names, fr_pair.emb1)
    got = name_vectors_spark(spark, fr_pair.kg1.names, fr_pair.emb1)
    np.testing.assert_allclose(got, ref, atol=1e-9)


def test_spark_long_oracle_checked(spark, fr_pair):
    """The token-join-average dataflow, verified by DuckDB over the long
    (token, pos, val) embedding table and the exploded token list."""
    names = fr_pair.kg1.names
    toks = pd.DataFrame(
        [(i, t) for i, nm in zip(names["id"], names["name"]) for t in nm.split()],
        columns=["id", "token"],
    )
    long_emb = emb_long_format(fr_pair.emb1)
    got = name_vectors_long(spark, names, fr_pair.emb1)
    assert_equivalent(
        got,
        """
        SELECT t.id AS id, e.pos AS pos, avg(e.val) AS val
        FROM toks t JOIN emb e ON t.token = e.token
        GROUP BY t.id, e.pos
        """,
        toks=toks,
        emb=long_emb,
    )


def test_spark_handles_cjk(spark, zh_pair):
    ref = name_vectors_numpy(zh_pair.kg1.names, zh_pair.emb1)
    got = name_vectors_spark(spark, zh_pair.kg1.names, zh_pair.emb1)
    np.testing.assert_allclose(got, ref, atol=1e-9)
