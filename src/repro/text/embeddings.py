"""Helpers over the synthetic word-embedding tables.

The tables themselves are produced by :func:`repro.kgdata.generator._emb_table`
(one per language, simulating fastText+MUSE: aligned-ish latent vectors,
per-language alignment noise, OOV holes). This module provides the driver-side
reference implementation of the paper's averaged-word-embedding name encoder
(Section IV-B, ``ne(e) = (1/l) Σ w_i``) plus format shims for the Spark path
and the DuckDB oracle.

OOV policy (the paper assumes all words are in vocabulary): the average runs
over the *in-vocabulary* tokens of a name only; a name with no in-vocabulary
token gets the zero vector, whose cosine similarity to anything is defined
as 0 here. This mirrors how reference implementations handle fastText misses.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.text.tokenize import tokens


def embedding_dim(emb: pd.DataFrame) -> int:
    """Dimensionality of an embedding table (``token``, ``vector`` columns)."""
    if len(emb) == 0:
        raise ValueError("empty embedding table has no dimensionality")
    return len(emb["vector"].iloc[0])


def emb_long_format(emb: pd.DataFrame) -> pd.DataFrame:
    """Long format ``(token, pos, val)`` of an embedding table — the shape the
    DuckDB oracle can aggregate over (array columns are not comparable)."""
    rows = [
        (tok, pos, float(val))
        for tok, vec in zip(emb["token"], emb["vector"])
        for pos, val in enumerate(vec)
    ]
    return pd.DataFrame(rows, columns=["token", "pos", "val"])


def name_vectors_numpy(names: pd.DataFrame, emb: pd.DataFrame) -> np.ndarray:
    """Reference (driver-side) name encoder.

    ``names`` has columns ``id`` (dense 0..n-1) and ``name``; returns an
    ``(n, d)`` matrix row-indexed by entity id. Average of in-vocab token
    vectors; zero vector when every token is OOV.
    """
    d = embedding_dim(emb)
    table = {t: np.asarray(v, dtype=np.float64) for t, v in zip(emb["token"], emb["vector"])}
    out = np.zeros((len(names), d), dtype=np.float64)
    for eid, name in zip(names["id"], names["name"]):
        vecs = [table[t] for t in tokens(name) if t in table]
        if vecs:
            out[int(eid)] = np.mean(vecs, axis=0)
    return out
