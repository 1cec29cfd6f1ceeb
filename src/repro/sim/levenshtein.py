"""Levenshtein distance and the paper's Levenshtein ratio (Section IV-C).

The paper scores string similarity with ``r = (|a|+|b| - lev*) / (|a|+|b|)``
where ``lev*`` is edit distance with substitution cost 2 (insert/delete cost
1). With substitutions costing as much as a delete+insert, the identity
``lev*(a, b) = |a| + |b| - 2·LCS(a, b)`` holds, so ``r = 2·LCS/(|a|+|b|)``
— which is what the vectorized batch path computes. The identity is proved
by a hypothesis property test against the reference DPs.

Three implementations, fastest last:
- ``lev`` / ``lev_star``: reference dynamic programs straight from Eq. (2).
- ``ratio``: scalar ratio via ``lev_star``.
- ``ratio_batch``: NumPy batch of pairs via the LCS row recurrence with the
  running-max trick (``cur = cummax(max(prev, prev[j-1]+eq))``), vectorized
  over the batch and the second string; loops only over ``|a|``.
"""
from __future__ import annotations

import numpy as np


def lev(a: str, b: str) -> int:
    """Classic Levenshtein distance (substitution cost 1), Eq. (2)."""
    return _edit_distance(a, b, sub_cost=1)


def lev_star(a: str, b: str) -> int:
    """Levenshtein variant with substitution cost 2 (the paper's ``lev*``)."""
    return _edit_distance(a, b, sub_cost=2)


def _edit_distance(a: str, b: str, *, sub_cost: int) -> int:
    la, lb = len(a), len(b)
    prev = list(range(lb + 1))
    for i in range(1, la + 1):
        cur = [i] + [0] * lb
        for j in range(1, lb + 1):
            cur[j] = min(
                prev[j] + 1,
                cur[j - 1] + 1,
                prev[j - 1] + (0 if a[i - 1] == b[j - 1] else sub_cost),
            )
        prev = cur
    return prev[lb]


def lcs_len(a: str, b: str) -> int:
    """Length of the longest common subsequence (reference DP)."""
    la, lb = len(a), len(b)
    prev = [0] * (lb + 1)
    for i in range(1, la + 1):
        cur = [0] * (lb + 1)
        for j in range(1, lb + 1):
            if a[i - 1] == b[j - 1]:
                cur[j] = prev[j - 1] + 1
            else:
                cur[j] = max(prev[j], cur[j - 1])
        prev = cur
    return prev[lb]


def ratio(a: str, b: str) -> float:
    """The paper's Levenshtein ratio ``(|a|+|b|-lev*)/(|a|+|b|)`` in [0, 1].

    Two empty strings are defined as identical (ratio 1.0).
    """
    n = len(a) + len(b)
    if n == 0:
        return 1.0
    return (n - lev_star(a, b)) / n


def _encode(strings: list[str], width: int) -> tuple[np.ndarray, np.ndarray]:
    """Pad strings to ``(len(strings), width)`` int32 codepoints; -1 padding
    (never equal to a real character). Returns (codes, lengths)."""
    out = np.full((len(strings), width), -1, dtype=np.int32)
    lens = np.empty(len(strings), dtype=np.int64)
    for k, s in enumerate(strings):
        lens[k] = len(s)
        if s:
            out[k, : len(s)] = np.frombuffer(s.encode("utf-32-le"), dtype=np.uint32)[
                : len(s)
            ].astype(np.int32)
    return out, lens


def ratio_batch(a: list[str], b: list[str]) -> np.ndarray:
    """Levenshtein ratio for element-wise pairs ``(a[k], b[k])``.

    Computes ``2·LCS/(|a|+|b|)`` with the batch LCS DP. The inner recurrence
    ``cur[j] = max(prev[j], cur[j-1], prev[j-1] + eq)`` vectorizes because an
    LCS row is non-decreasing in ``j``: take ``tmp = max(prev, shift(prev)+eq)``
    then ``cur = cummax(tmp)`` along ``j``.
    """
    if len(a) != len(b):
        raise ValueError("ratio_batch expects aligned lists of equal length")
    if not a:
        return np.zeros(0, dtype=np.float64)
    wa = max(1, max(len(s) for s in a))
    wb = max(1, max(len(s) for s in b))
    ca, la = _encode(list(a), wa)
    cb, lb = _encode(list(b), wb)
    n = len(a)
    prev = np.zeros((n, wb + 1), dtype=np.int32)
    for i in range(wa):
        eq = (ca[:, i : i + 1] == cb) & (cb != -1)  # (n, wb)
        # column j of cur corresponds to first j chars of b; j>=1 positions.
        tmp = np.maximum(prev[:, 1:], prev[:, :-1] + eq.astype(np.int32))
        cur = np.empty_like(prev)
        cur[:, 0] = 0
        np.maximum.accumulate(tmp, axis=1, out=tmp)
        cur[:, 1:] = tmp
        # rows whose string a is shorter than i+1 chars keep their final DP row
        done = la <= i
        cur[done] = prev[done]
        prev = cur
    lcs = prev[np.arange(n), lb]
    denom = (la + lb).astype(np.float64)
    with np.errstate(invalid="ignore", divide="ignore"):
        r = np.where(denom > 0, 2.0 * lcs / np.where(denom > 0, denom, 1.0), 1.0)
    return r
