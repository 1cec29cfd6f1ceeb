"""Deferred acceptance (Gale–Shapley) for EA as stable matching (Section VI).

Preference lists come from the fused similarity matrix: source ``i`` ranks
targets by row ``m[i, :]`` descending; target ``j`` ranks sources by column
``m[:, j]`` descending. Sources propose (the paper's rounds in Figure 4),
targets hold provisional matches and trade up. Ties are broken by the lower
index on both sides (stable sort), and an incumbent is only displaced by a
strictly preferred proposer — this makes the outcome deterministic.

The result is source-optimal among stable matchings (classic GS property,
checked against brute force in tests) and contains no blocking pairs.
"""
from __future__ import annotations

from collections import deque

import numpy as np


def deferred_acceptance(m: np.ndarray) -> np.ndarray:
    """Stable matching; returns ``match[i] = j`` for the square matrix ``m``."""
    n_src, n_tgt = m.shape
    if n_src > n_tgt:
        raise ValueError("every source must be matchable: need n_src <= n_tgt")
    # prefs[i] = target indices in descending similarity (ties: lower index).
    prefs = np.argsort(-m, axis=1, kind="stable")
    # target-side rank of each source: lower = more preferred.
    tgt_rank = np.empty((n_tgt, n_src), dtype=np.int64)
    order = np.argsort(-m.T, axis=1, kind="stable")
    for j in range(n_tgt):
        tgt_rank[j, order[j]] = np.arange(n_src)

    next_prop = np.zeros(n_src, dtype=np.int64)
    tgt_match = np.full(n_tgt, -1, dtype=np.int64)
    src_match = np.full(n_src, -1, dtype=np.int64)
    free = deque(range(n_src))
    while free:
        i = free.popleft()
        j = prefs[i, next_prop[i]]
        next_prop[i] += 1
        cur = tgt_match[j]
        if cur == -1:
            tgt_match[j] = i
            src_match[i] = j
        elif tgt_rank[j, i] < tgt_rank[j, cur]:
            tgt_match[j] = i
            src_match[i] = j
            src_match[cur] = -1
            free.append(cur)
        else:
            free.append(i)
    return src_match


def blocking_pairs(m: np.ndarray, match: np.ndarray) -> list[tuple[int, int]]:
    """All ``(i, j)`` where ``i`` strictly prefers ``j`` to its match and
    ``j`` strictly prefers ``i`` to its match (Section VI's BP definition).
    An unmatched side always "prefers" any partner."""
    n_src, n_tgt = m.shape
    tgt_match = np.full(n_tgt, -1, dtype=np.int64)
    for i, j in enumerate(match):
        if j >= 0:
            tgt_match[j] = i
    out = []
    for i in range(n_src):
        mi = match[i]
        cur_i = m[i, mi] if mi >= 0 else -np.inf
        for j in range(n_tgt):
            if j == mi:
                continue
            cur_j = m[tgt_match[j], j] if tgt_match[j] >= 0 else -np.inf
            if m[i, j] > cur_i and m[i, j] > cur_j:
                out.append((i, j))
    return out


def is_stable(m: np.ndarray, match: np.ndarray) -> bool:
    """True iff the matching admits no blocking pair."""
    return not blocking_pairs(m, match)
