"""Maximum-weight perfect bipartite matching (paper Section VI discussion).

The paper contrasts stable matching with the Maximum Weighted Bipartite
Matching formulation "solved ... using more specialized Hungarian algorithm
techniques [16]". We implement the O(n³) Hungarian algorithm with potentials
and shortest augmenting paths (Jonker–Volgenant style; inner column scan
vectorized with NumPy since SciPy is unavailable offline), and use it as the
matching-quality comparison point: its assignments maximize total similarity,
DAA's maximize stability.
"""
from __future__ import annotations

import numpy as np


def hungarian_min(cost: np.ndarray) -> np.ndarray:
    """Min-cost perfect assignment of a square matrix; returns col for row."""
    cost = np.asarray(cost, dtype=np.float64)
    n = cost.shape[0]
    if cost.shape != (n, n):
        raise ValueError("hungarian_min needs a square matrix")
    INF = np.inf
    u = np.zeros(n + 1)
    v = np.zeros(n + 1)
    p = np.zeros(n + 1, dtype=np.int64)  # p[j] = row matched to column j (1-based)
    way = np.zeros(n + 1, dtype=np.int64)
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = np.full(n + 1, INF)
        used = np.zeros(n + 1, dtype=bool)
        while True:
            used[j0] = True
            i0 = p[j0]
            # vectorized scan over unused columns 1..n
            free = ~used[1:]
            cur = cost[i0 - 1, :] - u[i0] - v[1:]
            better = free & (cur < minv[1:])
            minv[1:][better] = cur[better]
            way[1:][better] = j0
            masked = np.where(free, minv[1:], INF)
            j1 = int(np.argmin(masked)) + 1
            delta = masked[j1 - 1]
            u[p[used]] += delta
            v[used] -= delta
            minv[1:][free] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1
    match = np.empty(n, dtype=np.int64)
    match[p[1:] - 1] = np.arange(n)
    return match


def hungarian_max(m: np.ndarray) -> np.ndarray:
    """Max-weight perfect assignment; returns ``match[i] = j``."""
    return hungarian_min(np.max(m) - np.asarray(m, dtype=np.float64))
