"""Evaluation metrics (paper Section VII-A).

The benchmark construction makes gold the identity permutation over the
test split (row ``i`` of a :class:`~repro.sim.matrices.SimMatrix` aligns to
column ``i``), so accuracy is the fraction of fixed points in a matching
and ranking metrics score the diagonal.

Rank convention: the gold target's rank is ``1 + #{j ≠ i : m[i,j] > m[i,i]}``
(ties do not push the gold entry down) — the convention of the open-source
EA evaluation scripts the paper's numbers come from.
"""
from __future__ import annotations

import numpy as np


def accuracy(matches: np.ndarray) -> float:
    """Fraction of correctly aligned sources: ``match[i] == i``."""
    return float(np.mean(matches == np.arange(len(matches))))


def _gold_ranks(m: np.ndarray) -> np.ndarray:
    diag = np.diag(m)
    return 1 + (m > diag[:, None]).sum(axis=1)


def hits_at_k(m: np.ndarray, k: int) -> float:
    """Fraction of rows whose gold target ranks in the top ``k``."""
    return float(np.mean(_gold_ranks(m) <= k))


def mrr(m: np.ndarray) -> float:
    """Mean reciprocal rank of the gold target."""
    return float(np.mean(1.0 / _gold_ranks(m)))


def ranking_metrics(m: np.ndarray) -> dict[str, float]:
    """The Table VI triple: Hits@1, Hits@10, MRR."""
    ranks = _gold_ranks(m)
    return {
        "hits1": float(np.mean(ranks <= 1)),
        "hits10": float(np.mean(ranks <= 10)),
        "mrr": float(np.mean(1.0 / ranks)),
    }
