"""Adaptive feature fusion (paper Section V), faithfully staged:

1. *Candidate correspondence generation* — mutual-argmax confident pairs per
   feature matrix (:func:`repro.fusion.confident.confident_pairs`).
2. *Candidate correspondence filtering* — drop every candidate of a source
   entity for which two features disagree on the target; drop candidates
   produced by **all** k features (they cannot characterize any feature).
3. *Correspondence weight calculation* — a retained pair produced by ``n``
   features weighs ``1/n`` for each of them, overridden to ``θ2`` for a
   feature whose score for that pair exceeds ``θ1`` (prevents a saturated
   feature from swallowing the weight mass — the paper's "w/o θ1,θ2" row
   ablates exactly this override).
4. *Feature weight calculation* — feature score = Σ of its correspondence
   weights; weights are the scores normalized to sum 1. If filtering leaves
   nothing (degenerate), fall back to equal weights.
5. *Fusion* — weighted sum of the matrices. The full CEAFF fusion is
   two-stage (:func:`two_stage_fuse`): (semantic, string) → textual, then
   (structural, textual) → final.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.fusion.confident import confident_pairs

THETA1_DEFAULT = 0.98
THETA2_DEFAULT = 0.1


@dataclass
class FusionReport:
    """Bookkeeping of one fusion stage, for tests and the ablation harness."""

    weights: np.ndarray
    candidates: list[set[tuple[int, int]]] = field(default_factory=list)
    retained: set[tuple[int, int]] = field(default_factory=set)
    fallback_equal: bool = False


def adaptive_weights(
    mats: list[np.ndarray],
    *,
    theta1: float = THETA1_DEFAULT,
    theta2: float = THETA2_DEFAULT,
    theta_override: bool = True,
) -> FusionReport:
    """Adaptive weights for ``k`` feature matrices over the same entity grid."""
    k = len(mats)
    if k == 0:
        raise ValueError("need at least one feature matrix")
    if k == 1:
        return FusionReport(weights=np.array([1.0]))
    cands = [set(confident_pairs(m)) for m in mats]

    # Stage 2a: conflicting candidates for the same source entity.
    by_src: dict[int, set[int]] = {}
    for c in cands:
        for i, j in c:
            by_src.setdefault(i, set()).add(j)
    conflicted = {i for i, js in by_src.items() if len(js) > 1}

    # Stage 2b: pairs produced by all k features characterize none of them.
    shared_by_all = set.intersection(*cands) if cands else set()

    retained = {
        p for c in cands for p in c if p[0] not in conflicted and p not in shared_by_all
    }

    counts = {p: sum(p in c for c in cands) for p in retained}
    scores = np.zeros(k, dtype=np.float64)
    for f, c in enumerate(cands):
        for p in c:
            if p not in retained:
                continue
            w = 1.0 / counts[p]
            if theta_override and mats[f][p] > theta1:
                w = theta2
            scores[f] += w

    total = scores.sum()
    if total <= 0:
        return FusionReport(
            weights=np.full(k, 1.0 / k), candidates=cands, retained=retained,
            fallback_equal=True,
        )
    return FusionReport(weights=scores / total, candidates=cands, retained=retained)


def fuse(mats: list[np.ndarray], weights: np.ndarray) -> np.ndarray:
    """Weighted sum of similarity matrices."""
    out = np.zeros_like(mats[0])
    for m, w in zip(mats, weights):
        out += w * m
    return out


def two_stage_fuse(
    ms: np.ndarray | None,
    mn: np.ndarray | None,
    ml: np.ndarray | None,
    *,
    adaptive: bool = True,
    theta1: float = THETA1_DEFAULT,
    theta2: float = THETA2_DEFAULT,
    theta_override: bool = True,
) -> tuple[np.ndarray, dict[str, FusionReport]]:
    """CEAFF's fusion: textual = fuse(semantic, string); final = fuse
    (structural, textual). Disabled features (``None``) drop out of their
    stage; with a single feature left the stage is the identity.

    ``adaptive=False`` reproduces the "w/o AFF" ablation: equal weights at
    every stage. Returns the fused matrix and per-stage reports.
    """

    def stage(mats: list[np.ndarray], name: str, reports: dict) -> np.ndarray | None:
        mats = [m for m in mats if m is not None]
        if not mats:
            return None
        if len(mats) == 1:
            reports[name] = FusionReport(weights=np.array([1.0]))
            return mats[0]
        if adaptive:
            rep = adaptive_weights(
                mats, theta1=theta1, theta2=theta2, theta_override=theta_override
            )
        else:
            rep = FusionReport(weights=np.full(len(mats), 1.0 / len(mats)))
        reports[name] = rep
        return fuse(mats, rep.weights)

    reports: dict[str, FusionReport] = {}
    textual = stage([mn, ml], "textual", reports)
    final = stage([ms, textual], "final", reports)
    if final is None:
        raise ValueError("all features disabled — nothing to fuse")
    return final, reports
