"""NumPy 2-layer GCN: forward pass and manual backprop.

Architecture per the paper (Section IV-A): two GCNs — one per KG — sharing
layer weights ``W1``, ``W2``; the input feature matrix ``X`` is sampled from
a truncated normal with L2-normalized rows. ``X`` is *trainable* (as in
GCN-Align, whose entity "structure features" are learned): with per-KG
random inputs held fixed, seed supervision could not propagate any alignment
signal between the graphs, so training X is required for the mechanism the
paper relies on — seeds get pulled together, convolution spreads that to
their neighbourhoods.

Forward:  ``Z = Â · relu(Â · X · W1) · W2``   (linear output layer).
Backward: exact gradients of an arbitrary upstream ``dZ`` w.r.t. X, W1, W2 —
verified against numerical differentiation in tests.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


def truncated_normal(
    rng: np.random.Generator, shape: tuple[int, ...], *, std: float = 1.0
) -> np.ndarray:
    """Truncated normal at ±2σ via resampling, as TF's initializer does."""
    x = rng.standard_normal(shape)
    bad = np.abs(x) > 2.0
    while bad.any():
        x[bad] = rng.standard_normal(int(bad.sum()))
        bad = np.abs(x) > 2.0
    return x * std


@dataclass
class GCNParams:
    """Trainable parameters: per-KG inputs ``X1``/``X2``, shared ``W1``/``W2``."""

    x1: np.ndarray
    x2: np.ndarray
    w1: np.ndarray
    w2: np.ndarray


def init_params(n1: int, n2: int, d: int, rng: np.random.Generator) -> GCNParams:
    """Paper initialization: truncated-normal X with L2-normalized rows;
    Glorot-ish truncated-normal weights."""
    x1 = truncated_normal(rng, (n1, d))
    x2 = truncated_normal(rng, (n2, d))
    x1 /= np.linalg.norm(x1, axis=1, keepdims=True)
    x2 /= np.linalg.norm(x2, axis=1, keepdims=True)
    std = 1.0 / np.sqrt(d)
    return GCNParams(
        x1=x1,
        x2=x2,
        w1=truncated_normal(rng, (d, d), std=std),
        w2=truncated_normal(rng, (d, d), std=std),
    )


def gcn_forward(
    ahat: np.ndarray, x: np.ndarray, w1: np.ndarray, w2: np.ndarray
) -> tuple[np.ndarray, dict]:
    """Two-layer forward. Returns ``(Z, cache)`` with intermediates for
    :func:`gcn_backward`."""
    ax = ahat @ x
    h_pre = ax @ w1
    h = np.maximum(h_pre, 0.0)
    ah = ahat @ h
    z = ah @ w2
    return z, {"ahat": ahat, "x": x, "w1": w1, "w2": w2, "ax": ax, "h_pre": h_pre, "ah": ah}


def gcn_backward(dz: np.ndarray, cache: dict) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Gradients ``(dX, dW1, dW2)`` of a scalar loss with upstream ``dZ``."""
    ahat = cache["ahat"]
    dw2 = cache["ah"].T @ dz
    dh = (ahat.T @ dz) @ cache["w2"].T
    dh_pre = dh * (cache["h_pre"] > 0)
    dw1 = cache["ax"].T @ dh_pre
    dx = ahat.T @ (dh_pre @ cache["w1"].T)
    return dx, dw1, dw2
