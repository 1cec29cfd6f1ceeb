"""Training loop for the structural GCN encoder (paper Section IV-A).

Loss (Eq. 1): margin-based ranking over seed pairs with negative sampling —
``L = Σ_(u,v) Σ_(u',v') [ ||u − v||₁ − ||u' − v'||₁ + γ ]₊`` where negatives
corrupt either side of a seed pair with a uniformly random entity of the same
KG. Negatives are resampled every epoch. The paper uses SGD; we optimize with
Adam (a standard drop-in that converges in far fewer epochs, which matters
because our epoch budget is scaled down with the data — documented in
DESIGN.md). The margin γ=3 follows the paper; ``d_s`` defaults to 64 instead
of 300 at our reduced scale.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.structure.gcn import GCNParams, gcn_backward, gcn_forward, init_params


@dataclass(frozen=True)
class GCNConfig:
    """Hyper-parameters of the structural encoder.

    ``project_x=True`` re-normalizes the trainable input rows to the unit
    sphere after every update (projected gradient). Without it the optimizer
    memorizes the seed pairs by inflating their feature magnitudes and the
    embeddings stop generalizing to test entities — tuned empirically, see
    DESIGN.md.
    """

    dim: int = 64
    epochs: int = 600
    lr: float = 0.01
    margin: float = 3.0
    n_neg: int = 5
    seed: int = 7
    adjacency_variant: str = "sym"
    project_x: bool = True


@dataclass
class _Adam:
    lr: float
    beta1: float = 0.9
    beta2: float = 0.999
    eps: float = 1e-8
    t: int = 0
    m: dict = field(default_factory=dict)
    v: dict = field(default_factory=dict)

    def step(self, params: dict[str, np.ndarray], grads: dict[str, np.ndarray]) -> None:
        self.t += 1
        for k, g in grads.items():
            m = self.m.setdefault(k, np.zeros_like(g))
            v = self.v.setdefault(k, np.zeros_like(g))
            m *= self.beta1
            m += (1 - self.beta1) * g
            v *= self.beta2
            v += (1 - self.beta2) * g * g
            mhat = m / (1 - self.beta1**self.t)
            vhat = v / (1 - self.beta2**self.t)
            params[k] -= self.lr * mhat / (np.sqrt(vhat) + self.eps)


def margin_loss_and_grads(
    z1: np.ndarray,
    z2: np.ndarray,
    pos: np.ndarray,
    neg: np.ndarray,
    margin: float,
) -> tuple[float, np.ndarray, np.ndarray]:
    """Loss value and gradients ``(dZ1, dZ2)`` of Eq. (1).

    ``pos``: ``(p, 2)`` seed pairs (u, v); ``neg``: ``(p·k, 4)`` rows
    ``(u, v, u', v')`` pairing each negative with its originating positive.
    """
    dz1 = np.zeros_like(z1)
    dz2 = np.zeros_like(z2)
    pu, pv = neg[:, 0], neg[:, 1]
    nu, nv = neg[:, 2], neg[:, 3]
    d_pos = np.abs(z1[pu] - z2[pv]).sum(axis=1)
    d_neg = np.abs(z1[nu] - z2[nv]).sum(axis=1)
    act = d_pos - d_neg + margin > 0
    loss = float(np.sum((d_pos - d_neg + margin)[act]))
    if act.any():
        s_pos = np.sign(z1[pu[act]] - z2[pv[act]])
        s_neg = np.sign(z1[nu[act]] - z2[nv[act]])
        np.add.at(dz1, pu[act], s_pos)
        np.add.at(dz2, pv[act], -s_pos)
        np.add.at(dz1, nu[act], -s_neg)
        np.add.at(dz2, nv[act], s_neg)
    return loss, dz1, dz2


def sample_negatives(
    rng: np.random.Generator, pos: np.ndarray, n1: int, n2: int, k: int
) -> np.ndarray:
    """``k`` corruptions per seed pair: substitute u or v with a random
    entity from its own KG (paper Section IV-A)."""
    p = len(pos)
    rep = np.repeat(pos, k, axis=0)
    out = np.empty((p * k, 4), dtype=np.int64)
    out[:, 0] = rep[:, 0]
    out[:, 1] = rep[:, 1]
    corrupt_u = rng.random(p * k) < 0.5
    out[:, 2] = np.where(corrupt_u, rng.integers(0, n1, p * k), rep[:, 0])
    out[:, 3] = np.where(corrupt_u, rep[:, 1], rng.integers(0, n2, p * k))
    return out


def train_gcn(
    ahat1: np.ndarray,
    ahat2: np.ndarray,
    seeds: np.ndarray,
    cfg: GCNConfig,
) -> tuple[GCNParams, list[float]]:
    """Train the twin GCNs; returns final parameters and per-epoch losses."""
    n1, n2 = ahat1.shape[0], ahat2.shape[0]
    rng = np.random.default_rng(cfg.seed)
    params = init_params(n1, n2, cfg.dim, rng)
    opt = _Adam(lr=cfg.lr)
    losses: list[float] = []
    pos = np.asarray(seeds, dtype=np.int64)
    for _ in range(cfg.epochs):
        z1, cache1 = gcn_forward(ahat1, params.x1, params.w1, params.w2)
        z2, cache2 = gcn_forward(ahat2, params.x2, params.w1, params.w2)
        neg = sample_negatives(rng, pos, n1, n2, cfg.n_neg)
        loss, dz1, dz2 = margin_loss_and_grads(z1, z2, pos, neg, cfg.margin)
        losses.append(loss)
        dx1, dw1_a, dw2_a = gcn_backward(dz1, cache1)
        dx2, dw1_b, dw2_b = gcn_backward(dz2, cache2)
        pdict = {"x1": params.x1, "x2": params.x2, "w1": params.w1, "w2": params.w2}
        gdict = {"x1": dx1, "x2": dx2, "w1": dw1_a + dw1_b, "w2": dw2_a + dw2_b}
        opt.step(pdict, gdict)
        if cfg.project_x:
            params.x1 /= np.linalg.norm(params.x1, axis=1, keepdims=True)
            params.x2 /= np.linalg.norm(params.x2, axis=1, keepdims=True)
    return params, losses


def structural_embeddings(
    ahat1: np.ndarray,
    ahat2: np.ndarray,
    seeds: np.ndarray,
    cfg: GCNConfig,
) -> tuple[np.ndarray, np.ndarray]:
    """Final structural embeddings ``(Z1, Z2)`` after training."""
    params, _ = train_gcn(ahat1, ahat2, seeds, cfg)
    z1, _ = gcn_forward(ahat1, params.x1, params.w1, params.w2)
    z2, _ = gcn_forward(ahat2, params.x2, params.w1, params.w2)
    return z1, z2
