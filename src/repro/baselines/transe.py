"""TransE-family entity aligners (proxies for MTransE/IPTransE/BootEA/RSNs).

A NumPy TransE (margin ranking loss, L1 distance, uniform negative
sampling, per-epoch entity re-normalization — Bordes et al.) over the two
KGs, in two coupling modes:

- ``mode="mapping"`` (MTransE-class): disjoint entity and relation spaces;
  after training, a linear map between the spaces is fit on the seed pairs
  by least squares, and similarity is the cosine in the mapped space.
- ``mode="shared"`` (IPTransE/BootEA/RSNs-class): seed pairs are merged
  into one entity id; relation spaces stay disjoint. (The synthetic
  generator happens to keep latent relation ids aligned across views, but
  real DBP15K relations are not aligned — sharing them here would hand the
  TransE baselines an oracle signal no published baseline has, which
  inverted the paper's CEAFF-beats-all ordering until relation spaces were
  split. The alignment must flow through the merged seed entities alone.)

Extensions reproducing the mechanism of the stronger baselines:

- *iterative bootstrapping* (IPTransE/BootEA): between training rounds,
  confidently-aligned test pairs (mutual nearest neighbours above a
  threshold; optionally one-to-one greedy as in BootEA) are added as
  pseudo-seeds via an alignment relation fixed at the zero vector, which
  pulls the pair's embeddings together.
- *path augmentation* (RSNs-class long-term dependencies): sampled 2-hop
  paths ``(h, r1, x), (x, r2, t)`` become composite triples ``(h, r1∘r2, t)``
  over a hashed composite-relation vocabulary.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.kgdata.model import KGPair
from repro.sim.matrices import SimMatrix, cosine_matrix


@dataclass(frozen=True)
class TransEConfig:
    """Hyper-parameters for a TransE-family aligner."""

    dim: int = 32
    epochs: int = 200
    lr: float = 0.02
    margin: float = 1.0
    n_neg: int = 5
    seed: int = 13
    mode: str = "mapping"  # "mapping" | "shared"
    bootstrap_rounds: int = 0
    bootstrap_epochs: int = 60
    bootstrap_threshold: float = 0.7
    bootstrap_one_to_one: bool = False
    path_augment: bool = False
    n_paths: int = 1000
    n_composite_rel: int = 16


def _sample_paths(
    rng: np.random.Generator, triples: np.ndarray, n_paths: int, n_rel: int, n_comp: int
) -> np.ndarray:
    """Composite 2-hop triples ``(h, n_rel + hash(r1, r2), t)``."""
    if len(triples) == 0 or n_paths == 0:
        return np.empty((0, 3), dtype=np.int64)
    by_head: dict[int, list[int]] = {}
    for idx, h in enumerate(triples[:, 0]):
        by_head.setdefault(int(h), []).append(idx)
    first = triples[rng.integers(0, len(triples), n_paths)]
    out = []
    for h, r1, x in first:
        nxt = by_head.get(int(x))
        if not nxt:
            continue
        h2, r2, t = triples[nxt[rng.integers(0, len(nxt))]]
        if t == h:
            continue
        comp = n_rel + (int(r1) * 31 + int(r2)) % n_comp
        out.append((h, comp, t))
    if not out:
        return np.empty((0, 3), dtype=np.int64)
    return np.asarray(out, dtype=np.int64)


def _train(
    rng: np.random.Generator,
    triples: np.ndarray,
    ent_range: np.ndarray,
    n_ent: int,
    n_rel: int,
    cfg: TransEConfig,
    epochs: int,
    e: np.ndarray | None = None,
    r: np.ndarray | None = None,
    frozen_rel: int | None = None,
) -> tuple[np.ndarray, np.ndarray]:
    """Vectorized full-batch TransE SGD.

    ``ent_range[i] = (lo, hi)`` is the corruption range of triple ``i``
    (negatives stay within the triple's own KG). ``frozen_rel`` (the
    alignment relation) keeps its zero embedding.
    """
    if e is None:
        e = rng.uniform(-0.5, 0.5, (n_ent, cfg.dim)) / np.sqrt(cfg.dim)
    if r is None:
        r = rng.uniform(-0.5, 0.5, (n_rel, cfg.dim)) / np.sqrt(cfg.dim)
        if frozen_rel is not None:
            r[frozen_rel] = 0.0
    h, rel, t = triples[:, 0], triples[:, 1], triples[:, 2]
    lo, hi = ent_range[:, 0], ent_range[:, 1]
    m = len(triples)
    for _ in range(epochs):
        e /= np.maximum(np.linalg.norm(e, axis=1, keepdims=True), 1.0)
        for _ in range(cfg.n_neg):
            corrupt_h = rng.random(m) < 0.5
            rand_ent = lo + (rng.random(m) * (hi - lo)).astype(np.int64)
            nh = np.where(corrupt_h, rand_ent, h)
            nt = np.where(corrupt_h, t, rand_ent)
            d_pos = np.abs(e[h] + r[rel] - e[t]).sum(axis=1)
            d_neg = np.abs(e[nh] + r[rel] - e[nt]).sum(axis=1)
            act = d_pos - d_neg + cfg.margin > 0
            if not act.any():
                continue
            g_pos = np.sign(e[h[act]] + r[rel[act]] - e[t[act]])
            g_neg = np.sign(e[nh[act]] + r[rel[act]] - e[nt[act]])
            de = np.zeros_like(e)
            dr = np.zeros_like(r)
            np.add.at(de, h[act], g_pos)
            np.add.at(dr, rel[act], g_pos)
            np.add.at(de, t[act], -g_pos)
            np.add.at(de, nh[act], -g_neg)
            np.add.at(dr, rel[act], -g_neg)
            np.add.at(de, nt[act], g_neg)
            if frozen_rel is not None:
                dr[frozen_rel] = 0.0
            e -= cfg.lr * de
            r -= cfg.lr * dr
    return e, r


def _mutual_nn_pairs(
    sim: np.ndarray, threshold: float, one_to_one: bool
) -> list[tuple[int, int]]:
    """Confident pseudo-alignments for bootstrapping.

    ``one_to_one=False`` (IPTransE-style, conservative): mutual nearest
    neighbours above ``threshold`` — intrinsically injective, so few but
    precise. ``one_to_one=True`` (BootEA-style, aggressive): every row's
    best candidate above ``threshold``, then a greedy one-to-one resolution
    by descending similarity — BootEA's editable one-to-one-constrained
    labelling covers far more entities per round.
    """
    row_best = sim.argmax(axis=1)
    if not one_to_one:
        col_best = sim.argmax(axis=0)
        return [
            (i, int(row_best[i]))
            for i in range(sim.shape[0])
            if col_best[row_best[i]] == i and sim[i, row_best[i]] >= threshold
        ]
    pairs = [
        (i, int(row_best[i]))
        for i in range(sim.shape[0])
        if sim[i, row_best[i]] >= threshold
    ]
    pairs.sort(key=lambda p: -sim[p[0], p[1]])
    used_j: set[int] = set()
    out = []
    for i, j in pairs:
        if j in used_j:
            continue
        used_j.add(j)
        out.append((i, j))
    return out


def transe_similarity(pair: KGPair, cfg: TransEConfig) -> SimMatrix:
    """Train the configured TransE aligner; return the test-split cosine
    similarity matrix."""
    rng = np.random.default_rng(cfg.seed)
    n1 = pair.kg1.n_entities
    n2 = pair.kg2.n_entities
    t1 = pair.kg1.triples[["h", "r", "t"]].to_numpy(dtype=np.int64)
    t2 = pair.kg2.triples[["h", "r", "t"]].to_numpy(dtype=np.int64)
    n_rel_base = int(max(t1[:, 1].max(initial=0), t2[:, 1].max(initial=0))) + 1
    te1 = pair.test["e1"].to_numpy()
    te2 = pair.test["e2"].to_numpy()
    seeds = pair.train[["e1", "e2"]].to_numpy(dtype=np.int64)

    if cfg.path_augment:
        t1 = np.vstack([t1, _sample_paths(rng, t1, cfg.n_paths, n_rel_base, cfg.n_composite_rel)])
        t2 = np.vstack([t2, _sample_paths(rng, t2, cfg.n_paths, n_rel_base, cfg.n_composite_rel)])
    n_rel = n_rel_base + (cfg.n_composite_rel if cfg.path_augment else 0)

    if cfg.mode == "mapping":
        # disjoint spaces: KG2 entities and relations offset.
        tt2 = t2.copy()
        tt2[:, 0] += n1
        tt2[:, 2] += n1
        tt2[:, 1] += n_rel
        triples = np.vstack([t1, tt2])
        ent_range = np.vstack(
            [
                np.tile([0, n1], (len(t1), 1)),
                np.tile([n1, n1 + n2], (len(tt2), 1)),
            ]
        )
        e, _ = _train(rng, triples, ent_range, n1 + n2, 2 * n_rel, cfg, cfg.epochs)
        e1 = e[:n1]
        e2 = e[n1:]
        # Orthogonal Procrustes on the seed pairs: rotation-only mapping is
        # far more robust than unconstrained least squares with few seeds.
        u, _, vt = np.linalg.svd(e1[seeds[:, 0]].T @ e2[seeds[:, 1]])
        w = u @ vt
        return SimMatrix(te1, te2, cosine_matrix(e1[te1] @ w, e2[te2]))

    if cfg.mode != "shared":
        raise ValueError(f"unknown TransE mode: {cfg.mode}")

    # shared entity space: seed targets collapse onto their source id;
    # relation spaces stay disjoint (KG2 relations offset).
    remap2 = np.arange(n2, dtype=np.int64) + n1
    remap2[seeds[:, 1]] = seeds[:, 0]
    tt2 = t2.copy()
    tt2[:, 0] = remap2[tt2[:, 0]]
    tt2[:, 2] = remap2[tt2[:, 2]]
    tt2[:, 1] += n_rel
    triples = np.vstack([t1, tt2])
    ent_range = np.vstack(
        [
            np.tile([0, n1], (len(t1), 1)),
            # KG2 corruption draws from the remapped KG2 id space (which
            # includes merged ids < n1); approximate with the full range.
            np.tile([0, n1 + n2], (len(tt2), 1)),
        ]
    )
    n_ent = n1 + n2
    align_rel = 2 * n_rel
    e, r = _train(
        rng, triples, ent_range, n_ent, 2 * n_rel + 1, cfg, cfg.epochs, frozen_rel=align_rel
    )
    for _ in range(cfg.bootstrap_rounds):
        sim = cosine_matrix(e[te1], e[remap2[te2]])
        pseudo = _mutual_nn_pairs(sim, cfg.bootstrap_threshold, cfg.bootstrap_one_to_one)
        if pseudo:
            extra = np.asarray(
                [(te1[i], align_rel, remap2[te2[j]]) for i, j in pseudo], dtype=np.int64
            )
            aug = np.vstack([triples, extra])
            aug_range = np.vstack([ent_range, np.tile([0, n_ent], (len(extra), 1))])
        else:
            aug, aug_range = triples, ent_range
        e, r = _train(
            rng, aug, aug_range, n_ent, 2 * n_rel + 1, cfg, cfg.bootstrap_epochs,
            e=e, r=r, frozen_rel=align_rel,
        )
    return SimMatrix(te1, te2, cosine_matrix(e[te1], e[remap2[te2]]))
