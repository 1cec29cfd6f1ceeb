"""End-to-end CEAFF pipeline (paper Figure 2).

``compute_features`` runs the three feature dataflows once per dataset and
returns a :class:`FeatureBundle`; ``fuse_and_match`` applies any
:class:`~repro.core.config.CEAFFConfig` to a bundle (fusion + matching are
cheap, so ablation sweeps reuse one bundle). With ``cfg.use_spark`` the
similarity joins run through Spark (adjacency aggregation, token-join name
encoder, blocked cosine via ``mapInPandas``, Levenshtein similarity join);
otherwise the NumPy references are used — both paths are tested equal.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import SparkSession

from repro.core.config import CEAFFConfig
from repro.fusion.adaptive import FusionReport, two_stage_fuse
from repro.fusion.learned import lr_training_set, lr_weights
from repro.kgdata.model import KGPair
from repro.matching.daa import deferred_acceptance
from repro.matching.greedy import independent_top1
from repro.matching.hungarian import hungarian_max
from repro.sim.levenshtein import ratio_batch
from repro.sim.matrices import SimMatrix, cosine_matrix, cosine_matrix_spark, l2_normalize, to_dense
from repro.sim.string_matrix import string_matrix_numpy, string_matrix_spark
from repro.structure.adjacency import adjacency_dense, adjacency_dense_numpy
from repro.structure.training import structural_embeddings
from repro.text.embeddings import name_vectors_numpy
from repro.text.name_embedding import name_vectors_spark


@dataclass
class FeatureBundle:
    """Per-dataset feature artifacts, computed once and reused.

    ``ms``/``mn``/``ml`` are the structural / semantic / string similarity
    matrices over the test split. The full-KG embeddings and names are kept
    so the LR weighting baseline can evaluate features on arbitrary pairs
    (its training set lives on the *seed* entities, not the test split).
    """

    pair: KGPair
    z1: np.ndarray
    z2: np.ndarray
    nv1: np.ndarray
    nv2: np.ndarray
    names1: list[str]
    names2: list[str]
    ms: SimMatrix
    mn: SimMatrix
    ml: SimMatrix

    def pair_sims(self, u: np.ndarray, v: np.ndarray) -> np.ndarray:
        """``(len(u), 3)`` feature similarities for arbitrary entity pairs
        (struct, semantic, string) — the LR baseline's feature vector."""
        zu = l2_normalize(self.z1[u])
        zv = l2_normalize(self.z2[v])
        nu = l2_normalize(self.nv1[u])
        nv = l2_normalize(self.nv2[v])
        s_struct = (zu * zv).sum(axis=1)
        s_sem = (nu * nv).sum(axis=1)
        s_str = ratio_batch(
            [self.names1[i] for i in u], [self.names2[j] for j in v]
        )
        return np.column_stack([s_struct, s_sem, s_str])


@dataclass
class EAResult:
    """Outcome of one (bundle, config) evaluation."""

    config: CEAFFConfig
    matches: np.ndarray
    fused: SimMatrix
    weights: dict[str, FusionReport]
    accuracy: float


def compute_features(
    spark: SparkSession, pair: KGPair, cfg: CEAFFConfig | None = None
) -> FeatureBundle:
    """Run the three feature-generation dataflows for one dataset."""
    cfg = cfg or CEAFFConfig()
    te1 = pair.test["e1"].to_numpy()
    te2 = pair.test["e2"].to_numpy()

    # Structural: Â via Spark aggregation, GCN trained driver-side (NumPy).
    if cfg.use_spark:
        a1 = adjacency_dense(spark, pair.kg1.triples, pair.kg1.n_entities,
                             variant=cfg.gcn.adjacency_variant)
        a2 = adjacency_dense(spark, pair.kg2.triples, pair.kg2.n_entities,
                             variant=cfg.gcn.adjacency_variant)
    else:
        a1 = adjacency_dense_numpy(pair.kg1.triples, pair.kg1.n_entities,
                                   variant=cfg.gcn.adjacency_variant)
        a2 = adjacency_dense_numpy(pair.kg2.triples, pair.kg2.n_entities,
                                   variant=cfg.gcn.adjacency_variant)
    seeds = pair.train[["e1", "e2"]].to_numpy()
    z1, z2 = structural_embeddings(a1, a2, seeds, cfg.gcn)

    # Semantic: averaged word embeddings via token join.
    if cfg.use_spark:
        nv1 = name_vectors_spark(spark, pair.kg1.names, pair.emb1)
        nv2 = name_vectors_spark(spark, pair.kg2.names, pair.emb2)
    else:
        nv1 = name_vectors_numpy(pair.kg1.names, pair.emb1)
        nv2 = name_vectors_numpy(pair.kg2.names, pair.emb2)

    names1 = pair.kg1.names.sort_values("id")["name"].tolist()
    names2 = pair.kg2.names.sort_values("id")["name"].tolist()
    src_names = [names1[i] for i in te1]
    tgt_names = [names2[j] for j in te2]

    if cfg.use_spark:
        n = len(te1)
        ms_m = to_dense(cosine_matrix_spark(spark, z1[te1], z2[te2]), n, n)
        mn_m = to_dense(cosine_matrix_spark(spark, nv1[te1], nv2[te2]), n, n)
        ml_m = to_dense(string_matrix_spark(spark, src_names, tgt_names), n, n)
    else:
        ms_m = cosine_matrix(z1[te1], z2[te2])
        mn_m = cosine_matrix(nv1[te1], nv2[te2])
        ml_m = string_matrix_numpy(src_names, tgt_names)

    return FeatureBundle(
        pair=pair,
        z1=z1,
        z2=z2,
        nv1=nv1,
        nv2=nv2,
        names1=names1,
        names2=names2,
        ms=SimMatrix(te1, te2, ms_m),
        mn=SimMatrix(te1, te2, mn_m),
        ml=SimMatrix(te1, te2, ml_m),
    )


def _lr_fused(bundle: FeatureBundle, cfg: CEAFFConfig, mats: list[np.ndarray | None]) -> np.ndarray:
    """LR weighting: fit logistic regression on seeds + negatives, fuse the
    *enabled* features with the learned (clipped, normalized) weights."""
    rng = np.random.default_rng(cfg.lr_seed)
    seeds = bundle.pair.train[["e1", "e2"]].to_numpy()
    candidates = bundle.pair.kg2.names["id"].to_numpy()
    x, y = lr_training_set(
        rng, seeds, candidates, bundle.pair_sims, n_neg=cfg.lr_n_neg
    )
    enabled = [i for i, m in enumerate(mats) if m is not None]
    w = lr_weights(x[:, enabled], y)
    out = np.zeros_like(mats[enabled[0]])
    for wi, i in zip(w, enabled):
        out += wi * mats[i]
    return out


def fuse_and_match(bundle: FeatureBundle, cfg: CEAFFConfig) -> EAResult:
    """Fusion + matching for one configuration (cheap; no feature recompute)."""
    ms = bundle.ms.m if cfg.use_struct else None
    mn = bundle.mn.m if cfg.use_semantic else None
    ml = bundle.ml.m if cfg.use_string else None

    reports: dict[str, FusionReport] = {}
    if cfg.weighting == "lr":
        fused_m = _lr_fused(bundle, cfg, [ms, mn, ml])
    else:
        fused_m, reports = two_stage_fuse(
            ms,
            mn,
            ml,
            adaptive=(cfg.weighting == "adaptive"),
            theta1=cfg.theta1,
            theta2=cfg.theta2,
            theta_override=cfg.theta_override,
        )

    if not cfg.collective:
        matches = independent_top1(fused_m)
    elif cfg.matcher == "daa":
        matches = deferred_acceptance(fused_m)
    elif cfg.matcher == "hungarian":
        matches = hungarian_max(fused_m)
    else:
        raise ValueError(f"unknown matcher: {cfg.matcher}")

    accuracy = float(np.mean(matches == np.arange(len(matches))))
    return EAResult(
        config=cfg,
        matches=matches,
        fused=bundle.ms.copy_with(fused_m),
        weights=reports,
        accuracy=accuracy,
    )


def run_ceaff(spark: SparkSession, pair: KGPair, cfg: CEAFFConfig | None = None) -> EAResult:
    """Convenience: features + fusion + matching in one call."""
    cfg = cfg or CEAFFConfig()
    return fuse_and_match(compute_features(spark, pair, cfg), cfg)
