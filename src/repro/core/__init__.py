"""CEAFF core: configuration and the end-to-end pipeline
(features → adaptive fusion → collective matching → accuracy)."""
from repro.core.config import CEAFFConfig
from repro.core.pipeline import FeatureBundle, EAResult, compute_features, fuse_and_match, run_ceaff

__all__ = [
    "CEAFFConfig",
    "FeatureBundle",
    "EAResult",
    "compute_features",
    "fuse_and_match",
    "run_ceaff",
]
