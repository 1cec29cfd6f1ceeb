"""Shared test fixtures: small benchmark datasets and feature bundles.

Dataset generation and GCN training are deterministic, so session scope is
safe; sharing them keeps the suite fast (feature bundles are the expensive
part — fusion/matching configs reuse them, mirroring how the table
harnesses work).
"""
from __future__ import annotations

import pytest

from repro.core.config import CEAFFConfig
from repro.core.pipeline import compute_features
from repro.kgdata.benchmarks import dataset

SMALL_N = 150

NUMPY_CFG = CEAFFConfig(use_spark=False)


@pytest.fixture(scope="session")
def zh_pair():
    """Cross-lingual, distant scripts (DBP15K ZH-EN profile)."""
    return dataset("dbp15k_zh_en", n_pairs=SMALL_N)


@pytest.fixture(scope="session")
def fr_pair():
    """Cross-lingual, shared script (SRPRS EN-FR profile)."""
    return dataset("srprs_en_fr", n_pairs=SMALL_N)


@pytest.fixture(scope="session")
def mono_pair():
    """Mono-lingual (DYW100K DBP-WD profile)."""
    return dataset("dyw100k_dbp_wd", n_pairs=SMALL_N)


@pytest.fixture(scope="session")
def zh_bundle(zh_pair):
    return compute_features(None, zh_pair, NUMPY_CFG)


@pytest.fixture(scope="session")
def fr_bundle(fr_pair):
    return compute_features(None, fr_pair, NUMPY_CFG)


@pytest.fixture(scope="session")
def mono_bundle(mono_pair):
    return compute_features(None, mono_pair, NUMPY_CFG)
