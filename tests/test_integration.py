"""Cross-layer integration: the full Spark pipeline on a small dataset,
including collective matching executed via the iterative Spark DAA, and
consistency between the harness and the pipeline primitives."""
from dataclasses import replace

import numpy as np
import pytest

from repro import synth_data
from repro.core.config import CEAFFConfig
from repro.core.pipeline import compute_features, fuse_and_match
from repro.evalx.metrics import accuracy
from repro.evalx.tables import Harness
from repro.kgdata.benchmarks import dataset
from repro.matching.daa import deferred_acceptance
from repro.matching.daa_spark import deferred_acceptance_spark


@pytest.fixture(scope="module")
def tiny_pair():
    return dataset("srprs_dbp_yg", n_pairs=60)


def test_full_spark_pipeline_with_spark_daa(spark, tiny_pair):
    """Feature dataflows AND collective matching through Spark end-to-end:
    the fused matrix from the Spark feature path, stable-matched by the
    iterative DataFrame DAA, must equal the NumPy pipeline's result."""
    cfg = CEAFFConfig(use_spark=True)
    bundle = compute_features(spark, tiny_pair, cfg)
    res = fuse_and_match(bundle, cfg)
    spark_match = deferred_acceptance_spark(spark, res.fused.m)
    np.testing.assert_array_equal(spark_match, deferred_acceptance(res.fused.m))
    np.testing.assert_array_equal(spark_match, res.matches)
    assert accuracy(spark_match) == res.accuracy


def test_harness_consistent_with_pipeline(tiny_pair):
    h = Harness(None, n_pairs=60, use_spark=False)
    acc_h = h.ceaff_accuracy("srprs_dbp_yg")
    bundle = compute_features(None, dataset("srprs_dbp_yg", n_pairs=60),
                              CEAFFConfig(use_spark=False))
    acc_p = fuse_and_match(bundle, replace(CEAFFConfig(), use_spark=False)).accuracy
    assert acc_h == acc_p


def test_synth_data_generators_cover_schema(spark):
    """The provided TPC-H-lite generators stay usable for oracle work."""
    p = synth_data.part(spark, sf=0.001)
    c = synth_data.customer(spark, sf=0.001)
    u = synth_data.uniform_keys(spark, n=100, n_keys=10)
    assert {"p_partkey", "p_brand"} <= set(p.columns)
    assert {"c_custkey", "c_mktsegment"} <= set(c.columns)
    assert u.count() == 100


def test_config_defaults_match_paper_parameters():
    cfg = CEAFFConfig()
    assert cfg.theta1 == 0.98 and cfg.theta2 == 0.1  # Section VII-A
    assert cfg.gcn.margin == 3.0  # γ = 3
    assert cfg.gcn.n_neg == 5  # five negatives per positive
    assert cfg.lr_n_neg == 10  # LR baseline: 10 negatives per seed
    assert cfg.collective and cfg.weighting == "adaptive"
