"""End-to-end CEAFF pipeline: bundle integrity, Spark/NumPy dataflow
equality, config toggles, matcher variants, and the paper's headline shape
claims on the shared small datasets."""
from dataclasses import replace

import numpy as np
import pytest

from repro.core.config import CEAFFConfig
from repro.core.pipeline import compute_features, fuse_and_match
from repro.matching.greedy import independent_top1

CFG = CEAFFConfig(use_spark=False)


# ---- bundle integrity ---------------------------------------------------


@pytest.mark.parametrize("bundle_name", ["zh_bundle", "fr_bundle", "mono_bundle"])
def test_bundle_shapes(bundle_name, request):
    b = request.getfixturevalue(bundle_name)
    n = len(b.pair.test)
    for sm in (b.ms, b.mn, b.ml):
        assert sm.m.shape == (n, n)
        assert len(sm.src_ids) == n and len(sm.tgt_ids) == n
    assert b.z1.shape[0] == b.pair.kg1.n_entities
    assert b.nv2.shape[0] == b.pair.kg2.n_entities


def test_string_matrix_bounds(fr_bundle):
    assert fr_bundle.ml.m.min() >= 0.0 and fr_bundle.ml.m.max() <= 1.0


def test_cosine_matrices_bounded(zh_bundle):
    for sm in (zh_bundle.ms, zh_bundle.mn):
        assert sm.m.min() >= -1.0 - 1e-9 and sm.m.max() <= 1.0 + 1e-9


def test_pair_sims_matches_matrices(fr_bundle):
    """pair_sims on the test pairs must reproduce the matrices' diagonals."""
    te1 = fr_bundle.pair.test["e1"].to_numpy()
    te2 = fr_bundle.pair.test["e2"].to_numpy()
    sims = fr_bundle.pair_sims(te1, te2)
    np.testing.assert_allclose(sims[:, 0], np.diag(fr_bundle.ms.m), atol=1e-9)
    np.testing.assert_allclose(sims[:, 1], np.diag(fr_bundle.mn.m), atol=1e-9)
    np.testing.assert_allclose(sims[:, 2], np.diag(fr_bundle.ml.m), atol=1e-9)


def test_spark_and_numpy_features_agree(spark, fr_pair):
    """The full Spark feature dataflow must equal the NumPy reference."""
    b_np = compute_features(None, fr_pair, CFG)
    b_sp = compute_features(spark, fr_pair, replace(CFG, use_spark=True))
    np.testing.assert_allclose(b_sp.ms.m, b_np.ms.m, atol=1e-7)
    np.testing.assert_allclose(b_sp.mn.m, b_np.mn.m, atol=1e-7)
    np.testing.assert_allclose(b_sp.ml.m, b_np.ml.m, atol=1e-12)


# ---- config toggles -----------------------------------------------------


def test_full_config_runs(fr_bundle):
    res = fuse_and_match(fr_bundle, CFG)
    assert 0.0 <= res.accuracy <= 1.0
    assert sorted(res.matches.tolist()) == list(range(fr_bundle.ms.n))
    assert set(res.weights) == {"textual", "final"}


def test_disable_all_features_raises(fr_bundle):
    with pytest.raises(ValueError):
        fuse_and_match(
            fr_bundle,
            replace(CFG, use_struct=False, use_semantic=False, use_string=False),
        )


def test_unknown_matcher_raises(fr_bundle):
    with pytest.raises(ValueError):
        fuse_and_match(fr_bundle, replace(CFG, matcher="bogus"))


def test_greedy_when_not_collective(fr_bundle):
    res = fuse_and_match(fr_bundle, replace(CFG, collective=False))
    np.testing.assert_array_equal(res.matches, independent_top1(res.fused.m))


def test_hungarian_matcher_runs(fr_bundle):
    res = fuse_and_match(fr_bundle, replace(CFG, matcher="hungarian"))
    assert sorted(res.matches.tolist()) == list(range(fr_bundle.ms.n))


def test_single_feature_configs(fr_bundle):
    only_string = fuse_and_match(
        fr_bundle, replace(CFG, use_struct=False, use_semantic=False)
    )
    np.testing.assert_allclose(only_string.fused.m, fr_bundle.ml.m)


def test_lr_weighting_runs(fr_bundle):
    res = fuse_and_match(fr_bundle, replace(CFG, weighting="lr"))
    assert res.accuracy > 0.5


def test_config_labels():
    assert CEAFFConfig().label() == "CEAFF"
    assert CEAFFConfig(use_string=False).label() == "CEAFF w/o Ml"
    assert CEAFFConfig(collective=False, use_struct=False).label() == "CEAFF w/o C,Ms"
    assert CEAFFConfig(weighting="equal").label() == "CEAFF w/o AFF"
    assert CEAFFConfig(weighting="lr").label() == "LR"
    assert CEAFFConfig(theta_override=False).label() == "CEAFF w/o theta"


# ---- shape claims (paper Sections VII-B/C/D) ---------------------------


def test_collective_never_hurts_here(zh_bundle, fr_bundle, mono_bundle):
    for b in (zh_bundle, fr_bundle, mono_bundle):
        full = fuse_and_match(b, CFG).accuracy
        no_c = fuse_and_match(b, replace(CFG, collective=False)).accuracy
        assert full >= no_c - 1e-9


def test_ceaff_beats_single_features(fr_bundle, zh_bundle):
    for b in (fr_bundle, zh_bundle):
        gold = np.arange(b.ms.n)
        singles = [
            float(np.mean(independent_top1(m) == gold))
            for m in (b.ms.m, b.mn.m, b.ml.m)
        ]
        assert fuse_and_match(b, CFG).accuracy >= max(singles) - 1e-9


def test_monolingual_saturates(mono_bundle):
    assert fuse_and_match(mono_bundle, CFG).accuracy == 1.0


def test_monolingual_string_removal_hurts(mono_bundle):
    full = fuse_and_match(mono_bundle, CFG).accuracy
    wo_ml = fuse_and_match(mono_bundle, replace(CFG, use_string=False)).accuracy
    assert wo_ml < full


def test_zh_semantic_removal_hurts_most(zh_bundle):
    """Distant language pair: semantic carries the signal (Table V)."""
    full = fuse_and_match(zh_bundle, CFG).accuracy
    wo_mn = fuse_and_match(zh_bundle, replace(CFG, use_semantic=False)).accuracy
    wo_ml = fuse_and_match(zh_bundle, replace(CFG, use_string=False)).accuracy
    assert wo_mn < full
    assert wo_mn < wo_ml  # string is useless on disjoint scripts, semantic is not


def test_fr_string_removal_hurts_most(fr_bundle):
    """Close language pair: string carries the signal (Table V)."""
    full = fuse_and_match(fr_bundle, CFG).accuracy
    wo_ml = fuse_and_match(fr_bundle, replace(CFG, use_string=False)).accuracy
    wo_mn = fuse_and_match(fr_bundle, replace(CFG, use_semantic=False)).accuracy
    assert wo_ml < full
    assert wo_ml < wo_mn


def test_adaptive_beats_equal_on_crosslingual(zh_bundle, fr_bundle):
    for b in (zh_bundle, fr_bundle):
        adaptive = fuse_and_match(b, CFG).accuracy
        equal = fuse_and_match(b, replace(CFG, weighting="equal")).accuracy
        assert adaptive >= equal - 1e-9


def test_results_deterministic(fr_bundle):
    a = fuse_and_match(fr_bundle, CFG)
    b = fuse_and_match(fr_bundle, CFG)
    np.testing.assert_array_equal(a.matches, b.matches)
    assert a.accuracy == b.accuracy
