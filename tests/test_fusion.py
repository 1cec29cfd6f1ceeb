"""Adaptive feature fusion: confident-pair mining (NumPy, Spark, oracle),
the Figure 3 worked example end-to-end, filtering rules, the θ1/θ2
override, two-stage fusion, and weight-normalization properties."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.fusion.adaptive import adaptive_weights, fuse, two_stage_fuse
from repro.fusion.confident import confident_pairs, confident_pairs_spark
from repro.oracle import assert_equivalent


def _long(m: np.ndarray) -> pd.DataFrame:
    n, k = m.shape
    return pd.DataFrame(
        {
            "si": np.repeat(np.arange(n), k),
            "ti": np.tile(np.arange(k), n),
            "sim": m.ravel(),
        }
    )


# ---- confident pairs ----------------------------------------------------


def test_confident_pairs_simple():
    m = np.array([[0.9, 0.1], [0.2, 0.8]])
    assert set(confident_pairs(m)) == {(0, 0), (1, 1)}


def test_confident_pairs_row_only_max_excluded():
    # (0,0) is row max for row 0 but column 0's max is (1,0).
    m = np.array([[0.5, 0.1], [0.9, 0.2]])
    assert set(confident_pairs(m)) == {(1, 0)}


def test_confident_pairs_rectangular():
    m = np.array([[0.9, 0.1, 0.3], [0.2, 0.8, 0.4]])
    assert set(confident_pairs(m)) == {(0, 0), (1, 1)}


def test_confident_pairs_spark_matches_numpy(spark):
    rng = np.random.default_rng(0)
    m = rng.random((15, 15))
    df = spark.createDataFrame(_long(m))
    got = {(r["si"], r["ti"]) for r in confident_pairs_spark(df).collect()}
    assert got == set(confident_pairs(m))


def test_confident_pairs_spark_oracle(spark):
    rng = np.random.default_rng(1)
    m = rng.random((10, 10))
    long = _long(m)
    df = spark.createDataFrame(long)
    assert_equivalent(
        confident_pairs_spark(df),
        """
        WITH rmax AS (SELECT si, max(sim) AS rm FROM s GROUP BY si),
             cmax AS (SELECT ti, max(sim) AS cm FROM s GROUP BY ti)
        SELECT s.si AS si, s.ti AS ti, s.sim AS sim
        FROM s JOIN rmax USING (si) JOIN cmax USING (ti)
        WHERE s.sim = rmax.rm AND s.sim = cmax.cm
        """,
        s=long,
    )


# ---- Figure 3 worked example -------------------------------------------


@pytest.fixture()
def figure3():
    """Matrices engineered to replay Figure 3: M^s finds (u2,v2),(u3,v3);
    M^n finds (u1,v1) [score > θ1], (u2,v2); M^l finds (u1,v1), (u2,v3)."""
    ms = np.array(
        [
            [0.30, 0.20, 0.10],
            [0.10, 0.80, 0.20],
            [0.35, 0.10, 0.70],  # 0.35 denies (0,0) the column max
        ]
    )
    mn = np.array(
        [
            [0.99, 0.20, 0.10],
            [0.10, 0.85, 0.20],
            [0.20, 0.30, 0.25],
        ]
    )
    ml = np.array(
        [
            [0.90, 0.20, 0.10],
            [0.10, 0.20, 0.75],
            [0.20, 0.10, 0.30],
        ]
    )
    return ms, mn, ml


def test_figure3_candidates(figure3):
    ms, mn, ml = figure3
    assert set(confident_pairs(ms)) == {(1, 1), (2, 2)}
    assert set(confident_pairs(mn)) == {(0, 0), (1, 1)}
    assert set(confident_pairs(ml)) == {(0, 0), (1, 2)}


def test_figure3_weights(figure3):
    """Walkthrough of Section V / Figure 3: u2's candidates conflict
    ((1,1) vs (1,2)) and are all pruned; (2,2) is unique to M^s → weight 1;
    (0,0) is shared by M^n and M^l → 1/2 each, but M^n's score 0.99 > θ1
    so its contribution is overridden to θ2 = 0.1.

    Scores: s=1, n=0.1, l=0.5 → weights (1, .1, .5)/1.6.
    """
    ms, mn, ml = figure3
    rep = adaptive_weights([ms, mn, ml], theta1=0.98, theta2=0.1)
    assert rep.retained == {(0, 0), (2, 2)}
    np.testing.assert_allclose(rep.weights, np.array([1.0, 0.1, 0.5]) / 1.6)


def test_figure3_weights_without_override(figure3):
    ms, mn, ml = figure3
    rep = adaptive_weights([ms, mn, ml], theta_override=False)
    np.testing.assert_allclose(rep.weights, np.array([1.0, 0.5, 0.5]) / 2.0)


# ---- filtering rules ----------------------------------------------------


def test_conflict_filtering():
    m1 = np.array([[0.9, 0.1], [0.1, 0.8]])
    m2 = np.array([[0.1, 0.9], [0.1, 0.2]])  # feature 2 says (0,1): conflict on u0
    rep = adaptive_weights([m1, m2])
    assert (0, 0) not in rep.retained and (0, 1) not in rep.retained
    assert (1, 1) in rep.retained


def test_shared_by_all_filtered():
    m1 = np.array([[0.9, 0.1], [0.1, 0.8]])
    m2 = np.array([[0.7, 0.1], [0.1, 0.6]])
    # both features produce both pairs -> everything filtered -> equal fallback
    rep = adaptive_weights([m1, m2])
    assert rep.retained == set()
    assert rep.fallback_equal
    np.testing.assert_allclose(rep.weights, [0.5, 0.5])


def test_pair_shared_by_subset_weighted_down():
    # candidates: m1 {(0,0),(1,1),(2,2)}, m2 {(0,0)}, m3 {(0,0),(1,1)}
    m1 = np.array([[0.7, 0.1, 0.1], [0.1, 0.6, 0.1], [0.1, 0.1, 0.5]])
    m2 = np.array([[0.8, 0.1, 0.2], [0.5, 0.2, 0.1], [0.6, 0.25, 0.3]])
    m3 = np.array([[0.9, 0.2, 0.1], [0.1, 0.8, 0.3], [0.2, 0.6, 0.4]])
    # (0,0): all three features -> filtered (shared by all).
    # (1,1): features 1,3 -> weight 1/2 each. (2,2): feature 1 only -> 1.
    rep = adaptive_weights([m1, m2, m3])
    assert (0, 0) not in rep.retained
    assert rep.retained == {(1, 1), (2, 2)}
    np.testing.assert_allclose(rep.weights, np.array([1.5, 0.0, 0.5]) / 2.0)


def test_single_feature_weight_one():
    rep = adaptive_weights([np.array([[1.0]])])
    np.testing.assert_allclose(rep.weights, [1.0])


def test_empty_input_raises():
    with pytest.raises(ValueError):
        adaptive_weights([])


# ---- fuse / two-stage ---------------------------------------------------


def test_fuse_weighted_sum():
    a = np.ones((2, 2))
    b = np.full((2, 2), 2.0)
    np.testing.assert_allclose(fuse([a, b], np.array([0.25, 0.75])), 0.25 + 1.5)


def test_two_stage_all_disabled_raises():
    with pytest.raises(ValueError):
        two_stage_fuse(None, None, None)


def test_two_stage_single_feature_identity():
    m = np.random.default_rng(0).random((4, 4))
    fused, reports = two_stage_fuse(None, m, None)
    np.testing.assert_allclose(fused, m)
    assert reports["textual"].weights[0] == 1.0


def test_two_stage_struct_only():
    m = np.random.default_rng(1).random((4, 4))
    fused, _ = two_stage_fuse(m, None, None)
    np.testing.assert_allclose(fused, m)


def test_two_stage_equal_weights():
    rng = np.random.default_rng(2)
    ms, mn, ml = rng.random((3, 4, 4))
    fused, _ = two_stage_fuse(ms, mn, ml, adaptive=False)
    np.testing.assert_allclose(fused, 0.5 * ms + 0.25 * mn + 0.25 * ml)


def test_two_stage_reports_present():
    rng = np.random.default_rng(3)
    ms, mn, ml = rng.random((3, 6, 6))
    _, reports = two_stage_fuse(ms, mn, ml)
    assert set(reports) == {"textual", "final"}


# ---- properties ---------------------------------------------------------


@given(
    arrays(np.float64, (5, 5), elements=st.floats(0, 0.97)),
    arrays(np.float64, (5, 5), elements=st.floats(0, 0.97)),
)
@settings(max_examples=50, deadline=None)
def test_weights_normalized(m1, m2):
    rep = adaptive_weights([m1, m2])
    assert rep.weights.shape == (2,)
    assert abs(rep.weights.sum() - 1.0) < 1e-9
    assert (rep.weights >= 0).all()


@given(arrays(np.float64, (4, 4), elements=st.floats(0, 1)))
@settings(max_examples=50, deadline=None)
def test_fused_bounded_by_inputs(m):
    fused, _ = two_stage_fuse(m, m, m)
    np.testing.assert_allclose(fused, m, atol=1e-9)
