"""The iterative Spark DataFrame implementation of deferred acceptance must
agree exactly with the NumPy reference (same tie policy) and stay stable."""
import numpy as np
import pytest

from repro.matching.daa import deferred_acceptance, is_stable
from repro.matching.daa_spark import deferred_acceptance_spark


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_spark_daa_matches_numpy(spark, seed):
    rng = np.random.default_rng(seed)
    m = rng.random((10, 10))
    got = deferred_acceptance_spark(spark, m)
    np.testing.assert_array_equal(got, deferred_acceptance(m))


def test_spark_daa_figure4(spark):
    m = np.array([[0.9, 0.6, 0.3], [0.8, 0.7, 0.4], [0.2, 0.65, 0.5]])
    np.testing.assert_array_equal(deferred_acceptance_spark(spark, m), [0, 1, 2])


def test_spark_daa_with_ties(spark):
    m = np.ones((4, 4))
    np.testing.assert_array_equal(deferred_acceptance_spark(spark, m), [0, 1, 2, 3])


def test_spark_daa_stable_medium(spark):
    rng = np.random.default_rng(7)
    m = rng.random((25, 25))
    got = deferred_acceptance_spark(spark, m)
    assert sorted(got.tolist()) == list(range(25))
    assert is_stable(m, got)
    np.testing.assert_array_equal(got, deferred_acceptance(m))


def test_spark_daa_rejects_more_sources(spark):
    with pytest.raises(ValueError):
        deferred_acceptance_spark(spark, np.zeros((3, 2)))


def test_spark_daa_round_limit(spark):
    m = np.array([[0.9, 0.1], [0.8, 0.2]])
    with pytest.raises(RuntimeError):
        deferred_acceptance_spark(spark, m, max_rounds=0)
