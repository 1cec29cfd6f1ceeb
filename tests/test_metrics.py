"""Accuracy / Hits@k / MRR metric unit tests."""
import numpy as np
import pytest

from repro.evalx.metrics import accuracy, hits_at_k, mrr, ranking_metrics


def test_accuracy_all_correct():
    assert accuracy(np.array([0, 1, 2])) == 1.0


def test_accuracy_partial():
    assert accuracy(np.array([0, 2, 1])) == pytest.approx(1 / 3)


def test_hits_at_1_is_argmax_accuracy():
    m = np.array([[0.9, 0.1], [0.4, 0.5]])
    assert hits_at_k(m, 1) == 1.0
    m2 = np.array([[0.1, 0.9], [0.4, 0.5]])
    assert hits_at_k(m2, 1) == 0.5


def test_hits_at_k_monotone_in_k():
    rng = np.random.default_rng(0)
    m = rng.random((30, 30))
    h = [hits_at_k(m, k) for k in (1, 5, 10, 30)]
    assert h == sorted(h)
    assert h[-1] == 1.0


def test_mrr_perfect():
    assert mrr(np.eye(4) + 0.1) == 1.0


def test_mrr_known_ranks():
    # gold ranks: row0 -> 1, row1 -> 2
    m = np.array([[0.9, 0.5], [0.9, 0.5]])
    assert mrr(m) == pytest.approx((1.0 + 0.5) / 2)


def test_ties_do_not_push_gold_down():
    m = np.array([[0.5, 0.5], [0.5, 0.5]])
    assert hits_at_k(m, 1) == 1.0
    assert mrr(m) == 1.0


def test_ranking_metrics_bundle():
    rng = np.random.default_rng(1)
    m = rng.random((20, 20))
    r = ranking_metrics(m)
    assert set(r) == {"hits1", "hits10", "mrr"}
    assert 0 <= r["hits1"] <= r["hits10"] <= 1
    assert r["hits1"] <= r["mrr"] <= 1
