"""LR weighting baseline: the logistic fit, weight extraction, training-set
construction, and that it learns to favour the informative feature."""
import numpy as np
import pytest

from repro.fusion.learned import logistic_fit, lr_training_set, lr_weights


def test_logistic_fit_separable():
    rng = np.random.default_rng(0)
    x = rng.standard_normal((200, 2))
    y = (x[:, 0] > 0).astype(float)
    w, b = logistic_fit(x, y)
    assert w[0] > 1.0
    assert abs(w[1]) < 0.5 * w[0]
    pred = (x @ w + b) > 0
    assert (pred == y.astype(bool)).mean() > 0.95


def test_lr_weights_favor_informative_feature():
    rng = np.random.default_rng(1)
    n = 300
    informative = np.concatenate([rng.uniform(0.7, 1.0, n), rng.uniform(0.0, 0.3, n)])
    noise = rng.uniform(0, 1, 2 * n)
    x = np.column_stack([informative, noise])
    y = np.concatenate([np.ones(n), np.zeros(n)])
    w = lr_weights(x, y)
    assert w.sum() == pytest.approx(1.0)
    assert w[0] > 0.8


def test_lr_weights_clip_negative():
    rng = np.random.default_rng(2)
    n = 300
    anti = np.concatenate([rng.uniform(0, 0.3, n), rng.uniform(0.7, 1.0, n)])
    good = np.concatenate([rng.uniform(0.6, 1.0, n), rng.uniform(0.0, 0.4, n)])
    x = np.column_stack([anti, good])
    y = np.concatenate([np.ones(n), np.zeros(n)])
    w = lr_weights(x, y)
    assert w[0] == 0.0 and w[1] == 1.0


def test_lr_weights_degenerate_falls_back_equal():
    x = np.zeros((10, 3))
    y = np.array([1, 0] * 5, dtype=float)
    np.testing.assert_allclose(lr_weights(x, y), [1 / 3, 1 / 3, 1 / 3])


def test_lr_training_set_shape():
    rng = np.random.default_rng(3)
    seeds = np.array([[0, 0], [1, 1], [2, 2]])
    cands = np.arange(10)

    def pair_sims(u, v):
        return np.column_stack([(u == v).astype(float), np.ones(len(u))])

    x, y = lr_training_set(rng, seeds, cands, pair_sims, n_neg=10)
    assert x.shape == (3 + 30, 2)
    assert y.sum() == 3
    # positives have feature-0 value 1 (u == v), negatives mostly 0
    assert x[:3, 0].mean() == 1.0
    assert x[3:, 0].mean() < 0.5


def test_lr_on_bundle_favors_string_for_monolingual(mono_bundle):
    """On a mono-lingual dataset the string feature separates seeds from
    corrupted pairs almost perfectly — LR should give it the top weight."""
    rng = np.random.default_rng(4)
    pair = mono_bundle.pair
    seeds = pair.train[["e1", "e2"]].to_numpy()
    cands = pair.kg2.names["id"].to_numpy()
    x, y = lr_training_set(rng, seeds, cands, mono_bundle.pair_sims, n_neg=10)
    w = lr_weights(x, y)
    assert np.argmax(w) == 2  # (struct, semantic, string)
