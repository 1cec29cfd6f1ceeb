"""Collective EA layer: DAA correctness (Figure 1 / Figure 4 worked
examples, stability, source-optimality vs brute force), greedy baseline,
Hungarian optimality, and hypothesis property tests."""
import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.matching.daa import blocking_pairs, deferred_acceptance, is_stable
from repro.matching.greedy import independent_top1
from repro.matching.hungarian import hungarian_max, hungarian_min

# Figure 1/4-style fused matrix: greedy makes two mistakes, DAA fixes both.
FIG = np.array(
    [
        [0.9, 0.6, 0.3],
        [0.8, 0.7, 0.4],
        [0.2, 0.65, 0.5],
    ]
)


# ---- worked examples ----------------------------------------------------


def test_figure1_greedy_conflicts():
    """Independent EA aligns both u1 and u2 to v1, and u3 to v2 — two of
    three decisions wrong, exactly the Figure 1 failure mode."""
    g = independent_top1(FIG)
    np.testing.assert_array_equal(g, [0, 0, 1])
    assert float(np.mean(g == np.arange(3))) == pytest.approx(1 / 3)


def test_figure4_daa_trace():
    """DAA recovers the correct bijection: v1 keeps u1 over u2; u2 then
    displaces u3 at v2 ("trade up"); u3 ends at v3 (Figure 4 rounds)."""
    match = deferred_acceptance(FIG)
    np.testing.assert_array_equal(match, [0, 1, 2])
    assert float(np.mean(match == np.arange(3))) == 1.0


def test_daa_perfect_matching():
    rng = np.random.default_rng(0)
    m = rng.random((20, 20))
    match = deferred_acceptance(m)
    assert sorted(match.tolist()) == list(range(20))


def test_daa_rect_more_targets():
    m = np.array([[0.9, 0.1, 0.5], [0.8, 0.2, 0.6]])
    match = deferred_acceptance(m)
    assert len(set(match)) == 2
    assert is_stable(m, match)


def test_daa_more_sources_raises():
    with pytest.raises(ValueError):
        deferred_acceptance(np.zeros((3, 2)))


def test_blocking_pairs_detects_instability():
    m = np.array([[0.9, 0.1], [0.8, 0.2]])
    bad = np.array([1, 0])  # u0->v1, u1->v0: u0 and v0 prefer each other
    assert (0, 0) in blocking_pairs(m, bad)
    assert not is_stable(m, bad)


def test_ties_deterministic():
    m = np.ones((4, 4))
    match = deferred_acceptance(m)
    np.testing.assert_array_equal(match, [0, 1, 2, 3])


# ---- properties ---------------------------------------------------------


@given(arrays(np.float64, (6, 6), elements=st.floats(0, 1, width=32)))
@settings(max_examples=150, deadline=None)
def test_daa_always_stable(m):
    match = deferred_acceptance(m)
    assert sorted(match.tolist()) == list(range(6))
    assert is_stable(m, match)


def _all_stable_matchings(m):
    n = m.shape[0]
    out = []
    for perm in itertools.permutations(range(n)):
        match = np.array(perm)
        if is_stable(m, match):
            out.append(match)
    return out


@given(arrays(np.float64, (4, 4), elements=st.floats(0, 1, width=16)))
@settings(max_examples=60, deadline=None)
def test_daa_source_optimal(m):
    """Among all stable matchings, source-proposing DAA gives every source
    its best achievable partner (classic Gale–Shapley optimality).

    The theorem requires strict preferences, so ties are removed with a
    global rank transform (ties broken by position, matching DAA's own
    index-ascending tie policy).
    """
    m = np.argsort(np.argsort(m.ravel(), kind="stable"), kind="stable").reshape(m.shape).astype(float)
    match = deferred_acceptance(m)
    for other in _all_stable_matchings(m):
        assert all(m[i, match[i]] >= m[i, other[i]] - 1e-12 for i in range(4))


@given(arrays(np.float64, (5, 5), elements=st.floats(0, 1, width=32)))
@settings(max_examples=100, deadline=None)
def test_hungarian_beats_or_ties_everything(m):
    h = hungarian_max(m)
    assert sorted(h.tolist()) == list(range(5))
    best = max(
        sum(m[i, p[i]] for i in range(5)) for p in itertools.permutations(range(5))
    )
    assert sum(m[i, h[i]] for i in range(5)) == pytest.approx(best, abs=1e-9)


@given(arrays(np.float64, (5, 5), elements=st.floats(0, 1, width=32)))
@settings(max_examples=60, deadline=None)
def test_hungarian_total_weight_geq_daa_and_greedy_matching(m):
    """Max-weight assignment dominates any perfect matching's total weight,
    including the stable one (the Section VI trade-off)."""
    h = hungarian_max(m)
    d = deferred_acceptance(m)
    wh = sum(m[i, h[i]] for i in range(5))
    wd = sum(m[i, d[i]] for i in range(5))
    assert wh >= wd - 1e-9


def test_hungarian_min_known():
    cost = np.array([[4.0, 1.0, 3.0], [2.0, 0.0, 5.0], [3.0, 2.0, 2.0]])
    match = hungarian_min(cost)
    assert sum(cost[i, match[i]] for i in range(3)) == 5.0


def test_hungarian_rejects_rectangular():
    with pytest.raises(ValueError):
        hungarian_min(np.zeros((2, 3)))


def test_greedy_allows_duplicates_daa_does_not():
    rng = np.random.default_rng(5)
    for _ in range(10):
        m = rng.random((8, 8))
        g = independent_top1(m)
        d = deferred_acceptance(m)
        assert len(set(d.tolist())) == 8
        # greedy has no such guarantee; DAA only differs when greedy collides
        if len(set(g.tolist())) == 8:
            np.testing.assert_array_equal(np.sort(g), np.arange(8))
