"""Levenshtein layer: reference DPs, the paper's lev* identity, worked
examples from Section IV-C, and the vectorized batch kernel (hypothesis)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.sim.levenshtein import lcs_len, lev, lev_star, ratio, ratio_batch

words = st.text(alphabet="abcde", max_size=12)
cjk_words = st.text(alphabet="丈丑丂且丏", max_size=8)


# ---- worked examples ----------------------------------------------------


def test_known_lev():
    assert lev("kitten", "sitting") == 3
    assert lev("", "abc") == 3
    assert lev("abc", "abc") == 0


def test_paper_example_a_c():
    """Section IV-C: ratio('a','c') is 0.5 under lev but 0 under lev*."""
    n = 2
    assert (n - lev("a", "c")) / n == 0.5
    assert ratio("a", "c") == 0.0


def test_ratio_identical():
    assert ratio("abc", "abc") == 1.0
    assert ratio("", "") == 1.0


def test_ratio_disjoint_alphabets():
    assert ratio("abc", "丈丑丂") == 0.0


# ---- property tests -----------------------------------------------------


@given(words, words)
@settings(max_examples=200)
def test_lev_star_lcs_identity(a, b):
    """The identity the batch kernel relies on: lev* = |a|+|b| − 2·LCS."""
    assert lev_star(a, b) == len(a) + len(b) - 2 * lcs_len(a, b)


@given(words, words)
@settings(max_examples=100)
def test_symmetry(a, b):
    assert lev(a, b) == lev(b, a)
    assert lev_star(a, b) == lev_star(b, a)
    assert ratio(a, b) == ratio(b, a)


@given(words, words)
@settings(max_examples=100)
def test_bounds(a, b):
    assert 0 <= lev(a, b) <= max(len(a), len(b))
    assert lev(a, b) <= lev_star(a, b) <= len(a) + len(b)
    assert 0.0 <= ratio(a, b) <= 1.0


@given(words, words, words)
@settings(max_examples=100)
def test_triangle_inequality(a, b, c):
    assert lev(a, c) <= lev(a, b) + lev(b, c)
    assert lev_star(a, c) <= lev_star(a, b) + lev_star(b, c)


@given(st.lists(st.tuples(words, words), max_size=30))
@settings(max_examples=60)
def test_batch_matches_reference(pairs):
    a = [p[0] for p in pairs]
    b = [p[1] for p in pairs]
    got = ratio_batch(a, b)
    ref = np.array([ratio(x, y) for x, y in pairs])
    np.testing.assert_allclose(got, ref, atol=1e-12)


@given(st.lists(st.tuples(cjk_words, st.one_of(words, cjk_words)), min_size=1, max_size=20))
@settings(max_examples=40)
def test_batch_matches_reference_cjk(pairs):
    a = [p[0] for p in pairs]
    b = [p[1] for p in pairs]
    np.testing.assert_allclose(
        ratio_batch(a, b), [ratio(x, y) for x, y in pairs], atol=1e-12
    )


def test_batch_empty():
    assert ratio_batch([], []).shape == (0,)


def test_batch_empty_strings():
    np.testing.assert_allclose(ratio_batch(["", "a", ""], ["", "", "b"]), [1.0, 0.0, 0.0])


def test_batch_unequal_lengths_raises():
    with pytest.raises(ValueError):
        ratio_batch(["a"], ["a", "b"])
