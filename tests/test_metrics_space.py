"""Metric abstraction: known values + metric axioms (hypothesis)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.metrics.space import (
    EditDistanceMetric,
    EuclideanMetric,
    as_points,
    levenshtein,
)


# ---------------------------------------------------------------- euclidean
def test_euclidean_known():
    m = EuclideanMetric()
    A = np.array([[0.0, 0.0], [3.0, 4.0]])
    D = m.pairwise(A, A)
    assert D[0, 1] == pytest.approx(5.0)
    assert D[0, 0] == 0.0
    assert np.allclose(D, D.T)


def test_euclidean_to_point_matches_pairwise():
    g = np.random.default_rng(0)
    A = g.normal(size=(50, 7))
    p = g.normal(size=7)
    m = EuclideanMetric()
    assert np.allclose(m.to_point(A, p), m.pairwise(A, p[None, :])[:, 0])


def test_euclidean_no_negative_sqrt():
    # near-identical points must not produce NaN from FP cancellation
    A = np.full((4, 10), 1e8)
    D = EuclideanMetric().pairwise(A, A)
    assert np.isfinite(D).all() and (D >= 0).all()


@settings(max_examples=50, deadline=None)
@given(st.integers(0, 10**6))
def test_euclidean_triangle_inequality(seed):
    g = np.random.default_rng(seed)
    P = g.normal(size=(3, 4))
    m = EuclideanMetric()
    D = m.pairwise(P, P)
    assert D[0, 2] <= D[0, 1] + D[1, 2] + 1e-9


# ---------------------------------------------------------------- edit dist
@pytest.mark.parametrize(
    "a,b,want",
    [
        ("kitten", "sitting", 3),
        ("flaw", "lawn", 2),
        ("", "", 0),
        ("", "abc", 3),
        ("abc", "", 3),
        ("abc", "abc", 0),
        ("abc", "abd", 1),
        ("ab", "ba", 2),
        ("a", "ab", 1),
        ("sunday", "saturday", 3),
    ],
)
def test_levenshtein_known(a, b, want):
    assert levenshtein(a, b) == want


def _ref_lev(a: str, b: str) -> int:
    dp = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        prev, dp[0] = dp[0], i
        for j, cb in enumerate(b, 1):
            prev, dp[j] = dp[j], min(dp[j] + 1, dp[j - 1] + 1, prev + (ca != cb))
    return dp[len(b)]


@settings(max_examples=100, deadline=None)
@given(st.text(alphabet="abcd", max_size=12), st.text(alphabet="abcd", max_size=12))
def test_levenshtein_matches_reference(a, b):
    assert levenshtein(a, b) == _ref_lev(a, b)


@settings(max_examples=60, deadline=None)
@given(
    st.text(alphabet="abc", max_size=8),
    st.text(alphabet="abc", max_size=8),
    st.text(alphabet="abc", max_size=8),
)
def test_levenshtein_metric_axioms(a, b, c):
    assert levenshtein(a, b) == levenshtein(b, a)
    assert (levenshtein(a, b) == 0) == (a == b)
    assert levenshtein(a, c) <= levenshtein(a, b) + levenshtein(b, c)


def test_edit_metric_batch():
    m = EditDistanceMetric()
    A = np.array(["abc", "abd"], dtype=object)
    B = np.array(["abc", "xyz", ""], dtype=object)
    D = m.pairwise(A, B)
    assert D.tolist() == [[0, 3, 3], [1, 3, 3]]
    assert m.to_point(B, "abc").tolist() == [0, 3, 3]


# ---------------------------------------------------------------- as_points
def test_as_points_strings_and_floats():
    sp = as_points(["ab", "cd"])
    assert sp.dtype == object
    fp = as_points([[1, 2], [3, 4]])
    assert fp.dtype == np.float64
    arr = np.zeros((2, 2))
    assert as_points(arr) is arr
