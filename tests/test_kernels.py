"""Cell-local kernels shared by the driver and Spark paths."""
import numpy as np
import pytest

from repro.core import kernels
from repro.covertree.tree import CoverTree
from repro.metrics.space import EditDistanceMetric, EuclideanMetric

EUC = EuclideanMetric()


def test_count_within_matches_brute():
    g = np.random.default_rng(0)
    own = g.normal(size=(40, 3))
    cand = np.vstack([own, g.normal(size=(100, 3))])
    counts = kernels.count_within(own, cand, EUC, 1.0)
    want = (EUC.pairwise(own, cand) <= 1.0).sum(axis=1)
    assert np.array_equal(counts, want)


def test_count_within_chunking():
    """Result must not depend on the internal chunk size."""
    g = np.random.default_rng(1)
    own = g.normal(size=(500, 2))
    counts = kernels.count_within(own, own, EUC, 0.5)
    want = (EUC.pairwise(own, own) <= 0.5).sum(axis=1)
    assert np.array_equal(counts, want)


def test_count_within_includes_self():
    X = np.zeros((5, 2))
    assert (kernels.count_within(X, X, EUC, 0.1) == 5).all()


@pytest.mark.parametrize("sizes", [(5, 5), (30, 8), (100, 60)])
def test_bcp_leq_matches_brute(sizes):
    g = np.random.default_rng(2)
    A = g.normal(size=(sizes[0], 3))
    B = g.normal(loc=1.0, size=(sizes[1], 3))
    true_min = EUC.pairwise(A, B).min()
    assert kernels.bcp_leq(A, B, EUC, true_min + 1e-9)
    assert not kernels.bcp_leq(A, B, EUC, true_min - 1e-6)


def test_bcp_leq_empty_side():
    A = np.zeros((0, 2))
    B = np.zeros((3, 2))
    assert not kernels.bcp_leq(A, B, EUC, 10.0)


def test_bcp_leq_with_prebuilt_tree():
    g = np.random.default_rng(3)
    A = g.normal(size=(60, 2))
    B = g.normal(loc=3.0, size=(40, 2))
    tree = CoverTree(A, EUC)
    true_min = EUC.pairwise(A, B).min()
    assert kernels.bcp_leq(A, B, EUC, true_min + 1e-9, tree=tree)
    assert not kernels.bcp_leq(A, B, EUC, true_min - 1e-6, tree=tree)


def test_bcp_on_strings():
    m = EditDistanceMetric()
    A = np.array(["aaaa", "bbbb"], dtype=object)
    B = np.array(["aaab", "cccc"], dtype=object)
    assert kernels.bcp_leq(A, B, m, 1.0)
    assert not kernels.bcp_leq(A, B, m, 0.5)


def test_nearest_in_matches_brute():
    g = np.random.default_rng(4)
    own = g.normal(size=(50, 4))
    cand = g.normal(size=(80, 4))
    d, j = kernels.nearest_in(own, cand, EUC)
    D = EUC.pairwise(own, cand)
    assert np.allclose(d, D.min(axis=1))
    assert np.allclose(D[np.arange(50), j], D.min(axis=1))


def test_nearest_in_single_candidate():
    own = np.array([[0.0, 0.0], [3.0, 4.0]])
    cand = np.array([[0.0, 0.0]])
    d, j = kernels.nearest_in(own, cand, EUC)
    assert d.tolist() == [0.0, 5.0]
    assert j.tolist() == [0, 0]
