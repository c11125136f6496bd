"""Radius-guided Gonzalez (Algorithm 1): packing/covering invariants, cover
sets, neighbor sets, and the for-free ball counts (driver version)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.gonzalez import radius_guided_gonzalez
from repro.data.clustergen import make_blobs, make_moons, text_clusters
from repro.metrics.space import EditDistanceMetric, EuclideanMetric

EUC = EuclideanMetric()


@pytest.fixture(scope="module")
def moons():
    return make_moons(800, seed=0)


def test_covering_radius(moons):
    X, _ = moons
    g = radius_guided_gonzalez(X, EUC, 0.2)
    assert g.dist.max() <= 0.2 + 1e-12  # r̄-covering (termination condition)


def test_packing(moons):
    X, _ = moons
    g = radius_guided_gonzalez(X, EUC, 0.2)
    pd = g.center_pd + np.eye(g.n_centers) * 1e9
    assert pd.min() > 0.2  # r̄-packing: Gonzalez picks only uncovered points


def test_assignment_is_nearest_center(moons):
    X, _ = moons
    g = radius_guided_gonzalez(X, EUC, 0.25)
    D = EUC.pairwise(X, X[g.centers_idx])
    assert np.allclose(g.dist, D.min(axis=1))
    # assigned center achieves the min distance (ties allowed)
    picked = D[np.arange(len(X)), g.assign]
    assert np.allclose(picked, D.min(axis=1))


def test_smaller_rbar_more_centers(moons):
    X, _ = moons
    a = radius_guided_gonzalez(X, EUC, 0.4)
    b = radius_guided_gonzalez(X, EUC, 0.1)
    assert b.n_centers > a.n_centers
    assert a.n_iterations == a.n_centers


def test_cover_sets_partition(moons):
    X, _ = moons
    g = radius_guided_gonzalez(X, EUC, 0.3)
    cells = g.cover_sets()
    all_ids = np.sort(np.concatenate(cells))
    assert np.array_equal(all_ids, np.arange(len(X)))
    for e, members in enumerate(cells):
        assert (g.assign[members] == e).all()


def test_center_in_own_cover_set(moons):
    X, _ = moons
    g = radius_guided_gonzalez(X, EUC, 0.3)
    for e, ci in enumerate(g.centers_idx):
        assert g.assign[ci] == e


def test_neighbor_sets_vs_brute(moons):
    X, _ = moons
    g = radius_guided_gonzalez(X, EUC, 0.2)
    thr = 2 * 0.2 + 0.15
    nbrs = g.neighbor_sets(thr)
    C = X[g.centers_idx]
    for e in range(g.n_centers):
        want = np.flatnonzero(np.linalg.norm(C - C[e], axis=1) <= thr)
        assert np.array_equal(np.sort(nbrs[e]), want)
        assert e in nbrs[e]  # self always included


def test_neighbor_sets_symmetric(moons):
    X, _ = moons
    g = radius_guided_gonzalez(X, EUC, 0.2)
    nbrs = g.neighbor_sets(0.5)
    for e, ns in enumerate(nbrs):
        for e2 in ns:
            assert e in nbrs[e2]  # e' ∈ A_e ⟺ e ∈ A_e' (Lemma 4's key fact)


def test_ball_counts_exact(moons):
    X, _ = moons
    eps = 0.15
    g = radius_guided_gonzalez(X, EUC, eps / 2, eps=eps)
    D = EUC.pairwise(X[g.centers_idx], X)
    want = (D <= eps).sum(axis=1)
    assert np.array_equal(g.center_counts, want)


def test_counts_none_without_eps(moons):
    X, _ = moons
    g = radius_guided_gonzalez(X, EUC, 0.2)
    assert g.center_counts is None


def test_deterministic_in_first(moons):
    X, _ = moons
    a = radius_guided_gonzalez(X, EUC, 0.2, first=0)
    b = radius_guided_gonzalez(X, EUC, 0.2, first=0)
    assert np.array_equal(a.centers_idx, b.centers_idx)
    c = radius_guided_gonzalez(X, EUC, 0.2, first=5)
    assert c.centers_idx[0] == 5


def test_single_cluster_degenerate():
    X = np.zeros((20, 2))
    g = radius_guided_gonzalez(X, EUC, 0.5)
    assert g.n_centers == 1
    assert (g.assign == 0).all()


def test_rbar_larger_than_diameter():
    X, _ = make_blobs(100, k=1, d=2, std=0.1, center_box=0.1, seed=0)
    g = radius_guided_gonzalez(X, EUC, 1e6)
    assert g.n_centers == 1


def test_on_edit_distance():
    X, _ = text_clusters(120, k=3, seed=1)
    m = EditDistanceMetric()
    g = radius_guided_gonzalez(X, m, 3.0, eps=5.0)
    assert g.dist.max() <= 3.0
    pd = g.center_pd + np.eye(g.n_centers) * 1e9
    assert pd.min() > 3.0
    D = m.pairwise(X[g.centers_idx], X)
    assert np.array_equal(g.center_counts, (D <= 5.0).sum(axis=1))


@settings(max_examples=20, deadline=None)
@given(st.integers(0, 10**6), st.floats(0.05, 2.0))
def test_invariants_property(seed, r_bar):
    g = np.random.default_rng(seed)
    X = g.uniform(-5, 5, size=(int(g.integers(5, 120)), 2))
    res = radius_guided_gonzalez(X, EUC, r_bar)
    assert res.dist.max() <= r_bar + 1e-9
    if res.n_centers > 1:
        pd = res.center_pd + np.eye(res.n_centers) * 1e9
        assert pd.min() > r_bar - 1e-9
