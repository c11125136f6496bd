"""Exact metric DBSCAN ≡ original DBSCAN (the paper's §3 correctness claim).

Across datasets, metrics, and (ε, MinPts) settings, our algorithm must match
brute-force original DBSCAN on: the core-point set, the partition of core
points into clusters, and the outlier set. Border points may differ only in
*which* adjacent cluster they join (Definition 1 footnote), so they are
checked for validity instead of equality.
"""
import numpy as np
import pytest

from repro.baselines.brute import brute_dbscan, core_partition_signature
from repro.core.exact import exact_dbscan
from repro.core.gonzalez import radius_guided_gonzalez
from repro.data.clustergen import (
    cluto_like,
    highdim_embedded,
    make_blobs,
    make_moons,
    text_clusters,
)
from repro.metrics.space import EditDistanceMetric, EuclideanMetric

EUC = EuclideanMetric()


def assert_same_dbscan(X, metric, ours, ref, eps):
    assert np.array_equal(ours.is_core, ref.is_core), "core sets differ"
    assert core_partition_signature(ours) == core_partition_signature(ref)
    assert ours.n_clusters == ref.n_clusters
    assert np.array_equal(ours.labels == -1, ref.labels == -1), "outliers differ"
    # border validity: within ε of a core point of the assigned cluster
    border = (~ours.is_core) & (ours.labels >= 0)
    for i in np.flatnonzero(border):
        cl = ours.labels[i]
        mates = np.flatnonzero(ours.is_core & (ours.labels == cl))
        d = metric.to_point(X[mates], X[i])
        assert d.min() <= eps + 1e-9


@pytest.mark.parametrize("eps,minpts", [(0.1, 5), (0.15, 10), (0.25, 10), (0.4, 20)])
def test_moons_sweep(eps, minpts):
    X, _ = make_moons(700, seed=2)
    ref = brute_dbscan(X, EUC, eps, minpts)
    ours = exact_dbscan(X, EUC, eps, minpts)
    assert_same_dbscan(X, EUC, ours, ref, eps)


@pytest.mark.parametrize("seed", range(3))
def test_cluto_like(seed):
    X, _ = cluto_like(800, seed=seed)
    eps, minpts = 0.35, 8
    ref = brute_dbscan(X, EUC, eps, minpts)
    ours = exact_dbscan(X, EUC, eps, minpts)
    assert_same_dbscan(X, EUC, ours, ref, eps)


@pytest.mark.parametrize("seed", range(3))
def test_blobs_with_outliers(seed):
    X, _ = make_blobs(600, k=4, d=5, std=0.8, outlier_frac=0.05, seed=seed)
    eps, minpts = 1.5, 6
    ref = brute_dbscan(X, EUC, eps, minpts)
    ours = exact_dbscan(X, EUC, eps, minpts)
    assert_same_dbscan(X, EUC, ours, ref, eps)


def test_highdim_low_intrinsic():
    X, _ = highdim_embedded(500, k=3, intrinsic_d=4, ambient_d=96, seed=1)
    eps, minpts = 18.0, 8
    ref = brute_dbscan(X, EUC, eps, minpts)
    ours = exact_dbscan(X, EUC, eps, minpts)
    assert_same_dbscan(X, EUC, ours, ref, eps)


@pytest.mark.parametrize("eps,minpts", [(3.0, 4), (4.0, 6)])
def test_edit_distance(eps, minpts):
    X, _ = text_clusters(150, k=3, seed=3)
    m = EditDistanceMetric()
    ref = brute_dbscan(X, m, eps, minpts)
    ours = exact_dbscan(X, m, eps, minpts)
    assert_same_dbscan(X, m, ours, ref, eps)


@pytest.mark.parametrize("seed", range(6))
def test_random_instances_fuzz(seed):
    g = np.random.default_rng(seed)
    n = int(g.integers(40, 300))
    X = g.uniform(-3, 3, size=(n, 2))
    eps = float(g.uniform(0.2, 1.0))
    minpts = int(g.integers(2, 8))
    ref = brute_dbscan(X, EUC, eps, minpts)
    ours = exact_dbscan(X, EUC, eps, minpts)
    assert_same_dbscan(X, EUC, ours, ref, eps)


def test_all_points_core_one_cluster():
    X = np.random.default_rng(0).normal(size=(50, 2)) * 0.01
    res = exact_dbscan(X, EUC, 1.0, 5)
    assert res.is_core.all()
    assert res.n_clusters == 1
    assert (res.labels == 0).all()


def test_all_outliers():
    g = np.random.default_rng(0)
    X = g.uniform(-100, 100, size=(30, 2))
    res = exact_dbscan(X, EUC, 0.01, 3)
    assert not res.is_core.any()
    assert (res.labels == -1).all()
    assert res.n_clusters == 0


def test_minpts_one_everything_core():
    X, _ = make_moons(100, seed=0)
    res = exact_dbscan(X, EUC, 0.2, 1)
    assert res.is_core.all()


def test_rbar_guard():
    X, _ = make_moons(100, seed=0)
    g = radius_guided_gonzalez(X, EUC, 0.5)  # r̄ too big for ε=0.2
    with pytest.raises(ValueError):
        exact_dbscan(X, EUC, 0.2, 5, gonzalez=g)


def test_reuse_gonzalez_across_eps():
    """Remark 5: one Algorithm-1 run at r̄=ε₀/2 serves any ε ≥ ε₀."""
    X, _ = make_moons(500, seed=4)
    g = radius_guided_gonzalez(X, EUC, 0.05)  # ε₀ = 0.1
    for eps in (0.1, 0.15, 0.25):
        ref = brute_dbscan(X, EUC, eps, 10)
        ours = exact_dbscan(X, EUC, eps, 10, gonzalez=g)
        assert_same_dbscan(X, EUC, ours, ref, eps)


def test_dense_cell_shortcut_consistency():
    """Dense-cell fast path must agree with counting on a dense blob."""
    X, _ = make_blobs(400, k=1, d=2, std=0.2, center_box=0.1, seed=5)
    eps, minpts = 0.5, 10
    ref = brute_dbscan(X, EUC, eps, minpts)
    ours = exact_dbscan(X, EUC, eps, minpts)
    assert np.array_equal(ours.is_core, ref.is_core)


def test_banana_shape_not_ball():
    """Remark 3's point: snake-shaped cluster, ε/2-net much smaller than the
    Proposition-1 ball bound, still exact."""
    t = np.linspace(0, 3 * np.pi, 400)
    X = np.c_[t, np.sin(t) * 3] + np.random.default_rng(1).normal(0, 0.05, (400, 2))
    ref = brute_dbscan(X, EUC, 0.4, 8)
    ours = exact_dbscan(X, EUC, 0.4, 8)
    assert_same_dbscan(X, EUC, ours, ref, 0.4)
    assert ref.n_clusters == 1
