"""Distributed exact/approx DBSCAN dataflows ≡ driver implementations."""
import numpy as np
import pytest

from repro.core.approx import approx_dbscan
from repro.core.exact import exact_dbscan
from repro.core.spark_dbscan import approx_dbscan_spark, exact_dbscan_spark
from repro.data.clustergen import make_blobs, make_moons, text_clusters
from repro.metrics.space import EditDistanceMetric, EuclideanMetric

EUC = EuclideanMetric()


@pytest.fixture(scope="module")
def moons():
    return make_moons(800, seed=0)


def test_exact_spark_matches_driver(spark, moons):
    X, _ = moons
    eps, minpts = 0.15, 10
    d = exact_dbscan(X, EUC, eps, minpts)
    s = exact_dbscan_spark(spark, X, EUC, eps, minpts)
    assert np.array_equal(d.is_core, s.is_core)
    assert np.array_equal(d.labels, s.labels)
    assert d.n_clusters == s.n_clusters


def test_exact_spark_blobs_outliers(spark):
    X, _ = make_blobs(600, k=4, d=4, std=0.7, outlier_frac=0.05, seed=1)
    eps, minpts = 1.4, 6
    d = exact_dbscan(X, EUC, eps, minpts)
    s = exact_dbscan_spark(spark, X, EUC, eps, minpts)
    assert np.array_equal(d.is_core, s.is_core)
    assert np.array_equal(d.labels, s.labels)


def test_exact_spark_edit_distance(spark):
    X, _ = text_clusters(120, k=3, seed=2)
    m = EditDistanceMetric()
    d = exact_dbscan(X, m, 4.0, 5)
    s = exact_dbscan_spark(spark, X, m, 4.0, 5)
    assert np.array_equal(d.is_core, s.is_core)
    assert np.array_equal(d.labels, s.labels)


def test_approx_spark_matches_driver(spark, moons):
    X, _ = moons
    eps, minpts, rho = 0.15, 10, 0.5
    d = approx_dbscan(X, EUC, eps, minpts, rho)
    s = approx_dbscan_spark(spark, X, EUC, eps, minpts, rho)
    assert np.array_equal(np.sort(d.summary_idx), np.sort(s.summary_idx))
    assert np.array_equal(d.labels, s.labels)
    assert d.n_clusters == s.n_clusters


def test_approx_spark_high_rho(spark):
    X, _ = make_blobs(500, k=3, d=3, std=0.5, outlier_frac=0.03, seed=3)
    eps, minpts, rho = 1.2, 6, 2.0
    d = approx_dbscan(X, EUC, eps, minpts, rho)
    s = approx_dbscan_spark(spark, X, EUC, eps, minpts, rho)
    assert np.array_equal(d.labels, s.labels)


def test_exact_spark_with_distributed_gonzalez(spark):
    """End-to-end fully distributed: RDD Gonzalez feeding the DF dataflow."""
    X, _ = make_blobs(700, k=4, d=3, std=0.5, outlier_frac=0.02, seed=4)
    eps, minpts = 1.6, 6
    d = exact_dbscan(X, EUC, eps, minpts)
    s = exact_dbscan_spark(spark, X, EUC, eps, minpts, distributed_gonzalez=True)
    assert np.array_equal(d.is_core, s.is_core)
    assert np.array_equal(d.labels, s.labels)
