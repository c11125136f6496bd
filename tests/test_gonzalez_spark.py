"""Distributed Algorithm 1 (RDD map/reduce) ≡ driver version, point-for-point."""
import numpy as np
import pytest

from repro.core.gonzalez import radius_guided_gonzalez, radius_guided_gonzalez_spark
from repro.data.clustergen import make_blobs, text_clusters
from repro.metrics.space import EditDistanceMetric, EuclideanMetric

EUC = EuclideanMetric()


@pytest.fixture(scope="module")
def blobs():
    # few centers (large r̄) keeps the iterative Spark loop fast in CI
    return make_blobs(1200, k=5, d=3, std=0.6, outlier_frac=0.02, seed=0)


def test_matches_driver_bitwise(spark, blobs):
    X, _ = blobs
    d = radius_guided_gonzalez(X, EUC, 3.0, eps=1.5)
    s = radius_guided_gonzalez_spark(spark, X, EUC, 3.0, eps=1.5)
    assert np.array_equal(d.centers_idx, s.centers_idx)
    assert np.array_equal(d.assign, s.assign)
    assert np.allclose(d.dist, s.dist)
    assert np.array_equal(d.center_counts, s.center_counts)
    assert np.allclose(d.center_pd, s.center_pd)


def test_invariants(spark, blobs):
    X, _ = blobs
    s = radius_guided_gonzalez_spark(spark, X, EUC, 4.0)
    assert s.dist.max() <= 4.0 + 1e-9
    if s.n_centers > 1:
        pd = s.center_pd + np.eye(s.n_centers) * 1e9
        assert pd.min() > 4.0 - 1e-9
    assert s.center_counts is None


def test_block_count_invariance(spark, blobs):
    """Result must not depend on how the data is partitioned."""
    X, _ = blobs
    a = radius_guided_gonzalez_spark(spark, X, EUC, 4.0, n_blocks=2)
    b = radius_guided_gonzalez_spark(spark, X, EUC, 4.0, n_blocks=7)
    assert np.array_equal(a.centers_idx, b.centers_idx)
    assert np.array_equal(a.assign, b.assign)


def test_edit_distance_spark(spark):
    X, _ = text_clusters(120, k=3, seed=1)
    m = EditDistanceMetric()
    d = radius_guided_gonzalez(X, m, 6.0, eps=4.0)
    s = radius_guided_gonzalez_spark(spark, X, m, 6.0, eps=4.0)
    assert np.array_equal(d.centers_idx, s.centers_idx)
    assert np.array_equal(d.assign, s.assign)
    assert np.array_equal(d.center_counts, s.center_counts)


def test_nonzero_first_seed(spark, blobs):
    X, _ = blobs
    d = radius_guided_gonzalez(X, EUC, 3.0, first=17)
    s = radius_guided_gonzalez_spark(spark, X, EUC, 3.0, first=17)
    assert np.array_equal(d.centers_idx, s.centers_idx)
    assert s.centers_idx[0] == 17
