"""Synthetic dataset generators: determinism, shapes, planted structure."""
import numpy as np
import pytest

from repro.data import clustergen as cg


@pytest.mark.parametrize(
    "fn,kwargs",
    [
        (cg.make_moons, {}),
        (cg.cluto_like, {}),
        (cg.make_blobs, {"k": 3}),
        (cg.highdim_embedded, {"n": 300, "ambient_d": 64}),
        (cg.text_clusters, {"n": 120}),
        (cg.session_stream, {"n": 500}),
    ],
)
def test_deterministic(fn, kwargs):
    X1, y1 = fn(seed=7, **kwargs)
    X2, y2 = fn(seed=7, **kwargs)
    if X1.dtype == object:
        assert list(X1) == list(X2)
    else:
        assert np.array_equal(X1, X2)
    assert np.array_equal(y1, y2)
    X3, _ = fn(seed=8, **kwargs)
    if X1.dtype != object:
        assert not np.array_equal(X1, X3)


def test_moons_shape_and_labels():
    X, y = cg.make_moons(1000, outlier_frac=0.05)
    assert X.shape == (1000, 2)
    assert set(np.unique(y)) == {-1, 0, 1}
    assert (y == -1).sum() == 50


def test_cluto_three_shapes_plus_noise():
    X, y = cg.cluto_like(900, noise_frac=0.1)
    assert set(np.unique(y)) == {-1, 0, 1, 2}
    assert (y == -1).sum() == 90


def test_blobs_outliers_in_box():
    X, y = cg.make_blobs(500, k=4, d=3, outlier_frac=0.1)
    assert X.shape == (500, 3)
    assert (y == -1).sum() == 50
    assert len(set(y[y >= 0])) == 4


def test_highdim_embedded_intrinsic_dim():
    X, y = cg.highdim_embedded(400, k=3, intrinsic_d=5, ambient_d=128, outlier_frac=0.02)
    assert X.shape == (400, 128)
    inliers = X[y >= 0]
    # inliers live on a 5-dim affine subspace: SVD spectrum collapses after 5
    centered = inliers - inliers.mean(axis=0)
    s = np.linalg.svd(centered, compute_uv=False)
    assert s[5] < s[4] * 1e-6
    # outliers do not
    assert (y == -1).sum() == 8


def test_highdim_in_positive_box():
    X, _ = cg.highdim_embedded(200, ambient_d=32, box=255.0)
    assert X.min() >= -255 and X.max() <= 510  # loose: blobs may stray a bit


def test_noisy_duplicate_recipe():
    X, y = cg.make_blobs(100, k=2, d=8, outlier_frac=0.0, seed=1)
    Xn, yn = cg.noisy_duplicate(X, y, times=5, noise_frac=0.02)
    assert len(Xn) == 100 * 5 + 10
    assert (yn == -1).sum() == 10
    # duplicated labels preserve proportions
    for c in (0, 1):
        assert (yn == c).sum() == (y == c).sum() * 5


def test_text_clusters_structure():
    X, y = cg.text_clusters(200, k=3, max_edits=2, outlier_frac=0.05, seed=0)
    assert X.dtype == object
    assert len(X) == 200
    assert (y == -1).sum() == 10
    assert set(y[y >= 0]) <= {0, 1, 2}
    from repro.metrics.space import levenshtein

    # same-cluster strings are within 2*max_edits of each other
    for c in range(3):
        members = X[y == c][:10]
        for s in members[1:]:
            assert levenshtein(members[0], s) <= 4


def test_session_stream_drifts():
    X, y = cg.session_stream(2000, k=3, drift=5.0, seed=0)
    assert X.shape == (2000, 21)
    # per-cluster mean of the first 10% differs from the last 10%
    c = 0
    early = X[: 200][y[:200] == c]
    late = X[-200:][y[-200:] == c]
    assert np.linalg.norm(early.mean(0) - late.mean(0)) > 1.0


def test_to_spark_roundtrip(spark):
    X, y = cg.make_blobs(50, k=2, d=3)
    df = cg.to_spark(spark, X, y)
    assert df.count() == 50
    assert set(df.columns) == {"id", "features", "label"}
    Xt, yt = cg.text_clusters(20)
    dft = cg.to_spark(spark, Xt, yt)
    assert set(dft.columns) == {"id", "text", "label"}
    assert dft.count() == 20
