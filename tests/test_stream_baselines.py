"""Streaming baselines (DBStream / D-Stream / evoStream): behavior checks."""
import numpy as np
import pytest

from repro.baselines.stream_baselines import DBStream, DStream, EvoStream
from repro.core.streaming import stream_chunks
from repro.data.clustergen import make_blobs, make_moons
from repro.metrics.quality import adjusted_rand_index as ari


@pytest.fixture(scope="module")
def blobs():
    return make_blobs(900, k=3, d=2, std=0.4, center_box=12, outlier_frac=0.0, seed=0)


def _feed(model, X, chunk=150):
    for b in stream_chunks(X, chunk):
        model.insert(b)
    return model


def test_dbstream_separated_blobs(blobs):
    X, y = blobs
    m = _feed(DBStream(radius=1.2), X)
    assert ari(m.predict(X), y) > 0.9


def test_dbstream_micro_clusters_bounded(blobs):
    X, _ = blobs
    m = _feed(DBStream(radius=1.2), X)
    assert len(m.weights) < len(X) / 5
    # a point within radius of several micro-clusters feeds all of them
    assert m.weights.sum() >= len(X)


def test_dbstream_noise_points_far():
    X, y = make_blobs(400, k=2, d=2, std=0.3, center_box=10, seed=1)
    m = _feed(DBStream(radius=1.0), X)
    far = np.full((5, 2), 1e3)
    assert (m.predict(far) == -1).all()


def test_dstream_grid_blobs(blobs):
    X, y = blobs
    m = _feed(DStream(cell_size=1.5, c_m=2.0), X)
    labels = m.predict(X)
    assert ari(labels, y) > 0.5  # grids are cruder than micro-clusters


def test_dstream_empty_predicts_noise():
    m = DStream(cell_size=1.0)
    assert (m.predict(np.zeros((3, 2))) == -1).all()


def test_dstream_high_dim_degrades():
    """The paper's Table 4 '-' entries: grids collapse in high dimension."""
    X, y = make_blobs(500, k=3, d=20, std=0.5, center_box=10, seed=2)
    m = _feed(DStream(cell_size=2.0, c_m=2.0), X)
    assert ari(m.predict(X), y) < 0.5


def test_evostream_blobs(blobs):
    X, y = blobs
    m = _feed(EvoStream(radius=1.2, k=3, seed=0), X)
    labels = m.predict(X)
    assert ari(labels, y) > 0.3  # evolutionary offline phase is approximate


def test_evostream_deterministic(blobs):
    X, _ = blobs
    a = _feed(EvoStream(radius=1.2, k=3, seed=5), X).predict(X)
    b = _feed(EvoStream(radius=1.2, k=3, seed=5), X).predict(X)
    assert np.array_equal(a, b)


def test_all_handle_moons_stream():
    X, y = make_moons(600, seed=3)
    for model in (DBStream(0.15), DStream(0.3), EvoStream(0.15, 2)):
        _feed(model, X, chunk=100)
        labels = model.predict(X)
        assert len(labels) == len(X)
