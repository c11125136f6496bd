"""Streaming ρ-approximate DBSCAN (Algorithm 3): per-pass invariants,
memory bound, and agreement with the batch ρ-approx validity predicates."""
import numpy as np
import pytest

from repro.baselines.brute import brute_dbscan
from repro.core.streaming import StreamingDBSCAN, stream_chunks
from repro.data.clustergen import make_blobs, make_moons, session_stream, text_clusters
from repro.metrics.quality import adjusted_rand_index
from repro.metrics.space import EditDistanceMetric, EuclideanMetric

EUC = EuclideanMetric()
EPS, MINPTS, RHO = 0.15, 10, 0.5


def _fit(X, chunk=128, eps=EPS, minpts=MINPTS, rho=RHO, metric=EUC):
    s = StreamingDBSCAN(metric, eps, minpts, rho)
    labels = s.fit_chunks(stream_chunks(X, chunk))
    return s, labels


@pytest.fixture(scope="module")
def moons():
    return make_moons(900, seed=0)


def test_pass1_packing_and_covering(moons):
    X, _ = moons
    s = StreamingDBSCAN(EUC, EPS, MINPTS, RHO)
    for b in stream_chunks(X, 100):
        s.pass1_batch(b)
    C = np.asarray(s.centers)
    # covering: every point within r̄ of some center
    d = EUC.pairwise(X, C).min(axis=1)
    assert d.max() <= s.r_bar + 1e-9
    # packing: centers pairwise > r̄ apart (a center opens only when uncovered)
    pd = EUC.pairwise(C, C) + np.eye(len(C)) * 1e9
    assert pd.min() > s.r_bar - 1e-9


def test_pass1_counts_undercount_only(moons):
    """Pass-1 ball counts never exceed the true |B(e, ε)| (they miss only
    points that arrived before the center opened)."""
    X, _ = moons
    s = StreamingDBSCAN(EUC, EPS, MINPTS, RHO)
    for b in stream_chunks(X, 100):
        s.pass1_batch(b)
    C = np.asarray(s.centers)
    true_counts = (EUC.pairwise(C, X) <= EPS).sum(axis=1)
    assert (np.asarray(s.counts) <= true_counts).all()


def test_pass2_counts_exact(moons):
    X, _ = moons
    s = StreamingDBSCAN(EUC, EPS, MINPTS, RHO)
    for b in stream_chunks(X, 100):
        s.pass1_batch(b)
    s.begin_pass2()
    for b in stream_chunks(X, 100):
        s.pass2_batch(b)
    want = (EUC.pairwise(s._cand_pts, X) <= EPS).sum(axis=1)
    assert np.array_equal(s._cand_counts, want)


def test_m_buckets_only_for_noncore_centers(moons):
    X, _ = moons
    s = StreamingDBSCAN(EUC, EPS, MINPTS, RHO)
    for b in stream_chunks(X, 100):
        s.pass1_batch(b)
    for e in s.m_points:
        assert s.counts[e] < MINPTS  # core centers' buckets were dropped


def test_memory_independent_of_n():
    """|E|+|M| grows with the geometry, not with n (Theorem 4)."""
    sizes = [500, 1000, 2000]
    footprints = []
    for n in sizes:
        X, _ = make_moons(n, seed=1, outlier_frac=0.0)
        s, _ = _fit(X)
        st = s.stats()
        footprints.append(st.n_centers + st.n_m)
    # n quadruples, footprint grows < 1.6x (net size is geometry-bound)
    assert footprints[-1] < footprints[0] * 1.6


def test_memory_ratio_reported(moons):
    X, _ = moons
    s, _ = _fit(X)
    st = s.stats()
    assert 0 < st.memory_ratio < 1
    assert st.n_seen == len(X)


def test_summary_points_are_core(moons):
    X, _ = moons
    ref = brute_dbscan(X, EUC, EPS, MINPTS)
    s, _ = _fit(X)
    # every summary point must be a true core point (pass-2 exact counting)
    S = s.summary_pts
    D = EUC.pairwise(S, X)
    # match summary points back to dataset rows
    for row in range(len(S)):
        i = int(D[row].argmin())
        assert D[row, i] < 1e-9, "summary point not in dataset"
        assert ref.is_core[i]


def test_labels_valid_rho_approx(moons):
    X, _ = moons
    ref = brute_dbscan(X, EUC, EPS, MINPTS)
    s, labels = _fit(X)
    # every true core point is clustered (Definition 2)
    assert (labels[ref.is_core] >= 0).all()
    # outliers are far from every summary point
    out = np.flatnonzero(labels == -1)
    if len(out):
        d = EUC.pairwise(X[out], s.summary_pts).min(axis=1)
        assert d.min() > (RHO / 2 + 1) * EPS - 1e-9


def test_agrees_with_exact_on_clean_data(moons):
    X, y = moons
    from repro.core.exact import exact_dbscan

    ex = exact_dbscan(X, EUC, EPS, MINPTS)
    _, labels = _fit(X)
    assert adjusted_rand_index(ex.labels, labels) > 0.9


def test_chunk_size_one_matches_batch100(moons):
    """Stream order fixed ⇒ batch granularity must not change centers."""
    X, _ = moons
    X = X[:300]
    s1 = StreamingDBSCAN(EUC, EPS, MINPTS, RHO)
    for b in stream_chunks(X, 1):
        s1.pass1_batch(b)
    s2 = StreamingDBSCAN(EUC, EPS, MINPTS, RHO)
    for b in stream_chunks(X, 100):
        s2.pass1_batch(b)
    assert len(s1.centers) == len(s2.centers)
    assert np.allclose(np.asarray(s1.centers), np.asarray(s2.centers))


def test_three_pass_labels_complete(moons):
    X, _ = moons
    s, labels = _fit(X)
    assert len(labels) == len(X)
    assert set(np.unique(labels)) <= set(range(-1, s.n_clusters))


def test_edit_distance_stream():
    X, y = text_clusters(160, k=3, seed=2)
    m = EditDistanceMetric()
    s = StreamingDBSCAN(m, 4.0, 5, 0.5)
    labels = s.fit_chunks(stream_chunks(X, 40))
    assert adjusted_rand_index(labels, y) > 0.7


def test_drifting_session_stream():
    X, y = session_stream(1500, k=4, seed=3)
    s = StreamingDBSCAN(EUC, 4.0, 8, 2.0)
    labels = s.fit_chunks(stream_chunks(X, 250))
    assert adjusted_rand_index(labels, y) > 0.9
    assert s.stats().memory_ratio < 0.2


def test_rho_validation():
    with pytest.raises(ValueError):
        StreamingDBSCAN(EUC, 0.1, 5, rho=0.0)


def test_empty_batch_ignored(moons):
    X, _ = moons
    s = StreamingDBSCAN(EUC, EPS, MINPTS, RHO)
    s.pass1_batch(X[:100])
    n_before = len(s.centers)
    s.pass1_batch(X[:0])
    assert len(s.centers) == n_before
