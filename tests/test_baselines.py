"""Batch baselines: correctness anchors + behavioral sanity on planted data."""
import numpy as np
import pytest

from repro.baselines.brute import brute_dbscan, core_partition_signature
from repro.baselines.bico import BicoLite, bico_cluster
from repro.baselines.dbscanpp import dbscan_pp
from repro.baselines.densitypeak import density_peak
from repro.baselines.dpmeans import dp_means
from repro.baselines.dyw import dyw_dbscan
from repro.baselines.gantao import GridBlowupError, gan_tao_dbscan
from repro.baselines.meanshift import mean_shift
from repro.data.clustergen import make_blobs, make_moons
from repro.metrics.quality import adjusted_rand_index as ari
from repro.metrics.space import EuclideanMetric

EUC = EuclideanMetric()


@pytest.fixture(scope="module")
def moons():
    return make_moons(800, seed=0)


# -------------------------------------------------------------- brute dbscan
def test_brute_perfect_on_moons(moons):
    X, y = moons
    res = brute_dbscan(X, EUC, 0.15, 10)
    assert res.n_clusters == 2
    assert ari(res.labels, y) > 0.95


def test_brute_core_definition(moons):
    X, _ = moons
    eps, minpts = 0.15, 10
    res = brute_dbscan(X, EUC, eps, minpts)
    D = EUC.pairwise(X[:50], X)
    want = (D <= eps).sum(axis=1) >= minpts
    assert np.array_equal(res.is_core[:50], want)


def test_brute_cluster_connectivity(moons):
    """Two core points in different clusters are > ε apart (pairwise)."""
    X, _ = moons
    res = brute_dbscan(X, EUC, 0.12, 10)
    core = np.flatnonzero(res.is_core)
    a = core[res.labels[core] == 0][:40]
    b = core[res.labels[core] == 1][:40]
    if len(a) and len(b):
        assert EUC.pairwise(X[a], X[b]).min() > 0.12


# -------------------------------------------------------------- dbscan++
def test_dbscanpp_close_to_exact(moons):
    X, y = moons
    res = dbscan_pp(X, EUC, 0.15, 10, ratio=0.3, seed=0)
    assert ari(res.labels, y) > 0.85


def test_dbscanpp_ratio_one_cores_subset(moons):
    """ratio=1 samples everything ⇒ core set equals brute DBSCAN's."""
    X, _ = moons
    full = dbscan_pp(X, EUC, 0.15, 10, ratio=1.0, seed=0)
    ref = brute_dbscan(X, EUC, 0.15, 10)
    assert np.array_equal(full.is_core, ref.is_core)


def test_dbscanpp_deterministic_seed(moons):
    X, _ = moons
    a = dbscan_pp(X, EUC, 0.15, 10, seed=3)
    b = dbscan_pp(X, EUC, 0.15, 10, seed=3)
    assert np.array_equal(a.labels, b.labels)


# -------------------------------------------------------------- dyw
def test_dyw_core_set_exact(moons):
    """DYW restricts the search range but counts exactly ⇒ same core set."""
    X, _ = moons
    ref = brute_dbscan(X, EUC, 0.15, 10)
    res = dyw_dbscan(X, EUC, 0.15, 10, seed=1)
    assert np.array_equal(res.is_core, ref.is_core)
    assert core_partition_signature(res) == core_partition_signature(ref)


def test_dyw_quality(moons):
    X, y = moons
    res = dyw_dbscan(X, EUC, 0.15, 10, seed=2)
    assert ari(res.labels, y) > 0.9


# -------------------------------------------------------------- gan-tao
def test_gantao_exact_equals_brute(moons):
    X, _ = moons
    ref = brute_dbscan(X, EUC, 0.15, 10)
    res = gan_tao_dbscan(X, 0.15, 10)
    assert np.array_equal(res.is_core, ref.is_core)
    assert core_partition_signature(res) == core_partition_signature(ref)
    assert np.array_equal(res.labels == -1, ref.labels == -1)


def test_gantao_approx_sandwich(moons):
    """GT_Approx never splits an exact(ε) cluster, never merges past (1+ρ)ε."""
    X, _ = moons
    rho = 0.5
    lo = brute_dbscan(X, EUC, 0.12, 10)
    hi = brute_dbscan(X, EUC, (1 + rho) * 0.12, 10)
    ap = gan_tao_dbscan(X, 0.12, 10, rho=rho)
    core = np.flatnonzero(lo.is_core)[::20]
    for i in core:
        for j in core:
            if i < j and lo.labels[i] == lo.labels[j]:
                assert ap.labels[i] == ap.labels[j]
            if i < j and ap.labels[i] == ap.labels[j]:
                assert hi.labels[i] == hi.labels[j]


def test_gantao_blowup_guard():
    X = np.random.default_rng(0).normal(size=(50, 32))
    with pytest.raises(GridBlowupError):
        gan_tao_dbscan(X, 1.0, 5)


def test_gantao_3d():
    X, _ = make_blobs(400, k=3, d=3, std=0.4, outlier_frac=0.02, seed=1)
    ref = brute_dbscan(X, EUC, 1.2, 6)
    res = gan_tao_dbscan(X, 1.2, 6)
    assert np.array_equal(res.is_core, ref.is_core)
    assert core_partition_signature(res) == core_partition_signature(ref)


# -------------------------------------------------------------- dp-means
def test_dpmeans_recovers_separated_blobs():
    X, y = make_blobs(500, k=3, d=2, std=0.4, center_box=15, outlier_frac=0.0, seed=2)
    labels = dp_means(X)
    assert ari(labels, y) > 0.85  # λ from k-center init can oversplit a bit


def test_dpmeans_labels_every_point(moons):
    X, _ = moons
    labels = dp_means(X)
    assert (labels >= 0).all()
    assert len(labels) == len(X)


def test_dpmeans_lambda_controls_k():
    X, _ = make_blobs(300, k=4, d=2, std=0.3, center_box=10, seed=3)
    many = len(set(dp_means(X, lam=1.0)))
    few = len(set(dp_means(X, lam=50.0)))
    assert many > few


# -------------------------------------------------------------- bico
def test_bico_recovers_separated_blobs():
    X, y = make_blobs(800, k=3, d=2, std=0.4, center_box=15, outlier_frac=0.0, seed=4)
    labels = bico_cluster(X, k=3)
    assert ari(labels, y) > 0.9


def test_bico_bounded_features():
    X, _ = make_blobs(3000, k=5, d=3, seed=5)
    b = BicoLite(5, max_features=100)
    for lo in range(0, len(X), 512):
        b.partial_fit(X[lo : lo + 512])
    assert len(b.weights) <= 100
    assert b.weights.sum() == pytest.approx(len(X))


def test_bico_streaming_equivalence_order():
    """Different chunkings still produce a usable model (weights conserve)."""
    X, _ = make_blobs(1000, k=2, d=2, seed=6)
    b1 = BicoLite(2, seed=0)
    b1.partial_fit(X)
    assert b1.weights.sum() == pytest.approx(1000)


# -------------------------------------------------------------- density peak
def test_densitypeak_blobs():
    X, y = make_blobs(400, k=3, d=2, std=0.4, center_box=12, outlier_frac=0.0, seed=7)
    labels = density_peak(X, EUC, d_c=1.0, n_peaks=3, noise_rho=1)
    assert ari(labels, y) > 0.9


def test_densitypeak_memory_guard():
    X = np.zeros((100, 2))
    with pytest.raises(MemoryError):
        density_peak(X, EUC, d_c=1.0, n_peaks=2, max_n=50)


# -------------------------------------------------------------- mean shift
def test_meanshift_blobs():
    X, y = make_blobs(400, k=3, d=2, std=0.4, center_box=12, outlier_frac=0.0, seed=8)
    labels = mean_shift(X, bandwidth=2.0)
    assert ari(labels, y) > 0.9


def test_meanshift_single_mode():
    X = np.random.default_rng(9).normal(size=(200, 2)) * 0.2
    labels = mean_shift(X, bandwidth=3.0)
    assert len(set(labels)) == 1
