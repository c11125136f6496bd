"""ρ-approximate DBSCAN (Algorithm 2): sandwich theorem, summary-size bounds,
and ρ-approx validity predicates (Theorem 2 / Lemmas 8–9)."""
import numpy as np
import pytest

from repro.baselines.brute import brute_dbscan
from repro.core.approx import approx_dbscan
from repro.core.exact import exact_dbscan
from repro.data.clustergen import make_blobs, make_moons, text_clusters
from repro.metrics.space import EditDistanceMetric, EuclideanMetric

EUC = EuclideanMetric()


def _same_cluster_pairs(labels, idx):
    """Set of same-cluster pairs restricted to points in idx (labels >= 0)."""
    out = set()
    by = {}
    for i in idx:
        if labels[i] >= 0:
            by.setdefault(labels[i], []).append(i)
    for members in by.values():
        for a in range(len(members)):
            for b in range(a + 1, len(members)):
                out.add((members[a], members[b]))
    return out


@pytest.mark.parametrize("rho", [0.1, 0.5, 1.0, 2.0])
def test_sandwich_theorem(rho):
    """exact(ε) same-cluster ⇒ approx(ρ,ε) same-cluster ⇒ exact((1+ρ)ε)."""
    X, _ = make_moons(500, seed=1)
    eps, minpts = 0.12, 8
    lo = exact_dbscan(X, EUC, eps, minpts)
    hi = exact_dbscan(X, EUC, (1 + rho) * eps, minpts)
    ap = approx_dbscan(X, EUC, eps, minpts, rho)
    core = np.flatnonzero(lo.is_core)  # ε-core points are core in all three
    sample = core[:: max(1, len(core) // 60)]
    p_lo = _same_cluster_pairs(lo.labels, sample)
    p_ap = _same_cluster_pairs(ap.labels, sample)
    p_hi = _same_cluster_pairs(hi.labels, sample)
    assert p_lo <= p_ap, "approx split an exact(ε) cluster"
    assert p_ap <= p_hi, "approx merged beyond exact((1+ρ)ε)"


def test_core_points_all_clustered():
    """Definition 2: every core point belongs to exactly one cluster."""
    X, _ = make_moons(500, seed=2)
    eps, minpts = 0.15, 10
    ref = brute_dbscan(X, EUC, eps, minpts)
    ap = approx_dbscan(X, EUC, eps, minpts, rho=0.5)
    assert (ap.labels[ref.is_core] >= 0).all()


def test_summary_much_smaller_than_core_set():
    X, _ = make_moons(2000, seed=3)
    eps, minpts = 0.15, 10
    ref = brute_dbscan(X, EUC, eps, minpts)
    ap = approx_dbscan(X, EUC, eps, minpts, rho=2.0)
    assert len(ap.summary_idx) < ref.is_core.sum() / 3


def test_summary_members_are_core():
    X, _ = make_moons(600, seed=4)
    eps, minpts = 0.15, 10
    ref = brute_dbscan(X, EUC, eps, minpts)
    ap = approx_dbscan(X, EUC, eps, minpts, rho=0.5)
    assert ref.is_core[ap.summary_idx].all()


def test_lemma8_cell_cap():
    """|C_e ∩ S*| ≤ MinPts for every cell (Lemma 8)."""
    X, _ = make_moons(800, seed=5)
    eps, minpts = 0.15, 10
    ap = approx_dbscan(X, EUC, eps, minpts, rho=0.5)
    cells = ap.gonzalez.assign[ap.summary_idx]
    _, counts = np.unique(cells, return_counts=True)
    assert counts.max() <= minpts


def test_summary_covers_core_points():
    """Every core point is within (ρ/2)ε... of a summary point — the covering
    property that makes labeling sound: dis(p, S*) ≤ r̄ when c_p ∈ S*, and
    p ∈ S* otherwise."""
    X, _ = make_moons(600, seed=6)
    eps, minpts, rho = 0.15, 10, 0.5
    ref = brute_dbscan(X, EUC, eps, minpts)
    ap = approx_dbscan(X, EUC, eps, minpts, rho)
    S = X[ap.summary_idx]
    core = np.flatnonzero(ref.is_core)
    d = EUC.pairwise(X[core], S).min(axis=1)
    assert d.max() <= rho * eps / 2 + 1e-9


def test_connectivity_threshold():
    """Points sharing a cluster are chained by ≤ (1+ρ)ε hops inside S*."""
    X, _ = make_moons(400, seed=7)
    eps, minpts, rho = 0.15, 10, 0.5
    ap = approx_dbscan(X, EUC, eps, minpts, rho)
    S = X[ap.summary_idx]
    for cl in np.unique(ap.summary_labels):
        members = np.flatnonzero(ap.summary_labels == cl)
        if len(members) < 2:
            continue
        D = EUC.pairwise(S[members], S[members])
        # connected under threshold (1+ρ)ε: BFS reaches all members
        adj = D <= (1 + rho) * eps
        seen = {0}
        stack = [0]
        while stack:
            u = stack.pop()
            for v in np.flatnonzero(adj[u]):
                if v not in seen:
                    seen.add(int(v))
                    stack.append(int(v))
        assert len(seen) == len(members)


def test_outlier_labels_far_from_summary():
    X, _ = make_moons(500, seed=8)
    eps, minpts, rho = 0.12, 10, 0.5
    ap = approx_dbscan(X, EUC, eps, minpts, rho)
    S = X[ap.summary_idx]
    out = np.flatnonzero(ap.labels == -1)
    if len(out) and len(S):
        d = EUC.pairwise(X[out], S).min(axis=1)
        assert d.min() > (rho / 2 + 1) * eps - 1e-9


def test_border_labels_near_their_cluster():
    X, _ = make_moons(500, seed=9)
    eps, minpts, rho = 0.15, 10, 0.5
    ap = approx_dbscan(X, EUC, eps, minpts, rho)
    S, SL = X[ap.summary_idx], ap.summary_labels
    in_s = np.zeros(len(X), dtype=bool)
    in_s[ap.summary_idx] = True
    for i in np.flatnonzero((ap.labels >= 0) & ~in_s):
        mates = np.flatnonzero(SL == ap.labels[i])
        d = EUC.pairwise(X[i : i + 1], S[mates])[0]
        assert d.min() <= (rho / 2 + 1) * eps + 1e-9


def test_tiny_rho_close_to_exact():
    X, _ = make_moons(600, seed=10)
    eps, minpts = 0.15, 10
    ex = exact_dbscan(X, EUC, eps, minpts)
    ap = approx_dbscan(X, EUC, eps, minpts, rho=0.05)
    from repro.metrics.quality import adjusted_rand_index

    assert adjusted_rand_index(ex.labels, ap.labels) > 0.95


def test_edit_distance_approx():
    X, _ = text_clusters(150, k=3, seed=11)
    m = EditDistanceMetric()
    eps, minpts = 4.0, 5
    ex = exact_dbscan(X, m, eps, minpts)
    ap = approx_dbscan(X, m, eps, minpts, rho=0.5)
    from repro.metrics.quality import adjusted_rand_index

    assert adjusted_rand_index(ex.labels, ap.labels) > 0.8


def test_blobs_high_rho():
    X, _ = make_blobs(500, k=3, d=4, std=0.5, outlier_frac=0.04, seed=12)
    ap = approx_dbscan(X, EUC, 1.2, 6, rho=2.0)
    assert ap.n_clusters >= 1
    assert (ap.labels >= -1).all()


def test_rho_zero_rejected():
    X, _ = make_moons(100, seed=0)
    with pytest.raises(ValueError):
        approx_dbscan(X, EUC, 0.15, 5, rho=0.0)
