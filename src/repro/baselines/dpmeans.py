"""DP-means (Kulis & Jordan, 2011) — nonparametric k-means.

Lloyd-style iterations where a point farther than the penalty ``λ`` from all
current centers opens a new cluster. Following the paper's setup (§5.4), λ
defaults to the covering radius of a k-center (Gonzalez) initialization.
Euclidean only (centroids need a mean), which matches its use in Table 3.
"""
from __future__ import annotations

import numpy as np

from repro.metrics.space import EuclideanMetric


def _kcenter_lambda(X: np.ndarray, k: int) -> float:
    m = EuclideanMetric()
    dist = m.to_point(X, X[0])
    for _ in range(k - 1):
        q = int(np.argmax(dist))
        np.minimum(dist, m.to_point(X, X[q]), out=dist)
    return float(dist.max())


def dp_means(
    X: np.ndarray,
    *,
    lam: float | None = None,
    k_init: int = 8,
    max_iter: int = 50,
) -> np.ndarray:
    """Returns a label per point (no noise concept — every point clusters)."""
    X = np.asarray(X, dtype=np.float64)
    n = len(X)
    if lam is None:
        lam = _kcenter_lambda(X, k_init)
    m = EuclideanMetric()
    centers = X[:1].copy()
    labels = np.zeros(n, dtype=np.int64)
    for _ in range(max_iter):
        D = m.pairwise(X, centers)
        new_labels = D.argmin(axis=1).astype(np.int64)
        mind = D[np.arange(n), new_labels]
        # points beyond λ open clusters one at a time (deterministic scan;
        # later far points may be captured by a just-opened center)
        for i in np.flatnonzero(mind > lam):
            d = m.to_point(centers, X[i])
            if d.min() > lam:
                centers = np.vstack([centers, X[i]])
                new_labels[i] = len(centers) - 1
            else:
                new_labels[i] = int(d.argmin())
        converged = np.array_equal(new_labels, labels) and len(centers) == D.shape[1]
        labels = new_labels
        # recompute centroids; drop clusters that lost all members
        keep = [c for c in range(len(centers)) if (labels == c).any()]
        remap = {c: i for i, c in enumerate(keep)}
        labels = np.asarray([remap[int(c)] for c in labels], dtype=np.int64)
        centers = np.vstack([X[labels == i].mean(axis=0) for i in range(len(keep))])
        if converged:
            break
    return labels
