"""Mean shift (Comaniciu & Meer, 2002) with a flat kernel.

Every point iteratively moves to the mean of the dataset points within the
bandwidth ``h`` of its current position until the shift is negligible; modes
closer than ``h/2`` are merged and points inherit their mode's cluster. All
shift iterations are vectorized simultaneously over the points (O(n²) per
iteration) — the quadratic cost the paper observes (≥5× slower, §5.4).
"""
from __future__ import annotations

import numpy as np

from repro.metrics.space import EuclideanMetric


def mean_shift(
    X: np.ndarray,
    *,
    bandwidth: float,
    max_iter: int = 30,
    tol: float = 1e-3,
) -> np.ndarray:
    X = np.asarray(X, dtype=np.float64)
    m = EuclideanMetric()
    Y = X.copy()
    for _ in range(max_iter):
        D = m.pairwise(Y, X)
        W = D <= bandwidth
        counts = W.sum(axis=1)
        counts[counts == 0] = 1
        Y_new = (W @ X) / counts[:, None]
        if np.linalg.norm(Y_new - Y, axis=1).max() < tol * bandwidth:
            Y = Y_new
            break
        Y = Y_new
    # merge modes within h/2 (greedy scan in point order)
    modes: list[np.ndarray] = []
    labels = np.empty(len(X), dtype=np.int64)
    for i, y in enumerate(Y):
        for j, mo in enumerate(modes):
            if np.linalg.norm(y - mo) <= bandwidth / 2:
                labels[i] = j
                break
        else:
            modes.append(y)
            labels[i] = len(modes) - 1
    return labels
