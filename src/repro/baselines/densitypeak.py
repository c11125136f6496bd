"""Density-peak clustering (Rodriguez & Laio, Science 2014).

For every point: local density ``ρ_i = |B(p_i, d_c)|`` and ``δ_i`` = distance
to the nearest point of strictly higher density. Points with both high ρ and
high δ are peaks (cluster centers); every other point joins the cluster of
its nearest higher-density neighbor (following the assignment chain). Points
with ρ below ``noise_rho`` are reported as noise (-1).

Requires the full O(n²) distance matrix — the paper reports it overflowing
500 GB on the large datasets (Table 3's "*" entries); ``max_n`` reproduces
that failure mode by raising MemoryError past the cap.
"""
from __future__ import annotations

import numpy as np

from repro.metrics.space import Metric


def density_peak(
    X: np.ndarray,
    metric: Metric,
    *,
    d_c: float,
    n_peaks: int,
    noise_rho: int = 2,
    max_n: int = 20_000,
) -> np.ndarray:
    n = len(X)
    if n > max_n:
        raise MemoryError(
            f"density-peak needs the full {n}x{n} distance matrix (cap {max_n})"
        )
    D = metric.pairwise(X, X)
    rho = (D <= d_c).sum(axis=1) - 1
    # δ_i: distance to nearest higher-density point (ties broken by index so
    # the chain is acyclic); the global density max gets δ = max distance.
    order = np.lexsort((np.arange(n), -rho))  # density desc, index asc
    delta = np.full(n, np.inf)
    parent = np.full(n, -1, dtype=np.int64)
    for pos, i in enumerate(order):
        if pos == 0:
            delta[i] = D[i].max()
            parent[i] = i
            continue
        higher = order[:pos]
        j = higher[D[i, higher].argmin()]
        delta[i] = D[i, j]
        parent[i] = j
    gamma = rho * delta
    peaks = np.argsort(-gamma)[:n_peaks]
    labels = np.full(n, -1, dtype=np.int64)
    labels[peaks] = np.arange(len(peaks))
    for i in order:  # descending density ⇒ parents are labeled first
        if labels[i] == -1:
            labels[i] = labels[parent[i]]
    labels[rho < noise_rho] = -1
    return labels
