"""Cell-local numpy kernels shared by the driver and Spark DBSCAN paths.

Every kernel operates on one ε/2-net cell (cover set ``C_e``) and its
neighbor-cell candidate pool — the exact unit of work that exact DBSCAN's
Steps 1–3 perform per cell. The driver implementation loops over cells and
calls these directly; the Spark implementation runs the *same* functions
inside ``applyInPandas`` groups, so the two paths cannot drift apart.
"""
from __future__ import annotations

import numpy as np

from repro.covertree.tree import CoverTree
from repro.metrics.space import Metric

#: Below this size a brute-force BCP scan beats building a cover tree.
_BCP_BRUTE_MAX = 16


def count_within(
    own: np.ndarray, cand: np.ndarray, metric: Metric, eps: float
) -> np.ndarray:
    """For each point of ``own``: |B(p, ε) ∩ cand| (``cand`` ⊇ ``own``).

    Chunked over ``own`` so the pairwise block stays bounded even when a
    neighbor pool is large.
    """
    counts = np.empty(len(own), dtype=np.int64)
    chunk = max(1, int(4_000_000 // max(1, len(cand))))
    for lo in range(0, len(own), chunk):
        d = metric.pairwise(own[lo : lo + chunk], cand)
        counts[lo : lo + chunk] = (d <= eps).sum(axis=1)
    return counts


def bcp_leq(
    A: np.ndarray,
    B: np.ndarray,
    metric: Metric,
    tau: float,
    *,
    tree: CoverTree | None = None,
) -> bool:
    """Bichromatic-closest-pair predicate: min dis(A, B) ≤ tau?

    ``tree``: a pre-built cover tree over ``A`` (exact DBSCAN builds one per
    cell and reuses it across all neighbor pairs — Lemma 5); small sides fall
    back to a brute scan.
    """
    if min(len(A), len(B)) == 0:
        return False
    if tree is None and min(len(A), len(B)) <= _BCP_BRUTE_MAX:
        return bool((metric.pairwise(A, B) <= tau).any())
    if tree is None:
        tree = CoverTree(A, metric)
    return tree.min_dist_leq(B, tau)


def nearest_in(
    own: np.ndarray, cand: np.ndarray, metric: Metric
) -> tuple[np.ndarray, np.ndarray]:
    """Per point of ``own``: (distance to, index into) its nearest ``cand``."""
    best_d = np.full(len(own), np.inf)
    best_j = np.zeros(len(own), dtype=np.int64)
    chunk = max(1, int(4_000_000 // max(1, len(cand))))
    for lo in range(0, len(own), chunk):
        d = metric.pairwise(own[lo : lo + chunk], cand)
        best_j[lo : lo + chunk] = np.argmin(d, axis=1)
        best_d[lo : lo + chunk] = d[np.arange(len(d)), best_j[lo : lo + chunk]]
    return best_d, best_j
