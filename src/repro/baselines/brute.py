"""Original DBSCAN (Ester et al., KDD'96) — the ground-truth reference.

Blocked-numpy implementation of the Θ(n²) algorithm: core points by full
ε-neighborhood counting, clusters by union–find over the ≤ε core–core edges,
borders assigned to the nearest in-ε core point. Works over any
``repro.metrics.space.Metric`` (Euclidean, edit distance, …).

Used (a) as the correctness oracle for our exact algorithm — the paper's
exact method must reproduce its core partition and outlier set bit-for-bit —
and (b) as the "DBSCAN" baseline row of Figure 3 / Table 3.
"""
from __future__ import annotations

import numpy as np

from repro.core.exact import DBSCANResult
from repro.metrics.space import Metric
from repro.util.unionfind import UnionFind

_BLOCK = 1024


def brute_dbscan(
    X: np.ndarray, metric: Metric, eps: float, minpts: int
) -> DBSCANResult:
    n = len(X)
    # --- core points: full pairwise counting, blocked --------------------
    counts = np.zeros(n, dtype=np.int64)
    for lo in range(0, n, _BLOCK):
        d = metric.pairwise(X[lo : lo + _BLOCK], X)
        counts[lo : lo + _BLOCK] = (d <= eps).sum(axis=1)
    is_core = counts >= minpts
    core_idx = np.flatnonzero(is_core)

    # --- merge: union-find over ≤ε core-core edges -----------------------
    uf = UnionFind(len(core_idx))
    pos = {int(g): i for i, g in enumerate(core_idx)}
    for lo in range(0, len(core_idx), _BLOCK):
        blk = core_idx[lo : lo + _BLOCK]
        d = metric.pairwise(X[blk], X[core_idx])
        ii, jj = np.nonzero(d <= eps)
        for i, j in zip(ii, jj):
            a, b = lo + int(i), int(j)
            if a < b:
                uf.union(a, b)
    comp = uf.component_labels()
    labels = np.full(n, -1, dtype=np.int64)
    labels[core_idx] = comp

    # --- borders: nearest core point within ε ----------------------------
    non_core = np.flatnonzero(~is_core)
    if len(core_idx) and len(non_core):
        for lo in range(0, len(non_core), _BLOCK):
            blk = non_core[lo : lo + _BLOCK]
            d = metric.pairwise(X[blk], X[core_idx])
            j = d.argmin(axis=1)
            hit = d[np.arange(len(blk)), j] <= eps
            labels[blk[hit]] = labels[core_idx[j[hit]]]
    k = len({l for l in comp})
    return DBSCANResult(labels=labels, is_core=is_core, n_clusters=k)


def core_partition_signature(res: DBSCANResult) -> dict[int, int]:
    """Canonical mapping core-point-id → normalized cluster id, for comparing
    two DBSCAN results whose cluster numbering differs."""
    sig: dict[int, int] = {}
    remap: dict[int, int] = {}
    for i in np.flatnonzero(res.is_core):
        l = int(res.labels[i])
        if l not in remap:
            remap[l] = len(remap)
        sig[int(i)] = remap[l]
    return sig
