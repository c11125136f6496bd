"""DBSCAN++ (Jang & Jiang, ICML 2019) — sampling-based approximate DBSCAN.

Uniformly sample ``m = ratio·n`` points; compute each sample's ε-neighborhood
against the FULL dataset (O(n·m) distances); samples with ≥ MinPts neighbors
are core. Cluster the sampled core points by linking pairs within ε, then
assign every remaining point to the cluster of its nearest sampled core point
if that distance is ≤ ε, else noise. The paper's experiments use
``ratio = 0.3`` (§5.2), which we default to.
"""
from __future__ import annotations

import numpy as np

from repro.core.exact import DBSCANResult
from repro.metrics.space import Metric
from repro.util.unionfind import UnionFind

_BLOCK = 1024


def dbscan_pp(
    X: np.ndarray,
    metric: Metric,
    eps: float,
    minpts: int,
    *,
    ratio: float = 0.3,
    seed: int = 0,
) -> DBSCANResult:
    n = len(X)
    g = np.random.default_rng(seed)
    m = max(1, int(round(ratio * n)))
    sample = np.sort(g.choice(n, size=m, replace=False))

    counts = np.zeros(m, dtype=np.int64)
    for lo in range(0, m, _BLOCK):
        d = metric.pairwise(X[sample[lo : lo + _BLOCK]], X)
        counts[lo : lo + _BLOCK] = (d <= eps).sum(axis=1)
    core_s = sample[counts >= minpts]

    labels = np.full(n, -1, dtype=np.int64)
    is_core = np.zeros(n, dtype=bool)
    is_core[core_s] = True
    if len(core_s) == 0:
        return DBSCANResult(labels=labels, is_core=is_core, n_clusters=0)

    uf = UnionFind(len(core_s))
    for lo in range(0, len(core_s), _BLOCK):
        d = metric.pairwise(X[core_s[lo : lo + _BLOCK]], X[core_s])
        ii, jj = np.nonzero(d <= eps)
        for i, j in zip(ii, jj):
            if lo + int(i) < int(j):
                uf.union(lo + int(i), int(j))
    comp = np.asarray(uf.component_labels())
    labels[core_s] = comp

    rest = np.setdiff1d(np.arange(n), core_s, assume_unique=False)
    for lo in range(0, len(rest), _BLOCK):
        blk = rest[lo : lo + _BLOCK]
        d = metric.pairwise(X[blk], X[core_s])
        j = d.argmin(axis=1)
        hit = d[np.arange(len(blk)), j] <= eps
        labels[blk[hit]] = comp[j[hit]]
    return DBSCANResult(
        labels=labels, is_core=is_core, n_clusters=int(comp.max()) + 1
    )
