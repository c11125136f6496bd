"""DYW_DBSCAN — Ding, Yang & Wang, "On Metric DBSCAN with Low Doubling
Dimension" (IJCAI 2021): the randomized k-center-with-outliers predecessor
the paper compares against (§3.3).

Differences from the paper's method, reproduced here on purpose:

- **Pre-processing** is a *randomized* Gonzalez variant with an outlier
  budget: each round samples the next center uniformly from the farthest
  ``z̃+1`` points (so an adversarial outlier is not always picked), and the
  number of rounds ``k`` is a manually set termination condition.
- **Clustering** keeps the original DBSCAN structure: the ball partition only
  *restricts the search range* of each point's ε-neighborhood query; there is
  no dense-cell shortcut and merging is point-level BFS over core-core edges
  within neighbor balls (worst case still O(n²)).
"""
from __future__ import annotations

import numpy as np

from repro.core.exact import DBSCANResult
from repro.metrics.space import Metric
from repro.util.unionfind import UnionFind


def dyw_dbscan(
    X: np.ndarray,
    metric: Metric,
    eps: float,
    minpts: int,
    *,
    k: int | None = None,
    z_tilde: int = 10,
    seed: int = 0,
) -> DBSCANResult:
    n = len(X)
    g = np.random.default_rng(seed)
    if k is None:
        k = max(8, int(np.sqrt(n)))

    # --- randomized k-center with outliers ------------------------------
    centers = [int(g.integers(0, n))]
    dist = metric.to_point(X, X[centers[0]])
    for _ in range(k - 1):
        far = np.argsort(dist)[-(z_tilde + 1) :]
        c = int(g.choice(far))
        if dist[c] <= 0:
            break
        centers.append(c)
        d_new = metric.to_point(X, X[c])
        np.minimum(dist, d_new, out=dist)
    C = np.asarray(centers)
    D_pc = metric.pairwise(X, X[C])
    assign = D_pc.argmin(axis=1)
    radius = float(D_pc.min(axis=1).max())

    # neighbor balls: centers within 2·radius + ε can host ε-neighbors
    center_pd = metric.pairwise(X[C], X[C])
    nbr = [np.flatnonzero(row <= 2 * radius + eps) for row in center_pd]
    cells = [np.flatnonzero(assign == e) for e in range(len(C))]

    # --- core labeling: brute within neighbor balls ----------------------
    is_core = np.zeros(n, dtype=bool)
    for e, members in enumerate(cells):
        if len(members) == 0:
            continue
        cand = np.concatenate([cells[e2] for e2 in nbr[e]])
        d = metric.pairwise(X[members], X[cand])
        is_core[members[(d <= eps).sum(axis=1) >= minpts]] = True

    # --- point-level merge within neighbor balls -------------------------
    core_idx = np.flatnonzero(is_core)
    pos = np.full(n, -1, dtype=np.int64)
    pos[core_idx] = np.arange(len(core_idx))
    uf = UnionFind(len(core_idx))
    for e, members in enumerate(cells):
        own_core = members[is_core[members]]
        if len(own_core) == 0:
            continue
        cand = np.concatenate([cells[e2] for e2 in nbr[e]])
        cand_core = cand[is_core[cand]]
        d = metric.pairwise(X[own_core], X[cand_core])
        ii, jj = np.nonzero(d <= eps)
        for i, j in zip(ii, jj):
            uf.union(int(pos[own_core[i]]), int(pos[cand_core[j]]))
    comp = np.asarray(uf.component_labels())
    labels = np.full(n, -1, dtype=np.int64)
    labels[core_idx] = comp

    # --- borders ---------------------------------------------------------
    for e, members in enumerate(cells):
        pend = members[~is_core[members]]
        if len(pend) == 0:
            continue
        cand = np.concatenate([cells[e2] for e2 in nbr[e]])
        cand_core = cand[is_core[cand]]
        if len(cand_core) == 0:
            continue
        d = metric.pairwise(X[pend], X[cand_core])
        j = d.argmin(axis=1)
        hit = d[np.arange(len(pend)), j] <= eps
        labels[pend[hit]] = labels[cand_core[j[hit]]]
    k_out = int(comp.max()) + 1 if len(comp) else 0
    return DBSCANResult(labels=labels, is_core=is_core, n_clusters=k_out)
