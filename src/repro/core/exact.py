"""Exact metric DBSCAN via the radius-guided ε/2-net (paper §3).

Pipeline (after Algorithm 1 with ``r̄ ≤ ε/2``):

- **Step 1 — label core points.** Cells with ``|C_e| ≥ MinPts`` are dense:
  every point is core immediately (cell diameter ≤ 2r̄ ≤ ε). Sparse-cell
  points count their ε-neighbors only inside ``∪_{e'∈A_e} C_e'`` (Lemma 2).
- **Step 2 — merge.** All core points of one cell share a cluster; two
  neighboring cells merge iff the bichromatic closest pair between their core
  sets is ≤ ε, answered with a per-cell cover tree (Lemma 5). Union–find over
  cells yields the cluster ids — provably the same core-point partition as
  original DBSCAN.
- **Step 3 — borders & outliers.** A non-core point is a border point iff a
  core point lies within ε among its neighbor cells; it takes the cluster of
  its nearest such core point (Definition 1 allows any adjacent cluster),
  otherwise it is an outlier (label ``-1``).

The driver version here is the reference; ``repro.core.exact_spark``
distributes Steps 1–3 as DataFrame group-wise dataflows over the same
kernels.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core import kernels
from repro.core.gonzalez import GonzalezResult, radius_guided_gonzalez
from repro.covertree.tree import CoverTree
from repro.metrics.space import Metric
from repro.util.unionfind import UnionFind

#: Build a cover tree for a cell's core set only above this size.
_TREE_MIN = 17


@dataclass
class DBSCANResult:
    """Labels per point: cluster id ``0..k-1`` or ``-1`` for outliers."""

    labels: np.ndarray
    is_core: np.ndarray
    n_clusters: int


def label_core_points(
    X: np.ndarray,
    metric: Metric,
    g: GonzalezResult,
    eps: float,
    minpts: int,
    neighbors: list[np.ndarray],
    cells: list[np.ndarray],
) -> np.ndarray:
    """Step 1. Returns the boolean core mask."""
    is_core = np.zeros(len(X), dtype=bool)
    for e, members in enumerate(cells):
        if len(members) == 0:
            continue
        if len(members) >= minpts:  # dense cell: C_e ⊆ B(p, ε) for all p∈C_e
            is_core[members] = True
            continue
        cand = np.concatenate([cells[e2] for e2 in neighbors[e]])
        counts = kernels.count_within(X[members], X[cand], metric, eps)
        is_core[members[counts >= minpts]] = True
    return is_core


def merge_core_cells(
    X: np.ndarray,
    metric: Metric,
    is_core: np.ndarray,
    eps: float,
    neighbors: list[np.ndarray],
    cells: list[np.ndarray],
) -> tuple[np.ndarray, int]:
    """Step 2. Returns (cluster id per cell or -1, number of clusters)."""
    n_cells = len(cells)
    core_members = [m[is_core[m]] for m in cells]
    has_core = np.array([len(c) > 0 for c in core_members])
    trees: dict[int, CoverTree] = {
        e: CoverTree(X[core_members[e]], metric)
        for e in range(n_cells)
        if len(core_members[e]) >= _TREE_MIN
    }
    uf = UnionFind(n_cells)
    for e in range(n_cells):
        if not has_core[e]:
            continue
        for e2 in neighbors[e]:
            if e2 <= e or not has_core[e2] or uf.connected(e, e2):
                continue
            a, b = core_members[e], core_members[e2]
            # Query the pre-built tree side; trees are keyed per cell so each
            # is built once and reused across all its neighbor pairs.
            if e in trees:
                linked = trees[e].min_dist_leq(X[b], eps)
            elif e2 in trees:
                linked = trees[e2].min_dist_leq(X[a], eps)
            else:
                linked = kernels.bcp_leq(X[a], X[b], metric, eps)
            if linked:
                uf.union(e, e2)
    cell_cluster = np.full(n_cells, -1, dtype=np.int64)
    roots: dict[int, int] = {}
    for e in range(n_cells):
        if has_core[e]:
            r = uf.find(e)
            if r not in roots:
                roots[r] = len(roots)
            cell_cluster[e] = roots[r]
    return cell_cluster, len(roots)


def label_non_core(
    X: np.ndarray,
    metric: Metric,
    is_core: np.ndarray,
    labels: np.ndarray,
    eps: float,
    neighbors: list[np.ndarray],
    cells: list[np.ndarray],
) -> None:
    """Step 3, in place: borders take the nearest in-ε core point's cluster."""
    for e, members in enumerate(cells):
        pending = members[~is_core[members]]
        if len(pending) == 0:
            continue
        cand = np.concatenate([cells[e2] for e2 in neighbors[e]])
        cand = cand[is_core[cand]]
        if len(cand) == 0:
            continue
        d, j = kernels.nearest_in(X[pending], X[cand], metric)
        hit = d <= eps
        labels[pending[hit]] = labels[cand[j[hit]]]


def exact_dbscan(
    X: np.ndarray,
    metric: Metric,
    eps: float,
    minpts: int,
    *,
    gonzalez: GonzalezResult | None = None,
) -> DBSCANResult:
    """Exact metric DBSCAN (paper §3.1).

    ``gonzalez``: a precomputed Algorithm-1 result with ``r̄ ≤ ε/2`` may be
    reused across (ε, MinPts) settings — the parameter-tuning advantage of
    Remark 5 that Table 2 quantifies.
    """
    if gonzalez is None:
        gonzalez = radius_guided_gonzalez(X, metric, eps / 2.0)
    if gonzalez.r_bar > eps / 2.0 + 1e-12:
        raise ValueError(
            f"need r̄ ≤ ε/2 (got r̄={gonzalez.r_bar}, ε={eps}); see Remark 5"
        )
    cells = gonzalez.cover_sets()
    neighbors = gonzalez.neighbor_sets(2.0 * gonzalez.r_bar + eps)
    is_core = label_core_points(X, metric, gonzalez, eps, minpts, neighbors, cells)
    cell_cluster, n_clusters = merge_core_cells(X, metric, is_core, eps, neighbors, cells)
    labels = np.full(len(X), -1, dtype=np.int64)
    for e, members in enumerate(cells):
        core_m = members[is_core[members]]
        labels[core_m] = cell_cluster[e]
    label_non_core(X, metric, is_core, labels, eps, neighbors, cells)
    return DBSCANResult(labels=labels, is_core=is_core, n_clusters=n_clusters)
