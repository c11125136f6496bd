"""ρ-approximate metric DBSCAN via core-point summary (paper Algorithm 2).

Run Algorithm 1 with ``r̄ = ρε/2`` (ball counts ``|B(e,ε)|`` come for free —
Lemma 10), then:

1. **Summary S\\***: a core center represents its whole cell; a non-core
   center contributes all core points of its cell (≤ MinPts of them, Lemma 8).
   ``|S*| = O((Δ/ρε)^D + z)`` (Lemma 9).
2. **Merge inside S\\***: same cluster id iff distance ≤ ``(1+ρ)ε``,
   restricted to neighbor cells under the widened ``A_p`` threshold ``4r̄+ε``
   (eq. 13, Lemma 11).
3. **Label everything else**: a point whose center is in S* inherits its
   center's cluster; otherwise it joins the cluster of any summary point
   within ``(ρ/2+1)ε``; otherwise it is an outlier. (Theorem 2 proves this
   yields a valid ρ-approximate DBSCAN solution.)

The same summary drives the streaming variant (``repro.core.streaming``) and
the Spark labeling pass (``repro.core.spark_dbscan``).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core import kernels
from repro.core.gonzalez import GonzalezResult, radius_guided_gonzalez
from repro.metrics.space import Metric
from repro.util.unionfind import UnionFind


@dataclass
class ApproxResult:
    """ρ-approximate DBSCAN output plus the summary for inspection."""

    labels: np.ndarray  # cluster id per point, -1 = outlier
    summary_idx: np.ndarray  # global indices of S*
    summary_labels: np.ndarray  # cluster id per summary point
    n_clusters: int
    gonzalez: GonzalezResult


def build_summary(
    X: np.ndarray,
    metric: Metric,
    g: GonzalezResult,
    eps: float,
    minpts: int,
    neighbors: list[np.ndarray],
    cells: list[np.ndarray],
) -> np.ndarray:
    """S* construction (Algorithm 2 lines 2–8). Returns global point indices."""
    assert g.center_counts is not None, "run Algorithm 1 with eps= to get counts"
    center_is_core = g.center_counts >= minpts
    out: list[np.ndarray] = []
    for e, members in enumerate(cells):
        if center_is_core[e]:
            out.append(g.centers_idx[e : e + 1])
        elif len(members):
            # Identify the core points of this sparse cell (Lemma 2 bound).
            cand = np.concatenate([cells[e2] for e2 in neighbors[e]])
            counts = kernels.count_within(X[members], X[cand], metric, eps)
            core = members[counts >= minpts]
            if len(core):
                out.append(core)
    if not out:
        return np.empty(0, dtype=np.int64)
    return np.concatenate(out)


def merge_summary(
    X: np.ndarray,
    metric: Metric,
    summary_idx: np.ndarray,
    assign: np.ndarray,
    eps: float,
    rho: float,
    neighbors: list[np.ndarray],
) -> tuple[np.ndarray, int]:
    """Algorithm 2 line 9: same id iff distance ≤ (1+ρ)ε.

    The scan for each summary point is restricted to summary points living in
    its neighbor cells — sound because two linkable summary points have
    centers within ``(1+2ρ)ε ≤ 4r̄+ε`` of each other (Lemma 11 derivation).
    """
    m = len(summary_idx)
    uf = UnionFind(m)
    s_cell = assign[summary_idx]
    by_cell: dict[int, list[int]] = {}
    for i, c in enumerate(s_cell):
        by_cell.setdefault(int(c), []).append(i)
    thr = (1.0 + rho) * eps
    for i in range(m):
        cand: list[int] = []
        for e2 in neighbors[int(s_cell[i])]:
            cand.extend(by_cell.get(int(e2), ()))
        cand_arr = np.asarray([j for j in cand if j > i], dtype=np.int64)
        if len(cand_arr) == 0:
            continue
        d = metric.pairwise(X[summary_idx[i : i + 1]], X[summary_idx[cand_arr]])[0]
        for j in cand_arr[d <= thr]:
            uf.union(i, int(j))
    labels = np.asarray(uf.component_labels(), dtype=np.int64)
    return labels, uf.n_components


def approx_dbscan(
    X: np.ndarray,
    metric: Metric,
    eps: float,
    minpts: int,
    rho: float,
    *,
    gonzalez: GonzalezResult | None = None,
) -> ApproxResult:
    """Algorithm 2 end-to-end (driver version)."""
    if rho <= 0:
        raise ValueError("rho must be positive (rho=0 is the exact problem)")
    r_bar = rho * eps / 2.0
    if gonzalez is None:
        gonzalez = radius_guided_gonzalez(X, metric, r_bar, eps=eps)
    cells = gonzalez.cover_sets()
    neighbors = gonzalez.neighbor_sets(4.0 * gonzalez.r_bar + eps)
    summary_idx = build_summary(X, metric, gonzalez, eps, minpts, neighbors, cells)
    s_labels, n_clusters = merge_summary(
        X, metric, summary_idx, gonzalez.assign, eps, rho, neighbors
    )
    labels = label_against_summary(
        X, metric, gonzalez, summary_idx, s_labels, eps, minpts, rho, neighbors
    )
    return ApproxResult(
        labels=labels,
        summary_idx=summary_idx,
        summary_labels=s_labels,
        n_clusters=n_clusters,
        gonzalez=gonzalez,
    )


def label_against_summary(
    X: np.ndarray,
    metric: Metric,
    g: GonzalezResult,
    summary_idx: np.ndarray,
    s_labels: np.ndarray,
    eps: float,
    minpts: int,
    rho: float,
    neighbors: list[np.ndarray],
) -> np.ndarray:
    """Algorithm 2 lines 10–20, vectorized per cell.

    A non-summary point p: if ``c_p ∈ S*`` (i.e. its center is a core center)
    it inherits that cluster; else it joins the nearest summary point within
    ``(ρ/2+1)ε``; else outlier. Candidate summary points are restricted to
    p's neighbor cells (safe: dis(p,s) ≤ (ρ/2+1)ε ⇒ dis(c_p, c_s) ≤
    (1+3ρ/2)ε ≤ 4r̄+ε).
    """
    n = len(X)
    labels = np.full(n, -1, dtype=np.int64)
    labels[summary_idx] = s_labels
    in_summary = np.zeros(n, dtype=bool)
    in_summary[summary_idx] = True

    # Map: cell -> cluster id of its center when the center is in S* (a
    # center lands in S* exactly when it is a core center — see
    # build_summary; non-core centers are never core points of their cell).
    assert g.center_counts is not None
    center_is_core = g.center_counts >= minpts
    center_cluster = np.full(g.n_centers, -1, dtype=np.int64)
    center_pos = {int(ci): e for e, ci in enumerate(g.centers_idx)}
    for si, gi in enumerate(summary_idx):
        e = center_pos.get(int(gi))
        if e is not None and center_is_core[e]:
            center_cluster[e] = s_labels[si]

    s_cell = g.assign[summary_idx]
    order = np.argsort(s_cell, kind="stable")
    uniq, starts = np.unique(s_cell[order], return_index=True)
    by_cell: dict[int, np.ndarray] = {
        int(e): chunk
        for e, chunk in zip(uniq, np.split(order, starts[1:]))
    }

    cells = g.cover_sets()
    thr = (rho / 2.0 + 1.0) * eps
    for e, members in enumerate(cells):
        pending = members[~in_summary[members]]
        if len(pending) == 0:
            continue
        if center_cluster[e] >= 0:  # line 11: c_p ∈ S*
            labels[pending] = center_cluster[e]
            continue
        cand: list[np.ndarray] = [
            by_cell[int(e2)] for e2 in neighbors[e] if int(e2) in by_cell
        ]
        if not cand:
            continue
        cand_s = np.concatenate(cand)
        d, j = kernels.nearest_in(X[pending], X[summary_idx[cand_s]], metric)
        hit = d <= thr
        labels[pending[hit]] = s_labels[cand_s[j[hit]]]
    return labels
