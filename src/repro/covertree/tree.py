"""Cover tree for nearest-neighbor search in a doubling metric.

Used by exact metric DBSCAN Step 2: the bichromatic-closest-pair (BCP) test
between the core sets of two neighboring ε/2-net cells is answered with
nearest-neighbor queries against a per-cell cover tree (paper §3.1, Lemma 5).

This is the *simplified* cover tree of Izbicki & Shelton (ICML 2015) — one
node per point, children at strictly lower levels, covering invariant
``dis(parent, child) ≤ 2^parent.level``. The paper's Remark 2 notes the
vanilla tree can be replaced by such variants. Query correctness relies only
on the covering invariant: every descendant of a node at level ``l`` lies
within ``2^(l+1)`` of it (geometric sum of the per-level radii), which gives
the branch-and-bound pruning rule.

Exact duplicate points are folded into one node (an ``ids`` multiset) so the
level recursion never has to represent distance 0.
"""
from __future__ import annotations

import math

import numpy as np

from repro.metrics.space import Metric


class _Node:
    __slots__ = ("point", "ids", "level", "children")

    def __init__(self, point, pid: int, level: int):
        self.point = point
        self.ids = [pid]
        self.level = level
        self.children: list[_Node] = []


def _maxdist(node: _Node) -> float:
    """Upper bound on dis(node, any descendant): Σ_{i≤level} 2^i = 2^(l+1)."""
    return 2.0 ** (node.level + 1)


class CoverTree:
    """Cover tree over ``points`` (numpy container) under ``metric``."""

    def __init__(self, points: np.ndarray, metric: Metric, ids=None):
        if len(points) == 0:
            raise ValueError("cannot build a cover tree on an empty set")
        self.metric = metric
        self.root: _Node | None = None
        self.n = 0
        ids = range(len(points)) if ids is None else ids
        for pid, p in zip(ids, points):
            self.insert(p, pid)

    # ------------------------------------------------------------- build
    def insert(self, p, pid: int) -> None:
        self.n += 1
        if self.root is None:
            self.root = _Node(p, pid, level=0)
            return
        d_root = float(self.metric.to_point(_one(p), self.root.point)[0])
        if d_root == 0.0:
            self.root.ids.append(pid)
            return
        if d_root > 2.0**self.root.level:
            # Raise the root level until it can cover the new point.
            self.root.level = max(self.root.level, math.ceil(math.log2(d_root)))
        self._insert(self.root, p, pid, d_root)

    def _insert(self, q: _Node, p, pid: int, d_pq: float) -> None:
        # Precondition: d_pq = dis(p, q) ≤ 2^q.level.
        while True:
            nxt = None
            for c in q.children:
                d = float(self.metric.to_point(_one(p), c.point)[0])
                if d == 0.0:
                    c.ids.append(pid)
                    return
                if d <= 2.0**c.level:
                    nxt, d_pq = c, d
                    break
            if nxt is None:
                level = min(q.level - 1, math.floor(math.log2(d_pq)))
                q.children.append(_Node(p, pid, level))
                return
            q = nxt

    # ------------------------------------------------------------- query
    def nearest(self, p, prune_above: float = math.inf) -> tuple[float, int]:
        """(distance, point id) of the nearest stored point to ``p``.

        ``prune_above``: an external bound — subtrees that provably cannot
        contain a point closer than the current best *or* this bound are
        skipped. With a finite bound the returned distance is only reliable
        when it is ≤ the bound (enough for the BCP ≤ ε test).
        """
        assert self.root is not None
        best_d = float(self.metric.to_point(_one(p), self.root.point)[0])
        best_id = self.root.ids[0]
        stack = [(best_d, self.root)]
        while stack:
            d_q, q = stack.pop()
            bound = min(best_d, prune_above)
            if d_q - _maxdist(q) > bound:
                continue
            for c in q.children:
                d_c = float(self.metric.to_point(_one(p), c.point)[0])
                if d_c < best_d:
                    best_d, best_id = d_c, c.ids[0]
                if d_c - _maxdist(c) <= min(best_d, prune_above):
                    stack.append((d_c, c))
        return best_d, best_id

    def min_dist_leq(self, B: np.ndarray, tau: float) -> bool:
        """True iff min_{b∈B, p∈tree} dis(b, p) ≤ tau — the BCP predicate.

        Early-exits on the first query point whose NN distance is ≤ tau.
        """
        for b in B:
            d, _ = self.nearest(b, prune_above=tau)
            if d <= tau:
                return True
        return False

    def size(self) -> int:
        return self.n


def _one(p) -> np.ndarray:
    """Wrap a single point as a length-1 container for Metric batch calls."""
    if isinstance(p, str):
        return np.array([p], dtype=object)
    return np.asarray(p, dtype=np.float64)[None, :]
