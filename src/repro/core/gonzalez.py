"""Radius-guided Gonzalez k-center selection (paper Algorithm 1).

Farthest-first traversal that terminates when the covering radius drops to
``r̄`` instead of at a fixed ``k``. Produces the ε/2-net (or ρε/2-net) the
exact / approximate DBSCAN algorithms are built on: the center set ``E``, the
per-point assignment ``c_p`` (→ cover sets ``C_e``), the residual distances
``dis(p, E)``, and — when ``eps`` is supplied — the ball counts
``|B(e, ε) ∩ X|`` accumulated at no extra asymptotic cost (Lemma 10).

Two implementations share the same result type:

- :func:`radius_guided_gonzalez` — driver-side numpy loop.
- :func:`radius_guided_gonzalez_spark` — the dataset lives as an RDD of numpy
  blocks; each iteration is one broadcast + ``map`` (update the per-block
  min-distance state against the newly chosen center) + ``reduce`` (global
  farthest point). This is the classic iterative-refinement dataflow (k-means‖
  style); lineage is truncated with ``localCheckpoint`` periodically.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.metrics.space import Metric

#: Truncate the Spark lineage chain every this many iterations.
_CHECKPOINT_EVERY = 25


@dataclass
class GonzalezResult:
    """Everything downstream DBSCAN steps need from Algorithm 1."""

    centers_idx: np.ndarray  # indices into X of the centers, selection order
    assign: np.ndarray  # c_p as a center ordinal, per point
    dist: np.ndarray  # dis(p, E) per point
    r_bar: float
    center_pd: np.ndarray  # |E| x |E| center pairwise distances
    center_counts: np.ndarray | None = None  # |B(e, eps) ∩ X| if eps given
    eps: float | None = None
    n_iterations: int = field(default=0)

    @property
    def n_centers(self) -> int:
        return len(self.centers_idx)

    def cover_sets(self) -> list[np.ndarray]:
        """C_e: point indices per center ordinal."""
        order = np.argsort(self.assign, kind="stable")
        bounds = np.searchsorted(self.assign[order], np.arange(self.n_centers + 1))
        return [order[bounds[i] : bounds[i + 1]] for i in range(self.n_centers)]

    def neighbor_sets(self, threshold: float) -> list[np.ndarray]:
        """A_e = {e' : dis(e, e') ≤ threshold} per center ordinal (incl. self).

        The paper uses ``threshold = 2r̄+ε`` for exact DBSCAN (eq. 1) and
        ``4r̄+ε`` for the approximate variant (eq. 13). Computed from the
        small |E|×|E| matrix, mirroring the incremental bookkeeping of §2.
        """
        return [np.flatnonzero(row <= threshold) for row in self.center_pd]


def radius_guided_gonzalez(
    X: np.ndarray,
    metric: Metric,
    r_bar: float,
    *,
    eps: float | None = None,
    first: int = 0,
) -> GonzalezResult:
    """Driver-side Algorithm 1. Deterministic given ``first``."""
    n = len(X)
    dist = metric.to_point(X, X[first])
    assign = np.zeros(n, dtype=np.int64)
    centers = [first]
    counts = [int((dist <= eps).sum())] if eps is not None else None
    while True:
        q = int(np.argmax(dist))
        if dist[q] <= r_bar:
            break
        d_new = metric.to_point(X, X[q])
        if counts is not None:
            counts.append(int((d_new <= eps).sum()))
        closer = d_new < dist
        dist = np.where(closer, d_new, dist)
        assign[closer] = len(centers)
        centers.append(q)
    centers_idx = np.asarray(centers, dtype=np.int64)
    center_pd = metric.pairwise(X[centers_idx], X[centers_idx])
    return GonzalezResult(
        centers_idx=centers_idx,
        assign=assign,
        dist=dist,
        r_bar=r_bar,
        center_pd=center_pd,
        center_counts=np.asarray(counts) if counts is not None else None,
        eps=eps,
        n_iterations=len(centers),
    )


def radius_guided_gonzalez_spark(
    spark,
    X: np.ndarray,
    metric: Metric,
    r_bar: float,
    *,
    eps: float | None = None,
    first: int = 0,
    n_blocks: int | None = None,
) -> GonzalezResult:
    """Distributed Algorithm 1 over an RDD of numpy blocks.

    Block state is ``(ids, points, dist, assign)``. Per iteration:

    1. ``map``+``reduce``: global farthest point (value + the point itself).
    2. broadcast the new center; ``map`` rewrites each block's ``dist`` /
       ``assign`` (and, with ``eps``, a per-block ≤ε count that is summed).

    Equivalent to the driver version point-for-point (same ``first`` seed, same
    argmax tie-breaking by lowest global id) — asserted in tests.

    One Spark job per iteration: the block-update ``map`` is chained with a
    stats ``map``+``reduce`` that simultaneously materializes the new cached
    state, finds the global farthest point, and sums the new center's ≤ε
    count (the distances are computed once, in the update).
    """
    sc = spark.sparkContext
    n = len(X)
    if n_blocks is None:
        n_blocks = max(1, min(sc.defaultParallelism, n // 512 or 1))
    splits = np.array_split(np.arange(n), n_blocks)
    p0 = X[first]
    blocks = [(ids, X[ids]) for ids in splits if len(ids)]

    def init_block(block):
        ids, pts = block
        d = metric.to_point(pts, p0)
        cnt = int((d <= eps).sum()) if eps is not None else 0
        return ids, pts, d, np.zeros(len(ids), dtype=np.int64), cnt

    def stats(block):
        ids, _, d, _, cnt = block
        j = int(np.argmax(d))
        # point payload fetched lazily only for the winning block below
        return float(d[j]), int(ids[j]), cnt

    def pick(a, b):  # max by distance; break ties toward the lower global id
        return (max(a[:2], b[:2], key=lambda t: (t[0], -t[1])) + (a[2] + b[2],))

    def fetch_point(gid):
        return X[gid]

    state = sc.parallelize(blocks, len(blocks)).map(init_block).cache()
    d_max, q_id, cnt0 = state.map(stats).reduce(pick)
    counts = [cnt0] if eps is not None else None
    centers = [first]
    it = 0
    while d_max > r_bar:
        it += 1
        cidx = len(centers)
        centers.append(q_id)
        bc = sc.broadcast(fetch_point(q_id))

        def update(block, bc=bc, cidx=cidx):
            ids, pts, d, a, _ = block
            d_new = metric.to_point(pts, bc.value)
            closer = d_new < d
            cnt = int((d_new <= eps).sum()) if eps is not None else 0
            return (
                ids,
                pts,
                np.where(closer, d_new, d),
                np.where(closer, cidx, a),
                cnt,
            )

        new_state = state.map(update)
        if it % _CHECKPOINT_EVERY == 0:
            new_state.localCheckpoint()  # truncates lineage; also persists
        else:
            new_state = new_state.cache()
        # single action: materializes new_state AND yields (farthest, count)
        d_max, q_id, cnt = new_state.map(stats).reduce(pick)
        if counts is not None:
            counts.append(cnt)
        state.unpersist()
        state = new_state

    collected = state.map(lambda b: (b[0], b[2], b[3])).collect()
    state.unpersist()
    dist = np.empty(n)
    assign = np.empty(n, dtype=np.int64)
    for ids, d, a in collected:
        dist[ids] = d
        assign[ids] = a
    centers_idx = np.asarray(centers, dtype=np.int64)
    center_pd = metric.pairwise(X[centers_idx], X[centers_idx])
    return GonzalezResult(
        centers_idx=centers_idx,
        assign=assign,
        dist=dist,
        r_bar=r_bar,
        center_pd=center_pd,
        center_counts=np.asarray(counts) if counts is not None else None,
        eps=eps,
        n_iterations=len(centers),
    )
