"""Metric-space abstraction.

The paper's algorithms work over an abstract metric ``(X, dis)``. Points are
held in numpy arrays — a float ``(n, d)`` matrix for Euclidean space, or an
``object`` array of Python strings for edit distance — so that index-array
slicing works uniformly in the cell-local kernels.

Every metric exposes batch operations only (``pairwise`` / ``to_point``):
distance evaluation is the unit of cost in the paper (``t_dis``), and batch
evaluation is what lets the Spark kernels stay Arrow/numpy-vectorized.
"""
from __future__ import annotations

import numpy as np


class Metric:
    """Abstract metric over a numpy point container."""

    name = "abstract"

    def pairwise(self, A: np.ndarray, B: np.ndarray) -> np.ndarray:
        """Full distance matrix, shape ``(len(A), len(B))``."""
        raise NotImplementedError

    def to_point(self, A: np.ndarray, p) -> np.ndarray:
        """Distances from every point of ``A`` to the single point ``p``."""
        raise NotImplementedError


class EuclideanMetric(Metric):
    """L2 distance on an ``(n, d)`` float matrix."""

    name = "euclidean"

    def pairwise(self, A: np.ndarray, B: np.ndarray) -> np.ndarray:
        A = np.asarray(A, dtype=np.float64)
        B = np.asarray(B, dtype=np.float64)
        # |a-b|^2 = |a|^2 + |b|^2 - 2 a.b ; clamp the FP-negative residue.
        sq = (
            (A * A).sum(axis=1)[:, None]
            + (B * B).sum(axis=1)[None, :]
            - 2.0 * (A @ B.T)
        )
        np.maximum(sq, 0.0, out=sq)
        return np.sqrt(sq)

    def to_point(self, A: np.ndarray, p) -> np.ndarray:
        A = np.asarray(A, dtype=np.float64)
        d = A - np.asarray(p, dtype=np.float64)[None, :]
        return np.sqrt((d * d).sum(axis=1))


def levenshtein(a: str, b: str) -> int:
    """Classic edit distance via a rolling numpy DP row — O(|a|·|b|)."""
    if a == b:
        return 0
    if not a:
        return len(b)
    if not b:
        return len(a)
    if len(a) < len(b):  # keep the inner (vectorized) dimension the long one
        a, b = b, a
    prev = np.arange(len(a) + 1, dtype=np.int64)
    arr_a = np.frombuffer(a.encode("utf-32-le"), dtype=np.uint32)
    for i, cb in enumerate(b, start=1):
        cur = np.empty_like(prev)
        cur[0] = i
        sub = prev[:-1] + (arr_a != ord(cb))
        # cur[j] = min(prev[j] + 1, sub[j-1], cur[j-1] + 1); the cur[j-1]
        # dependency is sequential, but a prefix-min identity resolves it:
        # cur[j] = min over t<=j of (cand[t] + (j - t)).
        cand = np.minimum(prev[1:] + 1, sub)
        cur[1:] = np.minimum.accumulate(cand - np.arange(len(a))) + np.arange(
            len(a)
        )
        prev = cur
    return int(prev[-1])


class EditDistanceMetric(Metric):
    """Levenshtein distance on an object array of strings.

    ``t_dis`` here is genuinely expensive (quadratic in string length), which
    is exactly the regime where the paper's reduced-search-range techniques
    pay off; the text-dataset experiments exercise this path.
    """

    name = "edit"

    def pairwise(self, A: np.ndarray, B: np.ndarray) -> np.ndarray:
        out = np.empty((len(A), len(B)), dtype=np.float64)
        for i, sa in enumerate(A):
            for j, sb in enumerate(B):
                out[i, j] = levenshtein(sa, sb)
        return out

    def to_point(self, A: np.ndarray, p) -> np.ndarray:
        return np.array([levenshtein(s, p) for s in A], dtype=np.float64)


def as_points(obj) -> np.ndarray:
    """Normalize a dataset into the numpy container the kernels expect."""
    if isinstance(obj, np.ndarray):
        return obj
    if len(obj) and isinstance(obj[0], str):
        return np.array(obj, dtype=object)
    return np.asarray(obj, dtype=np.float64)
