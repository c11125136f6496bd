"""BICO-lite (Fichtenberger et al., ESA 2013) — streaming k-means coreset.

BICO maintains a bounded set of weighted micro-clusters ("coreset features"):
a streamed point joins its nearest feature if doing so keeps the feature's
squared-error cost under a threshold ``T``, else opens a new feature; when
the feature budget overflows, ``T`` doubles and the features are rebuilt by
re-inserting them. Offline, weighted k-means (k-means++ init + Lloyd) runs on
the coreset; full-data labels come from the nearest final center.

This is the flat (single-level) variant — the original's BIRCH-style tree
only accelerates nearest-feature lookup, which numpy handles directly at our
scales. Requires ``k`` as input, the practical weakness the paper highlights
in §5.4. Streaming interface: ``partial_fit`` batches, then ``finalize``.
"""
from __future__ import annotations

import numpy as np

from repro.metrics.space import EuclideanMetric


class BicoLite:
    def __init__(self, k: int, *, max_features: int = 200, seed: int = 0):
        self.k = k
        self.max_features = max_features
        self.seed = seed
        self.T = None  # cost threshold; bootstrapped from the first batch
        self.centers = np.empty((0, 0))
        self.weights = np.empty(0)
        self.costs = np.empty(0)
        self._m = EuclideanMetric()
        self.final_centers: np.ndarray | None = None

    def _insert(self, p: np.ndarray, w: float, cost: float) -> None:
        if len(self.weights) == 0:
            self.centers = p[None, :].copy()
            self.weights = np.array([w])
            self.costs = np.array([cost])
            return
        d2 = ((self.centers - p) ** 2).sum(axis=1)
        j = int(d2.argmin())
        # merging p into feature j adds w·|p-c_j|² (parallel-axis bound)
        if self.costs[j] + cost + w * d2[j] <= self.T:
            wj = self.weights[j]
            self.centers[j] = (wj * self.centers[j] + w * p) / (wj + w)
            self.weights[j] = wj + w
            self.costs[j] += cost + w * d2[j]
        else:
            self.centers = np.vstack([self.centers, p])
            self.weights = np.append(self.weights, w)
            self.costs = np.append(self.costs, cost)
            if len(self.weights) > self.max_features:
                self._rebuild()

    def _rebuild(self) -> None:
        self.T *= 2.0
        C, W, Q = self.centers, self.weights, self.costs
        self.centers = np.empty((0, C.shape[1]))
        self.weights = np.empty(0)
        self.costs = np.empty(0)
        for c, w, q in zip(C, W, Q):
            self._insert(c, float(w), float(q))

    def partial_fit(self, batch: np.ndarray) -> "BicoLite":
        batch = np.asarray(batch, dtype=np.float64)
        if self.T is None:
            # bootstrap threshold from the batch's spread
            spread = batch.std(axis=0).sum() + 1e-9
            self.T = float(spread)
        for p in batch:
            self._insert(p, 1.0, 0.0)
        return self

    def finalize(self, *, n_iter: int = 25) -> np.ndarray:
        """Weighted k-means++ + Lloyd on the coreset; returns final centers."""
        g = np.random.default_rng(self.seed)
        C, W = self.centers, self.weights
        k = min(self.k, len(C))
        # k-means++ seeding on the weighted coreset
        first = int(g.choice(len(C), p=W / W.sum()))
        centers = [C[first]]
        d2 = ((C - centers[0]) ** 2).sum(axis=1)
        for _ in range(k - 1):
            p = d2 * W
            if p.sum() <= 0:
                break
            centers.append(C[int(g.choice(len(C), p=p / p.sum()))])
            d2 = np.minimum(d2, ((C - centers[-1]) ** 2).sum(axis=1))
        centers = np.asarray(centers)
        for _ in range(n_iter):
            D = self._m.pairwise(C, centers)
            a = D.argmin(axis=1)
            new = []
            for j in range(len(centers)):
                sel = a == j
                if sel.any():
                    new.append((C[sel] * W[sel, None]).sum(0) / W[sel].sum())
                else:
                    new.append(centers[j])
            new = np.asarray(new)
            if np.allclose(new, centers):
                break
            centers = new
        self.final_centers = centers
        return centers

    def predict(self, X: np.ndarray) -> np.ndarray:
        assert self.final_centers is not None, "call finalize() first"
        return self._m.pairwise(
            np.asarray(X, dtype=np.float64), self.final_centers
        ).argmin(axis=1)


def bico_cluster(
    X: np.ndarray, k: int, *, chunk: int = 2048, seed: int = 0
) -> np.ndarray:
    """Convenience: stream X through BICO-lite and label every point."""
    b = BicoLite(k, seed=seed)
    for lo in range(0, len(X), chunk):
        b.partial_fit(X[lo : lo + chunk])
    b.finalize()
    return b.predict(X)
