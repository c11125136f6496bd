"""Streaming density-clustering baselines for Table 4.

Simplified-but-faithful numpy engines for the three comparators (the
originals are R/C++ packages not available offline; DESIGN.md §3 documents
the substitution):

- **DBStream** (Hahsler & Bolaños, TKDE 2016): leader-based micro-clusters of
  radius ``r`` with a shared-density graph; offline, micro-clusters whose
  shared density exceeds the connectivity threshold α merge into
  macro-clusters.
- **D-Stream** (Chen & Tu, KDD 2007): density grid — each point feeds its
  cell's decayed density; offline, dense cells (≥ ``c_m`` × average) connect
  through face-adjacency into clusters. Grids degenerate in high dimension,
  which reproduces the paper's "-" entries on the image sets.
- **evoStream** (Carnein & Trautmann, 2018): DBStream-style online phase; the
  offline macro-clustering is an evolutionary search (mutation + crossover on
  the micro→macro assignment, fitness = weighted within-cluster SSE) run for
  a fixed budget of generations; requires ``k``.

All three expose ``insert(batch)`` for the online phase and ``predict(X)``
labeling against the final macro-clusters (nearest micro-cluster's macro
label; points farther than the model radius are noise, -1).
"""
from __future__ import annotations

import itertools

import numpy as np

from repro.metrics.space import EuclideanMetric
from repro.util.unionfind import UnionFind

_EUC = EuclideanMetric()


class DBStream:
    def __init__(
        self,
        radius: float,
        *,
        alpha: float = 0.3,
        decay: float = 0.0,
        min_weight: float = 2.0,
    ):
        self.r = radius
        self.alpha = alpha
        self.decay = decay
        self.min_weight = min_weight
        self.centers: np.ndarray | None = None
        self.weights = np.empty(0)
        self.shared: dict[tuple[int, int], float] = {}
        self._macro: np.ndarray | None = None

    def insert(self, batch: np.ndarray) -> None:
        for p in np.asarray(batch, dtype=np.float64):
            if self.decay > 0 and len(self.weights):
                self.weights *= 1.0 - self.decay
            if self.centers is None:
                self.centers = p[None, :].copy()
                self.weights = np.array([1.0])
                continue
            d = _EUC.to_point(self.centers, p)
            hits = np.flatnonzero(d <= self.r)
            if len(hits) == 0:
                self.centers = np.vstack([self.centers, p])
                self.weights = np.append(self.weights, 1.0)
                continue
            self.weights[hits] += 1.0
            # move each hit center toward p (competitive learning step)
            eta = 1.0 / self.weights[hits]
            self.centers[hits] += eta[:, None] * (p - self.centers[hits])
            for a, b in itertools.combinations(sorted(map(int, hits)), 2):
                self.shared[(a, b)] = self.shared.get((a, b), 0.0) + 1.0

    def finalize(self) -> None:
        n = 0 if self.centers is None else len(self.centers)
        keep = np.flatnonzero(self.weights >= self.min_weight)
        uf = UnionFind(n)
        for (a, b), s in self.shared.items():
            wa, wb = self.weights[a], self.weights[b]
            if min(wa, wb) > 0 and s / min(wa, wb) >= self.alpha:
                uf.union(a, b)
        macro = np.full(n, -1, dtype=np.int64)
        remap: dict[int, int] = {}
        for i in keep:
            r = uf.find(int(i))
            if r not in remap:
                remap[r] = len(remap)
            macro[i] = remap[r]
        self._macro = macro

    def predict(self, X: np.ndarray) -> np.ndarray:
        if self.centers is None:
            return -np.ones(len(X), dtype=np.int64)
        if self._macro is None:
            self.finalize()
        D = _EUC.pairwise(np.asarray(X, np.float64), self.centers)
        j = D.argmin(axis=1)
        labels = self._macro[j]
        labels = labels.copy()
        labels[D[np.arange(len(X)), j] > 2 * self.r] = -1
        return labels


class DStream:
    def __init__(self, cell_size: float, *, c_m: float = 3.0, decay: float = 0.0):
        self.size = cell_size
        self.c_m = c_m
        self.decay = decay
        self.density: dict[tuple, float] = {}

    def insert(self, batch: np.ndarray) -> None:
        for p in np.asarray(batch, dtype=np.float64):
            if self.decay > 0:
                for k in self.density:
                    self.density[k] *= 1.0 - self.decay
            key = tuple(np.floor(p / self.size).astype(np.int64))
            self.density[key] = self.density.get(key, 0.0) + 1.0

    def _dense_cells(self) -> list[tuple]:
        if not self.density:
            return []
        avg = sum(self.density.values()) / len(self.density)
        return [k for k, v in self.density.items() if v >= self.c_m * avg]

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=np.float64)
        dense = self._dense_cells()
        labels = -np.ones(len(X), dtype=np.int64)
        if not dense:
            return labels
        pos = {k: i for i, k in enumerate(dense)}
        uf = UnionFind(len(dense))
        d = X.shape[1]
        for k in dense:  # face-adjacency merge
            for ax in range(d):
                for step in (-1, 1):
                    k2 = list(k)
                    k2[ax] += step
                    k2 = tuple(k2)
                    if k2 in pos:
                        uf.union(pos[k], pos[k2])
        comp = uf.component_labels()
        keys = np.floor(X / self.size).astype(np.int64)
        for i, key in enumerate(map(tuple, keys)):
            if key in pos:
                labels[i] = comp[pos[key]]
        return labels


class EvoStream(DBStream):
    """DBStream online phase + evolutionary offline macro-clustering."""

    def __init__(
        self,
        radius: float,
        k: int,
        *,
        generations: int = 40,
        pop: int = 12,
        seed: int = 0,
        min_weight: float = 2.0,
    ):
        super().__init__(radius, min_weight=min_weight)
        self.k = k
        self.generations = generations
        self.pop = pop
        self.seed = seed

    def finalize(self) -> None:
        n = 0 if self.centers is None else len(self.centers)
        if n == 0:
            self._macro = np.empty(0, dtype=np.int64)
            return
        g = np.random.default_rng(self.seed)
        C, W = self.centers, self.weights
        k = min(self.k, n)

        def fitness(a: np.ndarray) -> float:
            sse = 0.0
            for j in range(k):
                sel = a == j
                if sel.any():
                    mu = (C[sel] * W[sel, None]).sum(0) / W[sel].sum()
                    sse += (W[sel] * ((C[sel] - mu) ** 2).sum(1)).sum()
            return -sse

        popu = [g.integers(0, k, n) for _ in range(self.pop)]
        scores = [fitness(a) for a in popu]
        for _ in range(self.generations):
            i1, i2 = np.argsort(scores)[-2:]
            child = np.where(g.random(n) < 0.5, popu[i1], popu[i2])
            mut = g.random(n) < 0.1
            child[mut] = g.integers(0, k, mut.sum())
            s = fitness(child)
            worst = int(np.argmin(scores))
            if s > scores[worst]:
                popu[worst] = child
                scores[worst] = s
        best = popu[int(np.argmax(scores))]
        macro = best.astype(np.int64).copy()
        macro[self.weights < self.min_weight] = -1
        self._macro = macro
