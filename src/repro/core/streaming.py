"""Streaming ρ-approximate DBSCAN (paper Algorithm 3).

Three passes over the stream, with memory ``O((Δ/ρε)^D + z)`` — independent
of ``n`` (Theorem 4):

- **Pass 1** — incremental ball cover: assign each arriving point to an
  existing center within ``r̄ = ρε/2``, else open a new center at it. Track
  per-center ball counts ``|B(e, ε)|`` over the points seen so far, and keep
  ``M`` = points assigned to (still-)non-core centers; a center's M-bucket is
  dropped the moment the center turns core (its points then inherit the
  center's label, so they are never needed in S*). ``|M| = O(MinPts·|E|)``.
- **Pass 2** — re-scan the stream counting exact ε-neighborhoods of the
  candidates ``E ∪ M`` (pass-1 counts can only *under*-count: points that
  arrived before a center opened are missed, so a pass-1 "core" verdict is
  never revoked). Core centers and core M-points form the summary ``S*``,
  which is merged offline at threshold ``(1+ρ)ε`` (Algorithm 2 line 9).
- **Pass 3** — label: a point whose nearest center is a core center inherits
  that cluster; otherwise the nearest summary point within ``(ρ/2+1)ε``;
  otherwise outlier (Algorithm 2 lines 10–20).

The state machine consumes arbitrary batches, so it plugs directly into
Structured Streaming via ``foreachBatch`` (:func:`structured_pass1`) and is
also driven chunk-by-chunk in tests/benchmarks.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.metrics.space import Metric
from repro.util.unionfind import UnionFind


def _stack(points: list) -> np.ndarray:
    """list of points -> numpy container (object array for strings)."""
    if points and isinstance(points[0], str):
        return np.array(points, dtype=object)
    return np.asarray(points, dtype=np.float64)


@dataclass
class StreamingStats:
    n_seen: int
    n_centers: int
    n_m: int

    @property
    def memory_ratio(self) -> float:
        """(|E| + |M|) / n — the Figure-6 metric."""
        return (self.n_centers + self.n_m) / max(1, self.n_seen)


class StreamingDBSCAN:
    """Three-pass streaming ρ-approximate DBSCAN state machine."""

    def __init__(self, metric: Metric, eps: float, minpts: int, rho: float):
        if rho <= 0:
            raise ValueError("rho must be positive")
        self.metric = metric
        self.eps = eps
        self.minpts = minpts
        self.rho = rho
        self.r_bar = rho * eps / 2.0
        self.centers: list = []  # center points, creation order
        self.counts: list[int] = []  # pass-1 ball counts |B(e, ε)| (under-count)
        self.m_points: dict[int, list] = {}  # center ordinal -> assigned points
        self.n_seen = 0
        # pass-2/3 state
        self._cand_pts: np.ndarray | None = None
        self._cand_counts: np.ndarray | None = None
        self.summary_pts: np.ndarray | None = None
        self.summary_labels: np.ndarray | None = None
        self.n_clusters = 0
        self._center_cluster: np.ndarray | None = None

    # ------------------------------------------------------------ pass 1
    def pass1_batch(self, batch: np.ndarray) -> None:
        """Consume one stream batch (Algorithm 3 lines 2–13)."""
        self.n_seen += len(batch)
        counts = np.asarray(self.counts, dtype=np.int64)
        if self.centers:
            C = _stack(self.centers)
            D = self.metric.pairwise(batch, C)
            counts = counts + (D <= self.eps).sum(axis=0)
            mind = D.min(axis=1)
            nearest = D.argmin(axis=1)
            unassigned = np.flatnonzero(mind > self.r_bar)
            assigned = np.flatnonzero(mind <= self.r_bar)
        else:
            nearest = np.zeros(len(batch), dtype=np.int64)
            unassigned = np.arange(len(batch))
            assigned = np.empty(0, dtype=np.int64)
        # Sequentially place the points not covered by the pre-batch centers:
        # each may open a new center that later points in the batch must see.
        new_counts: list[int] = []
        new_from = len(self.centers)
        for i in unassigned:
            p = batch[i]
            if len(self.centers) > new_from:
                newC = _stack(self.centers[new_from:])
                d_new = self.metric.to_point(newC, p)
                within = d_new <= self.eps
                for k in np.flatnonzero(within):
                    new_counts[k] += 1
                j = int(np.argmin(d_new))
                if d_new[j] <= self.r_bar:
                    nearest[i] = new_from + j
                    continue
            self.centers.append(p)
            new_counts.append(1)  # the center sees itself
            nearest[i] = len(self.centers) - 1
            # earlier points of the stream that fall in B(e, ε) are missed
            # here by construction — pass 2 recounts exactly.
        self.counts = list(counts) + new_counts
        # M bookkeeping at batch granularity: any point whose center is
        # still non-core after this batch goes to M; buckets of centers that
        # turned core are dropped (their points inherit the center label).
        for i in np.concatenate([assigned, unassigned]).astype(np.int64):
            e = int(nearest[i])
            if self.counts[e] < self.minpts:
                self.m_points.setdefault(e, []).append(batch[int(i)])
        for e in [e for e, c in enumerate(self.counts) if c >= self.minpts]:
            self.m_points.pop(e, None)

    def finish_pass1(self) -> StreamingStats:
        return self.stats()

    def stats(self) -> StreamingStats:
        return StreamingStats(
            n_seen=self.n_seen,
            n_centers=len(self.centers),
            n_m=sum(len(v) for v in self.m_points.values()),
        )

    # ------------------------------------------------------------ pass 2
    def begin_pass2(self) -> None:
        flat_m = [p for pts in self.m_points.values() for p in pts]
        self._m_sizes = {e: len(v) for e, v in self.m_points.items()}
        self._cand_pts = _stack(list(self.centers) + flat_m)
        self._cand_counts = np.zeros(len(self._cand_pts), dtype=np.int64)

    def pass2_batch(self, batch: np.ndarray) -> None:
        """Exact ε-neighborhood counting for the candidates E ∪ M."""
        assert self._cand_counts is not None
        D = self.metric.pairwise(batch, self._cand_pts)
        self._cand_counts += (D <= self.eps).sum(axis=0)

    def finish_pass2(self) -> None:
        """Form S* from the exact counts, then merge offline (≤ (1+ρ)ε)."""
        assert self._cand_counts is not None
        n_c = len(self.centers)
        is_core = self._cand_counts >= self.minpts
        # S* = core centers ∪ core M-points (completeness argument: a core
        # point p either has a core center — p inherits c_p's label — or its
        # center is non-core, in which case p ∈ M and is promoted here).
        s_sel = np.flatnonzero(is_core)
        self.summary_pts = self._cand_pts[s_sel]
        self._summary_is_center = s_sel < n_c
        m = len(self.summary_pts)
        uf = UnionFind(m)
        thr = (1.0 + self.rho) * self.eps
        if m:
            S = self.summary_pts
            chunk = max(1, int(4_000_000 // max(1, m)))
            for lo in range(0, m, chunk):
                D = self.metric.pairwise(S[lo : lo + chunk], S)
                ii, jj = np.nonzero(D <= thr)
                for i, j in zip(ii + lo, jj):
                    if i < j:
                        uf.union(int(i), int(j))
        self.summary_labels = np.asarray(uf.component_labels(), dtype=np.int64)
        self.n_clusters = uf.n_components
        # cluster of each center that is a core center, else -1
        self._center_cluster = np.full(n_c, -1, dtype=np.int64)
        core_center_sel = s_sel[s_sel < n_c]
        self._center_cluster[core_center_sel] = self.summary_labels[
            : len(core_center_sel)
        ]

    # ------------------------------------------------------------ pass 3
    def pass3_batch(self, batch: np.ndarray) -> np.ndarray:
        """Label one batch; returns cluster ids (-1 = outlier)."""
        assert self.summary_pts is not None and self._center_cluster is not None
        labels = np.full(len(batch), -1, dtype=np.int64)
        C = _stack(self.centers)
        D = self.metric.pairwise(batch, C)
        nearest = D.argmin(axis=1)
        ncl = self._center_cluster[nearest]
        direct = ncl >= 0
        labels[direct] = ncl[direct]
        rest = np.flatnonzero(~direct)
        if len(rest) and len(self.summary_pts):
            Ds = self.metric.pairwise(batch[rest], self.summary_pts)
            j = Ds.argmin(axis=1)
            d = Ds[np.arange(len(rest)), j]
            hit = d <= (self.rho / 2.0 + 1.0) * self.eps
            labels[rest[hit]] = self.summary_labels[j[hit]]
        return labels

    # ------------------------------------------------------ convenience
    def fit_chunks(self, chunks: list[np.ndarray]) -> np.ndarray:
        """Run all three passes over an in-memory chunked stream."""
        for b in chunks:
            self.pass1_batch(b)
        self.begin_pass2()
        for b in chunks:
            self.pass2_batch(b)
        self.finish_pass2()
        return np.concatenate([self.pass3_batch(b) for b in chunks])


def stream_chunks(X: np.ndarray, chunk_size: int) -> list[np.ndarray]:
    """Split a dataset into stream-order batches."""
    return [X[lo : lo + chunk_size] for lo in range(0, len(X), chunk_size)]


# --------------------------------------------------------------------------
# Structured Streaming integration (pass 1 as a foreachBatch sink).
# --------------------------------------------------------------------------
def write_stream_dir(X: np.ndarray, labels, out_dir: str, chunk_size: int) -> None:
    """Materialize the stream as ordered parquet files for the file source."""
    import os

    import pandas as pd

    os.makedirs(out_dir, exist_ok=True)
    chunks = stream_chunks(np.arange(len(X)), chunk_size)
    for k, ids in enumerate(chunks):
        pdf = pd.DataFrame({"id": ids})
        if X.dtype == object:
            pdf["text"] = list(X[ids])
        else:
            pdf["features"] = list(np.asarray(X[ids], dtype=np.float64))
        if labels is not None:
            pdf["label"] = np.asarray(labels)[ids]
        pdf.to_parquet(os.path.join(out_dir, f"chunk-{k:05d}.parquet"))


def structured_pass1(
    spark,
    state: StreamingDBSCAN,
    stream_dir: str,
    *,
    point_col: str = "features",
    max_files_per_trigger: int = 1,
) -> StreamingStats:
    """Run pass 1 as a Structured Streaming query over a file source.

    Uses ``trigger(availableNow=True)`` so the query drains the directory and
    terminates — the deterministic harness form of a live stream. Each
    micro-batch is sorted by ``id`` before being fed to the state machine so
    a single-file trigger reproduces the sequential chunk order exactly.
    A fresh checkpoint directory is used per call — reusing one would make a
    second query resume past the files and feed the state machine nothing.
    """
    import tempfile

    first = spark.read.option("recursiveFileLookup", "false").parquet(stream_dir)
    schema = first.schema
    ckpt = tempfile.mkdtemp(prefix="repro-stream-ckpt-")

    def feed(df, _epoch):
        pdf = df.orderBy("id").toPandas()
        if len(pdf) == 0:
            return
        if point_col == "text":
            batch = np.array(list(pdf["text"]), dtype=object)
        else:
            batch = np.asarray(list(pdf[point_col]), dtype=np.float64)
        state.pass1_batch(batch)

    q = (
        spark.readStream.schema(schema)
        .option("maxFilesPerTrigger", max_files_per_trigger)
        .parquet(stream_dir)
        .writeStream.trigger(availableNow=True)
        .option("checkpointLocation", ckpt)
        .foreachBatch(feed)
        .start()
    )
    q.awaitTermination()
    return state.finish_pass1()
