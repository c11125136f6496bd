"""Distributed exact / approximate metric DBSCAN as Spark DataFrame dataflows.

The ε/2-net from Algorithm 1 induces a natural partitioning: every per-cell
task (core counting, BCP merging, border labeling) touches only the cell and
its ``A_e`` neighbor cells. This module expresses the paper's Steps 1–3 as
group-wise dataflows:

- points live in a DataFrame ``(id, cell, features|text)``;
- the tiny driver-side ``(cell, nbr)`` edge table (``Σ|A_e|`` rows) is joined
  in to replicate each point to the cells it is a *candidate* for;
- ``applyInPandas`` per target cell runs the **same numpy kernels** as the
  driver implementation (``repro.core.kernels``), so the two paths cannot
  drift — tests assert bit-identical results;
- the cell-merge edge list (Step 2) is ``O(Σ|A_e|)`` small, so it is
  collected and union-found on the driver, mirroring the paper's "merge
  offline" structure.

The approximate variant reuses the distributed core labeling to build the
summary ``S*``, merges it on the driver (``|S*|`` is small — Lemma 9), and
labels all points with one broadcast-summary ``applyInPandas`` pass.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core import kernels
from repro.core.approx import ApproxResult, merge_summary
from repro.core.exact import DBSCANResult
from repro.core.gonzalez import (
    GonzalezResult,
    radius_guided_gonzalez,
    radius_guided_gonzalez_spark,
)
from repro.metrics.space import Metric
from repro.util.unionfind import UnionFind


def _points_pdf(X: np.ndarray, assign: np.ndarray) -> pd.DataFrame:
    pdf = pd.DataFrame({"id": np.arange(len(X)), "cell": assign.astype(np.int64)})
    if X.dtype == object:
        pdf["text"] = list(X)
    else:
        pdf["features"] = list(np.asarray(X, dtype=np.float64))
    return pdf


def _unpack(pdf: pd.DataFrame) -> np.ndarray:
    if "text" in pdf.columns:
        return np.array(list(pdf["text"]), dtype=object)
    return np.asarray(list(pdf["features"]), dtype=np.float64)


def _pairs_pdf(neighbors: list[np.ndarray]) -> pd.DataFrame:
    tgt, nbr = [], []
    for e, ns in enumerate(neighbors):
        for e2 in ns:
            tgt.append(e)
            nbr.append(int(e2))
    return pd.DataFrame({"tgt": np.asarray(tgt, np.int64), "nbr": np.asarray(nbr, np.int64)})


def _core_flags_spark(
    spark: SparkSession,
    points_df,
    pairs_df,
    metric: Metric,
    eps: float,
    minpts: int,
) -> np.ndarray:
    """Distributed Step 1: per-cell ε-neighbor counting via applyInPandas."""
    joined = points_df.join(pairs_df, points_df.cell == pairs_df.nbr).drop("nbr")

    def kernel(key, pdf: pd.DataFrame) -> pd.DataFrame:
        (tgt,) = key
        own_mask = (pdf["cell"] == tgt).to_numpy()
        own = pdf[own_mask]
        if len(own) == 0:
            return pd.DataFrame({"id": [], "is_core": []}).astype(
                {"id": np.int64, "is_core": bool}
            )
        if own_mask.sum() >= minpts:  # dense cell: diameter ≤ 2r̄ ≤ ε
            flags = np.ones(len(own), dtype=bool)
        else:
            counts = kernels.count_within(
                _unpack(own), _unpack(pdf), metric, eps
            )
            flags = counts >= minpts
        return pd.DataFrame({"id": own["id"].to_numpy(), "is_core": flags})

    rows = (
        joined.groupBy("tgt")
        .applyInPandas(kernel, schema="id long, is_core boolean")
        .collect()
    )
    n = points_df.count()
    is_core = np.zeros(n, dtype=bool)
    for r in rows:
        is_core[r.id] = r.is_core
    return is_core


def exact_dbscan_spark(
    spark: SparkSession,
    X: np.ndarray,
    metric: Metric,
    eps: float,
    minpts: int,
    *,
    gonzalez: GonzalezResult | None = None,
    distributed_gonzalez: bool = False,
) -> DBSCANResult:
    """Exact metric DBSCAN with Steps 1–3 as Spark group-wise dataflows."""
    if gonzalez is None:
        if distributed_gonzalez:
            gonzalez = radius_guided_gonzalez_spark(spark, X, metric, eps / 2.0)
        else:
            gonzalez = radius_guided_gonzalez(X, metric, eps / 2.0)
    if gonzalez.r_bar > eps / 2.0 + 1e-12:
        raise ValueError("need r̄ ≤ ε/2")
    neighbors = gonzalez.neighbor_sets(2.0 * gonzalez.r_bar + eps)
    points_df = spark.createDataFrame(_points_pdf(X, gonzalez.assign)).cache()
    pairs_df = spark.createDataFrame(_pairs_pdf(neighbors))

    # ---- Step 1: core flags -------------------------------------------
    is_core = _core_flags_spark(spark, points_df, pairs_df, metric, eps, minpts)

    # ---- Step 2: BCP merge between neighbor cells ---------------------
    cells = gonzalez.cover_sets()
    has_core = np.array([bool(is_core[m].any()) for m in cells])
    pair_rows = []
    for e in range(gonzalez.n_centers):
        if not has_core[e]:
            continue
        for e2 in neighbors[e]:
            if e2 > e and has_core[e2]:
                pair_rows.append((len(pair_rows), e, int(e2)))
    if pair_rows:
        pair_pdf = pd.DataFrame(
            [(pid, c) for pid, a, b in pair_rows for c in (a, b)],
            columns=["pair_id", "cell"],
        )
        core_pdf = _points_pdf(X[is_core], gonzalez.assign[is_core])
        core_pdf["id"] = np.flatnonzero(is_core)
        core_df = spark.createDataFrame(core_pdf)
        pair_df = spark.createDataFrame(pair_pdf)
        grouped = core_df.join(pair_df, "cell")

        pair_cells = {pid: (a, b) for pid, a, b in pair_rows}

        def bcp_kernel(key, pdf: pd.DataFrame) -> pd.DataFrame:
            (pid,) = key
            a_cell, _ = pair_cells[pid]
            mask = (pdf["cell"] == a_cell).to_numpy()
            A, B = _unpack(pdf[mask]), _unpack(pdf[~mask])
            linked = kernels.bcp_leq(A, B, metric, eps)
            return pd.DataFrame({"pair_id": [pid], "linked": [bool(linked)]})

        edges = (
            grouped.groupBy("pair_id")
            .applyInPandas(bcp_kernel, schema="pair_id long, linked boolean")
            .collect()
        )
        linked_pairs = {r.pair_id for r in edges if r.linked}
    else:
        linked_pairs = set()
    uf = UnionFind(gonzalez.n_centers)
    for pid, a, b in pair_rows:
        if pid in linked_pairs:
            uf.union(a, b)
    cell_cluster = np.full(gonzalez.n_centers, -1, dtype=np.int64)
    roots: dict[int, int] = {}
    for e in range(gonzalez.n_centers):
        if has_core[e]:
            r = uf.find(e)
            if r not in roots:
                roots[r] = len(roots)
            cell_cluster[e] = roots[r]

    labels = np.full(len(X), -1, dtype=np.int64)
    for e, members in enumerate(cells):
        cm = members[is_core[members]]
        labels[cm] = cell_cluster[e]

    # ---- Step 3: borders ----------------------------------------------
    flag_df = spark.createDataFrame(
        pd.DataFrame({"id": np.arange(len(X)), "is_core": is_core})
    )
    cl_df = spark.createDataFrame(
        pd.DataFrame(
            {"cell": np.arange(gonzalez.n_centers), "cl": cell_cluster}
        )
    )
    pts2 = points_df.join(flag_df, "id").join(cl_df, "cell")
    joined3 = pts2.join(pairs_df, pts2.cell == pairs_df.nbr).drop("nbr")

    def border_kernel(key, pdf: pd.DataFrame) -> pd.DataFrame:
        (tgt,) = key
        own = pdf[(pdf["cell"] == tgt).to_numpy() & ~pdf["is_core"].to_numpy()]
        cand = pdf[pdf["is_core"].to_numpy()]
        empty = pd.DataFrame({"id": [], "label": []}).astype(
            {"id": np.int64, "label": np.int64}
        )
        if len(own) == 0 or len(cand) == 0:
            return empty
        d, j = kernels.nearest_in(_unpack(own), _unpack(cand), metric)
        hit = d <= eps
        return pd.DataFrame(
            {
                "id": own["id"].to_numpy()[hit],
                "label": cand["cl"].to_numpy()[j[hit]],
            }
        )

    for r in (
        joined3.groupBy("tgt")
        .applyInPandas(border_kernel, schema="id long, label long")
        .collect()
    ):
        labels[r.id] = r.label
    points_df.unpersist()
    return DBSCANResult(labels=labels, is_core=is_core, n_clusters=len(roots))


def approx_dbscan_spark(
    spark: SparkSession,
    X: np.ndarray,
    metric: Metric,
    eps: float,
    minpts: int,
    rho: float,
    *,
    gonzalez: GonzalezResult | None = None,
    distributed_gonzalez: bool = False,
) -> ApproxResult:
    """Algorithm 2 with distributed summary construction + labeling pass."""
    r_bar = rho * eps / 2.0
    if gonzalez is None:
        if distributed_gonzalez:
            gonzalez = radius_guided_gonzalez_spark(
                spark, X, metric, r_bar, eps=eps
            )
        else:
            gonzalez = radius_guided_gonzalez(X, metric, r_bar, eps=eps)
    assert gonzalez.center_counts is not None
    neighbors = gonzalez.neighbor_sets(4.0 * gonzalez.r_bar + eps)
    center_is_core = gonzalez.center_counts >= minpts
    points_df = spark.createDataFrame(_points_pdf(X, gonzalez.assign)).cache()

    # ---- distributed S* construction: core flags only needed in sparse
    # cells whose center is non-core (Algorithm 2 line 6).
    sparse_cells = set(np.flatnonzero(~center_is_core).tolist())
    sparse_pairs = _pairs_pdf(
        [
            neighbors[e] if e in sparse_cells else np.empty(0, int)
            for e in range(gonzalez.n_centers)
        ]
    )
    is_core = np.zeros(len(X), dtype=bool)
    if len(sparse_pairs):
        is_core = _core_flags_spark(
            spark,
            points_df,
            spark.createDataFrame(sparse_pairs),
            metric,
            eps,
            minpts,
        )
    # Assemble S* in the driver algorithm's cell order so cluster numbering
    # (and hence the labels array) matches repro.core.approx bit-for-bit.
    cells = gonzalez.cover_sets()
    summary_parts = []
    for e in range(gonzalez.n_centers):
        if center_is_core[e]:
            summary_parts.append(gonzalez.centers_idx[e : e + 1])
        else:
            members = cells[e]
            summary_parts.append(members[is_core[members]])
    summary_idx = (
        np.concatenate(summary_parts).astype(np.int64)
        if summary_parts
        else np.empty(0, dtype=np.int64)
    )

    # ---- merge S* on the driver (|S*| = O((Δ/ρε)^D + z), Lemma 9) -----
    s_labels, n_clusters = merge_summary(
        X, metric, summary_idx, gonzalez.assign, eps, rho, neighbors
    )

    # ---- broadcast-summary labeling pass ------------------------------
    s_cell = gonzalez.assign[summary_idx]
    center_cluster = np.full(gonzalez.n_centers, -1, dtype=np.int64)
    centers_idx_set = {int(c): e for e, c in enumerate(gonzalez.centers_idx)}
    for si, gi in enumerate(summary_idx):
        e = centers_idx_set.get(int(gi))
        if e is not None and center_is_core[e]:
            center_cluster[e] = s_labels[si]
    nbr_map = {e: set(map(int, ns)) for e, ns in enumerate(neighbors)}
    S_pts = X[summary_idx]
    thr = (rho / 2.0 + 1.0) * eps
    s_label_by_gid = dict(zip(map(int, summary_idx), map(int, s_labels)))

    def label_kernel(key, pdf: pd.DataFrame) -> pd.DataFrame:
        (cell,) = key
        ids = pdf["id"].to_numpy()
        out = np.full(len(pdf), -1, dtype=np.int64)
        in_s = np.array([int(i) in s_label_by_gid for i in ids])
        out[in_s] = [s_label_by_gid[int(i)] for i in ids[in_s]]
        rest = ~in_s
        if rest.any():
            if center_cluster[cell] >= 0:
                out[rest] = center_cluster[cell]
            else:
                cand = np.flatnonzero(
                    np.isin(s_cell, list(nbr_map.get(int(cell), ())))
                )
                if len(cand):
                    d, j = kernels.nearest_in(
                        _unpack(pdf[rest]), S_pts[cand], metric
                    )
                    hit = d <= thr
                    sel = np.flatnonzero(rest)[hit]
                    out[sel] = s_labels[cand[j[hit]]]
        return pd.DataFrame({"id": ids, "label": out})

    labels = np.full(len(X), -1, dtype=np.int64)
    for r in (
        points_df.groupBy("cell")
        .applyInPandas(label_kernel, schema="id long, label long")
        .collect()
    ):
        labels[r.id] = r.label
    points_df.unpersist()
    return ApproxResult(
        labels=labels,
        summary_idx=summary_idx,
        summary_labels=s_labels,
        n_clusters=n_clusters,
        gonzalez=gonzalez,
    )
