"""Harnesses that regenerate the paper's evaluation tables.

Each ``table*`` function returns a list of row dicts (and pretty-prints them)
so the same code backs the ``jobs/`` entrypoints, the ``benchmarks/``
pytest-benchmark wrappers, and the numbers recorded in ``EXPERIMENTS.md``.

Timing comparisons run every algorithm on the same substrate (driver-side
numpy kernels) so ratios reflect algorithmic work rather than JVM↔Python
overhead; the Spark dataflows are exercised separately (tests +
``jobs/run_*.py``).
"""
from __future__ import annotations

import time
from typing import Sequence

import numpy as np

from repro.baselines.bico import bico_cluster
from repro.baselines.brute import brute_dbscan
from repro.baselines.dbscanpp import dbscan_pp
from repro.baselines.densitypeak import density_peak
from repro.baselines.dpmeans import dp_means
from repro.baselines.dyw import dyw_dbscan
from repro.baselines.gantao import GridBlowupError, gan_tao_dbscan
from repro.baselines.meanshift import mean_shift
from repro.baselines.stream_baselines import DBStream, DStream, EvoStream
from repro.core.approx import approx_dbscan
from repro.core.exact import exact_dbscan
from repro.core.gonzalez import radius_guided_gonzalez
from repro.core.streaming import StreamingDBSCAN, stream_chunks
from repro.data.clustergen import noisy_duplicate
from repro.experiments.datasets import SPECS, Spec
from repro.metrics.quality import adjusted_mutual_info, adjusted_rand_index

RHO = 0.5  # the paper's headline approximation parameter


def _fmt(v) -> str:
    if isinstance(v, float):
        return f"{v:.2f}" if abs(v) >= 0.01 else "-"
    return str(v)


def print_rows(rows: list[dict], title: str) -> None:
    if not rows:
        return
    cols = list(rows[0].keys())
    widths = {c: max(len(c), *(len(_fmt(r[c])) for r in rows)) for c in cols}
    print(f"\n== {title} ==")
    print("  ".join(c.ljust(widths[c]) for c in cols))
    for r in rows:
        print("  ".join(_fmt(r[c]).ljust(widths[c]) for c in cols))


# ---------------------------------------------------------------- Table 2
def table2_gonzalez_share(
    names: Sequence[str] | None = None, scale: float = 1.0
) -> list[dict]:
    """Runtime share of Algorithm 1 inside our exact DBSCAN (paper Table 2)."""
    names = names or [
        "moons", "cancer_like", "usps_like", "biodeg_like", "mnist_like",
        "fashion_like", "arrhythmia_like", "cifar_like", "cola_like",
        "agnews_like", "mrpc_like",
    ]
    rows = []
    for name in names:
        spec = SPECS[name]
        X, _ = spec.load(scale)
        t0 = time.perf_counter()
        g = radius_guided_gonzalez(X, spec.metric, spec.eps / 2.0)
        t_gonz = time.perf_counter() - t0
        t1 = time.perf_counter()
        exact_dbscan(X, spec.metric, spec.eps, spec.minpts, gonzalez=g)
        t_rest = time.perf_counter() - t1
        total = t_gonz + t_rest
        rows.append(
            {
                "dataset": name,
                "paper_dataset": spec.paper_name,
                "n": len(X),
                "gonzalez_ms": round(t_gonz * 1e3, 1),
                "total_ms": round(total * 1e3, 1),
                "proportion_pct": round(100 * t_gonz / total, 1),
            }
        )
    print_rows(rows, "Table 2 — Radius-guided Gonzalez share of exact DBSCAN")
    return rows


# ---------------------------------------------------------------- Table 3
def _scores(labels, y) -> tuple[float, float]:
    return adjusted_rand_index(labels, y), adjusted_mutual_info(labels, y)


def table3_quality(
    names: Sequence[str] | None = None,
    scale: float = 1.0,
    *,
    densitypeak_max_n: int = 20_000,
) -> list[dict]:
    """ARI/AMI of exact & 0.5-approx DBSCAN vs the non-DBSCAN baselines."""
    names = names or [
        "moons", "cluto_like", "mnist_like", "mnist_noisy",
        "fashion_like", "fashion_noisy", "pcam_like", "lsun_like",
    ]
    rows = []
    for name in names:
        if name.endswith("_noisy"):
            base = SPECS[name.replace("_noisy", "_like")]
            X, y = noisy_duplicate(
                *base.load(scale * 0.2), times=5, perturb=0.6, noise_frac=0.01,
                box=255.0, seed=0
            )
            spec = base
        else:
            spec = SPECS[name]
            X, y = spec.load(scale)
        eps, minpts = spec.eps, spec.minpts
        row: dict = {"dataset": name, "n": len(X)}
        ex = exact_dbscan(X, spec.metric, eps, minpts)
        row["exact_ARI"], row["exact_AMI"] = _scores(ex.labels, y)
        ap = approx_dbscan(X, spec.metric, eps, minpts, RHO)
        row["approx_ARI"], row["approx_AMI"] = _scores(ap.labels, y)
        row["dpmeans_ARI"], row["dpmeans_AMI"] = _scores(dp_means(X), y)
        row["bico_ARI"], row["bico_AMI"] = _scores(bico_cluster(X, spec.k), y)
        try:
            dp = density_peak(
                X, spec.metric, d_c=eps, n_peaks=spec.k, max_n=densitypeak_max_n
            )
            row["dpeak_ARI"], row["dpeak_AMI"] = _scores(dp, y)
        except MemoryError:
            row["dpeak_ARI"] = row["dpeak_AMI"] = float("nan")  # paper's "*"
        row["mshift_ARI"], row["mshift_AMI"] = _scores(
            mean_shift(X, bandwidth=3 * eps), y
        )
        rows.append(row)
    print_rows(rows, "Table 3 — quality vs non-DBSCAN baselines (ARI/AMI)")
    return rows


# ---------------------------------------------------------------- Table 4
def table4_streaming(
    names: Sequence[str] | None = None, scale: float = 1.0, chunk: int = 1024
) -> list[dict]:
    """Streaming Algorithm 3 vs DBStream / D-Stream / evoStream / BICO."""
    names = names or [
        "moons", "cancer_like", "arrhythmia_like", "biodeg_like",
        "mnist_like", "cifar_like", "fashion_like", "usps_like",
        "pcam_like", "lsun_like",
        "session_1pct", "session_10pct", "session_50pct", "session_100pct",
    ]
    rows = []
    for name in names:
        if name.startswith("session_"):
            spec = SPECS["session_stream"]
            frac = {"1pct": 0.01, "10pct": 0.1, "50pct": 0.5, "100pct": 1.0}[
                name.split("_")[1]
            ]
            Xf, yf = spec.load(scale)
            n = max(60, int(len(Xf) * frac))
            X, y = Xf[:n], yf[:n]  # earliest prefix, like the paper's splits
        else:
            spec = SPECS[name]
            X, y = spec.load(scale)
        row: dict = {"dataset": name, "n": len(X)}
        chunks = stream_chunks(X, chunk)

        ours = StreamingDBSCAN(spec.metric, spec.eps, spec.minpts, RHO)
        labels = ours.fit_chunks(chunks)
        row["ours_ARI"], row["ours_AMI"] = _scores(labels, y)
        row["mem_ratio"] = round(ours.stats().memory_ratio, 4)

        if spec.metric.name == "euclidean":
            r = spec.stream_radius
            db = DBStream(r)
            for b in chunks:
                db.insert(b)
            row["dbstream_ARI"], row["dbstream_AMI"] = _scores(db.predict(X), y)
            ds = DStream(cell_size=2 * r / np.sqrt(max(1, X.shape[1])) * 4)
            for b in chunks:
                ds.insert(b)
            row["dstream_ARI"], row["dstream_AMI"] = _scores(ds.predict(X), y)
            ev = EvoStream(r, spec.k, seed=0)
            for b in chunks:
                ev.insert(b)
            row["evo_ARI"], row["evo_AMI"] = _scores(ev.predict(X), y)
            row["bico_ARI"], row["bico_AMI"] = _scores(
                bico_cluster(X, spec.k, chunk=chunk), y
            )
        else:  # Euclidean-only baselines cannot run on edit distance
            for c in ("dbstream", "dstream", "evo", "bico"):
                row[f"{c}_ARI"] = row[f"{c}_AMI"] = float("nan")
        rows.append(row)
    print_rows(rows, "Table 4 — streaming quality (ARI/AMI)")
    return rows


# ------------------------------------------------------------ Fig 3 (shape)
def fig3_runtime(
    names: Sequence[str] | None = None,
    scale: float = 1.0,
    *,
    include_brute: bool = True,
) -> list[dict]:
    """Same-substrate runtime comparison: ours vs the DBSCAN baselines."""
    names = names or ["moons", "mnist_like", "cola_like"]
    rows = []
    for name in names:
        spec = SPECS[name]
        X, _ = spec.load(scale)
        eps, minpts = spec.eps, spec.minpts
        row: dict = {"dataset": name, "n": len(X)}

        def clock(fn) -> float:
            t0 = time.perf_counter()
            fn()
            return round((time.perf_counter() - t0) * 1e3, 1)

        row["our_exact_ms"] = clock(
            lambda: exact_dbscan(X, spec.metric, eps, minpts)
        )
        row["our_approx_ms"] = clock(
            lambda: approx_dbscan(X, spec.metric, eps, minpts, RHO)
        )
        if include_brute:
            row["dbscan_ms"] = clock(
                lambda: brute_dbscan(X, spec.metric, eps, minpts)
            )
            row["dbscanpp_ms"] = clock(
                lambda: dbscan_pp(X, spec.metric, eps, minpts)
            )
            row["dyw_ms"] = clock(lambda: dyw_dbscan(X, spec.metric, eps, minpts))
            if spec.metric.name == "euclidean" and X.shape[1] <= 3:
                row["gt_exact_ms"] = clock(lambda: gan_tao_dbscan(X, eps, minpts))
                row["gt_approx_ms"] = clock(
                    lambda: gan_tao_dbscan(X, eps, minpts, rho=RHO)
                )
            else:
                row["gt_exact_ms"] = row["gt_approx_ms"] = float("nan")  # DNF
        rows.append(row)
    print_rows(rows, "Figure 3 (shape) — runtime, same substrate, ms")
    return rows


# ------------------------------------------------------------ Fig 6 (shape)
def fig6_memory(
    names: Sequence[str] | None = None,
    scale: float = 1.0,
    rhos: Sequence[float] = (0.5, 1.0, 2.0),
    chunk: int = 1024,
) -> list[dict]:
    """Streaming memory ratio (|E|+|M|)/n for ρ ∈ {0.5, 1, 2}."""
    names = names or ["moons", "mnist_like", "fashion_like", "usps_like"]
    rows = []
    for name in names:
        spec = SPECS[name]
        X, _ = spec.load(scale)
        row: dict = {"dataset": name, "n": len(X)}
        for rho in rhos:
            s = StreamingDBSCAN(spec.metric, spec.eps, spec.minpts, rho)
            for b in stream_chunks(X, chunk):
                s.pass1_batch(b)
            row[f"ratio_rho={rho}"] = round(s.stats().memory_ratio, 4)
        rows.append(row)
    print_rows(rows, "Figure 6 (shape) — streaming memory ratio (|E|+|M|)/n")
    return rows
