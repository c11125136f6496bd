"""Synthetic clustering datasets standing in for the paper's Table 1.

Every generator returns ``(points, labels)`` where ``points`` is a numpy
container (float matrix, or object array of strings for the text sets) and
``labels`` is an int array of ground-truth cluster ids with ``-1`` marking
planted outliers/noise. All generators are deterministic in ``seed``.

Substitutions (DESIGN.md §3): the paper's real image/text/session datasets
are replaced by synthetic sets engineered to have the property the paper's
algorithms exploit — inliers on a low-doubling-dimension manifold, outliers
unconstrained (Assumption 1).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def make_moons(
    n: int = 1000, *, noise: float = 0.06, outlier_frac: float = 0.02, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """Two interleaving half-circles + uniform background noise.

    Replaces sklearn's ``make_moons`` (paper's "Moons"); no sklearn in the
    container.
    """
    g = _rng(seed)
    n_out = int(n * outlier_frac)
    n_in = n - n_out
    n0 = n_in // 2
    n1 = n_in - n0
    t0 = g.random(n0) * np.pi
    t1 = g.random(n1) * np.pi
    upper = np.c_[np.cos(t0), np.sin(t0)]
    lower = np.c_[1.0 - np.cos(t1), 0.5 - np.sin(t1)]
    X = np.vstack([upper, lower]) + g.normal(0, noise, (n_in, 2))
    y = np.r_[np.zeros(n0, int), np.ones(n1, int)]
    out = g.uniform([-2.0, -1.5], [3.0, 2.0], (n_out, 2))
    X = np.vstack([X, out])
    y = np.r_[y, -np.ones(n_out, int)]
    perm = g.permutation(n)
    return X[perm], y[perm]


def cluto_like(
    n: int = 2000, *, noise_frac: float = 0.05, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """2-d arbitrary-shape mix (blobs + ring + sine ribbon) + uniform noise.

    Plays the role of the paper's "Cluto" (t-series) shape datasets.
    """
    g = _rng(seed)
    n_noise = int(n * noise_frac)
    n_in = n - n_noise
    n_blob, n_ring = n_in // 3, n_in // 3
    n_sine = n_in - n_blob - n_ring
    blob = g.normal([2.0, 8.0], 0.5, (n_blob, 2))
    theta = g.random(n_ring) * 2 * np.pi
    ring = np.c_[6 + 2.2 * np.cos(theta), 6 + 2.2 * np.sin(theta)]
    ring += g.normal(0, 0.12, (n_ring, 2))
    xs = g.random(n_sine) * 8
    sine = np.c_[xs, 1.2 * np.sin(xs) + 1.0] + g.normal(0, 0.12, (n_sine, 2))
    noise = g.uniform([-1, -2], [11, 12], (n_noise, 2))
    X = np.vstack([blob, ring, sine, noise])
    y = np.r_[
        np.zeros(n_blob, int),
        np.ones(n_ring, int),
        2 * np.ones(n_sine, int),
        -np.ones(n_noise, int),
    ]
    perm = g.permutation(n)
    return X[perm], y[perm]


def make_blobs(
    n: int = 1000,
    *,
    k: int = 3,
    d: int = 2,
    std: float = 1.0,
    center_box: float = 20.0,
    outlier_frac: float = 0.0,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Isotropic Gaussian blobs with optional uniform outliers."""
    g = _rng(seed)
    n_out = int(n * outlier_frac)
    n_in = n - n_out
    centers = g.uniform(-center_box, center_box, (k, d))
    y_in = g.integers(0, k, n_in)
    X_in = centers[y_in] + g.normal(0, std, (n_in, d))
    lo, hi = -1.5 * center_box, 1.5 * center_box
    X_out = g.uniform(lo, hi, (n_out, d))
    X = np.vstack([X_in, X_out])
    y = np.r_[y_in, -np.ones(n_out, int)]
    perm = g.permutation(n)
    return X[perm], y[perm]


def highdim_embedded(
    n: int = 2000,
    *,
    k: int = 5,
    intrinsic_d: int = 8,
    ambient_d: int = 784,
    std: float = 1.0,
    center_box: float = 25.0,
    outlier_frac: float = 0.01,
    box: float = 255.0,
    shapes: str = "blobs",
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Low-doubling-dimension inliers embedded in a high ambient dimension.

    Clusters are sampled in ``intrinsic_d`` dimensions, rotated into
    ``ambient_d`` by a random orthonormal frame and shifted into the positive
    orthant ``[0, box]^ambient_d``; outliers are uniform over the full ambient
    box (so their intrinsic dimension is the ambient one — the adversarial
    regime of Assumption 1). Stands in for MNIST / Fashion / USPS / CIFAR /
    PCAM / LSUN-class image sets.

    ``shapes="blobs"``: isotropic Gaussians. ``shapes="mixed"``: every other
    cluster is a non-convex manifold (ring or arc drawn in two intrinsic
    dims, Gaussian in the rest) — mimicking the arbitrary-shape structure of
    real image classes that defeats centroid methods in the paper's Table 3.
    """
    g = _rng(seed)
    n_out = int(round(n * outlier_frac))
    n_in = n - n_out
    centers = g.uniform(-center_box, center_box, (k, intrinsic_d))
    y_in = g.integers(0, k, n_in)
    Z = centers[y_in] + g.normal(0, std, (n_in, intrinsic_d))
    if shapes == "mixed":
        ring_r = 0.35 * center_box
        for c in range(0, k, 2):  # every other cluster becomes a ring/arc
            sel = np.flatnonzero(y_in == c)
            theta = g.random(len(sel)) * (2 * np.pi if c % 4 == 0 else np.pi)
            Z[sel, 0] = centers[c, 0] + ring_r * np.cos(theta)
            Z[sel, 1] = centers[c, 1] + ring_r * np.sin(theta)
            Z[sel, :2] += g.normal(0, std * 0.5, (len(sel), 2))
    elif shapes != "blobs":
        raise ValueError(f"unknown shapes mode: {shapes!r}")
    frame, _ = np.linalg.qr(g.normal(size=(ambient_d, intrinsic_d)))
    X_in = Z @ frame.T * (box / (4 * center_box)) + box / 2.0
    X_out = g.uniform(0, box, (n_out, ambient_d))
    X = np.vstack([X_in, X_out])
    y = np.r_[y_in, -np.ones(n_out, int)]
    perm = g.permutation(n)
    return X[perm], y[perm]


def noisy_duplicate(
    X: np.ndarray,
    y: np.ndarray,
    *,
    times: int = 10,
    perturb: float = 5.0,
    noise_frac: float = 0.01,
    box: float = 255.0,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """The paper's own "_noisy" recipe (§5.4): duplicate each point ``times``
    with U[-perturb, perturb] jitter per dimension, then add ``noise_frac``
    uniform points over ``[0, box]^d`` labeled -1."""
    g = _rng(seed)
    n, d = X.shape
    Xd = np.repeat(X, times, axis=0) + g.uniform(-perturb, perturb, (n * times, d))
    yd = np.repeat(y, times)
    n_noise = int(n * times * noise_frac)
    X_all = np.vstack([Xd, g.uniform(0, box, (n_noise, d))])
    y_all = np.r_[yd, -np.ones(n_noise, int)]
    perm = g.permutation(len(y_all))
    return X_all[perm], y_all[perm]


_ALPHABET = np.array(list("abcdefghij"))


def text_clusters(
    n: int = 400,
    *,
    k: int = 4,
    proto_len: int = 24,
    max_edits: int = 3,
    outlier_frac: float = 0.03,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Edit-distance clusters: members are prototypes with ≤ ``max_edits``
    random single-character edits; outliers are fresh random strings.

    Stands in for the paper's AG News / COLA / MNLI / MRPC text sets — it
    exercises the abstract-metric (non-Euclidean) code path with controllable
    cluster structure.
    """
    g = _rng(seed)

    def rand_str(length: int) -> str:
        return "".join(g.choice(_ALPHABET, length))

    protos = [rand_str(proto_len) for _ in range(k)]
    n_out = int(n * outlier_frac)
    n_in = n - n_out
    pts: list[str] = []
    labels: list[int] = []
    for _ in range(n_in):
        c = int(g.integers(0, k))
        s = list(protos[c])
        for _ in range(int(g.integers(0, max_edits + 1))):
            op = g.integers(0, 3)
            pos = int(g.integers(0, len(s)))
            ch = str(g.choice(_ALPHABET))
            if op == 0:
                s[pos] = ch
            elif op == 1:
                s.insert(pos, ch)
            elif len(s) > 1:
                del s[pos]
        pts.append("".join(s))
        labels.append(c)
    for _ in range(n_out):
        pts.append(rand_str(int(g.integers(proto_len // 2, proto_len * 2))))
        labels.append(-1)
    perm = g.permutation(n)
    return np.array(pts, dtype=object)[perm], np.asarray(labels)[perm]


def session_stream(
    n: int = 20000,
    *,
    k: int = 6,
    d: int = 21,
    drift: float = 3.0,
    std: float = 0.6,
    outlier_frac: float = 0.01,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Drifting 21-d Gaussian-mixture stream in time order (NOT shuffled).

    Stands in for Spotify_Session: cluster centers drift linearly over the
    stream, so earlier prefixes (the paper's 1%/10%/50% splits) see different
    geometry than the full set.
    """
    g = _rng(seed)
    centers0 = g.uniform(-10, 10, (k, d))
    direction = g.normal(size=(k, d))
    direction /= np.linalg.norm(direction, axis=1, keepdims=True)
    t = np.linspace(0.0, 1.0, n)[:, None]
    y = g.integers(0, k, n)
    X = centers0[y] + drift * t * direction[y] + g.normal(0, std, (n, d))
    n_out = int(n * outlier_frac)
    out_pos = g.choice(n, n_out, replace=False)
    X[out_pos] = g.uniform(-20, 20, (n_out, d))
    y[out_pos] = -1
    return X, y


def to_spark(
    spark: SparkSession, X: np.ndarray, y: np.ndarray | None = None
) -> DataFrame:
    """Points → DataFrame ``(id, features|text [, label])`` for the Spark paths."""
    cols: dict = {"id": np.arange(len(X))}
    if X.dtype == object:
        cols["text"] = list(X)
    else:
        cols["features"] = list(np.asarray(X, dtype=np.float64))
    if y is not None:
        cols["label"] = np.asarray(y, dtype=np.int64)
    return spark.createDataFrame(pd.DataFrame(cols))
