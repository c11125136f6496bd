"""Dataset registry for the evaluation tables.

Each spec is a laptop-scale synthetic stand-in for one of the paper's Table-1
datasets (the substitution rationale is in DESIGN.md §3), bundled with the
tuned DBSCAN parameters used across Tables 2–4 and the Figure-3/6 benches.
``scale`` multiplies the default n so tests (scale≈0.2) and benchmarks
(scale=1) share one registry.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable

import numpy as np

from repro.data import clustergen as cg
from repro.metrics.space import EditDistanceMetric, EuclideanMetric, Metric


@dataclass
class Spec:
    name: str  # our dataset name
    paper_name: str  # the Table-1 dataset it stands in for
    make: Callable[[float], tuple[np.ndarray, np.ndarray]]  # scale -> (X, y)
    metric: Metric
    eps: float
    minpts: int = 10
    k: int = 3  # planted cluster count, for k-requiring baselines
    stream_radius: float = 0.0  # micro-cluster radius for Table-4 baselines

    def load(self, scale: float = 1.0) -> tuple[np.ndarray, np.ndarray]:
        return self.make(scale)


_EUC = EuclideanMetric()
_EDIT = EditDistanceMetric()


def _n(base: int, scale: float) -> int:
    return max(60, int(base * scale))


SPECS: dict[str, Spec] = {}


def _reg(spec: Spec) -> Spec:
    SPECS[spec.name] = spec
    return spec


MOONS = _reg(
    Spec(
        "moons",
        "Moons",
        lambda s: cg.make_moons(_n(4000, s), outlier_frac=0.02, seed=0),
        _EUC,
        eps=0.12,
        minpts=10,
        k=2,
        stream_radius=0.12,
    )
)
CLUTO = _reg(
    Spec(
        "cluto_like",
        "Cluto",
        lambda s: cg.cluto_like(_n(4000, s), seed=0),
        _EUC,
        eps=0.35,
        minpts=10,
        k=3,
        stream_radius=0.35,
    )
)
CANCER = _reg(
    Spec(
        "cancer_like",
        "Cancer (569x32)",
        lambda s: cg.make_blobs(
            _n(600, s), k=2, d=32, std=1.0, center_box=12, outlier_frac=0.02, seed=1
        ),
        _EUC,
        eps=9.0,
        minpts=10,
        k=2,
        stream_radius=9.0,
    )
)
ARRHYTHMIA = _reg(
    Spec(
        "arrhythmia_like",
        "Arrhythmia (452x262)",
        lambda s: cg.highdim_embedded(
            _n(500, s), k=2, intrinsic_d=6, ambient_d=262, outlier_frac=0.03, seed=2
        ),
        _EUC,
        eps=40.0,
        minpts=10,
        k=2,
        stream_radius=40.0,
    )
)
BIODEG = _reg(
    Spec(
        "biodeg_like",
        "Biodeg (1055x41)",
        lambda s: cg.make_blobs(
            _n(1100, s), k=2, d=41, std=1.0, center_box=10, outlier_frac=0.03, seed=3
        ),
        _EUC,
        eps=10.0,
        minpts=10,
        k=2,
        stream_radius=10.0,
    )
)
MNIST = _reg(
    Spec(
        "mnist_like",
        "MNIST (784-d)",
        lambda s: cg.highdim_embedded(
            _n(3000, s), k=5, intrinsic_d=8, ambient_d=784, outlier_frac=0.01,
            shapes="mixed", seed=4
        ),
        _EUC,
        eps=30.0,
        minpts=10,
        k=5,
        stream_radius=16.0,
    )
)
FASHION = _reg(
    Spec(
        "fashion_like",
        "Fashion MNIST (784-d)",
        lambda s: cg.highdim_embedded(
            _n(3000, s), k=5, intrinsic_d=8, ambient_d=784, outlier_frac=0.01,
            shapes="mixed", seed=5
        ),
        _EUC,
        eps=30.0,
        minpts=10,
        k=5,
        stream_radius=16.0,
    )
)
USPS = _reg(
    Spec(
        "usps_like",
        "USPS HW (256-d)",
        lambda s: cg.highdim_embedded(
            _n(2500, s), k=5, intrinsic_d=8, ambient_d=256, outlier_frac=0.01, seed=6
        ),
        _EUC,
        eps=20.0,
        minpts=10,
        k=5,
        stream_radius=12.0,
    )
)
CIFAR = _reg(
    Spec(
        "cifar_like",
        "CIFAR 10 (3072-d)",
        lambda s: cg.highdim_embedded(
            _n(1500, s), k=5, intrinsic_d=10, ambient_d=3072, outlier_frac=0.01, seed=7
        ),
        _EUC,
        eps=50.0,
        minpts=10,
        k=5,
        stream_radius=25.0,
    )
)
PCAM = _reg(
    Spec(
        "pcam_like",
        "PCAM (1024-d)",
        lambda s: cg.highdim_embedded(
            _n(2500, s), k=4, intrinsic_d=12, ambient_d=1024, std=1.6,
            outlier_frac=0.02, shapes="mixed", seed=8
        ),
        _EUC,
        eps=50.0,
        minpts=10,
        k=4,
        stream_radius=35.0,
    )
)
LSUN = _reg(
    Spec(
        "lsun_like",
        "LSUN (1024-d)",
        lambda s: cg.highdim_embedded(
            _n(2500, s), k=6, intrinsic_d=12, ambient_d=1024, std=1.6,
            outlier_frac=0.02, shapes="mixed", seed=9
        ),
        _EUC,
        eps=50.0,
        minpts=10,
        k=6,
        stream_radius=35.0,
    )
)
COLA = _reg(
    Spec(
        "cola_like",
        "COLA (text, edit distance)",
        lambda s: cg.text_clusters(_n(250, s), k=4, seed=10),
        _EDIT,
        eps=4.0,
        minpts=5,
        k=4,
        stream_radius=4.0,
    )
)
AGNEWS = _reg(
    Spec(
        "agnews_like",
        "AG News (text, edit distance)",
        lambda s: cg.text_clusters(_n(350, s), k=4, proto_len=30, seed=11),
        _EDIT,
        eps=5.0,
        minpts=5,
        k=4,
        stream_radius=5.0,
    )
)
MRPC = _reg(
    Spec(
        "mrpc_like",
        "MRPC (text, edit distance)",
        lambda s: cg.text_clusters(_n(250, s), k=3, proto_len=26, seed=12),
        _EDIT,
        eps=4.0,
        minpts=5,
        k=3,
        stream_radius=4.0,
    )
)
SESSION = _reg(
    Spec(
        "session_stream",
        "Spotify_Session (21-d, drifting)",
        lambda s: cg.session_stream(_n(20000, s), k=6, seed=13),
        _EUC,
        eps=12.0,  # ρε/2 must exceed the ~4 unit 21-d shell spacing so the
        minpts=10,  # streamed net stays geometry-bound (Theorem 4)
        k=6,
        stream_radius=4.0,  # micro-cluster radius for the Table-4 baselines
    )
)


def noisy_variant(spec: Spec, scale: float) -> tuple[np.ndarray, np.ndarray]:
    """The paper's MNIST_noisy / Fashion_noisy recipe applied to a spec."""
    X, y = spec.load(scale * 0.2)
    return cg.noisy_duplicate(X, y, times=5, perturb=5.0, noise_frac=0.01, seed=0)
