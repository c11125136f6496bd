"""Experiment harnesses (shared by jobs/ and benchmarks/): smoke at tiny
scale + registry sanity."""
import numpy as np
import pytest

from repro.experiments import tables
from repro.experiments.datasets import SPECS, noisy_variant


def test_registry_complete():
    for required in (
        "moons", "cluto_like", "mnist_like", "fashion_like", "usps_like",
        "cifar_like", "pcam_like", "lsun_like", "cola_like", "agnews_like",
        "mrpc_like", "session_stream", "cancer_like", "arrhythmia_like",
        "biodeg_like",
    ):
        assert required in SPECS


def test_specs_load_and_shapes():
    for name in ("moons", "cancer_like", "cola_like"):
        X, y = SPECS[name].load(0.1)
        assert len(X) == len(y)
        assert (y >= -1).all()


def test_spec_scale_controls_n():
    a, _ = SPECS["moons"].load(0.1)
    b, _ = SPECS["moons"].load(0.2)
    assert len(b) > len(a)


def test_noisy_variant():
    X, y = noisy_variant(SPECS["mnist_like"], 0.2)
    assert (y == -1).sum() > 0
    assert len(X) > 100


def test_table2_smoke():
    rows = tables.table2_gonzalez_share(names=["moons", "cancer_like"], scale=0.1)
    assert len(rows) == 2
    for r in rows:
        assert 0 < r["proportion_pct"] <= 100
        assert r["gonzalez_ms"] <= r["total_ms"]


def test_table3_smoke():
    rows = tables.table3_quality(names=["moons"], scale=0.25, densitypeak_max_n=5000)
    (r,) = rows
    assert r["exact_ARI"] > 0.8
    assert r["exact_ARI"] > r["dpmeans_ARI"]


def test_table3_densitypeak_cap_marks_star():
    rows = tables.table3_quality(names=["moons"], scale=0.25, densitypeak_max_n=10)
    assert np.isnan(rows[0]["dpeak_ARI"])


def test_table4_smoke():
    rows = tables.table4_streaming(
        names=["moons", "session_10pct"], scale=0.1, chunk=128
    )
    assert len(rows) == 2
    for r in rows:
        assert -1 <= r["ours_ARI"] <= 1
        assert r["mem_ratio"] > 0


def test_table4_text_baselines_nan():
    rows = tables.table4_streaming(names=["cola_like"], scale=0.3, chunk=64)
    assert np.isnan(rows[0]["dbstream_ARI"])  # Euclidean-only baseline
    assert rows[0]["ours_ARI"] > 0.5  # ours runs on the abstract metric


def test_fig3_smoke():
    rows = tables.fig3_runtime(names=["moons"], scale=0.05)
    (r,) = rows
    assert r["our_exact_ms"] > 0
    assert not np.isnan(r["gt_exact_ms"])  # moons is 2-d: GT runs


def test_fig6_smoke():
    rows = tables.fig6_memory(names=["moons"], scale=0.1, rhos=(0.5, 2.0), chunk=128)
    (r,) = rows
    assert r["ratio_rho=2.0"] <= r["ratio_rho=0.5"]


def test_record_save(tmp_path, monkeypatch):
    from repro.experiments import record

    monkeypatch.setattr(record, "RESULTS_DIR", tmp_path)
    p = record.save_rows([{"a": 1, "b": float("nan")}], "t")
    import json

    data = json.loads(p.read_text())
    assert data == [{"a": 1, "b": None}]
