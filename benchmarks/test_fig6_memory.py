"""Benchmark reproducing Figure 6's shape: streaming memory footprint
(|E|+|M|)/n shrinks as ρ grows and is a small fraction of n at scale.
"""
import pytest

from repro.experiments.record import save_rows
from repro.experiments.tables import fig6_memory

SCALE = 1.0


@pytest.mark.benchmark(group="fig6")
def test_fig6_memory(benchmark):
    rows = benchmark.pedantic(
        lambda: fig6_memory(scale=SCALE), rounds=1, iterations=1
    )
    save_rows(rows, "fig6")
    for r in rows:
        # monotone: larger ρ ⇒ coarser net ⇒ smaller footprint
        assert r["ratio_rho=2.0"] <= r["ratio_rho=1.0"] <= r["ratio_rho=0.5"]
        # at benchmark scale the ρ=2 footprint is a small fraction of n
        assert r["ratio_rho=2.0"] < 0.25
