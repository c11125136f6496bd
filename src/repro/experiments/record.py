"""Persist benchmark table rows so EXPERIMENTS.md can cite real runs."""
from __future__ import annotations

import json
import os
from pathlib import Path

RESULTS_DIR = Path(
    os.environ.get("REPRO_RESULTS_DIR", Path(__file__).resolve().parents[3] / "bench_results")
)


def save_rows(rows: list[dict], name: str) -> Path:
    RESULTS_DIR.mkdir(parents=True, exist_ok=True)
    out = RESULTS_DIR / f"{name}.json"

    def clean(v):
        if isinstance(v, float):
            return None if v != v else round(v, 4)  # NaN -> null (paper's */-)
        return v

    with open(out, "w") as f:
        json.dump([{k: clean(v) for k, v in r.items()} for r in rows], f, indent=1)
    return out
