"""Shared helpers for the per-table benchmarks.

Each benchmark runs its table harness once (``benchmark.pedantic`` with a
single round — these are end-to-end pipelines, not microbenchmarks),
persists the resulting table under ``results/`` and prints it so the
teed benchmark log carries the numbers.

``REPRO_BENCH_SCALE`` (default 0.6) scales dataset sizes; jobs/ run the
same harnesses at full scale.
"""
from __future__ import annotations

import os
from pathlib import Path

import pandas as pd

BENCH_SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.6"))
RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def save_and_show(name: str, df: pd.DataFrame) -> pd.DataFrame:
    RESULTS_DIR.mkdir(exist_ok=True)
    df.to_csv(RESULTS_DIR / f"{name}.csv", index=False)
    print(f"\n=== {name} (scale={BENCH_SCALE}) ===")
    print(df.to_string(index=False))
    return df
