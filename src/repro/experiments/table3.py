"""Table 3 — overall F1 of weak/unsupervised methods, and the runtime
measurements reused by Table 6.

Methods: SIMPLE-EM, MV, D&S, EBCC, FS, SN (weak supervision) and ZE
(ZeroER, unsupervised, over Magellan-lite features).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro import em_data
from repro.experiments.common import f1_np, prepare, run_labeling_method

METHODS = ["SIMPLE-EM", "MV", "D&S", "EBCC", "FS", "SN", "ZE"]

PAPER = {
    "FZ": dict(zip(METHODS, [0.996, 0.848, 0.973, 0.978, 0.644, 0.942, 0.992])),
    "DA": dict(zip(METHODS, [0.991, 0.726, 0.339, 0.238, 0.324, 0.958, 0.957])),
    "DS": dict(zip(METHODS, [0.911, 0.908, 0.896, 0.824, 0.421, 0.904, 0.863])),
    "AB": dict(zip(METHODS, [0.906, 0.628, 0.686, 0.327, 0.689, 0.776, 0.520])),
    "AG": dict(zip(METHODS, [0.555, 0.439, 0.426, 0.369, 0.217, 0.199, 0.484])),
    "WA": dict(zip(METHODS, [0.499, 0.397, 0.332, 0.395, 0.085, 0.363, 0.400])),
    "IR": dict(zip(METHODS, [0.989, 0.985, 0.997, 0.911, 0.982, 0.958, 0.968])),
    "YY": dict(zip(METHODS, [0.969, 0.968, 0.952, 0.960, 0.956, 0.953, 0.684])),
    "ABN": dict(zip(METHODS, [0.897, 0.834, 0.792, 0.821, 0.240, 0.809, 0.839])),
    "M": dict(zip(METHODS, [0.887, 0.780, 0.708, 0.737, 0.665, 0.812, 0.325])),
    "C": dict(zip(METHODS, [0.872, 0.791, 0.791, 0.884, 0.865, 0.817, 0.477])),
}


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    datasets: list[str] | None = None,
    methods: list[str] | None = None,
    seed: int = 0,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """(F1 table, runtime-seconds table), one row per dataset."""
    methods = methods or METHODS
    f1_rows, time_rows = [], []
    for name in datasets or em_data.ALL_DATASETS:
        prep = prepare(spark, name, scale=scale, with_features="ZE" in methods)
        f1_row: dict = {"dataset": name}
        t_row: dict = {"dataset": name}
        for m in methods:
            gamma, secs = run_labeling_method(prep, m, seed=seed)
            f1_row[m] = round(f1_np((gamma >= 0.5).astype(int), prep.y), 3)
            f1_row[f"paper_{m}"] = PAPER[name][m]
            t_row[m] = round(secs, 2)
        f1_rows.append(f1_row)
        time_rows.append(t_row)
    f1_df = pd.DataFrame(f1_rows)
    t_df = pd.DataFrame(time_rows)
    avg = {"dataset": "Avg."}
    for m in methods:
        avg[m] = round(float(f1_df[m].mean()), 3)
        avg[f"paper_{m}"] = round(
            float(pd.Series([PAPER[d][m] for d in f1_df.dataset]).mean()), 3
        )
    f1_df = pd.concat([f1_df, pd.DataFrame([avg])], ignore_index=True)
    return f1_df, t_df
