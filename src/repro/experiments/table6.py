"""Table 6 — running time (minutes) of all labeling methods.

Wall-clock for the full per-method pipeline piece: LF application time is
shared (it is part of ``prepare``) and reported separately; the per-method
column times inference. ZE includes feature engineering, as in the paper.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from repro import em_data
from repro.experiments.common import prepare, run_labeling_method

METHODS = ["SIMPLE-EM", "MV", "D&S", "EBCC", "FS", "SN", "ZE"]

PAPER_MINUTES = {
    "FZ": [0.6, 0.1, 0.2, 0.1, 0.1, 0.1, 1.5],
    "DA": [3.7, 0.6, 1.8, 1.2, 0.7, 0.6, 16.3],
    "DS": [15.3, 3.1, 7.7, 3.5, 3.1, 3.3, 52.4],
    "AB": [17.9, 3.7, 8.4, 4.7, 3.9, 3.7, 71.8],
    "AG": [7.9, 0.8, 3.3, 1.1, 0.9, 0.8, 22.4],
    "WA": [6.8, 1.4, 3.6, 1.7, 1.5, 1.4, 179.2],
    "IR": [6.5, 0.9, 2.7, 1.3, 1.1, 0.9, 28.2],
    "YY": [1.7, 0.3, 0.4, 0.3, 0.3, 0.3, 4.5],
    "ABN": [12.8, 0.6, 11.6, 1.1, 0.9, 0.6, 30.3],
    "M": [5.5, 0.7, 5.1, 0.9, 0.8, 0.7, 128.1],
    "C": [46.5, 6.3, 42.2, 15.1, 7.4, 6.3, 197.9],
}


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    datasets: list[str] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    rows = []
    for name in datasets or em_data.ALL_DATASETS:
        t0 = time.perf_counter()
        prep = prepare(spark, name, scale=scale, with_features=True)
        prep_secs = time.perf_counter() - t0
        row = {"dataset": name, "pipeline_min": round(prep_secs / 60, 2)}
        for i, m in enumerate(METHODS):
            _, secs = run_labeling_method(prep, m, seed=seed)
            # LF application is shared by the weak-supervision methods;
            # ZeroER's share is the feature engineering instead.
            row[m] = round((secs + prep_secs) / 60, 2)
            row[f"paper_{m}"] = PAPER_MINUTES[name][i]
        rows.append(row)
    return pd.DataFrame(rows)
