"""Table 11 — sensitivity to the LF set.

Conditions: Original, RT+100% (randomized thresholds), RT+80%, RT+60%,
RT+40% (randomized thresholds + sampling that fraction of the LFs).
Scores are F1 averaged over the chosen datasets, per method.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro import em_data
from repro.experiments.common import f1_np, prepare, run_labeling_method
from repro.labeling.functions import lf_suite, randomize

CONDITIONS = ["Original", "RT+100%", "RT+80%", "RT+60%", "RT+40%"]
METHODS = ["SIMPLE-EM", "MV", "D&S", "EBCC", "SN", "FS"]

PAPER = {
    "SIMPLE-EM": [0.861, 0.856, 0.831, 0.766, 0.570],
    "MV": [0.755, 0.718, 0.599, 0.554, 0.537],
    "D&S": [0.717, 0.672, 0.595, 0.474, 0.397],
    "EBCC": [0.677, 0.632, 0.638, 0.533, 0.504],
    "SN": [0.772, 0.698, 0.674, 0.623, 0.554],
    "FS": [0.553, 0.486, 0.460, 0.447, 0.445],
}


def _condition_suite(name: str, cond: str, seed: int):
    suite = lf_suite(name)
    if cond == "Original":
        return suite
    g = np.random.default_rng(seed)
    suite = [randomize(lf, g) for lf in suite]
    frac = int(cond.split("+")[1].rstrip("%")) / 100
    k = max(2, int(round(frac * len(suite))))
    idx = sorted(g.choice(len(suite), size=k, replace=False))
    return [suite[i] for i in idx]


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    datasets: list[str] | None = None,
    methods: list[str] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    datasets = datasets or em_data.ALL_DATASETS
    methods = methods or METHODS
    rows = []
    for ci, cond in enumerate(CONDITIONS):
        scores: dict[str, list[float]] = {m: [] for m in methods}
        for name in datasets:
            prep = prepare(
                spark, name, scale=scale,
                lfs=_condition_suite(name, cond, seed + 17 * ci),
            )
            for m in methods:
                gamma, _ = run_labeling_method(prep, m, seed=seed)
                scores[m].append(f1_np((gamma >= 0.5).astype(int), prep.y))
        row = {"condition": cond}
        for m in methods:
            row[m] = round(float(np.mean(scores[m])), 3)
            row[f"paper_{m}"] = PAPER[m][ci]
        rows.append(row)
    return pd.DataFrame(rows)
