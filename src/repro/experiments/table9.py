"""Table 9 — F1 of the top methods as ground-truth transitivity
violations are injected (Section 5.5.2).

The paper corrupts the ground truth of the two single-table datasets
(Monitor, Camera): x·N_gt operations, 60% removing a true match, 40%
adding a spurious match around a randomly chosen tuple. Methods run once
(they never see the ground truth); each x re-evaluates against the
corrupted labels. Scores are averaged over the two datasets.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.em_data import corrupt_ground_truth
from repro.experiments.common import f1_np, np_labels, prepare, run_labeling_method

XS = [0.0, 0.1, 0.2, 0.3, 0.4, 0.5]
METHODS = ["SIMPLE-EM", "SN", "MV"]

PAPER = {
    "SIMPLE-EM": [0.880, 0.841, 0.802, 0.764, 0.726, 0.697],
    "SN": [0.815, 0.777, 0.740, 0.705, 0.670, 0.636],
    "MV": [0.786, 0.750, 0.715, 0.681, 0.648, 0.616],
}


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    datasets: list[str] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    datasets = datasets or ["M", "C"]
    preds: dict[str, dict[str, np.ndarray]] = {}
    preps = {}
    for name in datasets:
        prep = prepare(spark, name, scale=scale)
        preps[name] = prep
        preds[name] = {}
        for m in METHODS:
            gamma, _ = run_labeling_method(prep, m, seed=seed)
            preds[name][m] = (gamma >= 0.5).astype(int)
    rows = []
    for x in XS:
        row = {"x": x}
        for m in METHODS:
            scores = []
            for name in datasets:
                prep = preps[name]
                all_ids = prep.ds.left_pdf["rid_"].to_numpy()
                truth_x = corrupt_ground_truth(
                    prep.ds.truth_pdf, all_ids, x, seed=seed
                )
                y_x = np_labels(prep.keys, truth_x, partial=False)
                scores.append(f1_np(preds[name][m], y_x))
            row[m] = round(float(np.mean(scores)), 3)
            row[f"paper_{m}"] = PAPER[m][XS.index(x)]
        rows.append(row)
    return pd.DataFrame(rows)
