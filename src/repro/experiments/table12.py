"""Table 12 — SIMPLE on general weak supervision tasks (WRENCH-style).

Runs the general form (no transitivity) of every labeling model on the
ten synthetic WRENCH-profile datasets, reporting each dataset's official
metric (F1 or accuracy).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro import wrench_data
from repro.baselines import dawid_skene, ebcc, flying_squid, snorkel_lm
from repro.baselines.api import mv_soft
from repro.core.simple import simple_gamma

METHODS = ["SIMPLE", "MV", "D&S", "EBCC", "FS", "SN"]

PAPER = {
    "basketball": dict(zip(METHODS, [0.171, 0.181, 0.171, 0.171, 0.171, 0.144])),
    "commercial": dict(zip(METHODS, [0.837, 0.846, 0.778, 0.775, 0.763, 0.878])),
    "tennis": dict(zip(METHODS, [0.844, 0.847, 0.847, 0.847, 0.847, 0.841])),
    "yelp": dict(zip(METHODS, [0.744, 0.722, 0.683, 0.696, 0.709, 0.696])),
    "imdb": dict(zip(METHODS, [0.750, 0.737, 0.744, 0.744, 0.744, 0.750])),
    "spouse": dict(zip(METHODS, [0.517, 0.492, 0.343, 0.343, 0.505, 0.455])),
    "youtube": dict(zip(METHODS, [0.916, 0.853, 0.452, 0.452, 0.845, 0.847])),
    "cdr": dict(zip(METHODS, [0.713, 0.672, 0.001, 0.087, 0.104, 0.666])),
    "sms": dict(zip(METHODS, [0.825, 0.838, 0.650, 0.0, 0.0, 0.840])),
    "census": dict(zip(METHODS, [0.527, 0.330, 0.001, 0.0, 0.209, 0.445])),
}


def _score(pred: np.ndarray, y: np.ndarray, metric: str) -> float:
    if metric == "acc":
        return float((pred == y).mean())
    tp = int(((pred == 1) & (y == 1)).sum())
    fp = int(((pred == 1) & (y == 0)).sum())
    fn = int(((pred == 0) & (y == 1)).sum())
    p = tp / max(tp + fp, 1)
    r = tp / max(tp + fn, 1)
    return 2 * p * r / max(p + r, 1e-9)


def run(
    *, datasets: list[str] | None = None, methods: list[str] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    datasets = datasets or wrench_data.ALL_DATASETS
    methods = methods or METHODS
    rows = []
    for name in datasets:
        ds = wrench_data.load(name)
        y = (ds.y > 0).astype(int)
        X = ds.votes
        row = {"dataset": name, "n_lfs": X.shape[1], "metric": ds.metric}
        for m in methods:
            if m == "MV":
                gamma = mv_soft(X)
            elif m == "D&S":
                gamma = dawid_skene.fit_predict(X, seed=seed)
            elif m == "EBCC":
                gamma = ebcc.fit_predict(X, seed=seed)
            elif m == "FS":
                gamma = flying_squid.fit_predict(X, seed=seed)
            elif m == "SN":
                gamma = snorkel_lm.fit_predict(X, seed=seed)
            elif m == "SIMPLE":
                gamma, _, _, _ = simple_gamma(X, seed=seed, n_estimators=24)
            row[m] = round(_score((gamma >= 0.5).astype(int), y, ds.metric), 3)
            row[f"paper_{m}"] = PAPER[name][m]
        rows.append(row)
    df = pd.DataFrame(rows)
    avg = {"dataset": "Avg.", "n_lfs": None, "metric": None}
    for m in methods:
        avg[m] = round(float(df[m].mean()), 3)
        avg[f"paper_{m}"] = round(
            float(np.mean([PAPER[d][m] for d in datasets])), 3
        )
    return pd.concat([df, pd.DataFrame([avg])], ignore_index=True)
