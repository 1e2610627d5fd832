"""Table 4 — SIMPLE-EM vs Ditto-lite (simulated pretrained-LM matcher).

Protocol from the paper: all candidate-set pairs with ground-truth labels,
random 3:1:1 train/valid/test split; Ditto(-lite) trains supervised on the
train split and is evaluated on the test split; SIMPLE-EM (which never
sees labels) is evaluated on the same test split for comparability.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro import em_data
from repro.baselines import ditto_lite
from repro.experiments.common import f1_np, prepare, run_labeling_method

PAPER = {
    "FZ": (0.996, 0.951), "DA": (0.991, 0.967), "DS": (0.911, 0.933),
    "AB": (0.906, 0.283), "AG": (0.555, 0.275), "WA": (0.499, 0.262),
    "IR": (0.989, 0.716), "YY": (0.969, 0.861), "ABN": (0.897, 0.708),
    "M": (0.887, 0.844), "C": (0.872, 0.627),
}

_TEXT_ATTRS = ["name", "brand", "city", "phone", "descr", "price", "size", "year"]


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    datasets: list[str] | None = None,
    max_pairs: int = 12000,
    seed: int = 0,
) -> pd.DataFrame:
    """``max_pairs`` caps the pairs entering Ditto-lite's dense n-gram
    feature matrix (2 × 2048 float32 per pair); the split protocol is
    applied within the (match-preserving) sample."""
    rows = []
    for name in datasets or em_data.ALL_DATASETS:
        prep = prepare(spark, name, scale=scale)
        labeled = np.where(prep.y >= 0)[0]
        g = np.random.default_rng(seed)
        if len(labeled) > max_pairs:
            pos = labeled[prep.y[labeled] == 1]
            neg = labeled[prep.y[labeled] == 0]
            take_neg = g.choice(
                neg, size=max(0, max_pairs - len(pos)), replace=False
            )
            labeled = np.concatenate([pos, take_neg])
        sub = g.permutation(labeled)
        n = len(sub)
        tr = np.arange(0, int(0.6 * n))
        va = np.arange(int(0.6 * n), int(0.8 * n))
        te = np.arange(int(0.8 * n), n)
        # Build the textual pair frame driver-side from the record tables,
        # restricted to the sampled labeled pairs.
        li = prep.ds.left_pdf.set_index("rid_")
        ri = prep.ds.right_pdf.set_index("rid_")
        pf = prep.keys.iloc[sub].reset_index(drop=True).copy()
        for a in _TEXT_ATTRS:
            pf[f"l_{a}"] = li[a].reindex(pf.lid).to_numpy()
            pf[f"r_{a}"] = ri[a].reindex(pf.rid).to_numpy()
        F = ditto_lite.pair_features(pf, _TEXT_ATTRS)
        y_sub = prep.y[sub]
        model = ditto_lite.train(
            F[tr], y_sub[tr].astype(np.float64),
            F[va], y_sub[va], seed=seed,
        )
        ditto_f1 = f1_np(model.predict(F[te]), y_sub[te])
        gamma, _ = run_labeling_method(prep, "SIMPLE-EM", seed=seed)
        sem_f1 = f1_np((gamma >= 0.5).astype(int)[sub][te], y_sub[te])
        rows.append(
            {
                "dataset": name,
                "SIMPLE-EM": round(sem_f1, 3),
                "Ditto-lite": round(ditto_f1, 3),
                "paper_SIMPLE-EM": PAPER[name][0],
                "paper_Ditto": PAPER[name][1],
            }
        )
    return pd.DataFrame(rows)
