"""Table 5 — SIMPLE-EM vs active learning (AL-RF / AL-RF-S).

For each complete-ground-truth dataset: run both AL variants over
Magellan-lite features with uncertainty sampling; report the number of
labels needed to match SIMPLE-EM's F1 (and the derived human minutes at
3 s/label), plus the F1 with all pool labels. The best of the two AL
variants is reported, as in the paper. Partial-GT datasets (IR/YY/ABN)
are excluded, as in the paper.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.active_learning import run_active_learning
from repro.experiments.common import f1_np, prepare, run_labeling_method

DATASETS = ["FZ", "DA", "DS", "AB", "AG", "WA", "M", "C"]

PAPER = {
    #       SIMPLE-EM  #labels  %labels  minutes  F1@all  #labels@all
    "FZ": (0.996, None, None, None, 0.985, 2332),
    "DA": (0.991, None, None, None, 0.981, 37165),
    "DS": (0.911, 460, 0.4, 23, 0.938, 108262),
    "AB": (0.906, None, None, None, 0.510, 131258),
    "AG": (0.555, None, None, None, 0.539, 33931),
    "WA": (0.499, 350, 0.5, 17.5, 0.695, 3150),
    "M": (0.887, None, None, None, 0.848, 79384),
    "C": (0.872, 4310, 0.5, 215, 0.949, 881055),
}


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    datasets: list[str] | None = None,
    max_labels: int | None = 2000,
    seed: int = 0,
) -> pd.DataFrame:
    rows = []
    for name in datasets or DATASETS:
        prep = prepare(spark, name, scale=scale, with_features=True)
        gamma, _ = run_labeling_method(prep, "SIMPLE-EM", seed=seed)
        target = f1_np((gamma >= 0.5).astype(int), prep.y)
        y = np.where(prep.y < 0, 0, prep.y)
        best = None
        for smote_flag in (False, True):
            traj = run_active_learning(
                prep.F, y, use_smote=smote_flag,
                max_labels=max_labels, seed=seed,
            )
            if best is None or traj.final_f1 > best.final_f1:
                best = traj
        n_match = best.labels_to_reach(target)
        rows.append(
            {
                "dataset": name,
                "SIMPLE-EM": round(target, 3),
                "labels_to_match": n_match,
                "pct_labels": round(100 * n_match / len(y), 2) if n_match else None,
                "human_min": round(n_match * 3 / 60, 1) if n_match else None,
                "AL_final_F1": round(best.final_f1, 3),
                "AL_final_labels": best.n_labeled[-1],
                "paper_SIMPLE-EM": PAPER[name][0],
                "paper_labels_to_match": PAPER[name][1],
                "paper_F1_all": PAPER[name][4],
            }
        )
    return pd.DataFrame(rows)
