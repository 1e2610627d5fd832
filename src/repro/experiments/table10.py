"""Table 10 — saved labeling effort under data shift: LFs vs manual labels.

Source→target pairs: DA→DS, AB→AG, AB→WA' (WA restricted to AB's schema).

* LFs: saved effort = (N1' − N2') / N1' where N1' = #LFs on the target
  and N2' = #LFs not reusable from the source suite (by LF name).
* Manual labeling: N1 = labels active learning needs to reach the LF
  (SIMPLE-EM) performance on the target alone; N2 = additional target
  labels when all source ground-truth labels are added to the training
  pool. Saved effort = (N1 − N2) / N1 (negative when the source data
  hurts, as the paper observes for AB→AG / AB→WA').
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.active_learning import run_active_learning
from repro.experiments.common import f1_np, prepare, run_labeling_method
from repro.labeling.functions import lf_suite

SHIFTS = [("DA", "DS"), ("AB", "AG"), ("AB", "WA")]

PAPER = {("DA", "DS"): (31.5, 62.5), ("AB", "AG"): (-23.2, 63.6),
         ("AB", "WA"): (9.0, 73.3)}


def _lf_saved(src: str, tgt: str) -> float:
    src_names = {lf.name for lf in lf_suite(src)}
    tgt = lf_suite(tgt)
    n1 = len(tgt)
    n2 = sum(1 for lf in tgt if lf.name not in src_names)
    return 100.0 * (n1 - n2) / n1


def _al_labels_to_target(
    F, y, target, *, warm_F=None, warm_y=None, max_labels=1500, seed=0
):
    """#target labels queried until AL reaches ``target`` F1 (or its peak)."""
    if warm_F is not None:
        # Pre-pend the source labels: include them as already-labeled pool
        # rows that do not count toward the query budget.
        F_all = np.vstack([warm_F, F])
        y_all = np.concatenate([warm_y, y])
        eval_mask = np.zeros(len(y_all), dtype=bool)
        g = np.random.default_rng(seed)
        tgt_idx = np.arange(len(warm_F), len(y_all))
        eval_mask[g.choice(tgt_idx, size=max(1, len(y) // 5), replace=False)] = True
        traj = run_active_learning(
            F_all, y_all, eval_mask=eval_mask,
            seed_size=len(warm_F), max_labels=len(warm_F) + max_labels,
            seed=seed,
        )
        # Labels counted = queried beyond the warm-start block.
        ns = [max(0, n - len(warm_F)) for n in traj.n_labeled]
    else:
        traj = run_active_learning(F, y, max_labels=max_labels, seed=seed)
        ns = traj.n_labeled
    best = max(traj.f1)
    goal = min(target, best)
    for n, f in zip(ns, traj.f1):
        if f >= goal:
            return max(n, 1)
    return max(ns[-1], 1)


def run(
    spark: SparkSession, *, scale: float = 1.0, seed: int = 0,
    max_labels: int = 1500,
) -> pd.DataFrame:
    rows = []
    for src, tgt in SHIFTS:
        src_prep = prepare(spark, src, scale=scale, with_features=True)
        tgt_prep = prepare(spark, tgt, scale=scale, with_features=True)
        gamma, _ = run_labeling_method(tgt_prep, "SIMPLE-EM", seed=seed)
        lf_target_f1 = f1_np((gamma >= 0.5).astype(int), tgt_prep.y)
        y_t = np.where(tgt_prep.y < 0, 0, tgt_prep.y)
        y_s = np.where(src_prep.y < 0, 0, src_prep.y)
        n1 = _al_labels_to_target(
            tgt_prep.F, y_t, lf_target_f1, max_labels=max_labels, seed=seed
        )
        n2 = _al_labels_to_target(
            tgt_prep.F, y_t, lf_target_f1,
            warm_F=src_prep.F, warm_y=y_s, max_labels=max_labels, seed=seed,
        )
        manual_saved = 100.0 * (n1 - n2) / n1
        rows.append(
            {
                "shift": f"{src}-{tgt}",
                "manual_saved_pct": round(manual_saved, 1),
                "lf_saved_pct": round(_lf_saved(src, tgt), 1),
                "paper_manual_saved_pct": PAPER[(src, tgt)][0],
                "paper_lf_saved_pct": PAPER[(src, tgt)][1],
            }
        )
    return pd.DataFrame(rows)
