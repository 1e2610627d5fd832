"""Table 13 — duplicate-free detection on two-table datasets (App. 8.1).

Per dataset: duplicate counts in the ground truth and in the predicted
match set M of the labeling model without transitivity, the detector's
(L, R) duplicate-free verdicts, and whether enforcing the duplicate-free
exact solution actually helps F1 (comparing SIMPLE with and without the
detected transitivity step).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro import em_data
from repro.core.simple import simple_gamma
from repro.core.simple_em import detect_dupfree, make_transitivity_step
from repro.experiments.common import f1_np, prepare

PAPER = {
    #        GT dups (L,R)   pred dups (L,R)  detect (L,R)  helpful
    "FZ": ((0, 0), (3, 3), ("T", "T"), "Yes"),
    "DA": ((0, 0), (781, 817), ("T", "T"), "Yes"),
    "DS": ((2939, 129), (3973, 979), ("F", "F"), "No"),
    "AB": ((16, 5), (165, 172), ("T", "T"), "Yes"),
    "AG": ((187, 9), (544, 355), ("F", "F"), "No"),
    "WA": ((162, 8), (1265, 327), ("F", "F"), "No"),
    "IR": (None, None, ("T", "T"), "Yes"),
    "YY": (None, None, ("F", "F"), "No"),
    "ABN": (None, None, ("T", "T"), "Yes"),
}


def _dup_counts(pairs: pd.DataFrame) -> tuple[int, int]:
    """(#L dups, #R dups) implied by a cross-table match pair set."""
    l_dups = int((pairs.groupby("rid").size() - 1).clip(lower=0).sum())
    r_dups = int((pairs.groupby("lid").size() - 1).clip(lower=0).sum())
    return l_dups, r_dups


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    datasets: list[str] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    rows = []
    for name in datasets or em_data.TWO_TABLE:
        prep = prepare(spark, name, scale=scale)
        gamma0, _, _, _ = simple_gamma(prep.X, keys=prep.keys, seed=seed)
        pred_pairs = prep.keys[gamma0 >= 0.5]
        left_df, right_df = detect_dupfree(
            prep.keys, gamma0, n_left=prep.n_left, n_right=prep.n_right,
            seed=seed,
        )
        partial = prep.ds.config.partial_gt
        gt_dups = (
            None if partial
            else _dup_counts(prep.ds.truth_pdf[prep.ds.truth_pdf.label == 1])
        )
        # Is the dup-free-based exact solution helpful?
        f1_nt = f1_np((gamma0 >= 0.5).astype(int), prep.y)
        if left_df and right_df:
            mode = "two_table_both"
        elif left_df:
            mode = "two_table_left"
        elif right_df:
            mode = "two_table_right"
        else:
            mode = "no_trans"
        if mode != "no_trans":
            step = make_transitivity_step(mode, seed=seed)
            gamma1, _, _, _ = simple_gamma(
                prep.X, keys=prep.keys, seed=seed, transitivity_step=step
            )
            f1_t = f1_np((gamma1 >= 0.5).astype(int), prep.y)
            helpful = "Yes" if f1_t >= f1_nt else "No"
        else:
            helpful = "n/a"
        rows.append(
            {
                "dataset": name,
                "gt_dups_LR": gt_dups,
                "pred_dups_LR": _dup_counts(pred_pairs),
                "detected_dupfree_LR": (left_df, right_df),
                "dupfree_solution_helpful": helpful,
                "paper_detect_LR": PAPER[name][2],
                "paper_helpful": PAPER[name][3],
            }
        )
    return pd.DataFrame(rows)
