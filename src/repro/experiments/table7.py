"""Table 7 — end model (DeepMatcher-lite) on SIMPLE-EM labels vs GT labels.

Protocol: 3:1:1 split of the candidate set. (1) Train the end model on
SIMPLE-EM's generated labels for train+valid, evaluate on the GT-labeled
test split. (2) Sweep the number of ground-truth training labels until
the end model matches (1), and until its F1 converges.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro import em_data
from repro.baselines.end_model import end_model_f1, train_end_model
from repro.experiments.common import f1_np, prepare, run_labeling_method

PAPER = {
    #      end-model-on-SIMPLE-EM-labels F1, #GT to match, converged F1
    "FZ": (0.979, 2333, None), "DA": (0.978, 37170, 0.978),
    "DS": (0.926, 48284, None), "AB": (0.673, 164078, 0.692),
    "AG": (0.741, None, None), "WA": (0.450, None, None),
    "IR": (1.0, None, None), "YY": (1.0, None, None),
    "ABN": (0.898, None, None), "M": (0.956, 7586, None),
    "C": (0.929, None, None),
}

GT_SWEEP_FRACS = [0.02, 0.05, 0.1, 0.2, 0.4, 0.6, 0.8, 1.0]


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    datasets: list[str] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    rows = []
    for name in datasets or em_data.ALL_DATASETS:
        prep = prepare(spark, name, scale=scale, with_features=True)
        g = np.random.default_rng(seed)
        n = len(prep.y)
        perm = g.permutation(n)
        tr = perm[: int(0.8 * n)]          # train+valid (3:1 within)
        te = perm[int(0.8 * n):]
        te = te[prep.y[te] >= 0]           # evaluate on labeled pairs only
        gamma, _ = run_labeling_method(prep, "SIMPLE-EM", seed=seed)
        weak_labels = (gamma >= 0.5).astype(np.int8)
        m_weak = train_end_model(prep.F[tr], weak_labels[tr], seed=seed)
        f1_weak = end_model_f1(m_weak, prep.F[te], prep.y[te])
        # GT sweep (training pairs must be labeled).
        tr_lab = tr[prep.y[tr] >= 0]
        n_to_match, f1_prev, converged_f1, converged_n = None, -1.0, None, None
        for frac in GT_SWEEP_FRACS:
            k = max(10, int(frac * len(tr_lab)))
            sub = tr_lab[:k]
            m_gt = train_end_model(prep.F[sub], prep.y[sub], seed=seed)
            f1_gt = end_model_f1(m_gt, prep.F[te], prep.y[te])
            if n_to_match is None and f1_gt >= f1_weak:
                n_to_match = k
            if converged_f1 is None and f1_gt <= f1_prev + 0.005 and frac >= 0.4:
                converged_f1, converged_n = max(f1_gt, f1_prev), k
            f1_prev = max(f1_prev, f1_gt)
        if converged_f1 is None:
            converged_f1, converged_n = f1_prev, len(tr_lab)
        rows.append(
            {
                "dataset": name,
                "endmodel_on_SIMPLE-EM": round(f1_weak, 3),
                "gt_labels_to_match": n_to_match,
                "converged_F1": round(converged_f1, 3),
                "converged_labels": converged_n,
                "labeling_F1": round(
                    f1_np(weak_labels, prep.y), 3
                ),
                "paper_endmodel_F1": PAPER[name][0],
                "paper_gt_to_match": PAPER[name][1],
            }
        )
    return pd.DataFrame(rows)
