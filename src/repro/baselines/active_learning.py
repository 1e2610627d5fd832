"""Active learning baselines AL-RF / AL-RF-S (paper Section 5.1, Table 5).

Uncertainty sampling (modAL's default query strategy) over our random
forest on Magellan-lite similarity features:

1. seed with a small random labeled set (stratified if possible);
2. repeatedly query the ``batch`` most uncertain pairs (|p − 0.5| minimal),
   reveal their ground-truth labels, retrain;
3. record the F1 trajectory so Table 5's "# labels to match SIMPLE-EM"
   and "AL queries all labels" columns can be read off one run.

AL-RF-S differs only in applying SMOTE to the labeled pool before each
fit (the paper's class-imbalance variant).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.forest import RandomForest
from repro.core.smote import smote


@dataclass
class ALTrajectory:
    """F1 after each query round, plus label counts."""

    n_labeled: list[int]
    f1: list[float]

    def labels_to_reach(self, target_f1: float) -> int | None:
        """Smallest #labels whose F1 ≥ target, or None if never reached."""
        for n, f in zip(self.n_labeled, self.f1):
            if f >= target_f1:
                return n
        return None

    @property
    def final_f1(self) -> float:
        return self.f1[-1] if self.f1 else 0.0


def _f1(pred: np.ndarray, y: np.ndarray) -> float:
    tp = int(((pred == 1) & (y == 1)).sum())
    fp = int(((pred == 1) & (y == 0)).sum())
    fn = int(((pred == 0) & (y == 1)).sum())
    p = tp / max(tp + fp, 1)
    r = tp / max(tp + fn, 1)
    return 2 * p * r / max(p + r, 1e-9)


def run_active_learning(
    F: np.ndarray,
    y: np.ndarray,
    *,
    use_smote: bool = False,
    seed_size: int = 20,
    batch: int = 20,
    max_labels: int | None = None,
    eval_mask: np.ndarray | None = None,
    n_estimators: int = 16,
    max_depth: int = 8,
    seed: int = 0,
) -> ALTrajectory:
    """Run the AL loop on features F with oracle labels y.

    ``eval_mask`` selects the held-out evaluation pairs (paper: 20% test
    split); queries are drawn from the remaining pool. F1 is measured on
    the evaluation pairs only.
    """
    g = np.random.default_rng(seed)
    n = len(y)
    if eval_mask is None:
        eval_mask = np.zeros(n, dtype=bool)
        eval_mask[g.choice(n, size=max(1, n // 5), replace=False)] = True
    pool = np.where(~eval_mask)[0]
    max_labels = min(max_labels or len(pool), len(pool))
    labeled = set()
    # Stratified seed: grab a positive if the random seed found none.
    start = list(g.choice(pool, size=min(seed_size, len(pool)), replace=False))
    if y[start].sum() == 0 and (y[pool] == 1).any():
        start[0] = int(g.choice(pool[y[pool] == 1]))
    labeled.update(int(i) for i in start)
    traj = ALTrajectory(n_labeled=[], f1=[])
    while True:
        idx = np.fromiter(labeled, dtype=int)
        Xl, yl = F[idx], y[idx].astype(np.int8)
        if yl.min() == yl.max():
            pred_eval = np.full(int(eval_mask.sum()), int(yl[0]))
            probs_pool = np.full(len(pool), float(yl[0]))
        else:
            if use_smote:
                Xl, yl = smote(Xl.astype(np.float32), yl, seed=seed)
            rf = RandomForest(
                n_estimators=n_estimators, max_depth=max_depth,
                seed=seed + len(labeled),
            ).fit(Xl, yl)
            pred_eval = (rf.predict_proba(F[eval_mask]) >= 0.5).astype(int)
            probs_pool = rf.predict_proba(F[pool])
        traj.n_labeled.append(len(labeled))
        traj.f1.append(_f1(pred_eval, y[eval_mask]))
        if len(labeled) >= max_labels:
            break
        # Uncertainty sampling over the unlabeled pool.
        unlab = np.array([i for i in pool if i not in labeled])
        if len(unlab) == 0:
            break
        pos_in_pool = {p: i for i, p in enumerate(pool)}
        unc = np.abs(probs_pool[[pos_in_pool[i] for i in unlab]] - 0.5)
        take = unlab[np.argsort(unc)[: min(batch, len(unlab))]]
        labeled.update(int(i) for i in take)
    return traj
