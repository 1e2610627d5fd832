"""End-model substitute for DeepMatcher (paper Table 7).

DeepMatcher is a deep attribute-summarization matcher; with no torch or
embeddings available, the documented substitution (DESIGN.md) is a
random forest over Magellan-lite similarity features — a representative
supervised end model that, like DeepMatcher, consumes *record content*
(via engineered features) rather than LF votes, which is exactly the
property Table 7 exercises: an end model trained on SIMPLE-EM's generated
labels can use information the LFs never saw.

API: fit on a labeled training split (labels may be generated or ground
truth), evaluate F1 on a held-out test split.
"""
from __future__ import annotations

import numpy as np

from repro.core.forest import RandomForest
from repro.core.smote import smote


def train_end_model(
    F_train: np.ndarray,
    y_train: np.ndarray,
    *,
    n_estimators: int = 24,
    max_depth: int = 10,
    seed: int = 0,
) -> RandomForest:
    """SMOTE-balanced forest on similarity features."""
    y_train = np.asarray(y_train, dtype=np.int8)
    if y_train.min() == y_train.max():
        # Degenerate labels: a constant model (empty forest predicts 0.5
        # everywhere, so fall back to a single stump fit on the constant).
        rf = RandomForest(n_estimators=1, max_depth=1, seed=seed)
        rf.fit(F_train[:2], np.array([y_train[0], y_train[0]]))
        return rf
    Xb, yb = smote(F_train.astype(np.float32), y_train, seed=seed)
    return RandomForest(
        n_estimators=n_estimators, max_depth=max_depth, seed=seed
    ).fit(Xb, yb)


def end_model_f1(
    model: RandomForest, F_test: np.ndarray, y_test: np.ndarray
) -> float:
    """Pair F1 of the end model on a labeled test split."""
    pred = (model.predict_proba(F_test) >= 0.5).astype(np.int8)
    y = np.asarray(y_test)
    tp = int(((pred == 1) & (y == 1)).sum())
    fp = int(((pred == 1) & (y == 0)).sum())
    fn = int(((pred == 0) & (y == 1)).sum())
    p = tp / max(tp + fp, 1)
    r = tp / max(tp + fn, 1)
    return 2 * p * r / max(p + r, 1e-9)
