"""Shared wrapper for vote-matrix labeling models (truth inference).

Each baseline exposes ``fit_predict(X, seed) -> gamma`` over the numpy vote
matrix (votes in {-1,0,+1}; gamma = P(match)). ``run_model`` adapts that to
the Spark pair-table world: collect the (tiny) labeling matrix, infer, and
return a (lid, rid, prob, pred) DataFrame aligned with the input pairs.
"""
from __future__ import annotations

from typing import Callable

import numpy as np
from pyspark.sql import DataFrame

from repro.core.labeling_matrix import collect_matrix


def run_model(
    votes: DataFrame,
    fit_predict: Callable[..., np.ndarray],
    **kwargs,
) -> DataFrame:
    """Apply a numpy labeling model to a labeling-matrix DataFrame."""
    keys, X = collect_matrix(votes)
    gamma = np.asarray(fit_predict(X, **kwargs), dtype=np.float64)
    out = keys.copy()
    out["prob"] = gamma
    out["pred"] = (gamma >= 0.5).astype(np.int32)
    return votes.sparkSession.createDataFrame(out)


def dedup_patterns(X: np.ndarray) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """(unique patterns, inverse index, counts) — EM sufficient statistics."""
    uniq, inv, counts = np.unique(X, axis=0, return_inverse=True, return_counts=True)
    return uniq, inv, counts.astype(np.float64)


def mv_soft(X: np.ndarray) -> np.ndarray:
    """Majority-vote soft labels in [0,1] (ties → 0.5) — common EM init."""
    s = X.sum(axis=1)
    return np.where(s > 0, 1.0, np.where(s < 0, 0.0, 0.5))
