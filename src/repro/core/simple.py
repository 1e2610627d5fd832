"""SIMPLE — the paper's labeling model (Algorithm 1).

Expectation–Maximization where the M-step trains a capacity-restricted
random forest on the current estimated hard labels (after SMOTE class
balancing, with (max_depth, ccp_alpha) chosen by cross-validation on those
estimated labels — never on ground truth), and the E-step re-predicts the
soft labels γ. Initialization is majority vote.

Dataflow layout (see DESIGN.md): the labeling matrix is collected to the
driver as an (n × m) int8 array and *deduplicated into vote patterns with
counts* — the sufficient statistics for every fit — so all model fitting is
driver-side numpy over at most min(n, 3^m) weighted rows. The final E-step
scoring runs distributed over the votes DataFrame via mapInPandas with the
fitted forest shipped to executors.

An optional ``transitivity_step`` hook transforms γ after each E-step; this
is how SIMPLE-EM (``repro.core.simple_em``) injects the constrained E-step
of Section 4 without duplicating the EM loop.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

from repro.core.forest import RandomForest
from repro.core.labeling_matrix import collect_matrix, vote_columns
from repro.core.smote import smote

# CV grid for (max_depth, ccp_alpha) — the two capacity knobs of Sec. 3.2.
DEFAULT_GRID = [(3, 0.0), (5, 0.0), (7, 0.0), (10, 0.0), (7, 0.005), (10, 0.005)]


@dataclass
class SimpleResult:
    """Output of one SIMPLE(-EM) run."""

    preds: DataFrame          # (lid, rid, prob, pred) — distributed scoring
    keys: pd.DataFrame        # (lid, rid) aligned with gamma
    gamma: np.ndarray         # final soft labels
    model: RandomForest       # last fitted forest
    n_iter: int


def _dedup(X: np.ndarray, y: np.ndarray):
    """Unique (pattern, label) rows with counts as weights."""
    Xr = np.round(X.astype(np.float32), 4)
    stacked = np.column_stack([Xr, y.astype(np.float32)])
    uniq, counts = np.unique(stacked, axis=0, return_counts=True)
    return uniq[:, :-1], uniq[:, -1].astype(np.int8), counts.astype(np.float64)


def _cv_select(
    X: np.ndarray, y: np.ndarray, w: np.ndarray,
    grid: list[tuple[int, float]], folds: int, seed: int,
) -> tuple[int, float]:
    """Pick (max_depth, ccp_alpha) by weighted k-fold accuracy on (X, y)."""
    g = np.random.default_rng(seed)
    fold_of = g.integers(0, folds, size=len(X))
    best, best_acc = grid[0], -1.0
    for depth, alpha in grid:
        correct = total = 0.0
        for f in range(folds):
            tr, va = fold_of != f, fold_of == f
            if y[tr].min(initial=1) == y[tr].max(initial=0) or not va.any():
                continue  # degenerate fold
            rf = RandomForest(
                n_estimators=6, max_depth=depth, ccp_alpha=alpha,
                seed=seed + f,
            ).fit(X[tr], y[tr], w[tr])
            p = rf.predict(X[va])
            correct += float(((p == y[va]) * w[va]).sum())
            total += float(w[va].sum())
        acc = correct / total if total else 0.0
        if acc > best_acc + 1e-9:
            best, best_acc = (depth, alpha), acc
    return best


def _distributed_score(
    votes: DataFrame, model: RandomForest, *, shift: float = 0.0
) -> DataFrame:
    """Score every pair on executors: mapInPandas with the forest shipped.

    ``shift`` is the prior-preserving calibration offset from the EM loop,
    applied so the distributed 0.5 threshold matches the driver labels.
    """
    cols = vote_columns(votes)
    schema = T.StructType(
        [
            T.StructField("lid", T.LongType()),
            T.StructField("rid", T.LongType()),
            T.StructField("prob", T.DoubleType()),
            T.StructField("pred", T.IntegerType()),
        ]
    )

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            prob = np.clip(
                model.predict_proba(pdf[cols].to_numpy(dtype=np.float32))
                + shift,
                0.0,
                1.0,
            )
            yield pd.DataFrame(
                {
                    "lid": pdf["lid"].to_numpy(),
                    "rid": pdf["rid"].to_numpy(),
                    "prob": prob,
                    "pred": (prob >= 0.5).astype(np.int32),
                }
            )

    return votes.mapInPandas(run, schema=schema)


def simple_gamma(
    X: np.ndarray,
    *,
    keys: pd.DataFrame | None = None,
    max_iter: int = 10,
    n_estimators: int = 16,
    cv_grid: list[tuple[int, float]] | None = None,
    cv_folds: int = 3,
    seed: int = 0,
    transitivity_step: Callable[[pd.DataFrame, np.ndarray], np.ndarray] | None = None,
) -> tuple[np.ndarray, RandomForest | None, int, float]:
    """Algorithm 1 over a numpy vote matrix.

    Returns (γ, model, #iters, score_shift) where ``score_shift`` is the
    final prior-preserving calibration offset (add it to raw forest scores
    before thresholding at 0.5 — used by the distributed scorer).

    ``transitivity_step(keys, gamma) -> gamma`` is applied after every
    E-step (the constrained E-step of Eq. 4); pass None for plain SIMPLE.
    """
    grid = cv_grid or DEFAULT_GRID
    n = len(X)
    shift = 0.0
    # Init: majority vote (Algorithm 1, line 1). Ties → non-match.
    gamma = (X.sum(axis=1) > 0).astype(np.float64)
    # Calibration anchor: the positive count of the majority-vote
    # initialization. The class prior is estimated once from MV — the same
    # convention the paper uses to hand class weights to the baselines —
    # and every E-step is calibrated to it. Anchoring to a FIXED prior
    # (rather than the running labels) is what prevents the EM from
    # ratcheting the positive set up or down across iterations.
    npos0 = int((gamma >= 0.5).sum())
    if transitivity_step is not None:
        gamma = transitivity_step(keys, gamma)
    model = None
    it = 0
    for it in range(1, max_iter + 1):
        y_hard = (gamma >= 0.5).astype(np.int8)
        if y_hard.min() == y_hard.max():
            # Degenerate labeling (all one class) — nothing to fit.
            break
        # M-step: SMOTE-balance, CV-select capacity, fit forest.
        Xb, yb = smote(X, y_hard, seed=seed + it)
        Xd, yd, wd = _dedup(Xb, yb)
        depth, alpha = _cv_select(Xd, yd, wd, grid, cv_folds, seed + it)
        model = RandomForest(
            n_estimators=n_estimators, max_depth=depth, ccp_alpha=alpha,
            seed=seed + 1000 + it,
        ).fit(Xd, yd, wd)
        # E-step: predict soft labels on the ORIGINAL points (predict on
        # unique original patterns, broadcast back through inverse index).
        Xu, inv = np.unique(X, axis=0, return_inverse=True)
        gamma_new = model.predict_proba(Xu.astype(np.float32))[inv]
        # Prior-preserving calibration: the forest is trained on a class-
        # balanced set, so its raw 0.5 threshold systematically inflates
        # the minority class; left uncalibrated the EM ratchets (each
        # iteration's extra positives feed the next). Shift the scores so
        # that the 0.5 cut keeps the current positive count — corrections
        # then come from the forest's *ranking* (its learned LF
        # reliabilities), which is the stable form of the update.
        if 0 < npos0 < n:
            t = np.partition(gamma_new, n - npos0)[n - npos0]
            shift = 0.5 - min(max(float(t), 1e-6), 1 - 1e-6)
            gamma_new = np.clip(gamma_new + shift, 0.0, 1.0)
        if transitivity_step is not None:
            gamma_new = transitivity_step(keys, gamma_new)
        if np.array_equal((gamma_new >= 0.5), (gamma >= 0.5)):
            gamma = gamma_new
            break
        gamma = gamma_new
    return gamma, model, it, shift


def run_simple(
    votes: DataFrame,
    *,
    max_iter: int = 10,
    n_estimators: int = 16,
    cv_grid: list[tuple[int, float]] | None = None,
    cv_folds: int = 3,
    seed: int = 0,
    transitivity_step: Callable[[pd.DataFrame, np.ndarray], np.ndarray] | None = None,
) -> SimpleResult:
    """Run SIMPLE on a labeling-matrix DataFrame (lid, rid, lf_*)."""
    keys, X = collect_matrix(votes)
    gamma, model, it, shift = simple_gamma(
        X,
        keys=keys,
        max_iter=max_iter,
        n_estimators=n_estimators,
        cv_grid=cv_grid,
        cv_folds=cv_folds,
        seed=seed,
        transitivity_step=transitivity_step,
    )
    if model is not None and transitivity_step is None:
        preds = _distributed_score(votes, model, shift=shift)
    else:
        # Constrained γ is not a pure function of the vote row — emit the
        # driver-computed labels as a DataFrame.
        spark = votes.sparkSession
        out = keys.copy()
        out["prob"] = gamma
        out["pred"] = (gamma >= 0.5).astype(np.int32)
        preds = spark.createDataFrame(out)
    return SimpleResult(preds=preds, keys=keys, gamma=gamma, model=model, n_iter=it)
