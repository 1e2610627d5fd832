"""SIMPLE-EM — SIMPLE tailored to entity matching with transitivity
(paper Section 4).

Chooses the constrained E-step by scenario:

* two-table, both tables duplicate-free → assignment-based exact solution;
* two-table, one table duplicate-free → argmax-per-partner exact solution;
* two-table, neither duplicate-free → no transitivity (paper Section 4.4
  complexity summary: transitivity unused in this case);
* single-table → the offline-trained swapping-invariant model, guarded by
  a confidence margin (the learned h carries approximation error vs the
  numeric solver, so only confident model outputs override the forest's
  labels — this bounds error propagation across EM iterations).

When duplicate-freeness is unknown (``dupfree="auto"``), it is detected
with the Appendix 8.1 hypothesis test applied to the predicted matches of
a preliminary SIMPLE run without transitivity — no extra user effort, as
the test reuses the LR labeling functions' output.

``simple_em_gamma`` is the driver-side numpy entry point (used by the
experiment harnesses); ``run_simple_em`` adapts it to a labeling-matrix
DataFrame.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.core.labeling_matrix import collect_matrix
from repro.core.simple import SimpleResult, run_simple, simple_gamma
from repro.transitivity.apply import single_table_step
from repro.transitivity.dupfree import is_duplicate_free
from repro.transitivity.exact import one_table_dupfree, two_table_dupfree
from repro.transitivity.model import TransitivityModel, get_model


@dataclass
class SimpleEMOutcome:
    """Numpy-level SIMPLE-EM output."""

    gamma: np.ndarray
    mode: str                 # "two_table_both" | "two_table_left" |
    #                           "two_table_right" | "no_trans" | "single_table"
    n_iter: int
    left_dupfree: bool | None = None
    right_dupfree: bool | None = None


@dataclass
class SimpleEMResult:
    """DataFrame-level SIMPLE-EM output (wraps a SimpleResult)."""

    result: SimpleResult
    mode: str
    left_dupfree: bool | None = None
    right_dupfree: bool | None = None


def detect_dupfree(
    keys: pd.DataFrame, gamma: np.ndarray, *, n_left: int, n_right: int,
    top_frac: float = 0.5, seed: int = 0,
) -> tuple[bool, bool]:
    """(left_dupfree, right_dupfree) from predicted matches (App. 8.1).

    The hypothesis test has no discriminative power once |M| approaches
    the partner-table size (duplication is then expected even under pure
    noise). At our compressed benchmark scales |M| can exceed the table
    size, so the test runs on the top-``top_frac``·N_partner matches by
    probability — the high-precision subset that restores the |M| ≪ N
    operating regime the appendix assumes (documented deviation).
    """
    match = gamma >= 0.5
    order = np.argsort(-gamma)
    lid = keys["lid"].to_numpy()
    rid = keys["rid"].to_numpy()

    def side(partner_col: np.ndarray, n_partner: int, s: int) -> bool:
        k = min(int(match.sum()), max(30, int(top_frac * n_partner)))
        top = order[:k]
        arr = partner_col[top][gamma[top] >= 0.5]
        return is_duplicate_free(arr, n_partner, seed=s)

    # Left table dup-free ⇔ each right tuple appears once among matches.
    left_df = side(rid, n_right, seed)
    right_df = side(lid, n_left, seed + 1)
    return left_df, right_df


def make_transitivity_step(
    mode: str,
    *,
    model: TransitivityModel | None = None,
    model_margin: float = 0.2,
    seed: int = 0,
):
    """The constrained-E-step callable for a resolved scenario (or None)."""
    if mode == "two_table_both":
        return two_table_dupfree
    if mode == "two_table_left":
        return lambda k, g: one_table_dupfree(k, g, dupfree_side="left")
    if mode == "two_table_right":
        return lambda k, g: one_table_dupfree(k, g, dupfree_side="right")
    if mode == "single_table":
        mdl = model or get_model()

        def step(keys, gamma):
            gm = single_table_step(keys, gamma, mdl, seed=seed)
            conf = np.abs(gm - 0.5) > model_margin
            return np.where(conf, gm, gamma)

        return step
    return None


def simple_em_gamma(
    keys: pd.DataFrame,
    X: np.ndarray,
    *,
    single_table: bool,
    n_left: int | None = None,
    n_right: int | None = None,
    dupfree: str | tuple[bool, bool] = "auto",
    model: TransitivityModel | None = None,
    model_margin: float = 0.2,
    seed: int = 0,
    **simple_kw,
) -> SimpleEMOutcome:
    """Run SIMPLE-EM over a collected labeling matrix."""
    if single_table:
        step = make_transitivity_step(
            "single_table", model=model, model_margin=model_margin, seed=seed
        )
        gamma, _, it, _ = simple_gamma(
            X, keys=keys, seed=seed, transitivity_step=step, **simple_kw
        )
        return SimpleEMOutcome(gamma=gamma, mode="single_table", n_iter=it)

    if n_left is None or n_right is None:
        raise ValueError("two-table EM needs n_left / n_right")
    if dupfree == "auto":
        gamma0, _, _, _ = simple_gamma(X, keys=keys, seed=seed, **simple_kw)
        left_df, right_df = detect_dupfree(
            keys, gamma0, n_left=n_left, n_right=n_right, seed=seed
        )
    else:
        left_df, right_df = dupfree
    if left_df and right_df:
        mode = "two_table_both"
    elif left_df:
        mode = "two_table_left"
    elif right_df:
        mode = "two_table_right"
    else:
        mode = "no_trans"
    step = make_transitivity_step(mode, seed=seed)
    gamma, _, it, _ = simple_gamma(
        X, keys=keys, seed=seed, transitivity_step=step, **simple_kw
    )
    return SimpleEMOutcome(
        gamma=gamma, mode=mode, n_iter=it,
        left_dupfree=left_df, right_dupfree=right_df,
    )


def run_simple_em(
    votes: DataFrame,
    *,
    single_table: bool,
    n_left: int | None = None,
    n_right: int | None = None,
    dupfree: str | tuple[bool, bool] = "auto",
    model: TransitivityModel | None = None,
    model_margin: float = 0.2,
    seed: int = 0,
    **simple_kw,
) -> SimpleEMResult:
    """Run SIMPLE-EM on a labeling-matrix DataFrame (lid, rid, lf_*)."""
    keys, X = collect_matrix(votes)
    out = simple_em_gamma(
        keys, X,
        single_table=single_table, n_left=n_left, n_right=n_right,
        dupfree=dupfree, model=model, model_margin=model_margin,
        seed=seed, **simple_kw,
    )
    spark = votes.sparkSession
    pdf = keys.copy()
    pdf["prob"] = out.gamma
    pdf["pred"] = (out.gamma >= 0.5).astype(np.int32)
    preds = spark.createDataFrame(pdf)
    res = SimpleResult(
        preds=preds, keys=keys, gamma=out.gamma, model=None, n_iter=out.n_iter
    )
    return SimpleEMResult(
        result=res, mode=out.mode,
        left_dupfree=out.left_dupfree, right_dupfree=out.right_dupfree,
    )
