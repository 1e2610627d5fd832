"""Pairwise EM metrics (precision / recall / F1) over Spark DataFrames.

Predictions and ground truth are both pair tables keyed by
(``lid``, ``rid``). A prediction DataFrame carries ``pred`` ∈ {0,1} (or a
probability column to be thresholded); ground truth carries ``label`` ∈
{0,1}. Pairs absent from the prediction table are treated as predicted
non-matches, mirroring the paper's evaluation over the full candidate set.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class PRF:
    """Precision / recall / F1 plus the underlying confusion counts."""

    tp: int
    fp: int
    fn: int

    @property
    def precision(self) -> float:
        return self.tp / (self.tp + self.fp) if (self.tp + self.fp) else 0.0

    @property
    def recall(self) -> float:
        return self.tp / (self.tp + self.fn) if (self.tp + self.fn) else 0.0

    @property
    def f1(self) -> float:
        p, r = self.precision, self.recall
        return 2 * p * r / (p + r) if (p + r) else 0.0


def pair_f1(
    pred: DataFrame,
    truth: DataFrame,
    *,
    pred_col: str = "pred",
    complete: bool = True,
) -> PRF:
    """F1 of predicted matches against ground-truth matches.

    ``pred``: DataFrame with columns (lid, rid, <pred_col>) where <pred_col>
    is 1 for predicted match. ``truth``: DataFrame with (lid, rid, label).

    ``complete=True`` (Table 1's "-" datasets): ``truth`` lists every match
    and all absent pairs are non-matches, so a predicted match missing from
    truth is a false positive. ``complete=False`` (partial-GT datasets
    IR/YY/ABN): pairs without an explicit label are excluded, matching the
    paper's evaluation on the labeled subset.
    """
    p = pred.select("lid", "rid", F.col(pred_col).cast("int").alias("p"))
    t = truth.select("lid", "rid", F.col("label").cast("int").alias("y"))
    j = p.join(t, on=["lid", "rid"], how="full_outer").select(
        F.coalesce(F.col("p"), F.lit(0)).alias("p"),
        F.coalesce(F.col("y"), F.lit(0)).alias("y")
        if complete
        else F.col("y"),
    )
    agg = (
        j.where(F.col("y").isNotNull())
        .agg(
            F.sum(((F.col("p") == 1) & (F.col("y") == 1)).cast("long")).alias("tp"),
            F.sum(((F.col("p") == 1) & (F.col("y") == 0)).cast("long")).alias("fp"),
            F.sum(((F.col("p") == 0) & (F.col("y") == 1)).cast("long")).alias("fn"),
        )
        .first()
    )
    return PRF(tp=int(agg["tp"] or 0), fp=int(agg["fp"] or 0), fn=int(agg["fn"] or 0))


def dataset_f1(pred: DataFrame, ds, *, pred_col: str = "pred") -> PRF:
    """F1 against an ``EMDataset``'s ground truth, honoring partial GT."""
    return pair_f1(
        pred, ds.truth, pred_col=pred_col, complete=not ds.config.partial_gt
    )


def accuracy(pred: DataFrame, truth: DataFrame, *, pred_col: str = "pred") -> float:
    """Plain accuracy over labeled pairs — used by WRENCH-style datasets."""
    p = pred.select("lid", "rid", F.col(pred_col).cast("int").alias("p"))
    t = truth.select("lid", "rid", F.col("label").cast("int").alias("y"))
    j = p.join(t, on=["lid", "rid"], how="inner")
    row = j.agg(
        F.avg((F.col("p") == F.col("y")).cast("double")).alias("acc")
    ).first()
    return float(row["acc"] or 0.0)
