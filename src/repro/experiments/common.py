"""Shared pipeline for all table reproductions.

``prepare`` runs the distributed part once per dataset — generate records,
overlap-block, apply the LF suite via mapInPandas, optionally compute
Magellan-lite features — and collects the (small) labeling matrix and
ground-truth labels for the driver-side model zoo. Each ``table*.py``
module then composes these pieces into one evaluation-table harness.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro import em_data
from repro.baselines import dawid_skene, ebcc, flying_squid, snorkel_lm, zeroer
from repro.baselines.api import mv_soft
from repro.blocking import blocking_recall, overlap_block
from repro.core.labeling_matrix import apply_lfs, collect_matrix, pair_table
from repro.core.simple import simple_gamma
from repro.core.simple_em import simple_em_gamma
from repro.features import collect_features, featurize
from repro.labeling.functions import LF, lf_suite
from repro.transitivity.postprocess import zeroer_trans_step

LABELING_METHODS = ["SIMPLE-EM", "MV", "D&S", "EBCC", "FS", "SN"]


@dataclass
class Prepared:
    """One dataset's pipeline artifacts."""

    name: str
    ds: em_data.EMDataset
    cand: DataFrame
    votes: DataFrame
    keys: pd.DataFrame
    X: np.ndarray                  # (n, m) labeling matrix
    y: np.ndarray                  # ground truth: 1/0, -1 = unlabeled
    recall: float
    n_left: int
    n_right: int
    lfs: list[LF] = field(default_factory=list)
    feat_keys: pd.DataFrame | None = None
    F: np.ndarray | None = None    # Magellan-lite features


def np_labels(keys: pd.DataFrame, truth_pdf: pd.DataFrame, partial: bool) -> np.ndarray:
    """Per-pair ground truth aligned with ``keys`` (−1 = unlabeled)."""
    lab = {
        (int(a), int(b)): int(c)
        for a, b, c in zip(truth_pdf.lid, truth_pdf.rid, truth_pdf.label)
    }
    default = -1 if partial else 0
    return np.array(
        [lab.get((int(a), int(b)), default) for a, b in zip(keys.lid, keys.rid)],
        dtype=np.int8,
    )


def prf_np(pred: np.ndarray, y: np.ndarray) -> tuple[float, float, float]:
    """(precision, recall, F1) over labeled pairs (y >= 0)."""
    m = y >= 0
    pred = np.asarray(pred)[m]
    yy = y[m]
    tp = int(((pred == 1) & (yy == 1)).sum())
    fp = int(((pred == 1) & (yy == 0)).sum())
    fn = int(((pred == 0) & (yy == 1)).sum())
    p = tp / max(tp + fp, 1)
    r = tp / max(tp + fn, 1)
    return p, r, 2 * p * r / max(p + r, 1e-9)


def f1_np(pred: np.ndarray, y: np.ndarray) -> float:
    return prf_np(pred, y)[2]


def prepare(
    spark: SparkSession,
    name: str,
    *,
    scale: float = 1.0,
    with_features: bool = False,
    lfs: list[LF] | None = None,
) -> Prepared:
    """Generate + block + label one benchmark; collect driver artifacts."""
    ds = em_data.load(spark, name, scale=scale)
    cfg = ds.config
    cand = overlap_block(
        ds.left, ds.right,
        attr=cfg.blocking_attr,
        overlap_size=cfg.blocking_overlap,
        single_table=ds.single_table,
    ).cache()
    recall = blocking_recall(cand, ds.truth.where("label = 1"))
    pairs = pair_table(ds, cand).cache()
    suite = lfs if lfs is not None else lf_suite(name)
    votes = apply_lfs(pairs, suite).cache()
    keys, X = collect_matrix(votes)
    y = np_labels(keys, ds.truth_pdf, cfg.partial_gt)
    prep = Prepared(
        name=name, ds=ds, cand=cand, votes=votes, keys=keys, X=X, y=y,
        recall=recall, lfs=list(suite),
        n_left=ds.left.count(), n_right=ds.right.count(),
    )
    if with_features:
        feats = featurize(pairs)
        prep.feat_keys, F = collect_features(feats)
        # Align features to the vote-key order (both sorted by lid, rid).
        assert prep.feat_keys[["lid", "rid"]].equals(keys[["lid", "rid"]])
        prep.F = F
    return prep


def run_labeling_method(
    prep: Prepared, method: str, *, seed: int = 0, **kw
) -> tuple[np.ndarray, float]:
    """(γ, wall-clock seconds) for one labeling model on a prepared dataset."""
    X = prep.X
    t0 = time.perf_counter()
    if method == "MV":
        gamma = mv_soft(X)
    elif method == "D&S":
        gamma = dawid_skene.fit_predict(X, seed=seed)
    elif method == "EBCC":
        gamma = ebcc.fit_predict(X, seed=seed)
    elif method == "FS":
        gamma = flying_squid.fit_predict(X, seed=seed)
    elif method == "SN":
        gamma = snorkel_lm.fit_predict(X, seed=seed)
    elif method == "SIMPLE":
        gamma, _, _, _ = simple_gamma(X, keys=prep.keys, seed=seed, **kw)
    elif method == "SIMPLE-EM":
        out = simple_em_gamma(
            prep.keys, X,
            single_table=prep.ds.single_table,
            n_left=prep.n_left, n_right=prep.n_right,
            seed=seed, **kw,
        )
        gamma = out.gamma
    elif method == "ZE":
        if prep.F is None:
            raise ValueError("ZeroER needs prepare(..., with_features=True)")
        gamma = zeroer.fit_predict(prep.F, seed=seed)
        gamma = zeroer_trans_step(
            prep.keys, gamma, single_table=prep.ds.single_table
        )
    else:
        raise ValueError(f"unknown method {method!r}")
    return gamma, time.perf_counter() - t0
