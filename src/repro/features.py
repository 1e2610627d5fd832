"""Magellan-lite similarity features over record pairs.

ZeroER and the active-learning baselines (paper Section 5.1) rely on
Magellan's automatic feature engineering. This module is the substitute:
a fixed set of per-attribute similarity features over the shared record
schema, computed executor-side via ``mapInPandas`` (the same dataflow
shape as LF application).

Missing values produce a neutral 0.5 for similarity features and 0.5 for
relative-difference features (ZeroER's GMM and the forests both tolerate
this imputation; a missing-indicator would leak schema specifics).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

from repro.labeling import primitives as P

# (feature name, attribute, kind)
FEATURES: list[tuple[str, str, str]] = [
    ("name_jac", "name", "jaccard"),
    ("name_ovl", "name", "overlap"),
    ("name_lev", "name", "lev"),
    ("descr_jac", "descr", "jaccard"),
    ("descr_ovl", "descr", "overlap"),
    ("brand_eq", "brand", "exact"),
    ("city_eq", "city", "exact"),
    ("phone_eq", "phone", "exact"),
    ("price_rd", "price", "reldiff"),
    ("size_rd", "size", "reldiff"),
    ("year_rd", "year", "reldiff"),
]

FEATURE_NAMES = [f[0] for f in FEATURES]


def _feat(kind: str, a, b) -> float:
    missing = (
        a is None or b is None
        or (isinstance(a, float) and np.isnan(a))
        or (isinstance(b, float) and np.isnan(b))
        or (a is pd.NA or b is pd.NA)
    )
    if missing:
        return 0.5
    if kind == "jaccard":
        return P.jaccard(a, b)
    if kind == "overlap":
        return P.overlap_coeff(a, b)
    if kind == "lev":
        return P.lev_sim(a, b)
    if kind == "exact":
        return 1.0 if P.norm_str(a) == P.norm_str(b) else 0.0
    if kind == "reldiff":
        d = P.rel_num_diff(a, b)
        # similarity-oriented: 1 identical, 0 very different
        return 0.5 if d is None else float(max(0.0, 1.0 - d))
    raise ValueError(kind)


def featurize_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """Feature frame for a pandas pair frame with l_*/r_* columns."""
    out = pdf[["lid", "rid"]].copy()
    for fname, attr, kind in FEATURES:
        la, ra = pdf[f"l_{attr}"], pdf[f"r_{attr}"]
        out[fname] = np.array(
            [_feat(kind, x, y) for x, y in zip(la, ra)], dtype=np.float64
        )
    return out


def featurize(pairs: DataFrame) -> DataFrame:
    """(lid, rid, <features…>) for a pair DataFrame from ``pair_table``."""
    schema = T.StructType(
        [
            T.StructField("lid", T.LongType()),
            T.StructField("rid", T.LongType()),
            *[T.StructField(f, T.DoubleType()) for f in FEATURE_NAMES],
        ]
    )

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            yield featurize_pdf(pdf)

    return pairs.mapInPandas(run, schema=schema)


def collect_features(feats: DataFrame) -> tuple[pd.DataFrame, np.ndarray]:
    """Driver-side (keys, feature matrix) ordered by (lid, rid)."""
    pdf = feats.orderBy("lid", "rid").toPandas()
    return (
        pdf[["lid", "rid"]].reset_index(drop=True),
        pdf[FEATURE_NAMES].to_numpy(dtype=np.float64),
    )
