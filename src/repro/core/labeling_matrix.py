"""Build the labeling matrix X as a Spark DataFrame over record pairs.

The pipeline is pure DataFrame dataflow:

1. ``pair_table`` joins the candidate pair set (lid, rid) with the left and
   right record tables, prefixing attributes as ``l_*`` / ``r_*``;
2. ``apply_lfs`` runs every labeling function over each partition via
   ``mapInPandas`` (vectorized, executor-side), emitting one int column per
   LF — the labeling matrix with the pair key kept alongside.

Downstream labeling models consume the resulting votes DataFrame either as
distributed aggregations (majority vote, confusion counts, moments) or by
collecting the (n × m) int8 matrix, which is tiny relative to record data.
"""
from __future__ import annotations

from typing import Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.em_data import EMDataset, RECORD_COLUMNS
from repro.labeling.functions import LF


def pair_table(ds: EMDataset, cand: DataFrame) -> DataFrame:
    """Join candidate pairs with record attributes (l_*/r_* prefixed)."""
    attrs = [c for c in RECORD_COLUMNS if c != "rid_"]
    left = ds.left.select(
        F.col("rid_").alias("lid"), *[F.col(a).alias(f"l_{a}") for a in attrs]
    )
    right = ds.right.select(
        F.col("rid_").alias("rid"), *[F.col(a).alias(f"r_{a}") for a in attrs]
    )
    return cand.select("lid", "rid").join(left, "lid").join(right, "rid")


def apply_lfs(pairs: DataFrame, lfs: Sequence[LF]) -> DataFrame:
    """Labeling matrix DataFrame: (lid, rid, lf_0 … lf_{m-1})."""
    lf_list = list(lfs)
    out_schema = T.StructType(
        [
            T.StructField("lid", T.LongType()),
            T.StructField("rid", T.LongType()),
            *[T.StructField(f"lf_{j}", T.IntegerType()) for j in range(len(lf_list))],
        ]
    )

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            out = pdf[["lid", "rid"]].copy()
            for j, lf in enumerate(lf_list):
                out[f"lf_{j}"] = lf.vote(pdf).astype(np.int32)
            yield out

    return pairs.mapInPandas(run, schema=out_schema)


def vote_columns(votes: DataFrame) -> list[str]:
    """The lf_* columns of a labeling-matrix DataFrame, in index order."""
    cols = [c for c in votes.columns if c.startswith("lf_")]
    return sorted(cols, key=lambda c: int(c.split("_")[1]))


def collect_matrix(votes: DataFrame) -> tuple[pd.DataFrame, np.ndarray]:
    """Driver-side (pair-key frame, (n×m) int8 vote matrix), row-aligned.

    Rows are ordered by (lid, rid) so repeated collections are deterministic.
    """
    cols = vote_columns(votes)
    pdf = votes.orderBy("lid", "rid").toPandas()
    X = pdf[cols].to_numpy(dtype=np.int8)
    return pdf[["lid", "rid"]].reset_index(drop=True), X
