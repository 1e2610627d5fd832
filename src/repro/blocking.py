"""Overlap blocker — Spark reimplementation of py_entitymatching's
``OverlapBlocker``.

Given a left and right record table (or one table for single-table EM),
emit candidate pairs whose chosen attribute shares at least ``overlap_size``
tokens. The whole computation is DataFrame dataflow: tokenize → explode →
(optionally drop ultra-frequent tokens) → self/cross join on token →
group by pair → count shared tokens → filter.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _tokenized(df: DataFrame, id_col: str, attr: str, out_id: str) -> DataFrame:
    """(out_id, token) rows: distinct lower-cased alnum tokens of ``attr``."""
    toks = F.explode(
        F.array_distinct(
            F.split(F.lower(F.regexp_replace(F.col(attr).cast("string"), "[^a-zA-Z0-9]+", " ")), " ")
        )
    ).alias("token")
    return (
        df.select(F.col(id_col).alias(out_id), toks)
        .where((F.col("token") != "") & F.col("token").isNotNull())
        .distinct()
    )


def overlap_block(
    left: DataFrame,
    right: DataFrame,
    *,
    attr: str,
    overlap_size: int = 1,
    id_col: str = "rid_",
    max_token_df: float | None = 0.2,
    single_table: bool = False,
) -> DataFrame:
    """Candidate pair table (lid, rid, overlap) with ≥ ``overlap_size`` shared tokens.

    ``max_token_df``: tokens appearing in more than this fraction of the
    smaller table are dropped before joining (standard stop-token guard that
    keeps the token join from exploding). ``single_table=True`` dedupes to
    lid < rid so each unordered pair appears once.
    """
    lt = _tokenized(left, id_col, attr, "lid")
    rt = _tokenized(right, id_col, attr, "rid")
    if max_token_df is not None:
        n = min(left.count(), right.count())
        cap = max(2.0, max_token_df * n)
        freq = (
            lt.groupBy("token").count().union(rt.groupBy("token").count())
            .groupBy("token").agg(F.max("count").alias("df"))
        )
        keep = freq.where(F.col("df") <= cap).select("token")
        lt = lt.join(keep, "token")
        rt = rt.join(keep, "token")
    pairs = (
        lt.join(rt, "token")
        .groupBy("lid", "rid")
        .agg(F.count("*").alias("overlap"))
        .where(F.col("overlap") >= overlap_size)
    )
    if single_table:
        pairs = pairs.where(F.col("lid") < F.col("rid"))
    return pairs


def blocking_recall(cand: DataFrame, truth_matches: DataFrame) -> float:
    """Fraction of ground-truth matches kept by blocking (Table 1 'recall')."""
    total = truth_matches.count()
    if total == 0:
        return 1.0
    kept = truth_matches.join(cand.select("lid", "rid"), ["lid", "rid"]).count()
    return kept / total
