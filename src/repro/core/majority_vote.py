"""Majority-vote labeling model (baseline "MV", and SIMPLE's initializer).

Pure DataFrame aggregation: sum the {-1,0,+1} votes per pair; positive sum
→ match. Ties (sum 0, e.g. all LFs abstain) fall to non-match, the majority
class in EM candidate sets.
"""
from __future__ import annotations

from functools import reduce

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.labeling_matrix import vote_columns


def majority_vote(votes: DataFrame) -> DataFrame:
    """(lid, rid, pred, prob): pred ∈ {0,1}, prob a crude vote-share score."""
    cols = vote_columns(votes)
    total = reduce(lambda a, b: a + b, [F.col(c) for c in cols])
    n_voted = reduce(
        lambda a, b: a + b, [(F.col(c) != 0).cast("int") for c in cols]
    )
    return votes.select(
        "lid",
        "rid",
        (total > 0).cast("int").alias("pred"),
        F.when(n_voted > 0, (total / n_voted + 1) / 2)
        .otherwise(F.lit(0.0))
        .alias("prob"),
    )
