"""Table 1 — benchmark dataset statistics.

Columns mirror the paper: tuple counts, #matches, #attributes, candidate
set size after blocking, and blocking recall.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro import em_data
from repro.experiments.common import prepare

PAPER = {
    #        tuples L, R      N_M   #attr  candset  recall
    "FZ": (533, 331, 112, 7, 2915, 1.0),
    "DA": (2616, 2294, 2224, 4, 46456, 0.998),
    "DS": (2616, 64263, 5347, 4, 135327, 0.913),
    "AB": (1082, 1093, 1098, 4, 164072, 0.995),
    "AG": (1363, 3226, 1300, 4, 42413, 0.944),
    "WA": (2554, 22074, 1154, 9, 68265, 0.879),
    "IR": (2960, 3093, 169, 10, 63798, 1.0),
    "YY": (11840, 5223, 131, 6, 5278, 1.0),
    "ABN": (9836, 9958, 233, 11, 68145, 0.884),
    "M": (16663, 16663, 26921, 10, 99230, 0.953),
    "C": (29788, 29788, 314315, 10, 1101318, 0.979),
}


def run(
    spark: SparkSession, *, scale: float = 1.0, datasets: list[str] | None = None
) -> pd.DataFrame:
    rows = []
    for name in datasets or em_data.ALL_DATASETS:
        prep = prepare(spark, name, scale=scale)
        paper = PAPER[name]
        rows.append(
            {
                "dataset": name,
                "n_left": prep.n_left,
                "n_right": prep.n_right,
                "n_matches": prep.ds.n_matches,
                "n_attrs": len(prep.ds.config.attrs),
                "candset_size": len(prep.X),
                "blocking_recall": round(prep.recall, 3),
                "paper_candset": paper[4],
                "paper_recall": paper[5],
            }
        )
    return pd.DataFrame(rows)
