"""Table 2 — labeling-function development effort.

The measurable structural quantities are the number of LFs per dataset
and how many are "new" (first use of an effort family, in the paper's
development order). The human minutes are paper-only (they measured a
person; we record them for the side-by-side diff).
"""
from __future__ import annotations

import pandas as pd

from repro.labeling.functions import suite_stats

PAPER = {
    #       #LFs  #new  minutes
    "FZ": (12, 5, 30),
    "DA": (13, 6, 50),
    "DS": (16, 4, 45),
    "AB": (13, 4, 30),
    "AG": (13, 3, 20),
    "WA": (14, 2, 15),
    "IR": (8, 1, 10),
    "YY": (10, 1, 10),
    "ABN": (13, 2, 15),
    "M": (10, 3, 25),
    "C": (11, 2, 15),
}


def run() -> pd.DataFrame:
    df = suite_stats()
    df["paper_n_lfs"] = df.dataset.map(lambda d: PAPER[d][0])
    df["paper_n_new_lfs"] = df.dataset.map(lambda d: PAPER[d][1])
    df["paper_minutes"] = df.dataset.map(lambda d: PAPER[d][2])
    return df
