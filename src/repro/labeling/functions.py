"""Labeling functions for EM and per-dataset LF suites (paper Section 5.2).

An :class:`LF` is a small declarative program over a record pair: a *kind*
(the predicate template), an *attribute*, and numeric *params* (thresholds).
Keeping LFs declarative rather than opaque closures gives us, for free:

* Table 2 — counting LFs and which ones are "new" vs reused across
  datasets (each (kind, attr) family records the dataset that introduced
  it, in the paper's development order);
* Table 10 — LF reuse under data shift;
* Table 11 — randomized-threshold sensitivity (perturb ``params``).

Votes follow the paper's encoding: +1 match, -1 non-match, 0 abstain.
Application to pair tables happens in ``repro.core.labeling_matrix`` via
mapInPandas; the ``vote`` method here is plain pandas/numpy.
"""
from __future__ import annotations

from dataclasses import dataclass, field, replace

import numpy as np
import pandas as pd

from repro.labeling import primitives as P

# Kinds and their perturbable numeric params (for Table 11 randomization).
_KIND_PARAMS = {
    "overlap": ("hi", "lo"),
    "jaccard": ("hi", "lo"),
    "lev": ("hi", "lo"),
    "equal_pos": (),
    "equal_neg": (),
    "num_reldiff": ("pos_tol", "neg_tol"),
    "regex_num_unmatch": ("tol",),
    "prefix_pos": (),
}


@dataclass(frozen=True)
class LF:
    """One labeling function: ``kind`` predicate on ``attr`` with ``params``."""

    name: str
    kind: str
    attr: str
    params: dict = field(default_factory=dict)
    origin: str = ""   # dataset that introduced this (kind, attr) family

    def vote(self, pdf: pd.DataFrame) -> np.ndarray:
        """Votes in {-1,0,+1} for each row of a pair frame (l_/r_ columns)."""
        a = pdf[f"l_{self.attr}"]
        b = pdf[f"r_{self.attr}"]
        fn = getattr(self, f"_{self.kind}")
        return np.array([fn(x, y) for x, y in zip(a, b)], dtype=np.int8)

    # --- kind implementations (scalar; None-safe via primitives) -----------
    def _overlap(self, a, b):
        s = P.overlap_coeff(a, b)
        if s >= self.params["hi"]:
            return 1
        if s <= self.params["lo"]:
            return -1
        return 0

    def _jaccard(self, a, b):
        s = P.jaccard(a, b)
        if s >= self.params["hi"]:
            return 1
        if s <= self.params["lo"]:
            return -1
        return 0

    def _lev(self, a, b):
        s = P.lev_sim(a, b)
        if s >= self.params["hi"]:
            return 1
        if s <= self.params["lo"]:
            return -1
        return 0

    def _equal_pos(self, a, b):
        if a is None or b is None or pd.isna(a) or pd.isna(b):
            return 0
        return 1 if P.norm_str(a) == P.norm_str(b) else 0

    def _equal_neg(self, a, b):
        if a is None or b is None or pd.isna(a) or pd.isna(b):
            return 0
        return -1 if P.norm_str(a) != P.norm_str(b) else 0

    def _num_reldiff(self, a, b):
        d = P.rel_num_diff(a, b)
        if d is None:
            return 0
        if d <= self.params["pos_tol"]:
            return 1
        if d >= self.params["neg_tol"]:
            return -1
        return 0

    def _regex_num_unmatch(self, a, b):
        # paper's size_unmatch: regex-extract a number; differ → non-match.
        na, nb = P.first_number(a), P.first_number(b)
        if na is None or nb is None:
            return 0
        return -1 if abs(na - nb) > self.params["tol"] else 0

    def _prefix_pos(self, a, b):
        ta, tb = P.token_list(a), P.token_list(b)
        k = int(self.params.get("k", 2))
        if len(ta) < k or len(tb) < k:
            return 0
        return 1 if ta[:k] == tb[:k] else 0


def randomize(lf: LF, g: np.random.Generator, rel: float = 0.2) -> LF:
    """Table 11 'RT': tweak each numeric threshold by ±``rel`` relative."""
    if not _KIND_PARAMS[lf.kind]:
        return lf
    new = dict(lf.params)
    for p in _KIND_PARAMS[lf.kind]:
        v = new[p]
        new[p] = float(np.clip(v * (1 + g.uniform(-rel, rel)), 0.0, 1.0)) if v <= 1 \
            else float(v * (1 + g.uniform(-rel, rel)))
    return replace(lf, params=new)


# ---------------------------------------------------------------------------
# Per-dataset suites (development order as in the paper: FZ, DA, DS, AB, AG,
# M, C, WA, IR, YY, ABN). A family key (kind, attr, variant) is "new" for
# the first dataset that uses it; later datasets reuse it.
# ---------------------------------------------------------------------------
_DEV_ORDER = ["FZ", "DA", "DS", "AB", "AG", "M", "C", "WA", "IR", "YY", "ABN"]

# (kind, attr, variant) → builder params. Variants model the paper's cheap
# "change the attribute or distance function" reuse.
_TEMPLATES: dict[tuple[str, str, str], dict] = {
    ("overlap", "name", "t1"): dict(hi=0.8, lo=0.2),
    ("overlap", "name", "t2"): dict(hi=0.65, lo=0.1),
    ("jaccard", "name", "t1"): dict(hi=0.6, lo=0.15),
    ("jaccard", "name", "t2"): dict(hi=0.45, lo=0.08),
    ("lev", "name", "t1"): dict(hi=0.8, lo=0.35),
    ("equal_pos", "name", "t1"): dict(),
    ("prefix_pos", "name", "t1"): dict(k=2),
    ("overlap", "descr", "t1"): dict(hi=0.7, lo=0.08),
    ("jaccard", "descr", "t1"): dict(hi=0.4, lo=0.05),
    ("regex_num_unmatch", "descr", "t1"): dict(tol=0.5),
    ("num_reldiff", "price", "t1"): dict(pos_tol=0.03, neg_tol=0.6),
    ("num_reldiff", "size", "t1"): dict(pos_tol=0.01, neg_tol=0.05),
    ("equal_neg", "size", "t1"): dict(),
    ("equal_neg", "brand", "t1"): dict(),
    ("equal_neg", "year", "t1"): dict(),
    ("equal_neg", "city", "t1"): dict(),
    ("equal_pos", "phone", "t1"): dict(),
    ("equal_neg", "phone", "t1"): dict(),
    ("num_reldiff", "year", "t1"): dict(pos_tol=0.0, neg_tol=0.001),
}

# Which template keys each dataset's suite uses (aligned to its attrs;
# suite sizes track Table 2's # of LFs).
_SUITES: dict[str, list[tuple[str, str, str]]] = {
    "FZ": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("jaccard", "name", "t2"),
        ("lev", "name", "t1"), ("equal_pos", "name", "t1"),
        ("prefix_pos", "name", "t1"), ("equal_neg", "city", "t1"),
        ("equal_pos", "phone", "t1"), ("equal_neg", "phone", "t1"),
        ("num_reldiff", "price", "t1"), ("lev", "city", "t1"),
    ],
    "DA": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("jaccard", "name", "t2"),
        ("lev", "name", "t1"), ("equal_pos", "name", "t1"),
        ("prefix_pos", "name", "t1"), ("equal_neg", "brand", "t1"),
        ("equal_neg", "year", "t1"), ("overlap", "descr", "t1"),
        ("jaccard", "descr", "t1"), ("lev", "descr", "t1"),
        ("num_reldiff", "year", "t1"),
    ],
    "DS": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("jaccard", "name", "t2"),
        ("lev", "name", "t1"), ("equal_pos", "name", "t1"),
        ("prefix_pos", "name", "t1"), ("equal_neg", "brand", "t1"),
        ("equal_neg", "year", "t1"), ("overlap", "descr", "t1"),
        ("jaccard", "descr", "t1"), ("lev", "descr", "t1"),
        ("num_reldiff", "year", "t1"), ("overlap", "descr", "t2"),
        ("jaccard", "name", "t3"), ("lev", "name", "t2"),
    ],
    "AB": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("jaccard", "name", "t2"),
        ("lev", "name", "t1"), ("prefix_pos", "name", "t1"),
        ("overlap", "descr", "t1"), ("jaccard", "descr", "t1"),
        ("regex_num_unmatch", "descr", "t1"),
        ("num_reldiff", "price", "t1"), ("equal_neg", "size", "t1"),
        ("num_reldiff", "size", "t1"), ("lev", "descr", "t1"),
    ],
    "AG": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("jaccard", "name", "t2"),
        ("lev", "name", "t1"), ("prefix_pos", "name", "t1"),
        ("equal_neg", "brand", "t1"), ("overlap", "descr", "t1"),
        ("jaccard", "descr", "t1"), ("regex_num_unmatch", "descr", "t1"),
        ("num_reldiff", "price", "t1"), ("lev", "descr", "t1"),
        ("overlap", "descr", "t2"),
    ],
    "M": [
        ("overlap", "name", "t1"), ("jaccard", "name", "t1"),
        ("lev", "name", "t1"), ("prefix_pos", "name", "t1"),
        ("equal_neg", "brand", "t1"), ("equal_neg", "size", "t1"),
        ("num_reldiff", "size", "t1"), ("num_reldiff", "price", "t1"),
        ("regex_num_unmatch", "descr", "t1"), ("overlap", "descr", "t1"),
    ],
    "C": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("lev", "name", "t1"),
        ("prefix_pos", "name", "t1"), ("equal_neg", "brand", "t1"),
        ("equal_neg", "size", "t1"), ("num_reldiff", "size", "t1"),
        ("num_reldiff", "price", "t1"), ("regex_num_unmatch", "descr", "t1"),
        ("overlap", "descr", "t1"),
    ],
    "WA": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("jaccard", "name", "t2"),
        ("lev", "name", "t1"), ("prefix_pos", "name", "t1"),
        ("equal_neg", "brand", "t1"), ("overlap", "descr", "t1"),
        ("jaccard", "descr", "t1"), ("regex_num_unmatch", "descr", "t1"),
        ("num_reldiff", "price", "t1"), ("equal_neg", "size", "t1"),
        ("num_reldiff", "size", "t1"), ("lev", "descr", "t1"),
    ],
    "IR": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("lev", "name", "t1"),
        ("equal_pos", "name", "t1"), ("equal_neg", "year", "t1"),
        ("overlap", "descr", "t1"), ("jaccard", "descr", "t1"),
    ],
    "YY": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("jaccard", "name", "t2"),
        ("lev", "name", "t1"), ("equal_pos", "name", "t1"),
        ("prefix_pos", "name", "t1"), ("equal_neg", "city", "t1"),
        ("equal_pos", "phone", "t1"), ("equal_neg", "phone", "t1"),
    ],
    "ABN": [
        ("overlap", "name", "t1"), ("overlap", "name", "t2"),
        ("jaccard", "name", "t1"), ("jaccard", "name", "t2"),
        ("lev", "name", "t1"), ("equal_pos", "name", "t1"),
        ("prefix_pos", "name", "t1"), ("equal_neg", "brand", "t1"),
        ("equal_neg", "year", "t1"), ("overlap", "descr", "t1"),
        ("jaccard", "descr", "t1"), ("lev", "descr", "t1"),
        ("num_reldiff", "year", "t1"),
    ],
}

# Extra variant templates referenced above but derived from base families
# (same (kind, attr) family → not "new" effort, per the paper's counting).
_TEMPLATES[("lev", "city", "t1")] = dict(hi=0.85, lo=0.3)
_TEMPLATES[("lev", "descr", "t1")] = dict(hi=0.7, lo=0.2)
_TEMPLATES[("overlap", "descr", "t2")] = dict(hi=0.55, lo=0.04)
_TEMPLATES[("jaccard", "name", "t3")] = dict(hi=0.35, lo=0.05)
_TEMPLATES[("lev", "name", "t2")] = dict(hi=0.7, lo=0.25)


def _family(key: tuple[str, str, str]) -> tuple[str, str]:
    """Effort family: (kind, attr) — variants of one family are cheap."""
    return key[0], key[1]


def _origins() -> dict[tuple[str, str], str]:
    """First dataset (in development order) using each effort family."""
    seen: dict[tuple[str, str], str] = {}
    for ds in _DEV_ORDER:
        for key in _SUITES[ds]:
            seen.setdefault(_family(key), ds)
    return seen


_ORIGINS = _origins()


def lf_suite(dataset: str) -> list[LF]:
    """The LF suite for a registered dataset (Table 2's LF sets)."""
    out = []
    for kind, attr, variant in _SUITES[dataset]:
        out.append(
            LF(
                name=f"{kind}_{attr}_{variant}",
                kind=kind,
                attr=attr,
                params=dict(_TEMPLATES[(kind, attr, variant)]),
                origin=_ORIGINS[(kind, attr)],
            )
        )
    return out


def new_lf_count(dataset: str) -> int:
    """# of LFs whose effort family was introduced by this dataset."""
    return sum(1 for lf in lf_suite(dataset) if lf.origin == dataset)


def suite_stats() -> pd.DataFrame:
    """Table 2 structural stats: # LFs and # new LFs per dataset."""
    rows = [
        {
            "dataset": ds,
            "n_lfs": len(lf_suite(ds)),
            "n_new_lfs": new_lf_count(ds),
        }
        for ds in _DEV_ORDER
    ]
    return pd.DataFrame(rows)
