"""Synthetic WRENCH-style weak supervision datasets (Table 12 substrate).

The WRENCH benchmark datasets (basketball, commercial, …, census) are not
available offline, so each registry entry generates a (ground truth,
labeling matrix) pair that preserves the characteristics the experiment
exercises. The generative structure has two LF blocks:

* **independent LFs** — each forms its own opinion of the truth with its
  own accuracy and firing propensity (conditionally independent given y);
* **herd LFs** — partitioned into "herds" that share a latent *view*:
  the view tracks the truth only weakly (``herd_view_acc``), but members
  copy the view almost perfectly (``herd_member_acc``), so herd members
  agree strongly *with each other* while being only loosely grounded.

The herd is the structural property that drives Table 12's shape: plain
majority vote double-counts the herd in proportion to its size; methods
that assume conditional independence (D&S, EBCC, FlyingSquid) mistake the
herd's mutual agreement for high accuracy and can converge to the herd's
view instead of the truth (the catastrophic near-zero scores the paper
reports on youtube/cdr/sms/census); SIMPLE's interaction-aware classifier
can learn that herd votes are redundant and lean on the accurate
independent LFs.

LF opinions are expressed subject to a per-LF firing propensity, and most
LFs are *unipolar* (emit one label or abstain) — the dominant LF shape in
real weak-supervision corpora. Votes are in {-1, 0, +1} with 0 = abstain,
matching the paper's encoding.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class WrenchConfig:
    """Profile of one synthetic general weak-supervision dataset."""

    name: str
    metric: str                     # "F1" or "acc" — as the benchmark reports
    n: int
    pos_rate: float                 # class balance P(y=+1)
    ind_lfs: int                    # number of independent LFs
    ind_acc: tuple[float, float]    # accuracy range of independent LFs
    ind_prop: tuple[float, float]   # firing-propensity range of independents
    herd_lfs: int = 0               # number of herd LFs (0 → no herd)
    n_herds: int = 1
    herd_view_acc: float = 0.55     # herd view's accuracy w.r.t. the truth
    herd_member_acc: float = 0.92   # member agreement with the herd view
    herd_prop: tuple[float, float] = (0.05, 0.15)
    unipolar_frac: float = 0.7      # fraction of LFs that emit one label only
    pos_polarity_frac: float = 0.6  # among unipolar LFs, P(polarity = +1)
    seed: int = 0

    @property
    def n_lfs(self) -> int:
        return self.ind_lfs + self.herd_lfs


@dataclass
class WrenchDataset:
    """Labeling matrix + hidden truth for one synthetic dataset."""

    name: str
    metric: str
    votes: np.ndarray         # (n, m) int8 in {-1, 0, +1}
    y: np.ndarray             # (n,) int8 in {-1, +1}

    def to_spark(self, spark: SparkSession) -> DataFrame:
        """Pair-table form: lid = row index, rid = 0, lf_0..lf_{m-1}, label."""
        n, m = self.votes.shape
        pdf = pd.DataFrame(
            self.votes.astype(np.int32), columns=[f"lf_{j}" for j in range(m)]
        )
        pdf.insert(0, "rid", 0)
        pdf.insert(0, "lid", np.arange(n, dtype=np.int64))
        pdf["label"] = (self.y > 0).astype(np.int32)
        return spark.createDataFrame(pdf)


def generate(cfg: WrenchConfig) -> WrenchDataset:
    g = np.random.default_rng(cfg.seed)
    n, m = cfg.n, cfg.n_lfs
    y = np.where(g.random(n) < cfg.pos_rate, 1, -1).astype(np.int8)
    # Herd views: weakly grounded, shared by each herd's members.
    views = y[:, None] * np.where(
        g.random((n, max(cfg.n_herds, 1))) < cfg.herd_view_acc, 1, -1
    )
    # Per-LF parameters. LFs [0, ind_lfs) are independent; the rest herd.
    accs = np.concatenate(
        [
            g.uniform(*cfg.ind_acc, size=cfg.ind_lfs),
            np.full(cfg.herd_lfs, cfg.herd_member_acc),
        ]
    )
    props = np.concatenate(
        [
            g.uniform(*cfg.ind_prop, size=cfg.ind_lfs),
            g.uniform(*cfg.herd_prop, size=cfg.herd_lfs),
        ]
    )
    herd_of = g.integers(0, max(cfg.n_herds, 1), size=cfg.herd_lfs)
    unip = g.random(m) < cfg.unipolar_frac
    pol = np.where(
        unip, np.where(g.random(m) < cfg.pos_polarity_frac, 1, -1), 0
    ).astype(np.int8)
    votes = np.zeros((n, m), dtype=np.int8)
    for j in range(m):
        if j < cfg.ind_lfs:
            target = y            # opinion anchored on the truth
        else:
            target = views[:, herd_of[j - cfg.ind_lfs]]  # ...on the herd view
        correct = g.random(n) < accs[j]
        opinion = target * np.where(correct, 1, -1)
        fired = g.random(n) < props[j]
        if pol[j] != 0:
            fired = fired & (opinion == pol[j])
        votes[fired, j] = opinion[fired]
    return WrenchDataset(name=cfg.name, metric=cfg.metric, votes=votes, y=y)


# Profiles mirror Table 12's dataset list (n scaled down; #LFs exact).
# Datasets where the paper reports near-parity have no or tiny herds;
# datasets where generative baselines collapse have large herds.
REGISTRY: dict[str, WrenchConfig] = {
    "basketball": WrenchConfig("basketball", "F1", 1500, 0.06,
                               4, (0.68, 0.78), (0.1, 0.25), seed=31),
    "commercial": WrenchConfig("commercial", "F1", 2000, 0.30,
                               4, (0.8, 0.92), (0.5, 0.8),
                               unipolar_frac=0.5, seed=32),
    "tennis": WrenchConfig("tennis", "F1", 1200, 0.35,
                           6, (0.78, 0.9), (0.5, 0.85),
                           unipolar_frac=0.5, seed=33),
    "yelp": WrenchConfig("yelp", "acc", 2000, 0.5,
                         6, (0.62, 0.82), (0.3, 0.6),
                         herd_lfs=2, herd_view_acc=0.6,
                         herd_prop=(0.3, 0.5), seed=34),
    "imdb": WrenchConfig("imdb", "acc", 2000, 0.5,
                         5, (0.62, 0.82), (0.3, 0.6),
                         herd_lfs=3, herd_view_acc=0.65,
                         herd_prop=(0.25, 0.45), seed=35),
    "spouse": WrenchConfig("spouse", "F1", 2500, 0.08,
                           5, (0.6, 0.8), (0.12, 0.35),
                           herd_lfs=4, herd_view_acc=0.6,
                           herd_prop=(0.08, 0.2),
                           unipolar_frac=0.8, seed=36),
    "youtube": WrenchConfig("youtube", "acc", 1600, 0.5,
                            4, (0.82, 0.95), (0.35, 0.7),
                            herd_lfs=6, herd_view_acc=0.58,
                            herd_member_acc=0.95, herd_prop=(0.3, 0.55),
                            seed=37),
    "cdr": WrenchConfig("cdr", "F1", 2500, 0.25,
                        10, (0.65, 0.85), (0.25, 0.5),
                        herd_lfs=23, n_herds=2, herd_view_acc=0.55,
                        herd_member_acc=0.92, herd_prop=(0.06, 0.18),
                        unipolar_frac=0.8, seed=38),
    "sms": WrenchConfig("sms", "F1", 2000, 0.13,
                        15, (0.8, 0.95), (0.1, 0.3),
                        herd_lfs=58, n_herds=3, herd_view_acc=0.55,
                        herd_member_acc=0.93, herd_prop=(0.01, 0.05),
                        unipolar_frac=0.85, seed=39),
    "census": WrenchConfig("census", "F1", 2500, 0.24,
                           10, (0.72, 0.85), (0.3, 0.6),
                           herd_lfs=73, n_herds=2, herd_view_acc=0.55,
                           herd_member_acc=0.92, herd_prop=(0.05, 0.12),
                           unipolar_frac=0.85, seed=40),
}

ALL_DATASETS = list(REGISTRY)


def load(name: str) -> WrenchDataset:
    """Generate a registered WRENCH-style dataset by name."""
    return generate(REGISTRY[name])
