"""Synthetic entity-matching benchmarks mirroring the paper's 11 datasets.

The paper evaluates on real benchmarks (Leipzig, Magellan, Alaska) that are
not available offline, so this module generates *structural equivalents*:
an entity universe organised in "families" of near-identical entities (the
source of hard non-matches), perturbed record views (typos, token drops,
abbreviations, missing values, numeric jitter — controlled by a per-dataset
``dirt`` level), and controllable duplicates per table (controlling the
duplicate-free property that SIMPLE-EM's transitivity machinery keys on).

Every dataset in the registry maps to one paper dataset and preserves the
properties its experiments exercise:

=====  ===========  =====================================================
name   paper        preserved structure
=====  ===========  =====================================================
FZ     Fodors-Zag.  tiny, clean, 1-to-1 matches, both tables dup-free
DA     DBLP-ACM     clean citations, both dup-free, many matches
DS     DBLP-Schol.  skewed sizes, right table has many duplicates
AB     Abt-Buy      dirty product text, (almost) dup-free
AG     Amazon-Goog  dirtier product text
WA     Walmart-Amz  dirtiest; weak LF signal, duplicates present
IR     IMDB-RT      partial ground truth, clean
YY     YP-Yelp      partial ground truth, right dups
ABN    Amzn-BN      partial ground truth, moderate dirt
M      Monitor      single table, medium clusters
C      Camera       single table, large (zipfian) clusters
=====  ===========  =====================================================

All record tables share one superset schema so labeling functions are
reusable across datasets exactly as in the paper (Section 5.2):

``rid_ (long), name, brand, city, phone, descr (str), price, size (double),
year (long)``
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

RECORD_COLUMNS = [
    "rid_", "name", "brand", "city", "phone", "descr", "price", "size", "year",
]

_WORDS = (
    "alpha nova prime ultra max pro plus mini slim turbo smart digital classic "
    "series elite core power air metro royal grand star vision fusion swift "
    "omega delta zeta quantum pixel echo luna terra aqua solar lumen vertex "
    "crest summit atlas orion nebula comet triton zephyr"
).split()
_BRANDS = (
    "samsung sony canon nikon apple dell lenovo panasonic philips sharp asus "
    "acer toshiba fujitsu olympus kodak benq viewsonic"
).split()
_CITIES = (
    "atlanta boston chicago dallas denver houston miami phoenix seattle "
    "portland austin nashville"
).split()


@dataclass
class DatasetConfig:
    """Knobs for one synthetic benchmark (see module docstring)."""

    name: str
    paper_name: str
    single_table: bool = False
    n_families: int = 120
    family_size: tuple[int, int] = (1, 3)  # entities per family (hard non-matches)
    n_left: int = 200
    n_right: int = 200
    n_matches: int = 100          # two-table: cross-table matching record pairs
    left_dups: int = 0            # extra duplicate records in the left table
    right_dups: int = 0
    dirt: float = 0.15            # perturbation intensity in [0, 1]
    missing_rate: float = 0.05
    partial_gt: bool = False      # only a labeled subset (IR/YY/ABN)
    n_gt_matches: int = 0         # labeled matches when partial_gt
    n_gt_nonmatches: int = 0
    # single-table: cluster-size distribution
    n_clusters: int = 0
    zipf_alpha: float = 0.0       # 0 → sizes uniform in [1, max_cluster]
    max_cluster: int = 4
    blocking_attr: str = "name"
    blocking_overlap: int = 1
    # words distinguishing family co-members' names: higher → family
    # non-matches are sparser/easier, and FP edges stop forming dense
    # transitively-consistent blobs (single-table datasets need this so
    # the transitivity machinery has prunable bridges, as in real data)
    variant_words: tuple[int, int] = (0, 3)
    attrs: tuple[str, ...] = ("name", "brand", "price", "size", "descr")
    seed: int = 7


@dataclass
class EMDataset:
    """A generated benchmark: record table(s) + ground truth + metadata."""

    name: str
    config: DatasetConfig
    left: DataFrame
    right: DataFrame          # == left for single-table datasets
    truth: DataFrame          # (lid, rid, label); partial GT → subset only
    single_table: bool
    n_matches: int
    left_pdf: pd.DataFrame = field(repr=False, default=None)
    right_pdf: pd.DataFrame = field(repr=False, default=None)
    truth_pdf: pd.DataFrame = field(repr=False, default=None)


def _mk_entities(cfg: DatasetConfig, g: np.random.Generator) -> pd.DataFrame:
    """Entity universe: families of near-identical entities.

    Family members share brand, base name tokens, description vocabulary
    and a base price, differing only in a short model token, (sometimes)
    size, and a small price offset — so family co-members are *hard*
    non-matches: every attribute looks similar, exactly like product
    variants in Abt-Buy/Walmart-Amazon or monitor models in Alaska.
    """
    # Ensure the universe can fill both tables (plus slack for the
    # interleaved split): keep generating families past n_families if the
    # configured table sizes need more entities.
    if cfg.single_table:
        needed = cfg.n_clusters
    else:
        needed = cfg.n_left + cfg.n_right + cfg.n_matches
    rows = []
    eid = 0
    fam = 0
    while fam < cfg.n_families or eid < needed:
        fam += 1
        base = list(g.choice(_WORDS, size=int(g.integers(2, 5)), replace=False))
        brand = str(g.choice(_BRANDS))
        city = str(g.choice(_CITIES))
        fam_descr = list(g.choice(_WORDS, size=4))
        fam_price = float(np.exp(g.normal(5.0, 1.0)))
        fam_size = int(g.integers(cfg.family_size[0], cfg.family_size[1] + 1))
        base_size = float(g.integers(10, 90))
        base_year = int(g.integers(1995, 2019))
        for k in range(fam_size):
            model = f"{g.integers(10, 99)}{chr(97 + int(g.integers(0, 26)))}"
            # Variant diversity: members differ by the model token plus a
            # variable number of member-specific words, so family pairs
            # span the whole similarity spectrum (some barely
            # distinguishable, some clearly different) — mirroring real
            # product variants and keeping LF errors diverse rather than
            # systematic.
            n_variant = int(g.integers(*cfg.variant_words))
            variant = list(g.choice(_WORDS, size=n_variant)) if n_variant else []
            size = base_size if g.random() < 0.3 else base_size + float(
                g.integers(1, 12)
            )
            price = fam_price * float(1 + g.normal(0, 0.08) + 0.05 * k)
            rows.append(
                {
                    "eid": eid,
                    "name": " ".join([brand] + base + [model] + variant),
                    "brand": brand,
                    "city": city,
                    "phone": f"{g.integers(200, 999)}-{g.integers(1000, 9999)}",
                    "descr": " ".join([f"{size:.0f} inch"] + fam_descr),
                    "price": float(np.round(price, 2)),
                    "size": size,
                    "year": int(np.clip(base_year + int(g.integers(0, 3)), 1995, 2021)),
                }
            )
            eid += 1
        if fam > 100000:  # safety against a misconfigured loop
            break
    return pd.DataFrame(rows)


def _typo(word: str, g: np.random.Generator) -> str:
    if len(word) < 2:
        return word
    i = int(g.integers(0, len(word)))
    c = chr(97 + int(g.integers(0, 26)))
    op = g.random()
    if op < 0.4:  # substitute
        return word[:i] + c + word[i + 1:]
    if op < 0.7:  # delete
        return word[:i] + word[i + 1:]
    return word[:i] + c + word[i:]  # insert


def _perturb_name(name: str, dirt: float, g: np.random.Generator) -> str:
    toks = name.split()
    out = []
    for t in toks:
        r = g.random()
        if r < dirt * 0.25:
            continue  # drop token
        if r < dirt * 0.45:
            out.append(_typo(t, g))
        elif r < dirt * 0.55 and len(t) > 3:
            out.append(t[0] + ".")  # abbreviate
        else:
            out.append(t)
    if g.random() < dirt * 0.3:
        out.append(str(g.choice(_WORDS)))  # spurious token
    if g.random() < dirt * 0.2 and len(out) > 1:
        i = int(g.integers(0, len(out) - 1))
        out[i], out[i + 1] = out[i + 1], out[i]
    return " ".join(out) if out else name


def _record_from_entity(
    ent: pd.Series, cfg: DatasetConfig, g: np.random.Generator
) -> dict:
    """One noisy record view of an entity."""
    d = cfg.dirt
    rec = {
        "name": _perturb_name(ent["name"], d, g),
        "brand": ent["brand"] if g.random() > d * 0.2 else _typo(ent["brand"], g),
        "city": ent["city"],
        "phone": ent["phone"],
        "descr": _perturb_name(ent["descr"], d * 0.8, g),
        "price": float(np.round(ent["price"] * (1 + g.normal(0, d * 0.15)), 2)),
        "size": float(ent["size"]) if g.random() > d * 0.1 else float(ent["size"]) + 1.0,
        "year": int(ent["year"]) if g.random() > d * 0.1 else int(ent["year"]) + 1,
    }
    for a in ("brand", "city", "phone", "descr"):
        if g.random() < cfg.missing_rate:
            rec[a] = None
    return rec


def _records(
    entity_rows: pd.DataFrame, counts: np.ndarray, cfg: DatasetConfig,
    g: np.random.Generator,
) -> pd.DataFrame:
    """``counts[i]`` record views of entity i, with fresh sequential rid_."""
    rows = []
    for (_, ent), c in zip(entity_rows.iterrows(), counts):
        for _ in range(int(c)):
            r = _record_from_entity(ent, cfg, g)
            r["eid"] = ent["eid"]
            rows.append(r)
    pdf = pd.DataFrame(rows)
    pdf.insert(0, "rid_", np.arange(len(pdf), dtype=np.int64))
    return pdf


def _two_table(cfg: DatasetConfig, g: np.random.Generator):
    ents = _mk_entities(cfg, g)
    n_ent = len(ents)
    n_shared = min(cfg.n_matches, n_ent)
    shared = ents.iloc[:n_shared]
    rest = ents.iloc[n_shared:]
    # Left-only / right-only entities fill each table to its target size.
    n_left_only = max(0, cfg.n_left - n_shared - cfg.left_dups)
    n_right_only = max(0, cfg.n_right - n_shared - cfg.right_dups)
    # Interleave the non-shared entities so that family co-members (which
    # are adjacent in the entity frame) land on OPPOSITE sides — the
    # cross-table hard non-matches that make blocking and LFs err.
    left_pool = pd.concat([shared, rest.iloc[::2].iloc[:n_left_only]])
    right_pool = pd.concat([shared, rest.iloc[1::2].iloc[:n_right_only]])

    lcounts = np.ones(len(left_pool), dtype=int)
    rcounts = np.ones(len(right_pool), dtype=int)
    # Duplicates: extra record views of random (preferably shared) entities.
    for _ in range(cfg.left_dups):
        lcounts[int(g.integers(0, min(n_shared, len(left_pool))))] += 1
    for _ in range(cfg.right_dups):
        rcounts[int(g.integers(0, min(n_shared, len(right_pool))))] += 1

    left = _records(left_pool, lcounts, cfg, g)
    right = _records(right_pool, rcounts, cfg, g)
    truth = (
        left[["rid_", "eid"]].rename(columns={"rid_": "lid"})
        .merge(right[["rid_", "eid"]].rename(columns={"rid_": "rid"}), on="eid")
        [["lid", "rid"]]
    )
    truth["label"] = 1
    return left.drop(columns=["eid"]), right.drop(columns=["eid"]), truth


def _single_table(cfg: DatasetConfig, g: np.random.Generator):
    ents = _mk_entities(cfg, g).iloc[: cfg.n_clusters]
    if cfg.zipf_alpha > 0:
        ranks = np.arange(1, len(ents) + 1)
        w = 1.0 / ranks ** cfg.zipf_alpha
        sizes = 1 + np.minimum(
            cfg.max_cluster - 1,
            g.poisson(w / w.mean() * 1.2, size=len(ents)),
        )
    else:
        sizes = g.integers(1, cfg.max_cluster + 1, size=len(ents))
    tab = _records(ents, sizes, cfg, g)
    m = tab[["rid_", "eid"]]
    truth = m.rename(columns={"rid_": "lid"}).merge(
        m.rename(columns={"rid_": "rid"}), on="eid"
    )
    truth = truth[truth.lid < truth.rid][["lid", "rid"]]
    truth["label"] = 1
    return tab.drop(columns=["eid"]), truth


def _partial_truth(
    truth: pd.DataFrame, cand: pd.DataFrame | None, cfg: DatasetConfig,
    g: np.random.Generator,
) -> pd.DataFrame:
    """Keep a labeled subset of matches + explicit labeled non-matches."""
    matches = truth.sample(
        n=min(cfg.n_gt_matches, len(truth)), random_state=int(g.integers(0, 2**31))
    )
    # Labeled non-matches: random record pairs not in the match set.
    key = set(zip(truth.lid, truth.rid))
    rows, tries = [], 0
    lids = truth.lid.unique()
    rids = truth.rid.unique()
    while len(rows) < cfg.n_gt_nonmatches and tries < cfg.n_gt_nonmatches * 50:
        tries += 1
        l = int(g.choice(lids))
        r = int(g.choice(rids))
        if (l, r) not in key:
            rows.append({"lid": l, "rid": r, "label": 0})
    non = pd.DataFrame(rows, columns=["lid", "rid", "label"])
    return pd.concat([matches, non], ignore_index=True)


def generate(
    spark: SparkSession, cfg: DatasetConfig, *, scale: float = 1.0
) -> EMDataset:
    """Generate one benchmark at ``scale`` (scales record counts, keeps dirt)."""
    cfg = _scaled(cfg, scale)
    g = np.random.default_rng(cfg.seed)
    if cfg.single_table:
        tab, truth = _single_table(cfg, g)
        left_pdf = right_pdf = tab
    else:
        left_pdf, right_pdf, truth = _two_table(cfg, g)
    n_matches = len(truth)
    if cfg.partial_gt:
        truth = _partial_truth(truth, None, cfg, g)
    left = spark.createDataFrame(_arrow_safe(left_pdf))
    right = left if cfg.single_table else spark.createDataFrame(_arrow_safe(right_pdf))
    return EMDataset(
        name=cfg.name,
        config=cfg,
        left=left,
        right=right,
        truth=spark.createDataFrame(truth),
        single_table=cfg.single_table,
        n_matches=n_matches,
        left_pdf=left_pdf,
        right_pdf=right_pdf,
        truth_pdf=truth,
    )


def _arrow_safe(pdf: pd.DataFrame) -> pd.DataFrame:
    """None-able object columns → pandas 'string' dtype for Arrow transfer."""
    out = pdf.copy()
    for c in out.columns:
        if out[c].dtype == object:
            out[c] = out[c].astype("string")
    return out


def _scaled(cfg: DatasetConfig, scale: float) -> DatasetConfig:
    if scale == 1.0:
        return cfg
    s = lambda v, lo=1: max(lo, int(round(v * scale)))  # noqa: E731
    return DatasetConfig(
        **{
            **cfg.__dict__,
            "n_families": s(cfg.n_families, 8),
            "n_left": s(cfg.n_left, 10),
            "n_right": s(cfg.n_right, 10),
            "n_matches": s(cfg.n_matches, 5),
            "left_dups": int(round(cfg.left_dups * scale)),
            "right_dups": int(round(cfg.right_dups * scale)),
            "n_gt_matches": s(cfg.n_gt_matches, 5) if cfg.partial_gt else 0,
            "n_gt_nonmatches": s(cfg.n_gt_nonmatches, 5) if cfg.partial_gt else 0,
            "n_clusters": s(cfg.n_clusters, 8) if cfg.single_table else 0,
        }
    )


def corrupt_ground_truth(
    truth_pdf: pd.DataFrame, all_ids: np.ndarray, x: float, seed: int = 0
) -> pd.DataFrame:
    """Inject transitivity violations per Section 5.5.2.

    Repeat ``x * N_gt`` times: pick a tuple with matches; with p=0.6 remove
    one of its true matching pairs, with p=0.4 add a spurious match pair
    involving it. Returns a new (lid, rid, label=1) match table.
    """
    g = np.random.default_rng(seed)
    matches = {(int(a), int(b)) for a, b in zip(truth_pdf.lid, truth_pdf.rid)}
    n_ops = int(round(x * len(matches)))
    for _ in range(n_ops):
        if not matches:
            break
        involved = list({t for p in matches for t in p})
        ti = int(g.choice(involved))
        mine = [p for p in matches if ti in p]
        if g.random() < 0.6 and mine:
            matches.discard(mine[int(g.integers(0, len(mine)))])
        else:
            for _ in range(20):
                tj = int(g.choice(all_ids))
                a, b = min(ti, tj), max(ti, tj)
                if a != b and (a, b) not in matches:
                    matches.add((a, b))
                    break
    out = pd.DataFrame(sorted(matches), columns=["lid", "rid"])
    out["label"] = 1
    return out


# ---------------------------------------------------------------------------
# Registry — scaled-down structural mirrors of Table 1.
# ---------------------------------------------------------------------------
REGISTRY: dict[str, DatasetConfig] = {
    "FZ": DatasetConfig(
        name="FZ", paper_name="Fodors-Zagats", n_families=60,
        family_size=(1, 2), n_left=110, n_right=70, n_matches=40,
        dirt=0.06, missing_rate=0.02, blocking_overlap=1, seed=11,
        attrs=("name", "city", "phone", "price"),
    ),
    "DA": DatasetConfig(
        name="DA", paper_name="DBLP-ACM", n_families=160,
        family_size=(1, 2), n_left=260, n_right=230, n_matches=220,
        dirt=0.10, blocking_overlap=1, seed=12,
        attrs=("name", "brand", "year", "descr"),
    ),
    "DS": DatasetConfig(
        name="DS", paper_name="DBLP-Scholar", n_families=220,
        family_size=(1, 3), n_left=260, n_right=900, n_matches=320,
        right_dups=160, dirt=0.28, blocking_overlap=1, seed=13,
        attrs=("name", "brand", "year", "descr"),
    ),
    "AB": DatasetConfig(
        name="AB", paper_name="Abt-Buy", n_families=140,
        family_size=(1, 3), n_left=220, n_right=220, n_matches=200,
        left_dups=3, right_dups=2, dirt=0.33, blocking_overlap=1, seed=14,
        attrs=("name", "descr", "price", "size"),
    ),
    "AG": DatasetConfig(
        name="AG", paper_name="Amazon-Google", n_families=170,
        family_size=(2, 3), n_left=260, n_right=620, n_matches=250,
        right_dups=60, dirt=0.46, blocking_overlap=1, seed=15,
        attrs=("name", "brand", "descr", "price"),
    ),
    "WA": DatasetConfig(
        name="WA", paper_name="Walmart-Amazon", n_families=200,
        family_size=(2, 4), n_left=320, n_right=1100, n_matches=230,
        left_dups=40, right_dups=80, dirt=0.58, missing_rate=0.12,
        blocking_overlap=1, seed=16,
        attrs=("name", "brand", "descr", "price", "size"),
    ),
    "IR": DatasetConfig(
        name="IR", paper_name="IMDB-RottenTomatoes", n_families=260,
        family_size=(1, 2), n_left=420, n_right=430, n_matches=60,
        dirt=0.08, partial_gt=True, n_gt_matches=40, n_gt_nonmatches=60,
        blocking_overlap=1, seed=17, attrs=("name", "year", "descr"),
    ),
    "YY": DatasetConfig(
        name="YY", paper_name="YellowPages-Yelp", n_families=300,
        family_size=(1, 2), n_left=700, n_right=380, n_matches=50,
        right_dups=10, dirt=0.12, partial_gt=True, n_gt_matches=35,
        n_gt_nonmatches=70, blocking_overlap=1, seed=18,
        attrs=("name", "city", "phone"),
    ),
    "ABN": DatasetConfig(
        name="ABN", paper_name="Amazon-BarnesNoble", n_families=320,
        family_size=(1, 2), n_left=620, n_right=630, n_matches=70,
        dirt=0.27, partial_gt=True, n_gt_matches=55, n_gt_nonmatches=40,
        blocking_overlap=1, seed=19, attrs=("name", "brand", "year", "descr"),
    ),
    "M": DatasetConfig(
        name="M", paper_name="Monitor", single_table=True, n_families=300,
        family_size=(2, 3), n_clusters=420, max_cluster=4, dirt=0.24,
        blocking_overlap=2, seed=20, variant_words=(1, 4),
        attrs=("name", "brand", "size", "price", "descr"),
    ),
    "C": DatasetConfig(
        name="C", paper_name="Camera", single_table=True, n_families=260,
        family_size=(2, 3), n_clusters=520, max_cluster=8, zipf_alpha=1.0,
        dirt=0.30, blocking_overlap=2, seed=21, variant_words=(1, 4),
        attrs=("name", "brand", "size", "price", "descr"),
    ),
}

TWO_TABLE = [k for k, c in REGISTRY.items() if not c.single_table]
SINGLE_TABLE = [k for k, c in REGISTRY.items() if c.single_table]
ALL_DATASETS = list(REGISTRY)


def load(spark: SparkSession, name: str, *, scale: float = 1.0) -> EMDataset:
    """Generate a registered benchmark by name."""
    return generate(spark, REGISTRY[name], scale=scale)
