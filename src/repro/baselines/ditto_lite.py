"""Ditto-lite — simulated pretrained-LM matcher (paper Table 4 baseline).

Ditto fine-tunes a pretrained language model on serialized record pairs.
No torch or pretrained weights exist in this container, so this module is
the documented substitution (DESIGN.md): records are serialized Ditto-
style ("COL <attr> VAL <value> …"), embedded as hashed character-3-gram
count vectors, and a pair is represented by [|u−v|, u⊙v] — the standard
text-pair interaction features. A logistic regression trained with Adam
(class-balanced) plays the classifier.

What the substitution preserves: the *protocol* (supervised training on a
random 3:1:1 split of the candidate set, picking the best epoch on the
validation F1) and the qualitative behaviour the paper observes — strong
on textual datasets, weaker on numeric/categorical signal, and sensitive
to the train/test split.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

import numpy as np
import pandas as pd

_DIM = 2048


def serialize(row: pd.Series, side: str, attrs: list[str]) -> str:
    """Ditto-style serialization of one record of a pair frame row."""
    parts = []
    for a in attrs:
        v = row.get(f"{side}_{a}")
        if v is None or (isinstance(v, float) and np.isnan(v)) or v is pd.NA:
            continue
        parts.append(f"COL {a} VAL {v}")
    return " ".join(parts)


def _ngram_vector(text: str, dim: int = _DIM) -> np.ndarray:
    # crc32, not builtin hash(): the builtin is salted per process and
    # would make features non-deterministic across runs.
    v = np.zeros(dim, dtype=np.float32)
    t = f"  {text.lower()}  "
    for i in range(len(t) - 2):
        v[zlib.crc32(t[i: i + 3].encode()) % dim] += 1.0
    n = np.linalg.norm(v)
    return v / n if n else v


def pair_features(pairs: pd.DataFrame, attrs: list[str]) -> np.ndarray:
    """[|u−v|, u⊙v] hashed-n-gram features for each pair row."""
    feats = np.empty((len(pairs), 2 * _DIM), dtype=np.float32)
    for i, (_, row) in enumerate(pairs.iterrows()):
        u = _ngram_vector(serialize(row, "l", attrs))
        v = _ngram_vector(serialize(row, "r", attrs))
        feats[i, :_DIM] = np.abs(u - v)
        feats[i, _DIM:] = u * v
    return feats


@dataclass
class DittoLite:
    """Logistic regression over pair interaction features."""

    w: np.ndarray
    b: float

    def predict_proba(self, F: np.ndarray) -> np.ndarray:
        z = F @ self.w + self.b
        return 1.0 / (1.0 + np.exp(-np.clip(z, -30, 30)))

    def predict(self, F: np.ndarray) -> np.ndarray:
        return (self.predict_proba(F) >= 0.5).astype(np.int8)


def train(
    F: np.ndarray,
    y: np.ndarray,
    F_val: np.ndarray | None = None,
    y_val: np.ndarray | None = None,
    *,
    epochs: int = 30,
    lr: float = 0.05,
    batch: int = 128,
    seed: int = 0,
) -> DittoLite:
    """Adam-trained class-balanced logistic regression, best-val-F1 epoch."""
    g = np.random.default_rng(seed)
    n, d = F.shape
    w = np.zeros(d, dtype=np.float64)
    b = 0.0
    pos = max(int((y == 1).sum()), 1)
    neg = max(int((y == 0).sum()), 1)
    sw = np.where(y == 1, n / (2 * pos), n / (2 * neg))
    m = np.zeros(d + 1)
    v = np.zeros(d + 1)
    b1, b2, eps = 0.9, 0.999, 1e-8
    step = 0
    best = (None, -1.0)
    for ep in range(epochs):
        order = g.permutation(n)
        for s in range(0, n, batch):
            idx = order[s: s + batch]
            z = F[idx] @ w + b
            p = 1.0 / (1.0 + np.exp(-np.clip(z, -30, 30)))
            gz = (p - y[idx]) * sw[idx] / len(idx)
            gw = F[idx].T @ gz + 1e-4 * w
            gb = gz.sum()
            grad = np.concatenate([gw, [gb]])
            step += 1
            m = b1 * m + (1 - b1) * grad
            v = b2 * v + (1 - b2) * grad * grad
            upd = lr * (m / (1 - b1**step)) / (np.sqrt(v / (1 - b2**step)) + eps)
            w -= upd[:-1]
            b -= upd[-1]
        if F_val is not None and len(F_val):
            model = DittoLite(w=w.copy(), b=float(b))
            pv = model.predict(F_val)
            tp = ((pv == 1) & (y_val == 1)).sum()
            fp = ((pv == 1) & (y_val == 0)).sum()
            fn = ((pv == 0) & (y_val == 1)).sum()
            prec = tp / max(tp + fp, 1)
            rec = tp / max(tp + fn, 1)
            f1 = 2 * prec * rec / max(prec + rec, 1e-9)
            if f1 > best[1]:
                best = (model, f1)
    if best[0] is not None:
        return best[0]
    return DittoLite(w=w, b=float(b))
