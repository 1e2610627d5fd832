"""SMOTE oversampler (imblearn substitute) — paper Section 3.2.

SIMPLE balances the classes at every M-step by synthesizing minority-class
points: pick a minority point, pick one of its k nearest minority
neighbours, emit a random convex combination of the two. This matches the
original SMOTE (Chawla et al. 2002) as used by the paper.

Distances are Euclidean over the vote features; neighbour search is brute
force in numpy, which is ample for labeling matrices (m ≤ ~100).
"""
from __future__ import annotations

import numpy as np


def smote(
    X: np.ndarray,
    y: np.ndarray,
    *,
    k: int = 5,
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Augment the minority class up to the majority-class size.

    Returns (X', y') = originals followed by synthetic minority points. If
    either class is empty or already balanced the input is returned as-is.
    """
    X = np.asarray(X, dtype=np.float32)
    y = np.asarray(y, dtype=np.int8)
    n_pos, n_neg = int((y == 1).sum()), int((y == 0).sum())
    if n_pos == 0 or n_neg == 0 or n_pos == n_neg:
        return X, y
    minority = 1 if n_pos < n_neg else 0
    need = abs(n_neg - n_pos)
    Xm = X[y == minority]
    g = np.random.default_rng(seed)
    # Brute-force kNN is quadratic in the minority size; cap it. Vote
    # patterns repeat heavily, so a subsample preserves the neighborhood
    # structure the interpolation needs.
    if len(Xm) > 3000:
        Xm = Xm[g.choice(len(Xm), size=3000, replace=False)]
    if len(Xm) == 1:
        synth = np.repeat(Xm, need, axis=0)
    else:
        kk = min(k, len(Xm) - 1)
        # Pairwise distances among minority points (brute force).
        d2 = ((Xm[:, None, :] - Xm[None, :, :]) ** 2).sum(-1)
        np.fill_diagonal(d2, np.inf)
        nn = np.argsort(d2, axis=1)[:, :kk]  # (n_min, kk)
        base = g.integers(0, len(Xm), size=need)
        pick = nn[base, g.integers(0, kk, size=need)]
        lam = g.random((need, 1)).astype(np.float32)
        synth = Xm[base] + lam * (Xm[pick] - Xm[base])
    X_out = np.concatenate([X, synth.astype(np.float32)])
    y_out = np.concatenate([y, np.full(need, minority, dtype=np.int8)])
    return X_out, y_out
