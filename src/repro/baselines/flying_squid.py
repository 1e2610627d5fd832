"""FlyingSquid — triplet-method labeling model, baseline "FS".

Fu et al. (2020) estimate LF accuracies in closed form, with no EM loop:
under conditional independence, the signed agreement moments satisfy
E[λ_i λ_j] = a_i a_j where a_j = E[λ_j z] ∈ [-1, 1] is LF j's signed
accuracy. For any triplet (i, j, k):

    |a_i| = sqrt(|M_ij · M_ik / M_jk|)

We estimate each |a_j| as the median over sampled triplets, fix sign(a_j)
positive (the better-than-random LF assumption), and compute posteriors by
naive Bayes over the fired LFs with class prior taken from majority vote —
mirroring the paper's setup where class weights come from MV counts.

Abstains: moments are computed over items where both LFs fired (the
standard on-support reduction).
"""
from __future__ import annotations

import itertools

import numpy as np

from repro.baselines.api import mv_soft


def fit_predict(
    X: np.ndarray, *, max_triplets: int = 200, seed: int = 0
) -> np.ndarray:
    """P(z=1 | votes) via triplet accuracy estimation + naive Bayes."""
    g = np.random.default_rng(seed)
    X = np.asarray(X, dtype=np.float64)
    n, m = X.shape
    fired = X != 0
    # Pairwise signed moments on common support.
    M = np.eye(m)
    support = np.zeros((m, m))
    for i in range(m):
        for j in range(i + 1, m):
            both = fired[:, i] & fired[:, j]
            support[i, j] = support[j, i] = both.sum()
            if both.sum() >= 5:
                M[i, j] = M[j, i] = float((X[both, i] * X[both, j]).mean())
    # Accuracy |a_i| from triplets with usable (non-zero, supported) moments.
    a = np.full(m, 0.5)
    all_triplets = list(itertools.combinations(range(m), 3))
    if len(all_triplets) > max_triplets:
        idx = g.choice(len(all_triplets), size=max_triplets, replace=False)
        all_triplets = [all_triplets[i] for i in idx]
    est: dict[int, list[float]] = {j: [] for j in range(m)}
    for i, j, k in all_triplets:
        for (x, y, z) in ((i, j, k), (j, i, k), (k, i, j)):
            if abs(M[y, z]) > 1e-3 and support[x, y] >= 5 and support[x, z] >= 5:
                v = abs(M[x, y] * M[x, z] / M[y, z])
                est[x].append(np.sqrt(min(v, 1.0)))
    for j in range(m):
        if est[j]:
            a[j] = float(np.clip(np.median(est[j]), 0.05, 0.95))
    # Class prior from majority vote (paper: class weights counted from MV).
    prior = float(np.clip((mv_soft(X) >= 0.5).mean(), 1e-3, 1 - 1e-3))
    # Naive-Bayes posterior: P(λ_j = z | fired) = (1 + a_j) / 2.
    acc = (1 + a) / 2
    log_ratio = np.log(acc) - np.log(1 - acc)        # weight per fired LF
    score = (X * log_ratio[None, :]).sum(axis=1)
    score += np.log(prior) - np.log(1 - prior)
    return 1.0 / (1.0 + np.exp(-score))
