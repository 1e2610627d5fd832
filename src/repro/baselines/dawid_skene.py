"""Dawid & Skene (1979) truth inference via EM — baseline "D&S".

Binary latent truth z ∈ {0,1}; each LF j has a confusion distribution
θ_j[z, v] over observed votes v ∈ {-1, 0, +1} (abstain is modeled as an
ordinary outcome, which is the standard adaptation for LFs). EM alternates
confusion/prior re-estimation (M) with posterior computation (E).

Runs over deduplicated vote patterns (sufficient statistics), so the cost
per iteration is O(#patterns × m), independent of n.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.api import dedup_patterns, mv_soft

_VOTE_IDX = {-1: 0, 0: 1, 1: 2}


def fit_predict(
    X: np.ndarray, *, n_iter: int = 50, tol: float = 1e-6, seed: int = 0
) -> np.ndarray:
    """P(z=1 | votes) for each row of X."""
    Xu, inv, w = dedup_patterns(X)
    n_pat, m = Xu.shape
    V = np.zeros((n_pat, m, 3))  # one-hot votes
    for v, k in _VOTE_IDX.items():
        V[:, :, k] = Xu == v
    gamma = mv_soft(Xu)
    prev = None
    for _ in range(n_iter):
        gw = gamma * w                      # weight of class-1 mass per pattern
        nw = (1 - gamma) * w
        pi1 = gw.sum() / w.sum()
        pi = np.clip(np.array([1 - pi1, pi1]), 1e-6, 1 - 1e-6)
        # M: confusion θ[j, z, v] with Laplace smoothing.
        theta = np.empty((m, 2, 3))
        theta[:, 1, :] = np.einsum("p,pmv->mv", gw, V) + 0.1
        theta[:, 0, :] = np.einsum("p,pmv->mv", nw, V) + 0.1
        theta /= theta.sum(axis=2, keepdims=True)
        # E: posterior per pattern.
        log1 = np.log(pi[1]) + np.einsum("pmv,mv->p", V, np.log(theta[:, 1, :]))
        log0 = np.log(pi[0]) + np.einsum("pmv,mv->p", V, np.log(theta[:, 0, :]))
        mx = np.maximum(log1, log0)
        e1, e0 = np.exp(log1 - mx), np.exp(log0 - mx)
        gamma = e1 / (e1 + e0)
        if prev is not None and np.abs(gamma - prev).max() < tol:
            break
        prev = gamma
    return gamma[inv]
