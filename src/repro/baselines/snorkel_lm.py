"""Snorkel-style generative label model — baseline "SN".

The Snorkel system's label model (data programming, Ratner et al. 2016)
treats each LF as conditionally independent given the latent truth z, with
per-LF *accuracy* α_j = P(λ_j = z | λ_j ≠ 0) and *propensity*
β_j = P(λ_j ≠ 0), and fits the parameters by maximizing the marginal
likelihood of the observed labeling matrix. (The v0.9 open-source release
solves an equivalent inverse-covariance matrix-completion problem; we fit
the original generative formulation by EM, which optimizes the same
likelihood under the same independence assumption — see DESIGN.md.)

Class balance is supplied from majority-vote counts, matching the paper's
experimental setup for methods that need a class-weight parameter.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.api import dedup_patterns, mv_soft


def fit_predict(
    X: np.ndarray, *, n_iter: int = 50, tol: float = 1e-6, seed: int = 0
) -> np.ndarray:
    """P(z=1 | votes) under the accuracy/propensity generative model."""
    Xu, inv, w = dedup_patterns(X)
    n_pat, m = Xu.shape
    fired = (Xu != 0).astype(np.float64)
    pos = (Xu == 1).astype(np.float64)
    neg = (Xu == -1).astype(np.float64)
    # Fixed class prior from majority vote (Snorkel's class_balance input).
    gamma0 = mv_soft(Xu)
    pi1 = float(np.clip((w * (gamma0 >= 0.5)).sum() / w.sum(), 1e-3, 1 - 1e-3))
    gamma = gamma0.copy()
    # β from empirical firing rates (propensity is truth-independent).
    beta = np.clip((w[:, None] * fired).sum(0) / w.sum(), 1e-4, 1 - 1e-4)
    alpha = np.full(m, 0.7)
    prev = None
    for _ in range(n_iter):
        # M: accuracy given current soft truth (agreement among fired LFs).
        gw, nw = gamma * w, (1 - gamma) * w
        agree = gw @ pos + nw @ neg          # per-LF mass of (fired ∧ correct)
        fire_mass = (gw + nw) @ fired
        alpha = np.clip((agree + 1.0) / (fire_mass + 2.0), 0.05, 0.95)
        # E: naive-Bayes posterior; β cancels between classes so only the
        # accuracy term and prior matter.
        lr = np.log(alpha) - np.log(1 - alpha)
        score = (pos - neg) @ lr + np.log(pi1 / (1 - pi1))
        gamma = 1.0 / (1.0 + np.exp(-score))
        if prev is not None and np.abs(gamma - prev).max() < tol:
            break
        prev = gamma
    return gamma[inv]
