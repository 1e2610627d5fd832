"""ZeroER — unsupervised EM baseline (Wu et al., SIGMOD 2020).

ZeroER fits a 2-component Gaussian mixture over Magellan-style similarity
features: one component for matches, one for non-matches, with the match
component expected to have higher feature means. We implement the core
model faithfully in numpy: diagonal covariances, a regularized EM with a
match-rate prior, component identification by mean similarity, and the
projection-based transitivity heuristic from the original paper exposed
separately (``repro.transitivity.postprocess.zeroer_trans_step``).

The feature matrix comes from ``repro.features`` (computed distributed);
the EM itself is a driver-side numpy loop over the (n × d) features.
"""
from __future__ import annotations

import numpy as np


def fit_predict(
    F: np.ndarray,
    *,
    n_iter: int = 60,
    prior_match: float = 0.05,
    var_floor: float = 1e-3,
    tol: float = 1e-6,
    seed: int = 0,
) -> np.ndarray:
    """P(match | features) for each row of the feature matrix F."""
    F = np.asarray(F, dtype=np.float64)
    n, d = F.shape
    # Init: split by overall similarity score so the components start
    # identified (top prior_match quantile → match component).
    score = F.mean(axis=1)
    cut = np.quantile(score, 1 - max(prior_match, 1.0 / n))
    r = (score >= cut).astype(np.float64)
    pi = max(r.mean(), 1e-4)
    prev = None
    for _ in range(n_iter):
        # M-step: weighted means/vars per component.
        w1, w0 = r, 1 - r
        s1, s0 = max(w1.sum(), 1e-9), max(w0.sum(), 1e-9)
        mu1 = (w1[:, None] * F).sum(0) / s1
        mu0 = (w0[:, None] * F).sum(0) / s0
        v1 = (w1[:, None] * (F - mu1) ** 2).sum(0) / s1 + var_floor
        v0 = (w0[:, None] * (F - mu0) ** 2).sum(0) / s0 + var_floor
        pi = float(np.clip(w1.mean(), 1e-5, 1 - 1e-5))
        # Component identification: the match component must have the
        # higher mean similarity (ZeroER's "match means are larger").
        if mu1.mean() < mu0.mean():
            mu1, mu0, v1, v0 = mu0, mu1, v0, v1
            pi = 1 - pi
        # E-step: diagonal Gaussian log-densities.
        ll1 = -0.5 * (((F - mu1) ** 2) / v1 + np.log(2 * np.pi * v1)).sum(1)
        ll0 = -0.5 * (((F - mu0) ** 2) / v0 + np.log(2 * np.pi * v0)).sum(1)
        a = ll1 + np.log(pi)
        b = ll0 + np.log(1 - pi)
        mx = np.maximum(a, b)
        r = np.exp(a - mx) / (np.exp(a - mx) + np.exp(b - mx))
        if prev is not None and np.abs(r - prev).max() < tol:
            break
        prev = r
    return r
