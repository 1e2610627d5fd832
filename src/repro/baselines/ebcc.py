"""Enhanced Bayesian Classifier Combination — baseline "EBCC".

Li, Rubinstein & Cohn (2019) extend Bayesian classifier combination with a
mixture of latent *subtypes* inside each class: the truth z picks a class,
the subtype s (per class) captures correlated error modes, and each LF has
a confusion distribution per (class, subtype). We implement the
maximum-likelihood EM version of that model (the reference implementation
is variational; the generative assumptions — the part the paper's analysis
is about — are the same).

State: prior π over z; subtype weights τ[z, s]; confusions θ[j, z, s, v].
Posterior is computed jointly over (z, s) and marginalized to z.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.api import dedup_patterns, mv_soft

_VOTE_IDX = {-1: 0, 0: 1, 1: 2}


def fit_predict(
    X: np.ndarray,
    *,
    n_subtypes: int = 2,
    n_iter: int = 60,
    tol: float = 1e-6,
    seed: int = 0,
) -> np.ndarray:
    """P(z=1 | votes) for each row of X under the subtype-mixture model."""
    g = np.random.default_rng(seed)
    Xu, inv, w = dedup_patterns(X)
    n_pat, m = Xu.shape
    K = n_subtypes
    V = np.zeros((n_pat, m, 3))
    for v, k in _VOTE_IDX.items():
        V[:, :, k] = Xu == v
    # Init: responsibilities r[p, z, s] from majority vote, random subtypes.
    gamma = mv_soft(Xu)
    r = np.empty((n_pat, 2, K))
    sub = g.dirichlet(np.ones(K), size=n_pat)
    r[:, 1, :] = gamma[:, None] * sub
    r[:, 0, :] = (1 - gamma)[:, None] * sub
    prev = None
    for _ in range(n_iter):
        rw = r * w[:, None, None]
        # M-step.
        pi = np.clip(rw.sum(axis=(0, 2)) / w.sum(), 1e-6, 1 - 1e-6)
        tau = rw.sum(axis=0) + 0.1                      # (2, K)
        tau /= tau.sum(axis=1, keepdims=True)
        theta = np.einsum("pzs,pmv->mzsv", rw, V) + 0.1  # (m, 2, K, 3)
        theta /= theta.sum(axis=3, keepdims=True)
        # E-step: log p(z, s | votes_p).
        ll = np.einsum("pmv,mzsv->pzs", V, np.log(theta))
        ll += np.log(pi)[None, :, None] + np.log(tau)[None, :, :]
        mx = ll.max(axis=(1, 2), keepdims=True)
        e = np.exp(ll - mx)
        r = e / e.sum(axis=(1, 2), keepdims=True)
        gamma = r[:, 1, :].sum(axis=1)
        if prev is not None and np.abs(gamma - prev).max() < tol:
            break
        prev = gamma
    return gamma[inv]
