"""Numeric solver for the constrained E-step (paper Eq. 5/7).

Given unconstrained matching probabilities γ* over a clique of tuples
(k×k symmetric matrix, diagonal = 1), find

    γ** = argmin_γ  α·Σ_{i,j,k} relu(γ_ij·γ_ik − γ_jk)  +  h1(γ*, γ)

where h1 is the free-energy divergence Σ_(i,j) KL(γ_ij ‖ γ*_ij). The paper
minimizes this with several torch optimizers and keeps the best solution;
we run our own numpy Adam from multiple learning rates (initialized at γ*,
as the paper does) and keep the lowest-loss result. γ is parameterized as
sigmoid(z) with z symmetric so box constraints hold by construction.

Used both to generate training data for the transitivity model
(Section 4.3) and as a reference in tests.
"""
from __future__ import annotations

import numpy as np

_EPS = 1e-5


def _sigmoid(z):
    return 1.0 / (1.0 + np.exp(-z))


def _logit(p):
    p = np.clip(p, _EPS, 1 - _EPS)
    return np.log(p / (1 - p))


def transitivity_violation(G: np.ndarray) -> float:
    """Total Σ relu(γ_ij γ_ik − γ_jk) over all ordered triplets."""
    T = np.einsum("ij,ik->ijk", G, G) - G[None, :, :]
    return float(np.clip(T, 0, None).sum())


def free_energy(Gstar: np.ndarray, G: np.ndarray) -> float:
    """h1(γ*, γ): sum of binary KL divergences over the off-diagonal."""
    Gs = np.clip(Gstar, _EPS, 1 - _EPS)
    Gc = np.clip(G, _EPS, 1 - _EPS)
    kl = Gc * np.log(Gc / Gs) + (1 - Gc) * np.log((1 - Gc) / (1 - Gs))
    off = ~np.eye(len(G), dtype=bool)
    return float(kl[off].sum())


def total_loss(Gstar: np.ndarray, G: np.ndarray, alpha: float = 100.0) -> float:
    """The objective of Eq. 7."""
    return alpha * transitivity_violation(G) + free_energy(Gstar, G)


def _grads(Gstar_logit: np.ndarray, z: np.ndarray, alpha: float) -> np.ndarray:
    """dLoss/dz for symmetric z (γ = sigmoid(z), diagonal excluded)."""
    G = _sigmoid(z)
    np.fill_diagonal(G, 1.0)
    # Transitivity term: T[i,j,k] = G[i,j]G[i,k] − G[j,k]; M = active set.
    T = np.einsum("ij,ik->ijk", G, G) - G[None, :, :]
    M = (T > 0).astype(np.float64)
    # d/dG[a,b]: 2·Σ_k M[a,b,k]·G[a,k] (as a product factor, using j↔k
    # symmetry) − Σ_i M[i,a,b] (as the subtracted γ_jk).
    g_trans = 2.0 * np.einsum("abk,ak->ab", M, G) - M.sum(axis=0)
    # Free-energy term: dKL/dG = logit(G) − logit(G*), counted for both
    # (i,j) and (j,i) in the full-matrix formulation.
    g_fe = _logit(G) - Gstar_logit
    grad_G = alpha * g_trans + g_fe
    # Chain through sigmoid; keep symmetric; diagonal is fixed.
    grad_z = grad_G * G * (1 - G)
    grad_z = (grad_z + grad_z.T) / 2.0
    np.fill_diagonal(grad_z, 0.0)
    return grad_z


def constrained_gamma(
    Gstar: np.ndarray,
    *,
    alpha: float = 100.0,
    iters: int = 400,
    lrs: tuple[float, ...] = (0.1, 0.02),
    seed: int = 0,
) -> np.ndarray:
    """γ** for one clique: best-of-multiple Adam runs initialized at γ*."""
    Gstar = np.asarray(Gstar, dtype=np.float64)
    k = len(Gstar)
    if k <= 1:
        return Gstar.copy()
    Gstar_logit = _logit(Gstar)
    best_G, best_loss = None, np.inf
    for lr in lrs:
        z = _logit(Gstar)
        np.fill_diagonal(z, 0.0)
        m = np.zeros_like(z)
        v = np.zeros_like(z)
        b1, b2, eps = 0.9, 0.999, 1e-8
        for t in range(1, iters + 1):
            g = _grads(Gstar_logit, z, alpha)
            m = b1 * m + (1 - b1) * g
            v = b2 * v + (1 - b2) * g * g
            mh = m / (1 - b1**t)
            vh = v / (1 - b2**t)
            z -= lr * mh / (np.sqrt(vh) + eps)
        G = _sigmoid(z)
        np.fill_diagonal(G, 1.0)
        loss = total_loss(Gstar, G, alpha)
        if loss < best_loss:
            best_loss, best_G = loss, G
    return best_G
