"""Swapping-invariant ML model approximating h: γ* → γ** (Section 4.3).

Architecture (paper Fig. 4, PointNet-style), implemented in numpy with
manual backprop (no torch in this container):

1. eigendecompose the symmetric input γ*_mat = V·W·Vᵀ (np.linalg.eigh);
   row-swaps of γ*_mat become row-swaps of V, which is what makes the
   invariance encodable;
2. a shared MLP encodes each row of V;
3. max-pool the row embeddings within group 1 = {row i, row j} (the pair
   being predicted, permuted to the front) and group 2 = {all other rows}
   — max-pooling is what grants invariance to swaps within each group;
4. concatenate [pool₁, pool₂, diag(W)] and run a head MLP with sigmoid
   output predicting the single value γ**_{i,j}; every cell of γ** is
   obtained by swap-indexing the same model (Fig. 3).

Eigenvector sign ambiguity (eigh may flip any column) is resolved by a
*permutation-invariant* canonicalization: flip each column so its entry
sum (tie-broken by cube sum) is non-negative — both statistics are
invariant to row swaps, so canonicalization never breaks the group
invariance. Eigenvalues come sorted from eigh, likewise invariant.

Training data: random block-structured γ* matrices; targets from the
numeric solver (``repro.transitivity.solver``). The paper uses 10⁵ 32×32
instances with torch optimizers; we default to ~1.5k 16×16 instances (CPU
budget, see DESIGN.md) — every solved matrix contributes all of its
K(K−1)/2 cells as training samples via swap-indexing. The trained model
is dataset-agnostic and cached on disk, matching the paper's train-once-
use-anywhere design.
"""
from __future__ import annotations

import os
from dataclasses import dataclass, field
from pathlib import Path

import numpy as np

from repro.transitivity.solver import constrained_gamma


def _relu(x):
    return np.maximum(x, 0.0)


def _sigmoid(x):
    return 1.0 / (1.0 + np.exp(-np.clip(x, -30, 30)))


def canonicalize_eigvecs(V: np.ndarray) -> np.ndarray:
    """Flip eigenvector signs by permutation-invariant statistics."""
    s = V.sum(axis=0)
    s3 = (V**3).sum(axis=0)
    crit = np.where(np.abs(s) > 1e-8, s, s3)
    flip = np.where(crit < 0, -1.0, 1.0)
    return V * flip[None, :]


def decompose(Gmat: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """(V, w): canonicalized eigenvectors (columns) and sorted eigenvalues."""
    w, V = np.linalg.eigh((Gmat + Gmat.T) / 2.0)
    return canonicalize_eigvecs(V), w


@dataclass
class TransitivityModel:
    """The trained network; ``k`` is the clique size it was trained at."""

    k: int
    params: dict = field(repr=False)

    # ----- forward ------------------------------------------------------
    def _forward(self, rows: np.ndarray, w: np.ndarray, want_cache: bool = False):
        """rows: (B, K, K) permuted V-row stacks; w: (B, K) eigenvalues."""
        p = self.params
        B, K, _ = rows.shape
        h1 = _relu(rows @ p["W1"] + p["b1"])          # (B, K, H1)
        emb = _relu(h1 @ p["W2"] + p["b2"])           # (B, K, H2)
        g1 = emb[:, :2, :].max(axis=1)                # pool over the pair
        a1 = emb[:, :2, :].argmax(axis=1)
        g2 = emb[:, 2:, :].max(axis=1)                # pool over the rest
        a2 = emb[:, 2:, :].argmax(axis=1)
        z = np.concatenate([g1, g2, w], axis=1)       # (B, 2*H2 + K)
        h3 = _relu(z @ p["W3"] + p["b3"])
        out = _sigmoid(h3 @ p["W4"] + p["b4"]).ravel()
        if not want_cache:
            return out
        return out, dict(rows=rows, h1=h1, emb=emb, a1=a1, a2=a2, z=z, h3=h3)

    def predict_matrix(self, Gstar: np.ndarray) -> np.ndarray:
        """γ** prediction for a full K×K matrix (diagonal fixed at 1)."""
        K = self.k
        G = _pad_to(Gstar, K)
        V, w = decompose(G)
        rows_V = V  # (K, K): row r is tuple r's eigen-row
        n = len(Gstar)
        pairs = [(i, j) for i in range(n) for j in range(i + 1, n)]
        if not pairs:
            return Gstar.copy()
        batch = np.empty((len(pairs), K, K))
        for t, (i, j) in enumerate(pairs):
            order = [i, j] + [r for r in range(K) if r not in (i, j)]
            batch[t] = rows_V[order]
        preds = self._forward(batch, np.tile(w, (len(pairs), 1)))
        out = np.eye(n)
        for t, (i, j) in enumerate(pairs):
            out[i, j] = out[j, i] = preds[t]
        return out

    # ----- persistence --------------------------------------------------
    def save(self, path: str | Path) -> None:
        np.savez(path, k=self.k, **self.params)

    @classmethod
    def load(cls, path: str | Path) -> "TransitivityModel":
        d = np.load(path)
        params = {k: d[k] for k in d.files if k != "k"}
        return cls(k=int(d["k"]), params=params)


def _pad_to(G: np.ndarray, K: int) -> np.ndarray:
    """Pad a clique matrix with dummy tuples (prob 0 to everyone)."""
    n = len(G)
    if n == K:
        return np.asarray(G, dtype=np.float64)
    if n > K:
        raise ValueError(f"matrix of size {n} exceeds model size {K}")
    out = np.zeros((K, K))
    out[:n, :n] = G
    np.fill_diagonal(out, 1.0)
    return out


# ---------------------------------------------------------------------------
# Training
# ---------------------------------------------------------------------------
def random_gamma_star(k: int, g: np.random.Generator) -> np.ndarray:
    """Block-structured random γ* matching the inference distribution.

    Inference pads every connected component to K with dummy tuples whose
    matching probability is 0, and EM soft labels are often saturated
    (forest probabilities near 0/1) — so training matrices must cover:
    a random *active* clique size s ∈ [2, K] with latent-cluster structure
    (sometimes saturated), zero-padded to K×K. Dummy rows add no binding
    transitivity constraints, so the solver's result on the padded matrix
    equals the padded result on the active block.
    """
    s = int(g.integers(2, k + 1))
    n_clusters = int(g.integers(1, max(2, s // 2) + 1))
    assign = g.integers(0, n_clusters, size=s)
    same = assign[:, None] == assign[None, :]
    if g.random() < 0.4:  # saturated regime (hard EM labels)
        hi = g.uniform(0.85, 0.99, size=(s, s))
        lo = g.uniform(0.0, 0.15, size=(s, s))
        noise = g.normal(0, 0.04, size=(s, s))
    else:
        hi = g.uniform(0.55, 0.98, size=(s, s))
        lo = g.uniform(0.0, 0.5, size=(s, s))
        noise = g.normal(0, 0.08, size=(s, s))
    A = np.clip(np.where(same, hi, lo) + noise, 0.0, 0.99)
    G = np.zeros((k, k))
    G[:s, :s] = (A + A.T) / 2.0
    np.fill_diagonal(G, 1.0)
    # Random placement of the active rows so the pair (i, j) being
    # predicted sees dummies in arbitrary positions (as at inference).
    perm = g.permutation(k)
    return G[np.ix_(perm, perm)]


def _init_params(k: int, h1: int, h2: int, h3: int, g: np.random.Generator):
    def xavier(a, b):
        return g.normal(0, np.sqrt(2.0 / (a + b)), size=(a, b))

    return {
        "W1": xavier(k, h1), "b1": np.zeros(h1),
        "W2": xavier(h1, h2), "b2": np.zeros(h2),
        "W3": xavier(2 * h2 + k, h3), "b3": np.zeros(h3),
        "W4": xavier(h3, 1), "b4": np.zeros(1),
    }


def train_transitivity_model(
    *,
    k: int = 16,
    n_matrices: int = 1500,
    hidden: tuple[int, int, int] = (32, 32, 64),
    epochs: int = 10,
    batch_size: int = 256,
    lr: float = 2e-3,
    seed: int = 0,
    solver_iters: int = 300,
) -> TransitivityModel:
    """Generate (γ*, γ**) pairs with the numeric solver and fit the network."""
    g = np.random.default_rng(seed)
    h1n, h2n, h3n = hidden
    # --- data generation ---
    rows_all, w_all, y_all = [], [], []
    for t in range(n_matrices):
        Gs = random_gamma_star(k, g)
        Gc = constrained_gamma(Gs, iters=solver_iters, lrs=(0.1,))
        V, w = decompose(Gs)
        for i in range(k):
            for j in range(i + 1, k):
                order = [i, j] + [r for r in range(k) if r not in (i, j)]
                rows_all.append(V[order])
                w_all.append(w)
                y_all.append(Gc[i, j])
    R = np.stack(rows_all)
    Wv = np.stack(w_all)
    Y = np.asarray(y_all)
    model = TransitivityModel(k=k, params=_init_params(k, h1n, h2n, h3n, g))
    _fit(model, R, Wv, Y, epochs=epochs, batch_size=batch_size, lr=lr, seed=seed)
    return model


def _fit(model, R, Wv, Y, *, epochs, batch_size, lr, seed):
    """Adam + manual backprop through the pooling architecture (BCE loss)."""
    p = model.params
    g = np.random.default_rng(seed)
    m = {k: np.zeros_like(v) for k, v in p.items()}
    v = {k: np.zeros_like(v_) for k, v_ in p.items()}
    b1m, b2m, eps = 0.9, 0.999, 1e-8
    step = 0
    n = len(Y)
    for ep in range(epochs):
        order = g.permutation(n)
        for s in range(0, n, batch_size):
            idx = order[s: s + batch_size]
            rows, w, y = R[idx], Wv[idx], Y[idx]
            out, c = model._forward(rows, w, want_cache=True)
            B, K, _ = rows.shape
            H2 = p["W2"].shape[1]
            # --- backward ---
            d_out = (out - y)[:, None] / B                   # BCE w/ sigmoid
            gW4 = c["h3"].T @ d_out
            gb4 = d_out.sum(0)
            d_h3 = (d_out @ p["W4"].T) * (c["h3"] > 0)
            gW3 = c["z"].T @ d_h3
            gb3 = d_h3.sum(0)
            d_z = d_h3 @ p["W3"].T                           # (B, 2H2+K)
            d_g1, d_g2 = d_z[:, :H2], d_z[:, H2: 2 * H2]
            # route pooled grads to argmax rows
            d_emb = np.zeros_like(c["emb"])                  # (B, K, H2)
            bi = np.arange(B)[:, None]
            hj = np.arange(H2)[None, :]
            d_emb[bi, c["a1"], hj] += d_g1
            d_emb[bi, 2 + c["a2"], hj] += d_g2
            d_h1 = (d_emb @ p["W2"].T) * (c["h1"] > 0)       # (B, K, H1)
            gW2 = np.einsum("bkh,bko->ho", c["h1"], d_emb)
            gb2 = d_emb.sum(axis=(0, 1))
            gW1 = np.einsum("bki,bkh->ih", c["rows"], d_h1)
            gb1 = d_h1.sum(axis=(0, 1))
            grads = {
                "W1": gW1, "b1": gb1, "W2": gW2, "b2": gb2,
                "W3": gW3, "b3": gb3, "W4": gW4, "b4": gb4,
            }
            step += 1
            for kk in p:
                m[kk] = b1m * m[kk] + (1 - b1m) * grads[kk]
                v[kk] = b2m * v[kk] + (1 - b2m) * grads[kk] ** 2
                mh = m[kk] / (1 - b1m**step)
                vh = v[kk] / (1 - b2m**step)
                p[kk] -= lr * mh / (np.sqrt(vh) + eps)


# ---------------------------------------------------------------------------
# Cache
# ---------------------------------------------------------------------------
_VERSION = 2  # bump when the training distribution or architecture changes


def _cache_dir() -> Path:
    d = Path(os.environ.get("REPRO_CACHE", Path.home() / ".cache" / "repro_transitivity"))
    d.mkdir(parents=True, exist_ok=True)
    return d


def get_model(
    *, k: int = 16, n_matrices: int = 2000, seed: int = 0, **train_kw
) -> TransitivityModel:
    """Load the cached offline-trained model, training it on first use."""
    path = _cache_dir() / f"trans_model_v{_VERSION}_k{k}_n{n_matrices}_s{seed}.npz"
    if path.exists():
        return TransitivityModel.load(path)
    model = train_transitivity_model(
        k=k, n_matrices=n_matrices, seed=seed, **train_kw
    )
    model.save(path)
    return model
