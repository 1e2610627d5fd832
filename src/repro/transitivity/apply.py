"""Apply the trained transitivity model to a pair table (model inference,
paper Section 4.3 "Model Inference").

Per E-step: build the match graph G_M (edges = pairs with γ > 0.5), find
its connected components, and process each component independently:

* components with ≤ K tuples are padded with dummy tuples to a K×K matrix
  and run through the model once — every in-component pair present in the
  candidate set gets its γ replaced by the model prediction;
* larger components are handled per edge: sample K−2 neighbours of the
  edge's endpoints, run the model on that subclique, repeat 10 times and
  average — only the edge pairs are updated (the paper's relaxation).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.transitivity.components import components_unionfind
from repro.transitivity.model import TransitivityModel


def single_table_step(
    keys: pd.DataFrame,
    gamma: np.ndarray,
    model: TransitivityModel,
    *,
    n_samples: int = 10,
    seed: int = 0,
) -> np.ndarray:
    """Constrained E-step γ → γ** via the swapping-invariant model."""
    g = np.random.default_rng(seed)
    lid = keys["lid"].to_numpy()
    rid = keys["rid"].to_numpy()
    out = gamma.copy()
    match = gamma > 0.5
    if not match.any():
        return out
    src, dst = lid[match], rid[match]
    comp = components_unionfind(src, dst)
    # pair index for fast membership/lookup
    pair_row = {(int(a), int(b)): i for i, (a, b) in enumerate(zip(lid, rid))}
    # adjacency over match edges
    nbrs: dict[int, set[int]] = {}
    for a, b in zip(src.tolist(), dst.tolist()):
        nbrs.setdefault(a, set()).add(b)
        nbrs.setdefault(b, set()).add(a)
    # group nodes by component
    nodes_of: dict[int, list[int]] = {}
    for node, c in comp.items():
        nodes_of.setdefault(c, []).append(node)

    def local_gamma(nodes: list[int]) -> np.ndarray:
        n = len(nodes)
        G = np.zeros((n, n))
        np.fill_diagonal(G, 1.0)
        for i in range(n):
            for j in range(i + 1, n):
                r = pair_row.get(_key(nodes[i], nodes[j]))
                if r is not None:
                    G[i, j] = G[j, i] = gamma[r]
        return G

    for c, nodes in nodes_of.items():
        nodes = sorted(nodes)
        if len(nodes) <= model.k:
            pred = model.predict_matrix(local_gamma(nodes))
            for i in range(len(nodes)):
                for j in range(i + 1, len(nodes)):
                    r = pair_row.get(_key(nodes[i], nodes[j]))
                    if r is not None:
                        out[r] = pred[i, j]
        else:
            # big component: per-edge neighbourhood sampling
            edges = [
                (a, b)
                for a, b in zip(src.tolist(), dst.tolist())
                if comp[a] == c
            ]
            for a, b in edges:
                r = pair_row.get(_key(a, b))
                if r is None:
                    continue
                pool = np.array(sorted((nbrs[a] | nbrs[b]) - {a, b}))
                preds = []
                for _ in range(n_samples):
                    take = min(model.k - 2, len(pool))
                    pick = (
                        list(g.choice(pool, size=take, replace=False))
                        if take
                        else []
                    )
                    sub = [a, b] + pick
                    Gl = local_gamma(sub)
                    preds.append(model.predict_matrix(Gl)[0, 1])
                out[r] = float(np.mean(preds))
    return out


def _key(a: int, b: int) -> tuple[int, int]:
    return (a, b) if a <= b else (b, a)
