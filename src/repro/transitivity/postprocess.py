"""Transitivity baselines for Table 8: ZeroER's projection heuristic and
classic postprocessing.

* ``zeroer_trans_step`` — ZeroER [Wu et al. 2020] enforces Eq. 4 with a
  greedy per-triplet projection inside the E-step: every violated triplet
  (γ_ij·γ_ik > γ_jk) is projected onto its own constraint boundary by
  scaling the two factor probabilities down by √(γ_jk / (γ_ij·γ_ik)).
  Corrections cascade in discovery order and, in two-table EM where the
  within-table probability is pinned at 0, the scale factor collapses to
  ~0 and kills both matches — this order-dependence/over-suppression is
  precisely the non-robustness the paper reports.
* ``postprocess_two_table`` — after inference, assume both tables
  duplicate-free and resolve conflicts by keeping the higher-probability
  pair (paper Section 5.4, following ZeroER's postprocessing).
* ``postprocess_single_table`` — average-linkage agglomerative clustering
  over 1−γ distances (the dedupe-style hierarchical clustering stand-in),
  then emit intra-cluster pairs as matches.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.transitivity.components import components_unionfind

_EPS = 1e-4


def zeroer_trans_step(
    keys: pd.DataFrame,
    gamma: np.ndarray,
    *,
    single_table: bool,
    passes: int = 2,
) -> np.ndarray:
    """Greedy per-triplet projection of γ onto the transitivity set."""
    out = gamma.copy()
    lid = keys["lid"].to_numpy()
    rid = keys["rid"].to_numpy()
    pair_row = {(int(a), int(b)): i for i, (a, b) in enumerate(zip(lid, rid))}

    def get(a, b):
        r = pair_row.get((a, b) if a <= b else (b, a))
        return r

    for _ in range(passes):
        changed = False
        match_idx = np.where(out > 0.5)[0]
        # adjacency of current predicted matches
        adj: dict[int, list[int]] = {}
        for i in match_idx:
            a, b = int(lid[i]), int(rid[i])
            adj.setdefault(a, []).append(b)
            adj.setdefault(b, []).append(a)
        for node, partners in adj.items():
            if len(partners) < 2:
                continue
            for x in range(len(partners)):
                for y in range(x + 1, len(partners)):
                    j, k = partners[x], partners[y]
                    rij = get(node, j)
                    rik = get(node, k)
                    if rij is None or rik is None:
                        continue
                    p, q = out[rij], out[rik]
                    rjk_row = get(j, k)
                    if rjk_row is not None:
                        r = out[rjk_row]
                    elif single_table:
                        r = 0.0          # pair missing from candidate set
                    else:
                        r = 0.0          # same-table pair: pinned to 0
                    if p * q > r + 1e-9:
                        f = np.sqrt(max(r, _EPS) / (p * q))
                        out[rij] = p * f
                        out[rik] = q * f
                        changed = True
        if not changed:
            break
    return out


def postprocess_two_table(keys: pd.DataFrame, gamma: np.ndarray) -> np.ndarray:
    """Keep the higher-probability pair in every same-tuple conflict."""
    out = gamma.copy()
    df = pd.DataFrame(
        {"lid": keys["lid"].to_numpy(), "rid": keys["rid"].to_numpy(), "g": gamma}
    )
    match = df[df.g > 0.5]
    # one partner per rid, then per lid (greedy argmax both directions)
    keep = set()
    for col in ("rid", "lid"):
        winners = match.groupby(col)["g"].idxmax()
        keep = keep & set(winners) if keep else set(winners)
    drop = set(match.index) - keep
    out[list(drop)] = 0.0
    return out


def postprocess_single_table(
    keys: pd.DataFrame, gamma: np.ndarray, *, dist_threshold: float = 0.5
) -> np.ndarray:
    """Average-linkage clustering over predicted matches; emit clusters.

    Pairs inside one final cluster get γ=1, across clusters γ=0; pairs not
    connected to any match keep γ (all < 0.5 by construction).
    """
    out = gamma.copy()
    lid = keys["lid"].to_numpy()
    rid = keys["rid"].to_numpy()
    pair_row = {(int(a), int(b)): i for i, (a, b) in enumerate(zip(lid, rid))}
    match = gamma > 0.5
    if not match.any():
        return out
    comp = components_unionfind(lid[match], rid[match])
    nodes_of: dict[int, list[int]] = {}
    for node, c in comp.items():
        nodes_of.setdefault(c, []).append(node)

    def dist(a: int, b: int) -> float:
        r = pair_row.get((a, b) if a <= b else (b, a))
        return 1.0 - out[r] if r is not None else 1.0

    for c, nodes in nodes_of.items():
        clusters = [[n] for n in sorted(nodes)]
        while len(clusters) > 1:
            best = (None, None, np.inf)
            for i in range(len(clusters)):
                for j in range(i + 1, len(clusters)):
                    d = float(
                        np.mean(
                            [dist(a, b) for a in clusters[i] for b in clusters[j]]
                        )
                    )
                    if d < best[2]:
                        best = (i, j, d)
            if best[2] >= dist_threshold:
                break
            i, j, _ = best
            clusters[i] += clusters[j]
            del clusters[j]
        cluster_of = {}
        for ci, cl in enumerate(clusters):
            for n in cl:
                cluster_of[n] = ci
        for i in range(len(nodes)):
            for j in range(i + 1, len(nodes)):
                a, b = nodes[i], nodes[j]
                r = pair_row.get((a, b) if a <= b else (b, a))
                if r is not None:
                    out[r] = 1.0 if cluster_of[a] == cluster_of[b] else 0.0
    return out
