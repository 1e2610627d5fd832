"""Exact constrained E-steps for two-table EM (paper Section 4.2).

Both operate on the driver-side representation used inside the EM loop: a
(lid, rid) key frame aligned with the soft-label vector γ.

* ``one_table_dupfree`` — when one table is duplicate-free, the optimal
  γ** keeps, for every tuple of the *other* table, only its highest-
  probability partner and zeroes the rest (argmax per group; proof in the
  paper via ΔF(γ) = log(1/(1−γ)) monotonicity).
* ``two_table_dupfree`` — when both tables are duplicate-free, keeping the
  best pairs subject to one-partner-per-tuple on both sides is the
  assignment problem. Following the paper's optimization, only pairs with
  γ > 0.5 participate; we solve per connected component of that match
  graph with the JV-style solver (cost = log(1−γ), i.e. −ΔF).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.transitivity.assignment import solve
from repro.transitivity.components import components_unionfind

_BIG = 1e6  # cost for a forbidden (not-in-candidate-set) pairing


def one_table_dupfree(
    keys: pd.DataFrame, gamma: np.ndarray, *, dupfree_side: str = "left"
) -> np.ndarray:
    """γ**: argmax per partner tuple, zero elsewhere.

    ``dupfree_side='left'`` means the left table has no duplicates, so each
    *right* tuple can match at most one left tuple → group by ``rid``.
    """
    group_col = "rid" if dupfree_side == "left" else "lid"
    out = np.zeros_like(gamma)
    df = pd.DataFrame({"g": group_col_values(keys, group_col), "gamma": gamma})
    winners = df.groupby("g")["gamma"].idxmax()
    out[winners.to_numpy()] = gamma[winners.to_numpy()]
    return out


def group_col_values(keys: pd.DataFrame, col: str) -> np.ndarray:
    """Column accessor kept separate for testability."""
    return keys[col].to_numpy()


def two_table_dupfree(keys: pd.DataFrame, gamma: np.ndarray) -> np.ndarray:
    """γ**: optimal one-to-one matching among pairs with γ > 0.5.

    Pairs below the 0.5 threshold are left untouched (they are non-matches
    either way); among predicted matches, the assignment keeps the subset
    minimizing Σ log(1−γ) with each lid/rid used at most once, and zeroes
    the rest.
    """
    out = gamma.copy()
    cand = np.where(gamma > 0.5)[0]
    if len(cand) == 0:
        return out
    lids = keys["lid"].to_numpy()[cand]
    rids = keys["rid"].to_numpy()[cand]
    # Component decomposition on the bipartite match graph (rids offset to
    # a disjoint id space).
    offset = int(lids.max()) + 1 + int(rids.max()) + 1
    comp = components_unionfind(lids, rids + offset)
    comp_of_pair = np.array([comp[l] for l in lids])
    keep = np.zeros(len(cand), dtype=bool)
    for c in np.unique(comp_of_pair):
        sel = np.where(comp_of_pair == c)[0]
        ls = np.unique(lids[sel])
        rs = np.unique(rids[sel])
        li = {v: i for i, v in enumerate(ls)}
        ri = {v: i for i, v in enumerate(rs)}
        cost = np.full((len(ls), len(rs)), _BIG)
        for s in sel:
            cost[li[lids[s]], ri[rids[s]]] = np.log(
                max(1.0 - gamma[cand[s]], 1e-12)
            )
        rr, cc = solve(cost)
        chosen = {
            (ls[a], rs[b]) for a, b in zip(rr, cc) if cost[a, b] < _BIG / 2
        }
        for s in sel:
            if (lids[s], rids[s]) in chosen:
                keep[s] = True
    out[cand[~keep]] = 0.0
    return out
