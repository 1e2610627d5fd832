"""Rectangular linear assignment solver (scipy LAPJV substitute).

The two-tables-duplicate-free case of Section 4.2 reduces the constrained
E-step to an assignment problem, solved in the paper by scipy's LAPJV
binding (``min_weight_full_bipartite_matching``). scipy is unavailable
here, so this implements the shortest-augmenting-path algorithm with dual
potentials — the core of Jonker–Volgenant, same optimality, O(n²·m) — in
numpy.

``solve(cost)`` minimizes total cost over a full assignment of the smaller
side of an (n_rows × n_cols) matrix. Use large finite costs to make a
pairing unattractive-but-allowed; +inf marks a truly forbidden pairing and
raises if some row has no feasible column.
"""
from __future__ import annotations

import numpy as np


def solve(cost: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Min-cost assignment. Returns (row_idx, col_idx), sorted by row.

    Every row is assigned when n_rows ≤ n_cols; otherwise the matrix is
    transposed internally and the result swapped back, so the smaller side
    is always fully matched.
    """
    cost = np.asarray(cost, dtype=np.float64)
    if cost.ndim != 2:
        raise ValueError("cost must be 2-D")
    transposed = cost.shape[0] > cost.shape[1]
    C = cost.T if transposed else cost
    n, m = C.shape
    if n == 0 or m == 0:
        return np.array([], dtype=int), np.array([], dtype=int)

    INF = np.inf
    # 1-based arrays; column 0 is the virtual "unmatched" column.
    u = np.zeros(n + 1)
    v = np.zeros(m + 1)
    match = np.zeros(m + 1, dtype=int)     # match[j] = row assigned to col j
    way = np.zeros(m + 1, dtype=int)       # parent column on the alt path

    for i in range(1, n + 1):
        match[0] = i
        j0 = 0
        minv = np.full(m + 1, INF)
        used = np.zeros(m + 1, dtype=bool)
        while True:
            used[j0] = True
            i0 = match[j0]
            delta = INF
            j1 = -1
            # Vectorized relaxation over unused columns.
            row = C[i0 - 1] - u[i0] - v[1:]
            cand = ~used[1:]
            better = cand & (row < minv[1:])
            if better.any():
                minv[1:][better] = row[better]
                way[1:][better] = j0
            active = np.where(cand)[0] + 1
            if len(active) == 0:
                raise ValueError("infeasible assignment")
            k = active[np.argmin(minv[active])]
            delta = minv[k]
            if not np.isfinite(delta):
                raise ValueError(
                    "infeasible assignment: a row has only forbidden columns"
                )
            j1 = k
            u[match[used]] += delta
            v[used] -= delta
            minv[~used] -= delta
            j0 = j1
            if match[j0] == 0:
                break
        # Augment along parent pointers.
        while j0 != 0:
            j_prev = way[j0]
            match[j0] = match[j_prev]
            j0 = j_prev

    rows = match[1:]
    cols = np.arange(1, m + 1)
    sel = rows > 0
    r, c = rows[sel] - 1, cols[sel] - 1
    order = np.argsort(r)
    r, c = r[order], c[order]
    return (c, r) if transposed else (r, c)


def solve_bruteforce(cost: np.ndarray) -> float:
    """Reference optimal cost by enumeration (tests only; tiny inputs)."""
    from itertools import permutations

    cost = np.asarray(cost, dtype=np.float64)
    n, m = cost.shape
    if n > m:
        return solve_bruteforce(cost.T)
    best = np.inf
    for perm in permutations(range(m), n):
        s = cost[np.arange(n), list(perm)].sum()
        best = min(best, s)
    return float(best)
