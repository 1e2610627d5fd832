"""Duplicate-free detection via hypothesis testing (paper Appendix 8.1).

Given the predicted matches M of a labeling model run *without*
transitivity, test the null hypothesis "the left table is duplicate-free"
from the number of distinct right tuples d_r among the matches: under the
null, the x true positives contribute x distinct right tuples and the
|M|−x false positives behave like uniform draws (with replacement) from
the right table.

The paper derives the x=0 distribution (Eq. 13, via Stirling numbers) as
an upper bound on p(d_r < observed); we compute that same distribution
with an exact O(|M|·N_distinct) DP recurrence (numerically stable where
the factorial form overflows):

    P(D=d | m draws) = P(D=d | m−1)·d/N + P(D=d−1 | m−1)·(N−d+1)/N

If the bound already rejects, the table has duplicates. Otherwise x is
chosen by maximum likelihood over a grid via simulation (|M|/10 steps,
exactly as in the appendix) and the test re-run under the empirical
distribution.
"""
from __future__ import annotations

import numpy as np


def distinct_count_distribution(m: int, n: int) -> np.ndarray:
    """P(D=d) for d in [0, m], after m uniform draws from n with replacement."""
    if m == 0:
        out = np.zeros(1)
        out[0] = 1.0
        return out
    p = np.zeros(m + 1)
    p[0] = 1.0  # zero draws → zero distinct
    for draws in range(1, m + 1):
        new = np.zeros(m + 1)
        d = np.arange(0, m + 1)
        # stay at d (redraw of an existing value) or arrive from d-1
        new[1:] = p[1:] * d[1:] / n + p[:-1] * (n - d[:-1]) / n
        p = new
    return p


def _pvalue_x0(m: int, n_r: int, d_obs: int) -> float:
    """P(D < d_obs) with all |M| matches treated as random draws (x = 0)."""
    dist = distinct_count_distribution(m, n_r)
    return float(dist[:d_obs].sum())


def _simulate_pvalue(
    m: int, n_r: int, d_obs: int, *, n_sim: int = 2000, seed: int = 0
) -> tuple[int, float]:
    """ML choice of x on a |M|/10 grid + empirical p-value under that x."""
    g = np.random.default_rng(seed)
    step = max(1, m // 10)
    best_x, best_like, best_p = 0, -1.0, 1.0
    for x in range(0, m + 1, step):
        # Paper's simulation: a bag initialized with x unique numbers
        # 1..x, plus |M|−x uniform draws from [1, N_r] with replacement;
        # d_sim = number of distinct values in the bag.
        if m - x == 0:
            d_sim = np.full(n_sim, x)
        else:
            draws = g.integers(1, n_r + 1, size=(n_sim, m - x))
            base = np.arange(1, x + 1)
            d_sim = np.array(
                [len(np.unique(np.concatenate([base, row]))) for row in draws]
            )
        like = float((d_sim == d_obs).mean())
        if like > best_like:
            best_like = like
            best_x = x
            best_p = float((d_sim < d_obs).mean())
    return best_x, best_p


def is_duplicate_free(
    matches: np.ndarray,
    n_partner: int,
    *,
    c: float = 0.05,
    seed: int = 0,
) -> bool:
    """Test whether the table *opposite* to ``matches``'s partner ids is
    duplicate-free.

    ``matches``: array of partner-side tuple ids, one per predicted match
    (e.g. the rid of every predicted (lid, rid) match when testing whether
    the LEFT table is duplicate-free). ``n_partner``: partner table size.
    Returns True when the null (duplicate-free) is NOT rejected.
    """
    m = len(matches)
    if m == 0:
        return True
    d_obs = len(np.unique(matches))
    if d_obs == m:
        return True
    # Bound: if even x=0 (pure noise) can't explain d_obs this small,
    # reject immediately.
    if _pvalue_x0(m, n_partner, d_obs) < c:
        # The bound is an upper bound on p under ANY x only in the
        # direction derived in the appendix (Eq. 12): p(d<d̂, x) ≤ p(d<d̂, 0)
        # ... so a small x=0 p-value implies rejection.
        return False
    _, p = _simulate_pvalue(m, n_partner, d_obs, seed=seed)
    return p >= c
