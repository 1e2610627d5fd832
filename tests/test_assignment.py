"""Unit tests for the JV-style assignment solver (LAPJV substitute)."""
import numpy as np
import pytest

from repro.transitivity.assignment import solve, solve_bruteforce


class TestSolveSmall:
    def test_identity_preferred(self):
        C = np.array([[0.0, 9.0], [9.0, 0.0]])
        r, c = solve(C)
        assert list(zip(r, c)) == [(0, 0), (1, 1)]

    def test_anti_diagonal(self):
        C = np.array([[5.0, 1.0], [1.0, 5.0]])
        r, c = solve(C)
        assert set(zip(r, c)) == {(0, 1), (1, 0)}

    def test_single_cell(self):
        r, c = solve(np.array([[3.0]]))
        assert (list(r), list(c)) == ([0], [0])

    def test_empty(self):
        r, c = solve(np.zeros((0, 3)))
        assert len(r) == len(c) == 0

    def test_rectangular_wide(self):
        C = np.array([[9.0, 1.0, 9.0], [9.0, 9.0, 1.0]])
        r, c = solve(C)
        assert set(zip(r, c)) == {(0, 1), (1, 2)}

    def test_rectangular_tall(self):
        C = np.array([[9.0, 1.0, 9.0], [9.0, 9.0, 1.0]]).T  # 3x2
        r, c = solve(C)
        # smaller side (2 cols) fully matched
        assert len(r) == 2

    def test_negative_costs(self):
        C = np.array([[-5.0, 0.0], [0.0, -5.0]])
        r, c = solve(C)
        assert C[r, c].sum() == pytest.approx(-10.0)

    def test_infeasible_raises(self):
        C = np.array([[np.inf, np.inf], [1.0, 1.0]])
        with pytest.raises(ValueError):
            solve(C)

    def test_1d_raises(self):
        with pytest.raises(ValueError):
            solve(np.array([1.0, 2.0]))


@pytest.mark.parametrize("seed", range(25))
def test_matches_bruteforce_square(seed):
    g = np.random.default_rng(seed)
    n = int(g.integers(2, 6))
    C = g.random((n, n)) * 10
    r, c = solve(C)
    assert len(r) == n
    assert len(set(c)) == n  # valid permutation
    assert C[r, c].sum() == pytest.approx(solve_bruteforce(C))


@pytest.mark.parametrize("seed", range(25))
def test_matches_bruteforce_rectangular(seed):
    g = np.random.default_rng(100 + seed)
    n, m = int(g.integers(1, 5)), int(g.integers(1, 7))
    C = g.random((n, m)) * 10
    r, c = solve(C)
    assert len(r) == min(n, m)
    assert len(set(r)) == len(r) and len(set(c)) == len(c)
    assert C[r, c].sum() == pytest.approx(solve_bruteforce(C))


def test_moderate_size_optimality_vs_greedy_lower_bound():
    g = np.random.default_rng(7)
    C = g.random((60, 80))
    r, c = solve(C)
    # Optimal must be at least the sum of per-row minima (a lower bound)
    assert C[r, c].sum() >= C.min(axis=1).sum() - 1e-9
    # ... and no worse than greedy row-by-row assignment.
    taken, greedy = set(), 0.0
    for i in range(60):
        j = min((j for j in range(80) if j not in taken), key=lambda j: C[i, j])
        taken.add(j)
        greedy += C[i, j]
    assert C[r, c].sum() <= greedy + 1e-9
