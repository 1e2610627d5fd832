"""Unit tests for the constrained E-step numeric solver (Eq. 5/7)."""
import numpy as np
import pytest

from repro.transitivity.solver import (
    constrained_gamma,
    free_energy,
    total_loss,
    transitivity_violation,
)


def _random_gamma(k, seed):
    g = np.random.default_rng(seed)
    A = g.random((k, k))
    G = (A + A.T) / 2
    np.fill_diagonal(G, 1.0)
    return G


class TestViolationMeasure:
    def test_consistent_matrix_has_zero_violation(self):
        G = np.full((3, 3), 0.9)
        np.fill_diagonal(G, 1.0)
        # 0.9*0.9 = 0.81 <= 0.9 — consistent
        assert transitivity_violation(G) == pytest.approx(0.0)

    def test_star_violates(self):
        G = np.eye(3)
        G[0, 1] = G[1, 0] = 0.9
        G[0, 2] = G[2, 0] = 0.9
        assert transitivity_violation(G) > 0

    def test_zero_matrix_consistent(self):
        G = np.eye(4)
        assert transitivity_violation(G) == pytest.approx(0.0)


class TestFreeEnergy:
    def test_zero_at_gamma_star(self):
        G = _random_gamma(5, 0)
        assert free_energy(G, G) == pytest.approx(0.0, abs=1e-9)

    def test_positive_away_from_gamma_star(self):
        G = _random_gamma(5, 1)
        G2 = np.clip(G + 0.2, 0, 1)
        np.fill_diagonal(G2, 1.0)
        assert free_energy(G, G2) > 0


class TestConstrainedGamma:
    @pytest.mark.parametrize("k", [3, 5, 8, 12])
    def test_eliminates_violations(self, k):
        G = _random_gamma(k, k)
        Gc = constrained_gamma(G, iters=300)
        assert transitivity_violation(Gc) < 0.05 * transitivity_violation(G) + 1e-3

    def test_consistent_input_stays_close(self):
        G = np.full((4, 4), 0.9)
        np.fill_diagonal(G, 1.0)
        Gc = constrained_gamma(G, iters=200)
        assert np.abs(Gc - G)[np.triu_indices(4, 1)].max() < 0.1

    def test_star_example_feasible_and_sensible(self):
        G = np.eye(3)
        G[0, 1] = G[1, 0] = 0.9
        G[0, 2] = G[2, 0] = 0.9
        G[1, 2] = G[2, 1] = 0.1
        Gc = constrained_gamma(G, iters=400)
        # feasibility: product constraint approximately satisfied
        assert Gc[0, 1] * Gc[0, 2] <= Gc[1, 2] + 0.02
        # the leaf-leaf pair must have been pulled up or hubs pulled down
        assert Gc[1, 2] > 0.1 or Gc[0, 1] < 0.9

    def test_loss_not_worse_than_start_when_feasible(self):
        G = np.full((4, 4), 0.8)
        np.fill_diagonal(G, 1.0)
        Gc = constrained_gamma(G, iters=200)
        assert total_loss(G, Gc) <= total_loss(G, G) + 1e-6

    def test_symmetric_output_unit_diagonal(self):
        G = _random_gamma(6, 3)
        Gc = constrained_gamma(G, iters=100)
        np.testing.assert_allclose(Gc, Gc.T, atol=1e-12)
        np.testing.assert_allclose(np.diag(Gc), 1.0)

    def test_trivial_sizes(self):
        assert constrained_gamma(np.array([[1.0]])).shape == (1, 1)
        G2 = np.array([[1.0, 0.7], [0.7, 1.0]])
        Gc = constrained_gamma(G2, iters=50)
        # no triplets → nothing should move much
        assert abs(Gc[0, 1] - 0.7) < 0.05
