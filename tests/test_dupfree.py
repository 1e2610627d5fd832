"""Unit tests for duplicate-free detection (Appendix 8.1)."""
import numpy as np
import pytest

from repro.transitivity.dupfree import (
    distinct_count_distribution,
    is_duplicate_free,
)


class TestDistinctCountDistribution:
    def test_sums_to_one(self):
        for m, n in [(5, 10), (20, 50), (1, 3)]:
            p = distinct_count_distribution(m, n)
            assert p.sum() == pytest.approx(1.0)

    def test_single_draw(self):
        p = distinct_count_distribution(1, 7)
        assert p[1] == pytest.approx(1.0)

    def test_two_draws_collision_probability(self):
        # P(D=1 | 2 draws from n) = 1/n
        n = 8
        p = distinct_count_distribution(2, n)
        assert p[1] == pytest.approx(1 / n)
        assert p[2] == pytest.approx(1 - 1 / n)

    def test_matches_simulation(self):
        g = np.random.default_rng(0)
        m, n = 12, 20
        sims = np.array(
            [len(np.unique(g.integers(0, n, size=m))) for _ in range(20000)]
        )
        p = distinct_count_distribution(m, n)
        emp = np.bincount(sims, minlength=m + 1) / len(sims)
        np.testing.assert_allclose(p[: m + 1], emp, atol=0.02)

    def test_zero_draws(self):
        p = distinct_count_distribution(0, 5)
        assert p[0] == pytest.approx(1.0)


class TestIsDuplicateFree:
    def test_all_distinct_accepts(self):
        matches = np.arange(50)
        assert is_duplicate_free(matches, 1000) is True

    def test_massive_duplication_rejects(self):
        # 100 matches hitting only 10 distinct partners out of 10000 —
        # impossible under noise-only duplication.
        g = np.random.default_rng(1)
        matches = g.integers(0, 10, size=100)
        assert is_duplicate_free(matches, 10000) is False

    def test_noise_level_duplication_accepts(self):
        # 100 matches over 120 partners: birthday collisions expected even
        # if the table is duplicate-free.
        g = np.random.default_rng(2)
        matches = g.integers(0, 120, size=100)
        assert is_duplicate_free(matches, 120) is True

    def test_empty_matches(self):
        assert is_duplicate_free(np.array([]), 100) is True

    def test_moderate_duplication_rejected_with_large_universe(self):
        # Each partner appears exactly 3x while the universe is huge:
        # under the null, d_r ≈ |M|; observing |M|/3 distinct rejects.
        matches = np.repeat(np.arange(40), 3)
        assert is_duplicate_free(matches, 100000) is False

    def test_deterministic(self):
        g = np.random.default_rng(3)
        matches = g.integers(0, 200, size=150)
        r1 = is_duplicate_free(matches, 5000, seed=7)
        r2 = is_duplicate_free(matches, 5000, seed=7)
        assert r1 == r2
