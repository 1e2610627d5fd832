"""Unit tests for the exact two-table transitivity solutions."""
import numpy as np
import pandas as pd
import pytest

from repro.transitivity.exact import one_table_dupfree, two_table_dupfree


def _keys(pairs):
    return pd.DataFrame(pairs, columns=["lid", "rid"])


class TestOneTableDupfree:
    def test_keeps_argmax_per_right_tuple(self):
        keys = _keys([(0, 10), (1, 10), (2, 11)])
        gamma = np.array([0.9, 0.7, 0.8])
        out = one_table_dupfree(keys, gamma, dupfree_side="left")
        np.testing.assert_allclose(out, [0.9, 0.0, 0.8])

    def test_right_side_groups_by_lid(self):
        keys = _keys([(0, 10), (0, 11), (1, 12)])
        gamma = np.array([0.6, 0.8, 0.5])
        out = one_table_dupfree(keys, gamma, dupfree_side="right")
        np.testing.assert_allclose(out, [0.0, 0.8, 0.5])

    def test_all_groups_singletons_is_identity(self):
        keys = _keys([(0, 10), (1, 11), (2, 12)])
        gamma = np.array([0.2, 0.9, 0.55])
        out = one_table_dupfree(keys, gamma, dupfree_side="left")
        np.testing.assert_allclose(out, gamma)

    def test_objective_optimality(self):
        """Keeping the max-γ partner minimizes ΔF = Σ log(1/(1-γ)) lost."""
        keys = _keys([(0, 10), (1, 10), (2, 10)])
        gamma = np.array([0.3, 0.8, 0.5])
        out = one_table_dupfree(keys, gamma, dupfree_side="left")
        assert out[1] == 0.8 and out[0] == 0.0 and out[2] == 0.0


class TestTwoTableDupfree:
    def test_resolves_conflict_optimally(self):
        # two lefts both matching one right, plus alternative: assignment
        # must pick the combination maximizing Σ log(1/(1−γ))
        keys = _keys([(0, 10), (1, 10), (1, 11)])
        gamma = np.array([0.8, 0.9, 0.85])
        out = two_table_dupfree(keys, gamma)
        # optimal: (0,10) + (1,11) — keeps two matches — beats lone (1,10)
        assert out[0] == pytest.approx(0.8)
        assert out[1] == 0.0
        assert out[2] == pytest.approx(0.85)

    def test_keeps_nonmatches_untouched(self):
        keys = _keys([(0, 10), (1, 11)])
        gamma = np.array([0.3, 0.2])
        out = two_table_dupfree(keys, gamma)
        np.testing.assert_allclose(out, gamma)

    def test_one_to_one_already(self):
        keys = _keys([(0, 10), (1, 11)])
        gamma = np.array([0.9, 0.8])
        out = two_table_dupfree(keys, gamma)
        np.testing.assert_allclose(out, gamma)

    def test_result_is_matching(self):
        g = np.random.default_rng(0)
        pairs = [(l, r) for l in range(6) for r in range(10, 16)]
        keys = _keys(pairs)
        gamma = g.random(len(pairs))
        out = two_table_dupfree(keys, gamma)
        kept = keys[(out > 0.5)]
        assert kept.lid.is_unique
        assert kept.rid.is_unique

    def test_components_independent(self):
        # two disjoint conflicts resolved independently
        keys = _keys([(0, 10), (1, 10), (2, 20), (3, 20)])
        gamma = np.array([0.9, 0.6, 0.7, 0.95])
        out = two_table_dupfree(keys, gamma)
        assert out[0] == 0.9 and out[1] == 0.0
        assert out[2] == 0.0 and out[3] == 0.95

    def test_empty_gamma(self):
        keys = _keys([])
        out = two_table_dupfree(keys, np.array([]))
        assert len(out) == 0
