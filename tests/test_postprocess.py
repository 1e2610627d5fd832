"""Unit tests for the transitivity baselines (ZeroER projection,
postprocessing)."""
import numpy as np
import pandas as pd
import pytest

from repro.transitivity.postprocess import (
    postprocess_single_table,
    postprocess_two_table,
    zeroer_trans_step,
)


def _keys(pairs):
    return pd.DataFrame(pairs, columns=["lid", "rid"])


class TestZeroerTrans:
    def test_two_table_conflict_suppresses_both(self):
        """With the within-table prob pinned at 0, the projection factor
        collapses and both conflicting matches get crushed — the
        non-robustness the paper describes."""
        keys = _keys([(0, 10), (1, 10)])
        gamma = np.array([0.9, 0.8])
        out = zeroer_trans_step(keys, gamma, single_table=False)
        assert out[0] < 0.1 and out[1] < 0.1

    def test_single_table_scales_to_boundary(self):
        keys = _keys([(0, 1), (0, 2), (1, 2)])
        gamma = np.array([0.9, 0.9, 0.4])
        out = zeroer_trans_step(keys, gamma, single_table=True)
        # after projection the triplet approximately satisfies p*q <= r
        assert out[0] * out[1] <= out[2] + 0.05

    def test_consistent_input_untouched(self):
        keys = _keys([(0, 1), (0, 2), (1, 2)])
        gamma = np.array([0.9, 0.9, 0.9])
        out = zeroer_trans_step(keys, gamma, single_table=True)
        np.testing.assert_allclose(out, gamma)

    def test_no_matches_is_identity(self):
        keys = _keys([(0, 1), (1, 2)])
        gamma = np.array([0.2, 0.3])
        out = zeroer_trans_step(keys, gamma, single_table=True)
        np.testing.assert_allclose(out, gamma)


class TestPostprocessTwoTable:
    def test_keeps_mutual_best(self):
        keys = _keys([(0, 10), (1, 10), (1, 11)])
        gamma = np.array([0.8, 0.9, 0.7])
        out = postprocess_two_table(keys, gamma)
        # (1,10) is best for both rid=10 and lid=1; others dropped
        assert out[1] == 0.9
        assert out[0] == 0.0 and out[2] == 0.0

    def test_no_conflicts_identity(self):
        keys = _keys([(0, 10), (1, 11)])
        gamma = np.array([0.8, 0.9])
        out = postprocess_two_table(keys, gamma)
        np.testing.assert_allclose(out, gamma)

    def test_result_has_no_conflicts(self):
        g = np.random.default_rng(0)
        pairs = [(l, r) for l in range(5) for r in range(10, 14)]
        keys = _keys(pairs)
        gamma = g.random(len(pairs))
        out = postprocess_two_table(keys, gamma)
        kept = keys[out > 0.5]
        assert kept.lid.is_unique and kept.rid.is_unique


class TestPostprocessSingleTable:
    def test_tight_cluster_closed(self):
        # 3 nodes, two strong edges, one weak: clustering closes the
        # triangle (all intra-cluster pairs become matches).
        keys = _keys([(0, 1), (0, 2), (1, 2)])
        gamma = np.array([0.9, 0.9, 0.45])
        out = postprocess_single_table(keys, gamma)
        assert out[2] == 1.0

    def test_weak_bridge_broken(self):
        # two tight pairs joined by one weak-ish bridge: average linkage
        # should keep two clusters and zero the bridge.
        keys = _keys([(0, 1), (2, 3), (1, 2)])
        gamma = np.array([0.95, 0.95, 0.55])
        out = postprocess_single_table(keys, gamma)
        assert out[0] == 1.0 and out[1] == 1.0
        assert out[2] == 0.0

    def test_no_matches_identity(self):
        keys = _keys([(0, 1)])
        gamma = np.array([0.3])
        out = postprocess_single_table(keys, gamma)
        np.testing.assert_allclose(out, gamma)

    def test_output_is_transitively_consistent(self):
        g = np.random.default_rng(1)
        nodes = range(6)
        pairs = [(a, b) for a in nodes for b in nodes if a < b]
        keys = _keys(pairs)
        gamma = g.random(len(pairs))
        out = postprocess_single_table(keys, gamma)
        idx = {(a, b): i for i, (a, b) in enumerate(pairs)}
        m = {p for p, i in idx.items() if out[i] > 0.5}
        for a, b in m:
            for c in nodes:
                ac = (min(a, c), max(a, c))
                bc = (min(b, c), max(b, c))
                if ac in m and bc not in m and c not in (a, b):
                    pytest.fail(f"violation: {a},{b},{c}")
