"""Unit tests for the numpy CART / random forest substrate."""
import numpy as np
import pytest

from repro.core.forest import DecisionTree, RandomForest, _best_split, _gini


class TestGini:
    def test_pure(self):
        assert _gini(0, 10) == 0.0
        assert _gini(10, 10) == 0.0

    def test_balanced(self):
        assert _gini(5, 10) == pytest.approx(0.5)

    def test_empty(self):
        assert _gini(0, 0) == 0.0


class TestBestSplit:
    def test_perfect_split(self):
        X = np.array([[0.0], [0.0], [1.0], [1.0]], dtype=np.float32)
        y = np.array([0.0, 0.0, 1.0, 1.0])
        w = np.ones(4)
        f, t, risk = _best_split(X, y, w, [0])
        assert f == 0
        assert t == pytest.approx(0.5)
        assert risk == pytest.approx(0.0)

    def test_no_split_on_constant_feature(self):
        X = np.zeros((4, 1), dtype=np.float32)
        y = np.array([0.0, 1.0, 0.0, 1.0])
        f, _, _ = _best_split(X, y, np.ones(4), [0])
        assert f is None

    def test_picks_informative_feature(self):
        g = np.random.default_rng(0)
        X = g.integers(0, 2, size=(200, 3)).astype(np.float32)
        y = X[:, 1].astype(np.float64)  # feature 1 is the label
        f, _, _ = _best_split(X, y, np.ones(200), [0, 1, 2])
        assert f == 1


class TestDecisionTree:
    def test_memorizes_separable_data(self):
        g = np.random.default_rng(1)
        X = g.integers(-1, 2, size=(300, 5)).astype(np.float32)
        y = (X[:, 0] > 0).astype(np.float64)
        t = DecisionTree(max_depth=3).fit(X, y)
        assert (t.predict_proba(X).round() == y).all()

    def test_max_depth_limits_leaves(self):
        g = np.random.default_rng(2)
        X = g.random((500, 4)).astype(np.float32)
        y = (g.random(500) > 0.5).astype(np.float64)
        t1 = DecisionTree(max_depth=2).fit(X, y)
        t2 = DecisionTree(max_depth=6).fit(X, y)
        assert t1.n_leaves() <= 4
        assert t2.n_leaves() > t1.n_leaves()

    def test_pruning_reduces_leaves(self):
        g = np.random.default_rng(3)
        X = g.integers(-1, 2, size=(400, 6)).astype(np.float32)
        y = ((X[:, 0] + 0.1 * g.standard_normal(400)) > 0).astype(np.float64)
        t_full = DecisionTree(max_depth=8).fit(X, y)
        t_pruned = DecisionTree(max_depth=8, ccp_alpha=0.05).fit(X, y)
        assert t_pruned.n_leaves() < t_full.n_leaves()

    def test_heavy_pruning_gives_stump_or_root(self):
        g = np.random.default_rng(4)
        X = g.random((200, 3)).astype(np.float32)
        y = (g.random(200) > 0.5).astype(np.float64)
        t = DecisionTree(max_depth=8, ccp_alpha=10.0).fit(X, y)
        assert t.n_leaves() == 1

    def test_sample_weights_shift_prediction(self):
        X = np.array([[0.0], [1.0]], dtype=np.float32)
        y = np.array([0.0, 1.0])
        # weight the positive example 9x: root prob = 0.9 before split
        t = DecisionTree(max_depth=0).fit(X, y, np.array([1.0, 9.0]))
        assert t.root.prob == pytest.approx(0.9)

    def test_zero_weight_rows_ignored(self):
        X = np.array([[0.0], [1.0], [1.0]], dtype=np.float32)
        y = np.array([0.0, 1.0, 0.0])
        t = DecisionTree(max_depth=2).fit(X, y, np.array([1.0, 1.0, 0.0]))
        assert t.predict_proba(np.array([[1.0]], dtype=np.float32))[0] == 1.0

    def test_pure_node_is_leaf(self):
        X = np.array([[0.0], [1.0]], dtype=np.float32)
        y = np.array([1.0, 1.0])
        t = DecisionTree(max_depth=5).fit(X, y)
        assert t.root.is_leaf


class TestRandomForest:
    def test_learns_interaction(self):
        # XOR of two features — a single weighted vote cannot express it.
        g = np.random.default_rng(5)
        X = g.integers(0, 2, size=(1500, 4)).astype(np.float32)
        y = (X[:, 0].astype(int) ^ X[:, 1].astype(int)).astype(np.int8)
        rf = RandomForest(n_estimators=16, max_depth=4, seed=0).fit(X, y)
        assert (rf.predict(X) == y).mean() > 0.95

    def test_predict_proba_in_unit_interval(self):
        g = np.random.default_rng(6)
        X = g.random((100, 3)).astype(np.float32)
        y = (g.random(100) > 0.5).astype(np.int8)
        rf = RandomForest(n_estimators=4, max_depth=3, seed=1).fit(X, y)
        p = rf.predict_proba(X)
        assert (p >= 0).all() and (p <= 1).all()

    def test_deterministic_given_seed(self):
        g = np.random.default_rng(7)
        X = g.random((200, 4)).astype(np.float32)
        y = (X[:, 0] > 0.5).astype(np.int8)
        p1 = RandomForest(n_estimators=8, seed=42).fit(X, y).predict_proba(X)
        p2 = RandomForest(n_estimators=8, seed=42).fit(X, y).predict_proba(X)
        np.testing.assert_array_equal(p1, p2)

    def test_weighted_patterns_equal_repeated_rows(self):
        # Fitting deduped patterns with counts ~ fitting the expanded rows.
        X = np.array([[1, 0], [0, 1], [1, 1], [0, 0]], dtype=np.float32)
        y = np.array([1, 0, 1, 0], dtype=np.int8)
        w = np.array([50.0, 50.0, 30.0, 30.0])
        rf = RandomForest(n_estimators=10, max_depth=3, seed=3).fit(X, y, w)
        assert (rf.predict(X) == y).all()

    def test_n_estimators_respected(self):
        rf = RandomForest(n_estimators=5, seed=0).fit(
            np.array([[0.0], [1.0]], dtype=np.float32), np.array([0, 1], dtype=np.int8)
        )
        assert len(rf.trees) == 5
