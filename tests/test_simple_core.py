"""Unit tests for SIMPLE's EM core (numpy level)."""
import numpy as np
import pytest

from repro.core.simple import DEFAULT_GRID, _cv_select, _dedup, simple_gamma
from repro.baselines.api import mv_soft


def _herd_data(seed=0, n=1500):
    """Votes with a weak correlated herd + strong independents: the regime
    where SIMPLE must beat majority vote."""
    g = np.random.default_rng(seed)
    y = np.where(g.random(n) < 0.4, 1, -1).astype(np.int8)
    view = y * np.where(g.random(n) < 0.58, 1, -1)
    X = np.zeros((n, 9), dtype=np.int8)
    for j in range(4):  # strong independents
        fired = g.random(n) < 0.55
        correct = g.random(n) < 0.88
        X[fired, j] = (y * np.where(correct, 1, -1))[fired]
    for j in range(4, 9):  # herd members copy the weak view
        fired = g.random(n) < 0.6
        correct = g.random(n) < 0.95
        X[fired, j] = (view * np.where(correct, 1, -1))[fired]
    return X, (y > 0).astype(np.int8)


def _f1(pred, y):
    tp = ((pred == 1) & (y == 1)).sum()
    fp = ((pred == 1) & (y == 0)).sum()
    fn = ((pred == 0) & (y == 1)).sum()
    p = tp / max(tp + fp, 1)
    r = tp / max(tp + fn, 1)
    return 2 * p * r / max(p + r, 1e-9)


class TestDedup:
    def test_counts(self):
        X = np.array([[1, 0], [1, 0], [0, 1]], dtype=np.float32)
        y = np.array([1, 1, 0], dtype=np.int8)
        Xd, yd, wd = _dedup(X, y)
        assert len(Xd) == 2
        assert wd.sum() == 3

    def test_same_pattern_different_label_kept_separate(self):
        X = np.array([[1, 0], [1, 0]], dtype=np.float32)
        y = np.array([1, 0], dtype=np.int8)
        Xd, yd, wd = _dedup(X, y)
        assert len(Xd) == 2


class TestCvSelect:
    def test_returns_grid_member(self):
        g = np.random.default_rng(0)
        X = g.integers(-1, 2, size=(300, 4)).astype(np.float32)
        y = (X[:, 0] > 0).astype(np.int8)
        out = _cv_select(X, y, np.ones(300), DEFAULT_GRID, 3, 0)
        assert out in DEFAULT_GRID

    def test_prefers_capacity_that_fits(self):
        # label needs depth 2 (AND of two features); depth grid includes 1
        g = np.random.default_rng(1)
        X = g.integers(0, 2, size=(800, 3)).astype(np.float32)
        y = ((X[:, 0] > 0) & (X[:, 1] > 0)).astype(np.int8)
        depth, _ = _cv_select(X, y, np.ones(800), [(1, 0.0), (3, 0.0)], 3, 0)
        assert depth == 3


class TestSimpleGamma:
    def test_beats_majority_vote_on_big_herd_profile(self):
        """On the census-profile data (big weak herd + accurate
        independents) SIMPLE must beat plain majority vote — the core
        Table 12 claim."""
        from repro import wrench_data

        ds = wrench_data.load("census")
        y = (ds.y > 0).astype(np.int8)
        gamma, model, it, shift = simple_gamma(ds.votes, seed=0, n_estimators=24)
        f_simple = _f1((gamma >= 0.5).astype(int), y)
        f_mv = _f1((mv_soft(ds.votes) >= 0.5).astype(int), y)
        assert f_simple > f_mv

    def test_stable_no_collapse(self):
        """Prior-preserving calibration: the positive count must stay near
        the MV initialization, never collapsing to 0 or exploding."""
        X, y = _herd_data(seed=3)
        n_mv = int((mv_soft(X) >= 0.5).sum())
        gamma, _, _, _ = simple_gamma(X, seed=1)
        n_simple = int((gamma >= 0.5).sum())
        assert 0.5 * n_mv <= n_simple <= 2.0 * n_mv

    def test_degenerate_all_negative_votes(self):
        X = -np.ones((50, 3), dtype=np.int8)
        gamma, model, it, _ = simple_gamma(X)
        assert model is None
        assert (gamma < 0.5).all()

    def test_degenerate_all_positive_votes(self):
        X = np.ones((50, 3), dtype=np.int8)
        gamma, model, it, _ = simple_gamma(X)
        assert (gamma >= 0.5).all()

    def test_max_iter_respected(self):
        X, _ = _herd_data(seed=5, n=400)
        _, _, it, _ = simple_gamma(X, max_iter=2)
        assert it <= 2

    def test_deterministic(self):
        X, _ = _herd_data(seed=6, n=400)
        g1, _, _, _ = simple_gamma(X, seed=11)
        g2, _, _, _ = simple_gamma(X, seed=11)
        np.testing.assert_allclose(g1, g2)

    def test_transitivity_hook_applied(self):
        X, _ = _herd_data(seed=7, n=300)
        calls = []

        def step(keys, gamma):
            calls.append(len(gamma))
            return gamma

        import pandas as pd

        keys = pd.DataFrame({"lid": np.arange(300), "rid": np.arange(300)})
        simple_gamma(X, keys=keys, transitivity_step=step, max_iter=2)
        assert len(calls) >= 2  # init + at least one E-step
