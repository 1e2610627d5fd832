"""Unit tests for the SMOTE oversampler."""
import numpy as np
import pytest

from repro.core.smote import smote


def _toy(n_pos=10, n_neg=100, m=4, seed=0):
    g = np.random.default_rng(seed)
    X = g.integers(-1, 2, size=(n_pos + n_neg, m)).astype(np.float32)
    y = np.concatenate([np.ones(n_pos), np.zeros(n_neg)]).astype(np.int8)
    return X, y


class TestSmote:
    def test_balances_classes(self):
        X, y = _toy()
        Xb, yb = smote(X, y, seed=1)
        assert (yb == 1).sum() == (yb == 0).sum() == 100

    def test_originals_preserved_as_prefix(self):
        X, y = _toy()
        Xb, yb = smote(X, y, seed=1)
        np.testing.assert_array_equal(Xb[: len(X)], X)
        np.testing.assert_array_equal(yb[: len(y)], y)

    def test_synthetics_within_convex_hull_bounds(self):
        X, y = _toy()
        Xb, yb = smote(X, y, seed=2)
        synth = Xb[len(X):]
        mins = X[y == 1].min(axis=0)
        maxs = X[y == 1].max(axis=0)
        assert (synth >= mins - 1e-6).all()
        assert (synth <= maxs + 1e-6).all()

    def test_already_balanced_is_identity(self):
        X, y = _toy(n_pos=50, n_neg=50)
        Xb, yb = smote(X, y)
        assert len(Xb) == len(X)

    def test_single_class_is_identity(self):
        X, y = _toy()
        y[:] = 0
        Xb, yb = smote(X, y)
        assert len(Xb) == len(X)

    def test_minority_negative_class(self):
        X, y = _toy(n_pos=100, n_neg=5)
        Xb, yb = smote(X, y, seed=3)
        assert (yb == 0).sum() == (yb == 1).sum()
        assert set(np.unique(yb[len(y):])) == {0}

    def test_single_minority_point_replicated(self):
        X, y = _toy(n_pos=1, n_neg=10)
        Xb, yb = smote(X, y, seed=4)
        synth = Xb[len(X):]
        np.testing.assert_allclose(synth, np.repeat(X[:1], 9, axis=0))

    def test_deterministic(self):
        X, y = _toy()
        X1, _ = smote(X, y, seed=9)
        X2, _ = smote(X, y, seed=9)
        np.testing.assert_array_equal(X1, X2)

    def test_large_minority_subsampled_path(self):
        X, y = _toy(n_pos=3500, n_neg=4000, seed=5)
        Xb, yb = smote(X, y, seed=5)
        assert (yb == 1).sum() == (yb == 0).sum()
