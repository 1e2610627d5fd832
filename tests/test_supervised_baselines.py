"""Tests for ZeroER, active learning, Ditto-lite, and the end model."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import zeroer
from repro.baselines.active_learning import ALTrajectory, run_active_learning
from repro.baselines.ditto_lite import pair_features, serialize, train
from repro.baselines.end_model import end_model_f1, train_end_model


def _feature_data(n=600, match_rate=0.15, seed=0):
    """Similarity-feature data: matches cluster near 1, non-matches near 0."""
    g = np.random.default_rng(seed)
    y = (g.random(n) < match_rate).astype(np.int8)
    mu = np.where(y[:, None] == 1, 0.85, 0.25)
    F = np.clip(mu + g.normal(0, 0.15, size=(n, 6)), 0, 1)
    return F, y


class TestZeroER:
    def test_separates_clusters(self):
        F, y = _feature_data()
        gamma = zeroer.fit_predict(F)
        acc = ((gamma >= 0.5).astype(int) == y).mean()
        assert acc > 0.9

    def test_match_component_is_high_similarity(self):
        F, y = _feature_data(seed=1)
        gamma = zeroer.fit_predict(F)
        # predicted matches must have higher mean similarity
        assert F[gamma >= 0.5].mean() > F[gamma < 0.5].mean()

    def test_probabilities_valid(self):
        F, _ = _feature_data(seed=2)
        gamma = zeroer.fit_predict(F)
        assert (gamma >= 0).all() and (gamma <= 1).all()

    def test_deterministic(self):
        F, _ = _feature_data(seed=3)
        np.testing.assert_allclose(zeroer.fit_predict(F), zeroer.fit_predict(F))


class TestActiveLearning:
    def test_trajectory_recorded(self):
        F, y = _feature_data()
        traj = run_active_learning(F, y, max_labels=100, seed=0)
        assert len(traj.n_labeled) == len(traj.f1)
        assert traj.n_labeled == sorted(traj.n_labeled)

    def test_learns_with_enough_labels(self):
        F, y = _feature_data(seed=4)
        traj = run_active_learning(F, y, max_labels=200, seed=0)
        assert traj.final_f1 > 0.7

    def test_labels_to_reach(self):
        t = ALTrajectory(n_labeled=[10, 20, 30], f1=[0.1, 0.6, 0.9])
        assert t.labels_to_reach(0.5) == 20
        assert t.labels_to_reach(0.95) is None

    def test_smote_variant_runs(self):
        F, y = _feature_data(seed=5)
        traj = run_active_learning(F, y, use_smote=True, max_labels=80, seed=0)
        assert traj.final_f1 >= 0.0

    def test_respects_max_labels(self):
        F, y = _feature_data(seed=6)
        traj = run_active_learning(F, y, max_labels=60, seed=0)
        assert traj.n_labeled[-1] <= 60

    def test_eval_mask_excluded_from_queries(self):
        F, y = _feature_data(n=200, seed=7)
        mask = np.zeros(200, dtype=bool)
        mask[:50] = True
        traj = run_active_learning(F, y, eval_mask=mask, max_labels=150, seed=0)
        assert traj.n_labeled[-1] <= 150


class TestDittoLite:
    def _pairs(self, n=300, seed=0):
        g = np.random.default_rng(seed)
        rows = []
        for i in range(n):
            match = g.random() < 0.4
            name = f"prod {g.integers(0, 50)} model {g.integers(0, 9)}"
            other = name if match else f"prod {g.integers(0, 50)} model {g.integers(0, 9)}"
            rows.append(
                {"lid": i, "rid": i, "l_name": name, "r_name": other,
                 "label": int(name == other)}
            )
        return pd.DataFrame(rows)

    def test_serialize_format(self):
        row = pd.Series({"l_name": "abc", "l_price": 5.0})
        s = serialize(row, "l", ["name", "price"])
        assert s == "COL name VAL abc COL price VAL 5.0"

    def test_serialize_skips_missing(self):
        row = pd.Series({"l_name": None})
        assert serialize(row, "l", ["name"]) == ""

    def test_identical_pair_features_structure(self):
        pairs = self._pairs(4)
        F = pair_features(pairs, ["name"])
        same = pairs.label.to_numpy() == 1
        if same.any():
            # identical sides → |u−v| part is all zeros
            i = int(np.where(same)[0][0])
            assert np.abs(F[i, :2048]).sum() == pytest.approx(0.0)

    def test_learns_textual_matching(self):
        pairs = self._pairs(400, seed=1)
        F = pair_features(pairs, ["name"])
        y = pairs.label.to_numpy().astype(np.float64)
        tr, te = np.arange(300), np.arange(300, 400)
        model = train(F[tr], y[tr], F[te], y[te].astype(int), epochs=8, seed=0)
        acc = (model.predict(F[te]) == y[te]).mean()
        assert acc > 0.85

    def test_deterministic_features(self):
        pairs = self._pairs(10, seed=2)
        np.testing.assert_array_equal(
            pair_features(pairs, ["name"]), pair_features(pairs, ["name"])
        )


class TestEndModel:
    def test_learns_from_clean_labels(self):
        F, y = _feature_data(seed=8)
        tr, te = np.arange(400), np.arange(400, 600)
        m = train_end_model(F[tr], y[tr], seed=0)
        assert end_model_f1(m, F[te], y[te]) > 0.8

    def test_robust_to_label_noise(self):
        """The Table 7 phenomenon: an end model trained on noisy labels
        can still generalize well from feature structure."""
        F, y = _feature_data(n=1000, seed=9)
        g = np.random.default_rng(0)
        noisy = y.copy()
        flip = g.random(1000) < 0.1
        noisy[flip] = 1 - noisy[flip]
        tr, te = np.arange(800), np.arange(800, 1000)
        m = train_end_model(F[tr], noisy[tr], seed=0)
        assert end_model_f1(m, F[te], y[te]) > 0.75

    def test_degenerate_labels_handled(self):
        F, y = _feature_data(n=100, seed=10)
        m = train_end_model(F, np.zeros(100, dtype=np.int8), seed=0)
        assert end_model_f1(m, F, y) >= 0.0
