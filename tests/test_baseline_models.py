"""Unit tests for the truth-inference baselines (D&S, EBCC, FS, SN)."""
import numpy as np
import pytest

from repro.baselines import dawid_skene, ebcc, flying_squid, snorkel_lm
from repro.baselines.api import dedup_patterns, mv_soft


def _cond_independent(n=2000, m=5, accs=None, props=None, pos=0.5, seed=0):
    """Conditionally-independent LF votes — every baseline's home turf."""
    g = np.random.default_rng(seed)
    accs = accs if accs is not None else g.uniform(0.65, 0.9, m)
    props = props if props is not None else g.uniform(0.5, 0.9, m)
    y = np.where(g.random(n) < pos, 1, -1).astype(np.int8)
    X = np.zeros((n, m), dtype=np.int8)
    for j in range(m):
        fired = g.random(n) < props[j]
        correct = g.random(n) < accs[j]
        X[fired, j] = (y * np.where(correct, 1, -1))[fired]
    return X, (y > 0).astype(np.int8)


def _acc(gamma, y):
    return ((gamma >= 0.5).astype(int) == y).mean()


ALL_MODELS = [
    ("D&S", dawid_skene.fit_predict),
    ("EBCC", ebcc.fit_predict),
    ("FS", flying_squid.fit_predict),
    ("SN", snorkel_lm.fit_predict),
]


class TestApiHelpers:
    def test_mv_soft_values(self):
        X = np.array([[1, 1, -1], [-1, -1, 0], [1, -1, 0], [0, 0, 0]])
        np.testing.assert_allclose(mv_soft(X), [1.0, 0.0, 0.5, 0.5])

    def test_dedup_patterns_roundtrip(self):
        X = np.array([[1, 0], [1, 0], [0, 1]], dtype=np.int8)
        uniq, inv, counts = dedup_patterns(X)
        np.testing.assert_array_equal(uniq[inv], X)
        assert counts.sum() == 3


@pytest.mark.parametrize("name,fit", ALL_MODELS)
class TestOnConditionallyIndependentData:
    def test_beats_chance(self, name, fit):
        X, y = _cond_independent(seed=1)
        assert _acc(fit(X), y) > 0.7

    def test_at_least_matches_majority_vote(self, name, fit):
        # Heterogeneous accuracies: learned weighting should not lose much
        # to (and typically beats) unweighted MV.
        X, y = _cond_independent(
            accs=np.array([0.55, 0.6, 0.95, 0.9, 0.55]), seed=2
        )
        assert _acc(fit(X), y) >= _acc(mv_soft(X), y) - 0.02

    def test_returns_probabilities(self, name, fit):
        X, _ = _cond_independent(n=300, seed=3)
        gamma = fit(X)
        assert gamma.shape == (300,)
        assert (gamma >= 0).all() and (gamma <= 1).all()

    def test_deterministic(self, name, fit):
        X, _ = _cond_independent(n=300, seed=4)
        np.testing.assert_allclose(fit(X, seed=5), fit(X, seed=5))

    def test_handles_all_abstain_rows(self, name, fit):
        X, _ = _cond_independent(n=200, seed=6)
        X[:10] = 0
        gamma = fit(X)
        assert np.isfinite(gamma).all()


class TestDawidSkene:
    def test_recovers_confusion_structure(self):
        # An adversarial LF (acc < 0.5) should be down-weighted by D&S but
        # hurts MV: construct 3 good LFs + 2 inverted ones.
        g = np.random.default_rng(7)
        n = 3000
        y = np.where(g.random(n) < 0.5, 1, -1).astype(np.int8)
        X = np.zeros((n, 5), dtype=np.int8)
        for j, a in enumerate([0.85, 0.85, 0.85, 0.2, 0.2]):
            correct = g.random(n) < a
            X[:, j] = y * np.where(correct, 1, -1)
        yb = (y > 0).astype(np.int8)
        assert _acc(dawid_skene.fit_predict(X), yb) > _acc(mv_soft(X), yb)


class TestFlyingSquid:
    def test_closed_form_accuracy_estimation(self):
        # With known accuracies, FS posterior should track the strong LF.
        g = np.random.default_rng(8)
        n = 4000
        y = np.where(g.random(n) < 0.5, 1, -1).astype(np.int8)
        X = np.zeros((n, 3), dtype=np.int8)
        for j, a in enumerate([0.95, 0.6, 0.6]):
            correct = g.random(n) < a
            X[:, j] = y * np.where(correct, 1, -1)
        gamma = flying_squid.fit_predict(X)
        yb = (y > 0).astype(np.int8)
        # accuracy should approach the best LF's accuracy
        assert _acc(gamma, yb) > 0.9
