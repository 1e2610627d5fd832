"""Tests for applying the transitivity model to pair tables."""
import numpy as np
import pandas as pd
import pytest

from repro.transitivity.apply import single_table_step
from repro.transitivity.model import train_transitivity_model


@pytest.fixture(scope="module")
def model():
    return train_transitivity_model(
        k=8, n_matrices=120, epochs=8, seed=3, solver_iters=150
    )


def _keys(pairs):
    return pd.DataFrame(pairs, columns=["lid", "rid"])


class TestSingleTableStep:
    def test_no_matches_identity(self, model):
        keys = _keys([(0, 1), (1, 2)])
        gamma = np.array([0.3, 0.2])
        out = single_table_step(keys, gamma, model)
        np.testing.assert_allclose(out, gamma)

    def test_component_pairs_updated(self, model):
        keys = _keys([(0, 1), (0, 2), (1, 2), (5, 6)])
        gamma = np.array([0.9, 0.9, 0.2, 0.1])
        out = single_table_step(keys, gamma, model)
        # the (1,2) pair sits inside the {0,1,2} component → updated
        assert out[2] != gamma[2]
        # the isolated (5,6) non-match pair is untouched
        assert out[3] == gamma[3]

    def test_consistent_clique_stays_matched(self, model):
        keys = _keys([(0, 1), (0, 2), (1, 2)])
        gamma = np.array([0.95, 0.95, 0.95])
        out = single_table_step(keys, gamma, model)
        assert (out > 0.5).all()

    def test_large_component_sampling_path(self, model):
        # chain of 12 nodes > model.k=8 → per-edge neighbor sampling
        pairs = [(i, i + 1) for i in range(12)]
        keys = _keys(pairs)
        gamma = np.full(len(pairs), 0.9)
        out = single_table_step(keys, gamma, model, seed=1)
        assert out.shape == gamma.shape
        assert np.isfinite(out).all()

    def test_deterministic(self, model):
        keys = _keys([(0, 1), (0, 2), (1, 2)])
        gamma = np.array([0.9, 0.8, 0.4])
        o1 = single_table_step(keys, gamma, model, seed=5)
        o2 = single_table_step(keys, gamma, model, seed=5)
        np.testing.assert_allclose(o1, o2)

    def test_outputs_are_probabilities(self, model):
        g = np.random.default_rng(0)
        nodes = range(7)
        pairs = [(a, b) for a in nodes for b in nodes if a < b]
        keys = _keys(pairs)
        gamma = g.random(len(pairs))
        out = single_table_step(keys, gamma, model)
        assert (out >= 0).all() and (out <= 1).all()
