"""Unit tests for the swapping-invariant transitivity model."""
import numpy as np
import pytest

from repro.transitivity.model import (
    TransitivityModel,
    _pad_to,
    canonicalize_eigvecs,
    decompose,
    random_gamma_star,
    train_transitivity_model,
)
from repro.transitivity.solver import constrained_gamma, transitivity_violation


@pytest.fixture(scope="module")
def small_model():
    """A quickly-trained k=8 model (module scope: trained once)."""
    return train_transitivity_model(
        k=8, n_matrices=120, epochs=8, seed=3, solver_iters=150
    )


class TestDecompose:
    def test_reconstruction(self):
        g = np.random.default_rng(0)
        G = random_gamma_star(8, g)
        V, w = decompose(G)
        np.testing.assert_allclose(V @ np.diag(w) @ V.T, G, atol=1e-8)

    def test_canonicalization_is_permutation_invariant(self):
        """Eigenvalues are exactly permutation-invariant; eigenvectors are
        unique (up to the canonicalized sign) only within non-degenerate
        eigenspaces, so compare per-eigenspace projectors instead of raw
        columns."""
        g = np.random.default_rng(1)
        G = random_gamma_star(8, g)
        perm = g.permutation(8)
        V1, w1 = decompose(G)
        V2, w2 = decompose(G[np.ix_(perm, perm)])
        np.testing.assert_allclose(w1, w2, atol=1e-8)
        # Projector onto each (possibly degenerate) eigenspace must map
        # under the permutation: P2 = Π P1 Πᵀ.
        uniq = []
        for val in w1:
            if not uniq or abs(val - uniq[-1]) > 1e-6:
                uniq.append(val)
        for val in uniq:
            sel = np.abs(w1 - val) < 1e-6
            P1 = V1[:, sel] @ V1[:, sel].T
            P2 = V2[:, sel] @ V2[:, sel].T
            np.testing.assert_allclose(P1[np.ix_(perm, perm)], P2, atol=1e-6)

    def test_canonical_sign_statistic(self):
        V = np.array([[1.0, -2.0], [2.0, -1.0]])
        Vc = canonicalize_eigvecs(V)
        assert Vc[:, 0].sum() >= 0
        assert Vc[:, 1].sum() >= 0


class TestPadding:
    def test_pad_smaller(self):
        G = np.array([[1.0, 0.8], [0.8, 1.0]])
        P = _pad_to(G, 4)
        assert P.shape == (4, 4)
        assert P[0, 1] == 0.8
        assert P[2, 3] == 0.0
        assert P[3, 3] == 1.0

    def test_pad_exact_size_identity(self):
        G = np.eye(4)
        np.testing.assert_array_equal(_pad_to(G, 4), G)

    def test_pad_too_big_raises(self):
        with pytest.raises(ValueError):
            _pad_to(np.eye(5), 4)


class TestModel:
    def test_output_shape_symmetric(self, small_model):
        g = np.random.default_rng(5)
        G = random_gamma_star(8, g)
        P = small_model.predict_matrix(G)
        assert P.shape == (8, 8)
        np.testing.assert_allclose(P, P.T)
        np.testing.assert_allclose(np.diag(P), 1.0)

    def test_swap_invariance_within_group2(self, small_model):
        """Swapping tuples other than the predicted pair must not change
        the (0,1) prediction (paper Eq. 8)."""
        g = np.random.default_rng(6)
        G = random_gamma_star(8, g)
        perm = [0, 1, 4, 3, 2, 7, 6, 5]
        p1 = small_model.predict_matrix(G)[0, 1]
        p2 = small_model.predict_matrix(G[np.ix_(perm, perm)])[0, 1]
        assert p1 == pytest.approx(p2, abs=1e-10)

    def test_swap_invariance_of_pair_order(self, small_model):
        g = np.random.default_rng(7)
        G = random_gamma_star(8, g)
        perm = [1, 0] + list(range(2, 8))
        p1 = small_model.predict_matrix(G)[0, 1]
        p2 = small_model.predict_matrix(G[np.ix_(perm, perm)])[0, 1]
        assert p1 == pytest.approx(p2, abs=1e-10)

    def test_approximates_solver(self, small_model):
        g = np.random.default_rng(8)
        errs = []
        for _ in range(5):
            G = random_gamma_star(8, g)
            Gc = constrained_gamma(G, iters=200)
            P = small_model.predict_matrix(G)
            errs.append(np.abs(P - Gc)[np.triu_indices(8, 1)].mean())
        assert np.mean(errs) < 0.15

    def test_reduces_violations(self, small_model):
        g = np.random.default_rng(9)
        before, after = [], []
        for _ in range(5):
            G = random_gamma_star(8, g)
            before.append(transitivity_violation(G))
            after.append(transitivity_violation(small_model.predict_matrix(G)))
        assert np.mean(after) < np.mean(before)

    def test_smaller_clique_padded(self, small_model):
        G = np.full((3, 3), 0.9)
        np.fill_diagonal(G, 1.0)
        P = small_model.predict_matrix(G)
        assert P.shape == (3, 3)

    def test_save_load_roundtrip(self, small_model, tmp_path):
        path = tmp_path / "m.npz"
        small_model.save(path)
        loaded = TransitivityModel.load(path)
        g = np.random.default_rng(10)
        G = random_gamma_star(8, g)
        np.testing.assert_allclose(
            small_model.predict_matrix(G), loaded.predict_matrix(G)
        )


class TestTrainingData:
    def test_random_gamma_star_valid(self):
        g = np.random.default_rng(11)
        for _ in range(10):
            G = random_gamma_star(16, g)
            assert G.shape == (16, 16)
            np.testing.assert_allclose(G, G.T)
            np.testing.assert_allclose(np.diag(G), 1.0)
            off = G[~np.eye(16, dtype=bool)]
            assert (off >= 0).all() and (off <= 0.99).all()
