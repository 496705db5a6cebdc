"""Unit tests for product quantisation (coarse + residual codebooks)."""
import numpy as np
import pytest

from repro.index.pq import _assign, _lloyd, train_quantizer


def _unit_rows(n, d, seed=0):
    X = np.random.default_rng(seed).standard_normal((n, d))
    return X / np.linalg.norm(X, axis=1, keepdims=True)


def _clustered(n, d, k, seed=0, spread=0.05):
    rng = np.random.default_rng(seed)
    centers = rng.standard_normal((k, d))
    X = centers[rng.integers(0, k, n)] + spread * rng.standard_normal((n, d))
    return X


@pytest.fixture(scope="module")
def quant():
    return train_quantizer(_unit_rows(600, 32), n_subspaces=4, k_coarse=16,
                           k_residual=16, iters=8, seed=0)


class TestLloyd:
    def test_recovers_separated_clusters(self):
        X = _clustered(400, 8, 4, spread=0.01)
        cent = _lloyd(X, 4, 15, np.random.default_rng(0))
        # every point should be within spread-distance of some centroid
        d2 = ((X[:, None, :] - cent[None]) ** 2).sum(-1).min(1)
        assert np.sqrt(d2).max() < 0.2

    def test_k_capped_at_n(self):
        X = _clustered(5, 4, 3)
        cent = _lloyd(X, 10, 5, np.random.default_rng(0))
        assert cent.shape[0] == 5

    def test_assign_nearest(self):
        cent = np.array([[0.0, 0.0], [10.0, 10.0]])
        X = np.array([[0.1, 0.1], [9.0, 9.5], [0.4, -0.2]])
        np.testing.assert_array_equal(_assign(X, cent), [0, 1, 0])


class TestTrain:
    def test_shapes(self, quant):
        assert quant.coarse.shape == (4, 16, 8)
        assert quant.residual.shape == (4, 16, 8)
        assert quant.dim == 32 and quant.sub_dim == 8

    def test_indivisible_dim_raises(self):
        with pytest.raises(ValueError):
            train_quantizer(_unit_rows(100, 30), n_subspaces=4)

    def test_deterministic(self):
        X = _unit_rows(300, 32)
        a = train_quantizer(X, n_subspaces=4, k_coarse=8, k_residual=8, seed=1)
        b = train_quantizer(X, n_subspaces=4, k_coarse=8, k_residual=8, seed=1)
        np.testing.assert_allclose(a.coarse, b.coarse)
        np.testing.assert_allclose(a.residual, b.residual)


class TestEncodeDecode:
    def test_code_ranges(self, quant):
        X = _unit_rows(200, 32, seed=5)
        cl, rc = quant.encode(X)
        assert cl.shape == rc.shape == (200, 4)
        assert cl.min() >= 0 and cl.max() < 16
        assert rc.min() >= 0 and rc.max() < 16

    def test_residual_refines_reconstruction(self, quant):
        """Two-level decode must beat coarse-only decode."""
        X = _unit_rows(200, 32, seed=6)
        cl, rc = quant.encode(X)
        full = quant.decode(cl, rc)
        coarse_only = quant.decode(cl, np.zeros_like(rc))
        # coarse-only uses residual centroid 0 — compare against true coarse
        parts = quant.split(X)
        coarse_rec = np.concatenate(
            [quant.coarse[p][cl[:, p]] for p in range(4)], axis=1
        )
        err_full = np.linalg.norm(X - full)
        err_coarse = np.linalg.norm(X - coarse_rec)
        assert err_full < err_coarse

    def test_reconstruction_beats_random_guess(self, quant):
        X = _unit_rows(200, 32, seed=7)
        cl, rc = quant.encode(X)
        rec = quant.decode(cl, rc)
        rand = _unit_rows(200, 32, seed=99)
        assert np.linalg.norm(X - rec) < np.linalg.norm(X - rand)

    def test_clustered_data_quantises_tightly(self):
        X = _clustered(500, 32, 8, spread=0.02)
        X /= np.linalg.norm(X, axis=1, keepdims=True)
        q = train_quantizer(X, n_subspaces=4, k_coarse=16, k_residual=16, seed=0)
        cl, rc = q.encode(X)
        rec = q.decode(cl, rc)
        rel = np.linalg.norm(X - rec) / np.linalg.norm(X)
        assert rel < 0.2

    def test_split_roundtrip(self, quant):
        X = _unit_rows(10, 32)
        parts = quant.split(X)
        back = parts.transpose(1, 0, 2).reshape(10, 32)
        np.testing.assert_allclose(back, X)


class TestLUTs:
    def test_coarse_lut_matches_bruteforce(self, quant):
        q = _unit_rows(1, 32, seed=11)[0]
        lut = quant.coarse_lut(q)
        qs = q.reshape(4, 8)
        for p in range(4):
            for m in range(16):
                assert lut[p, m] == pytest.approx(float(qs[p] @ quant.coarse[p, m]))

    def test_residual_lut_matches_bruteforce(self, quant):
        q = _unit_rows(1, 32, seed=12)[0]
        lut = quant.residual_lut(q)
        qs = q.reshape(4, 8)
        for p in range(4):
            for m in range(16):
                assert lut[p, m] == pytest.approx(float(qs[p] @ quant.residual[p, m]))

    def test_adc_score_approximates_exact(self, quant):
        """Σ_p (LUT_c + LUT_r) ≈ q·x, and beats the coarse-only estimate."""
        X = _unit_rows(100, 32, seed=13)
        q = _unit_rows(1, 32, seed=14)[0]
        cl, rc = quant.encode(X)
        clut, rlut = quant.coarse_lut(q), quant.residual_lut(q)
        approx = np.array(
            [sum(clut[p, cl[i, p]] + rlut[p, rc[i, p]] for p in range(4)) for i in range(100)]
        )
        coarse = np.array(
            [sum(clut[p, cl[i, p]] for p in range(4)) for i in range(100)]
        )
        exact = X @ q
        assert np.abs(approx - exact).mean() < np.abs(coarse - exact).mean() + 1e-9
        assert np.abs(approx - exact).mean() < 0.5
