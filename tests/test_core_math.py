"""Unit tests for LHS, Spearman, GP, acquisition and KPCA."""
import math

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.acquisition import (
    EIMCMC,
    _erf,
    expected_improvement,
    norm_cdf,
    norm_pdf,
    sample_hypers,
)
from repro.core.gp import GP, Hyper, log_marginal_likelihood
from repro.core.kpca import KERNELS, KernelPCA
from repro.core.lhs import latin_hypercube
from repro.core.spearman import rankdata, spearman, spearman_matrix


# ---------------------------------------------------------------- LHS
class TestLHS:
    def test_shape(self):
        u = latin_hypercube(7, 3, np.random.default_rng(0))
        assert u.shape == (7, 3)
        assert np.all((u >= 0) & (u <= 1))

    def test_stratification(self):
        n = 10
        u = latin_hypercube(n, 4, np.random.default_rng(1))
        for j in range(4):
            strata = np.floor(u[:, j] * n).astype(int)
            assert sorted(strata) == list(range(n))

    def test_deterministic_given_seed(self):
        a = latin_hypercube(5, 2, np.random.default_rng(42))
        b = latin_hypercube(5, 2, np.random.default_rng(42))
        np.testing.assert_array_equal(a, b)

    @pytest.mark.parametrize("n,dim", [(0, 1), (1, 0)])
    def test_rejects_bad_sizes(self, n, dim):
        with pytest.raises(ValueError):
            latin_hypercube(n, dim, np.random.default_rng(0))

    @given(st.integers(1, 30), st.integers(1, 6), st.integers(0, 1000))
    @settings(max_examples=20, deadline=None)
    def test_property_every_stratum_hit(self, n, dim, seed):
        u = latin_hypercube(n, dim, np.random.default_rng(seed))
        for j in range(dim):
            assert len(set(np.floor(u[:, j] * n).astype(int))) == n


# ------------------------------------------------------------ Spearman
class TestSpearman:
    def test_perfect_monotone(self):
        x = np.arange(10.0)
        assert spearman(x, x**3) == pytest.approx(1.0)
        assert spearman(x, -(x**3)) == pytest.approx(-1.0)

    def test_constant_is_zero(self):
        assert spearman(np.ones(10), np.arange(10.0)) == 0.0

    def test_ties_averaged(self):
        assert rankdata(np.array([1.0, 2.0, 2.0, 3.0])).tolist() == [1.0, 2.5, 2.5, 4.0]

    def test_matrix(self):
        rng = np.random.default_rng(0)
        X = rng.random((50, 3))
        y = 3 * X[:, 0] - 2 * X[:, 2] + 0.01 * rng.standard_normal(50)
        scc = spearman_matrix(X, y)
        assert scc[0] > 0.7
        assert scc[2] < -0.5
        assert abs(scc[1]) < 0.4

    def test_shape_checks(self):
        with pytest.raises(ValueError):
            spearman(np.arange(3.0), np.arange(4.0))
        with pytest.raises(ValueError):
            spearman(np.array([1.0]), np.array([1.0]))

    def test_known_value(self):
        # hand-computed Spearman rho for a small example
        x = np.array([1.0, 2.0, 3.0, 4.0, 5.0])
        y = np.array([2.0, 1.0, 4.0, 3.0, 5.0])
        assert spearman(x, y) == pytest.approx(0.8)


# ------------------------------------------------------------------ GP
class TestGP:
    def _fit(self, noise=1e-6):
        rng = np.random.default_rng(0)
        X = rng.random((20, 2))
        y = np.sin(4 * X[:, 0]) + X[:, 1]
        return X, y, GP(X, y, Hyper(np.array([0.3, 0.3]), 1.0, noise))

    def test_interpolates_training_points(self):
        X, y, gp = self._fit()
        mu, var = gp.predict(X)
        assert np.abs(mu - y).max() < 1e-2
        assert np.all(var >= 0)

    def test_uncertainty_grows_off_data(self):
        X, y, gp = self._fit()
        _, var_on = gp.predict(X[:1])
        _, var_off = gp.predict(np.array([[5.0, 5.0]]))
        assert var_off[0] > var_on[0] * 10

    def test_lml_finite_and_prefers_good_hypers(self):
        X, y, _ = self._fit()
        ys = (y - y.mean()) / y.std()
        good = log_marginal_likelihood(X, ys, Hyper(np.array([0.3, 0.3]), 1.0, 1e-2))
        bad = log_marginal_likelihood(X, ys, Hyper(np.array([1e-4, 1e-4]), 1.0, 1e-2))
        assert np.isfinite(good) and good > bad

    def test_hyper_log_vector_roundtrip(self):
        h = Hyper(np.array([0.5, 2.0]), 1.5, 0.01)
        h2 = Hyper.from_log_vector(h.as_log_vector())
        np.testing.assert_allclose(h2.lengthscales, h.lengthscales)
        assert h2.signal_var == pytest.approx(h.signal_var)
        assert h2.noise_var == pytest.approx(h.noise_var)

    def test_input_validation(self):
        with pytest.raises(ValueError):
            GP(np.zeros((3, 2)), np.zeros(4), Hyper(np.ones(2), 1.0, 0.1))


# ---------------------------------------------------------- acquisition
class TestAcquisition:
    def test_erf_matches_math_erf(self):
        z = np.linspace(-4, 4, 101)
        expected = np.array([math.erf(v) for v in z])
        np.testing.assert_allclose(_erf(z), expected, atol=2e-7)

    def test_norm_cdf_bounds(self):
        z = np.linspace(-8, 8, 50)
        c = norm_cdf(z)
        assert np.all((c >= 0) & (c <= 1))
        assert np.all(np.diff(c) >= 0)
        assert norm_cdf(np.array([0.0]))[0] == pytest.approx(0.5)

    def test_norm_pdf_peak(self):
        assert norm_pdf(np.array([0.0]))[0] == pytest.approx(1 / math.sqrt(2 * math.pi))

    def test_ei_nonnegative_and_zero_far_above_best(self):
        ei = expected_improvement(np.array([10.0]), np.array([1e-6]), best=1.0)
        assert ei[0] == pytest.approx(0.0, abs=1e-6)
        ei2 = expected_improvement(np.array([0.0]), np.array([1.0]), best=1.0)
        assert ei2[0] > 0.9

    def test_sample_hypers_count_and_positivity(self):
        rng = np.random.default_rng(0)
        X = rng.random((15, 3))
        y = X.sum(axis=1)
        hs = sample_hypers(X, y, rng, n_hyper=5)
        assert len(hs) == 5
        for h in hs:
            assert np.all(h.lengthscales > 0)
            assert h.signal_var > 0 and h.noise_var > 0

    def test_eimcmc_scores_and_prefers_promising(self):
        rng = np.random.default_rng(0)
        X = rng.random((25, 1))
        y = (X[:, 0] - 0.3) ** 2
        acq = EIMCMC(X, y, rng, n_hyper=4)
        scores = acq.score(np.array([[0.3], [0.95]]))
        assert scores.shape == (2,)
        assert np.all(scores >= 0)
        mu, var = acq.predict(np.array([[0.3], [0.95]]))
        assert mu[0] < mu[1]


# ---------------------------------------------------------------- KPCA
class TestKPCA:
    def _X(self, n=30, d=5, seed=0):
        return np.random.default_rng(seed).random((n, d))

    @pytest.mark.parametrize("kernel", KERNELS)
    def test_fit_transform_shapes(self, kernel):
        X = self._X()
        kp = KernelPCA(3, kernel=kernel).fit(X)
        Z = kp.transform(X)
        assert Z.shape == (30, 3)
        assert np.all(np.diff(kp.eigenvalues_) <= 1e-9)  # descending

    def test_explained_ratio_monotone(self):
        kp = KernelPCA(4).fit(self._X())
        r = kp.explained_ratio()
        assert np.all(np.diff(r) >= 0)
        assert 0 < r[-1] <= 1.0 + 1e-9

    def test_gaussian_preimage_roundtrip_reasonable(self):
        X = self._X(n=40, d=4, seed=1)
        kp = KernelPCA(3).fit(X)
        Xi = kp.inverse_transform(kp.transform(X[:10]))
        assert Xi.shape == (10, 4)
        assert np.all((Xi >= 0) & (Xi <= 1))
        assert np.abs(Xi - X[:10]).mean() < 0.15

    def test_preimage_better_than_mean_baseline(self):
        X = self._X(n=40, d=4, seed=2)
        kp = KernelPCA(3).fit(X)
        Xi = kp.inverse_transform(kp.transform(X))
        err = np.abs(Xi - X).mean()
        base = np.abs(X.mean(axis=0)[None, :] - X).mean()
        assert err < base

    def test_latent_bounds_contain_projections(self):
        X = self._X()
        kp = KernelPCA(3).fit(X)
        lo, hi = kp.latent_bounds()
        Z = kp.transform(X)
        assert np.all(Z >= lo - 1e-9) and np.all(Z <= hi + 1e-9)

    def test_errors(self):
        with pytest.raises(ValueError):
            KernelPCA(0)
        with pytest.raises(ValueError):
            KernelPCA(2, kernel="nope")
        with pytest.raises(RuntimeError):
            KernelPCA(2).transform(np.zeros((2, 2)))
        with pytest.raises(ValueError):
            KernelPCA(2).fit(np.zeros((1, 3)))

    def test_caps_components_at_positive_eigenvalues(self):
        X = np.vstack([self._X(4, 3, 3)] * 2)  # rank-deficient
        kp = KernelPCA(10).fit(X)
        assert kp.alphas_.shape[1] <= 8
