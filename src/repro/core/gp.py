"""Gaussian Process regression — the surrogate model of LOCAT's BO.

Pure-numpy GP with an ARD squared-exponential (RBF) kernel and Gaussian
observation noise, fitted by Cholesky factorization (paper eq. 8–10:
zero-mean prior, normal likelihood, closed-form posterior). Hyper-
parameters are *not* point-optimized here: LOCAT marginalizes them with
MCMC inside the acquisition function (EI-MCMC, see
:mod:`repro.core.acquisition`), exactly as Snoek et al.'s Spearmint does.

Targets are standardized internally so kernel amplitude priors are
scale-free; posteriors are reported back in the original units.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

__all__ = ["Hyper", "GP", "log_marginal_likelihood"]

_JITTER = 1e-8


@dataclass(frozen=True)
class Hyper:
    """GP hyperparameters: ARD lengthscales, signal variance, noise variance."""

    lengthscales: np.ndarray  # (d,) positive
    signal_var: float
    noise_var: float

    def as_log_vector(self) -> np.ndarray:
        return np.concatenate(
            [np.log(self.lengthscales), [np.log(self.signal_var), np.log(self.noise_var)]]
        )

    @staticmethod
    def from_log_vector(v: np.ndarray) -> "Hyper":
        v = np.asarray(v, dtype=float)
        return Hyper(np.exp(v[:-2]), float(np.exp(v[-2])), float(np.exp(v[-1])))


def _sqdist(A: np.ndarray, B: np.ndarray, ls: np.ndarray) -> np.ndarray:
    """Pairwise squared distance of rows of A and B after ARD scaling."""
    A = A / ls
    B = B / ls
    aa = np.sum(A * A, axis=1)[:, None]
    bb = np.sum(B * B, axis=1)[None, :]
    return np.maximum(aa + bb - 2.0 * A @ B.T, 0.0)


def rbf_kernel(A: np.ndarray, B: np.ndarray, hyper: Hyper) -> np.ndarray:
    """ARD RBF kernel matrix K(A, B)."""
    return hyper.signal_var * np.exp(-0.5 * _sqdist(A, B, hyper.lengthscales))


def log_marginal_likelihood(X: np.ndarray, y: np.ndarray, hyper: Hyper) -> float:
    """Log p(y | X, hyper) under the zero-mean GP prior.

    Returns ``-inf`` for numerically unfactorizable kernels so MCMC simply
    rejects those hyperparameter proposals.
    """
    n = len(y)
    K = rbf_kernel(X, X, hyper) + (hyper.noise_var + _JITTER) * np.eye(n)
    try:
        L = np.linalg.cholesky(K)
    except np.linalg.LinAlgError:
        return -np.inf
    alpha = np.linalg.solve(L.T, np.linalg.solve(L, y))
    return float(
        -0.5 * y @ alpha - np.sum(np.log(np.diag(L))) - 0.5 * n * np.log(2.0 * np.pi)
    )


class GP:
    """A fitted GP posterior for one fixed hyperparameter setting.

    ``X`` is an ``(n, d)`` input matrix (normalized configurations, plus
    the data-size coordinate for DAGP) and ``y`` the observed execution
    times. ``predict`` returns the posterior mean and variance of eq. 10.
    """

    def __init__(self, X: np.ndarray, y: np.ndarray, hyper: Hyper):
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=float)
        if X.ndim != 2 or y.ndim != 1 or len(X) != len(y):
            raise ValueError("X must be (n, d) and y (n,)")
        self.X = X
        self.hyper = hyper
        self._y_mean = float(y.mean())
        self._y_std = float(y.std()) or 1.0
        self._yn = (y - self._y_mean) / self._y_std
        n = len(y)
        K = rbf_kernel(X, X, hyper) + (hyper.noise_var + _JITTER) * np.eye(n)
        self._L = np.linalg.cholesky(K)
        self._alpha = np.linalg.solve(self._L.T, np.linalg.solve(self._L, self._yn))

    def predict(self, Xs: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """Posterior mean and variance at rows of ``Xs`` (original units)."""
        Xs = np.atleast_2d(np.asarray(Xs, dtype=float))
        Ks = rbf_kernel(self.X, Xs, self.hyper)  # (n, m)
        mu_n = Ks.T @ self._alpha
        v = np.linalg.solve(self._L, Ks)
        var_n = self.hyper.signal_var - np.sum(v * v, axis=0)
        var_n = np.maximum(var_n, 1e-12)
        mu = mu_n * self._y_std + self._y_mean
        var = var_n * self._y_std**2
        return mu, var

    def log_marginal_likelihood(self) -> float:
        return log_marginal_likelihood(self.X, self._yn, self.hyper)
