"""Unit tests for the from-scratch regressors (Section 5.7 machinery)."""
import numpy as np
import pytest

from repro.mlmodels import (
    GBRTRegressor,
    KernelRidgeRegressor,
    KNNRegressor,
    LinearRegressor,
    LogisticRegressor,
)

ALL_MODELS = [
    ("GBRT", lambda: GBRTRegressor(n_estimators=80, max_depth=3)),
    ("KRR", lambda: KernelRidgeRegressor(alpha=0.01)),
    ("Linear", lambda: LinearRegressor()),
    ("Logistic", lambda: LogisticRegressor(n_iter=800)),
    ("KNN", lambda: KNNRegressor(k=3)),
]


def _data(n=80, seed=0):
    rng = np.random.default_rng(seed)
    X = rng.random((n, 4))
    y = 3 * X[:, 0] + np.sin(4 * X[:, 1]) + 0.05 * rng.standard_normal(n)
    return X, y


@pytest.mark.parametrize("name,make", ALL_MODELS)
def test_fits_better_than_mean_predictor(name, make):
    X, y = _data()
    Xte, yte = _data(seed=1)
    model = make().fit(X, y)
    pred = model.predict(Xte)
    assert pred.shape == (len(yte),)
    mse = float(np.mean((pred - yte) ** 2))
    mse_mean = float(np.mean((y.mean() - yte) ** 2))
    assert mse < mse_mean, f"{name}: {mse} vs {mse_mean}"


@pytest.mark.parametrize("name,make", ALL_MODELS)
def test_predict_single_row(name, make):
    X, y = _data(30)
    model = make().fit(X, y)
    out = model.predict(X[0])
    assert out.shape == (1,)
    assert np.isfinite(out[0])


def test_linear_exact_on_linear_data():
    rng = np.random.default_rng(2)
    X = rng.random((50, 3))
    y = 2 * X[:, 0] - X[:, 2] + 5
    model = LinearRegressor().fit(X, y)
    np.testing.assert_allclose(model.predict(X), y, atol=1e-8)


def test_gbrt_feature_importance_finds_driver():
    rng = np.random.default_rng(3)
    X = rng.random((100, 6))
    y = 10 * X[:, 2] + 0.1 * rng.standard_normal(100)
    model = GBRTRegressor(n_estimators=50, max_depth=2).fit(X, y)
    assert model.feature_importances_.argmax() == 2
    assert model.feature_importances_.sum() == pytest.approx(1.0)


def test_gbrt_constant_target():
    X = np.random.default_rng(4).random((20, 3))
    model = GBRTRegressor().fit(X, np.full(20, 3.0))
    np.testing.assert_allclose(model.predict(X), 3.0)


def test_knn_exact_on_training_point_k1():
    X, y = _data(20)
    model = KNNRegressor(k=1).fit(X, y)
    assert model.predict(X[5])[0] == pytest.approx(y[5])


def test_logistic_predictions_within_target_range():
    X, y = _data(40)
    model = LogisticRegressor(n_iter=500).fit(X, y)
    pred = model.predict(X)
    assert pred.min() >= y.min() - 1e-9
    assert pred.max() <= y.max() + 1e-9


def test_krr_interpolates_with_small_alpha():
    X, y = _data(30)
    model = KernelRidgeRegressor(alpha=1e-8).fit(X, y)
    np.testing.assert_allclose(model.predict(X), y, atol=1e-3)
