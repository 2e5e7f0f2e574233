"""From-scratch numpy regressors for the paper's Section 5.7 comparison.

The paper benchmarks IICP against importance ranking derived from ML
performance models, and compares five model families on accuracy
(Figure 16): GBRT, SVR, Linear Regression, Logistic Regression and
k-NN regression. scikit-learn is unavailable in this container, so each
is implemented here on numpy. SVR is substituted by kernel ridge
regression (documented in DESIGN.md: both are kernel-based regularized
regressors with near-identical small-sample accuracy profiles, which is
the quantity Figure 16 measures).
"""
from repro.mlmodels.gbrt import GBRTRegressor
from repro.mlmodels.simple import (
    KNNRegressor,
    KernelRidgeRegressor,
    LinearRegressor,
    LogisticRegressor,
)

__all__ = [
    "GBRTRegressor",
    "KNNRegressor",
    "KernelRidgeRegressor",
    "LinearRegressor",
    "LogisticRegressor",
]
