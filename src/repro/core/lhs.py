"""Latin Hypercube Sampling (LHS).

LOCAT seeds Bayesian Optimization with three LHS-generated configurations
(paper Section 3.4, "Start points"). LHS stratifies each dimension into
``n`` equal slices and places exactly one sample per slice per dimension,
giving better space coverage than i.i.d. uniform draws for tiny sample
counts.
"""
from __future__ import annotations

import numpy as np

__all__ = ["latin_hypercube"]


def latin_hypercube(n: int, dim: int, rng: np.random.Generator) -> np.ndarray:
    """Return an ``(n, dim)`` LHS design on the unit hypercube.

    Each column is an independent random permutation of the ``n`` strata
    with uniform jitter inside each stratum, so every one-dimensional
    projection hits every stratum exactly once.
    """
    if n < 1:
        raise ValueError("n must be >= 1")
    if dim < 1:
        raise ValueError("dim must be >= 1")
    u = np.empty((n, dim))
    for j in range(dim):
        strata = rng.permutation(n)
        u[:, j] = (strata + rng.random(n)) / n
    return u
