"""Unit tests for the BO loop and the datasize-aware helpers."""
import numpy as np
import pytest

from repro.core.bo import bo_minimize
from repro.core.dagp import DS_REF, augment_with_ds, ds_normalize


class TestBO:
    def test_minimizes_smooth_quadratic(self):
        rng = np.random.default_rng(0)
        f = lambda x: float(((x - 0.3) ** 2).sum())
        res = bo_minimize(f, np.zeros(2), np.ones(2), rng, min_iters=10, max_iters=25)
        assert res.best_y < 0.02
        assert np.all((res.best_x >= 0) & (res.best_x <= 1))

    def test_respects_bounds(self):
        rng = np.random.default_rng(1)
        seen = []
        f = lambda x: (seen.append(x.copy()), float(x.sum()))[1]
        bo_minimize(f, np.array([2.0]), np.array([5.0]), rng, min_iters=3, max_iters=6)
        for x in seen:
            assert 2.0 - 1e-9 <= x[0] <= 5.0 + 1e-9

    def test_stop_condition_triggers(self):
        rng = np.random.default_rng(2)
        # constant objective: EI collapses once a few samples exist
        res = bo_minimize(lambda x: 5.0, np.zeros(1), np.ones(1), rng, min_iters=3, max_iters=30)
        assert res.stopped_early
        assert res.n_iters < 30

    def test_fixed_dims_pinned(self):
        rng = np.random.default_rng(3)
        seen = []
        f = lambda x: (seen.append(x.copy()), float(x[0] ** 2))[1]
        bo_minimize(
            f, np.zeros(2), np.ones(2), rng, min_iters=3, max_iters=5,
            fixed_dims={1: 0.7},
        )
        for x in seen:
            assert x[1] == pytest.approx(0.7)

    def test_init_reuse_skips_lhs(self):
        rng = np.random.default_rng(4)
        calls = []
        f = lambda x: (calls.append(1), float(x[0]))[1]
        init_X = np.array([[0.1], [0.5], [0.9]])
        res = bo_minimize(
            f, np.zeros(1), np.ones(1), rng, min_iters=2, max_iters=4,
            init_X=init_X, init_y=np.array([0.1, 0.5, 0.9]),
        )
        assert len(calls) == res.n_iters  # no extra LHS evaluations
        assert len(res.y) == 3 + res.n_iters

    def test_cand_base_accepted(self):
        rng = np.random.default_rng(5)
        base = np.array([[0.3, 0.3], [0.4, 0.4]])
        res = bo_minimize(
            lambda x: float(((x - 0.35) ** 2).sum()),
            np.zeros(2), np.ones(2), rng,
            min_iters=5, max_iters=10, cand_base=base,
        )
        assert res.best_y < 0.05

    def test_empty_box_rejected(self):
        with pytest.raises(ValueError):
            bo_minimize(lambda x: 0.0, np.ones(2), np.ones(2), np.random.default_rng(0))

    def test_ei_history_recorded(self):
        rng = np.random.default_rng(6)
        res = bo_minimize(lambda x: float(x[0]), np.zeros(1), np.ones(1), rng, min_iters=3, max_iters=5)
        assert len(res.ei_history) >= res.n_iters


class TestDAGPHelpers:
    def test_ds_normalize(self):
        assert ds_normalize(DS_REF) == pytest.approx(1.0)
        assert ds_normalize(100.0) == pytest.approx(0.2)
        with pytest.raises(ValueError):
            ds_normalize(0.0)

    def test_augment_scalar(self):
        X = np.zeros((3, 2))
        A = augment_with_ds(X, 250.0)
        assert A.shape == (3, 3)
        assert np.all(A[:, 2] == pytest.approx(0.5))

    def test_augment_vector(self):
        X = np.zeros((2, 2))
        A = augment_with_ds(X, [100.0, 500.0])
        assert A[:, 2].tolist() == pytest.approx([0.2, 1.0])

    def test_augment_length_mismatch(self):
        with pytest.raises(ValueError):
            augment_with_ds(np.zeros((2, 2)), [1.0, 2.0, 3.0])
