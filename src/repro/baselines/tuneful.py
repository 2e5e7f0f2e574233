"""Tuneful (Fekry et al. 2020) — structural reimplementation.

Tuneful is an online significance-aware tuner: a One-At-a-Time (OAT)
sensitivity stage sweeps each parameter individually (holding the rest
at defaults) to find the significant subspace, then GP-based BO searches
that subspace. The paper's critique (Section 6.1) is precisely its cost
structure: "the number of iterations of OAT increases rapidly when the
number of configuration parameters increases" — with 38 parameters the
OAT stage alone costs ~3 full-application runs per parameter — and it is
not datasize-aware, so every new input size repeats the whole procedure.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.common import BaseTuner
from repro.core.bo import bo_minimize
from repro.core.result import TuneResult
from repro.execmodel.interface import Executor

__all__ = ["Tuneful"]


class Tuneful(BaseTuner):
    name = "Tuneful"

    def __init__(self, space, *, seed: int = 0, queries=None, oat_values: int = 3, keep_frac: float = 0.33, bo_min_iters: int = 10, bo_max_iters: int = 30):
        super().__init__(space, seed=seed, queries=queries)
        self.oat_values = oat_values
        self.keep_frac = keep_frac
        self.bo_min_iters = bo_min_iters
        self.bo_max_iters = bo_max_iters

    def _oat(self, executor: Executor, ds: float, rng) -> list[str]:
        """One-at-a-time significance analysis: sweep each parameter over
        ``oat_values`` points, others at defaults; significance = relative
        spread of the observed execution times."""
        base = self.space.default_conf()
        significance: dict[str, float] = {}
        for p in self.space.params:
            times = []
            if p.kind == "bool":
                values = [False, True][: self.oat_values]
            else:
                values = [p.denormalize(u) for u in np.linspace(0.0, 1.0, self.oat_values)]
            for v in values:
                conf = dict(base)
                conf[p.name] = v
                conf = self._repair(executor, conf)
                times.append(self._run(executor, conf, ds))
            times = np.array(times)
            significance[p.name] = float(np.ptp(times) / times.mean())
        k = max(3, int(round(self.keep_frac * self.space.dim)))
        ranked = sorted(significance, key=lambda n: -significance[n])
        return ranked[:k]

    def tune(self, executor: Executor, ds: float) -> TuneResult:
        rng = np.random.default_rng(self.seed)
        t0 = executor.charged_seconds
        n0 = getattr(executor, "n_runs", 0)
        kept = self._oat(executor, ds, rng)
        sub = self.space.subspace(kept)
        base = self.space.default_conf()
        evals: list[tuple[dict, float]] = []

        def f(u: np.ndarray) -> float:
            conf = dict(base)
            conf.update(sub.from_vector(np.clip(u, 0.0, 1.0)))
            conf = self._repair(executor, conf)
            t = self._run(executor, conf, ds)
            evals.append((conf, t))
            return t

        bo_minimize(
            f,
            np.zeros(sub.dim),
            np.ones(sub.dim),
            rng,
            n_init=3,
            min_iters=self.bo_min_iters,
            max_iters=self.bo_max_iters,
            ei_frac=0.10,
            local_refine=False,
        )
        best_conf = min(evals, key=lambda e: e[1])[0]
        return self._result(executor, best_conf, ds, t0, n0)
