"""LOCAT (Xin et al., SIGMOD 2022): low-overhead online BO for Spark SQL.

LOCAT identifies configuration-sensitive parameters with Spearman
correlation analysis after an initial sample batch (Table 1: Adaptive
space △ — the selection is one-shot) and models performance with a
datasize-aware Gaussian process (DAGP), so changing input sizes are
handled. Objective is runtime (NOER ✓, everything else ✗); the cost
experiments pass a cost objective through ``problem`` exactly as the
paper "modified some modules ... to support cost minimization".
"""
from __future__ import annotations

import numpy as np

from repro.baselines.base import PARTIAL, YES, Capabilities, Tuner
from repro.core.acquisition import expected_improvement
from repro.core.bo import datasize_feature
from repro.core.gp import GaussianProcess


def spearman(a: np.ndarray, b: np.ndarray) -> float:
    """Spearman rank correlation (Pearson on ranks; ties share ranks)."""
    def rank(v: np.ndarray) -> np.ndarray:
        order = np.argsort(v, kind="stable")
        r = np.empty(len(v))
        r[order] = np.arange(len(v), dtype=np.float64)
        # average ranks over ties
        for val in np.unique(v):
            m = v == val
            r[m] = r[m].mean()
        return r

    ra, rb = rank(np.asarray(a, float)), rank(np.asarray(b, float))
    sa, sb = ra.std(), rb.std()
    if sa == 0 or sb == 0:
        return 0.0
    return float(((ra - ra.mean()) * (rb - rb.mean())).mean() / (sa * sb))


class LOCATTuner(Tuner):
    """Spearman-selected important parameters + datasize-aware GP."""

    name = "LOCAT"
    capabilities = Capabilities(noer=YES, adaptive_space=PARTIAL)
    n_init = 3
    sa_rounds = 10
    top_k = 10
    n_candidates = 1000

    def __init__(self, *args, **kwargs):
        super().__init__(*args, **kwargs)
        self._dims: list[int] | None = None

    def _spearman_dims(self) -> list[int]:
        X = self.history.X_unit()
        y = self.history.objectives()
        scores = np.array([abs(spearman(X[:, i], y)) for i in range(self.space.dim)])
        return list(np.argsort(-scores, kind="stable")[: self.top_k])

    def suggest(self) -> dict:
        it = len(self.history)
        if it < self.n_init:
            return self.space.sample_sobol(self.n_init, seed=self.seed)[it]
        if it < self.sa_rounds:
            return self.space.sample_random(1, self.rng)[0]
        if self._dims is None:
            self._dims = self._spearman_dims()
        X = self.history.X_unit(with_datasize=True)
        gp = GaussianProcess(self.space.cat_mask, has_datasize=True).fit(
            X, self.history.penalized_objectives()
        )
        best = self.history.best()
        base = best.config if best else self.space.default_config()
        cands = self.space.sample_random(
            self.n_candidates, self.rng, subspace=self._dims, base=base
        )
        ds = datasize_feature(self.history.observations[-1].result.datasize_mb)
        U = np.array([self.space.to_unit(c) for c in cands])
        U = np.concatenate([U, np.full((len(U), 1), ds)], axis=1)
        mu, sd = gp.predict(U)
        y_best = best.objective if best else float(np.min(self.history.objectives()))
        acq = expected_improvement(mu, sd, y_best)
        return cands[int(np.argmax(acq))]
