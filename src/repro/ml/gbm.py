"""Gradient-boosted regression trees (NumPy) — LightGBM stand-in.

The paper trains a LightGBM regressor as the meta-learning similarity
model :math:`M_{reg}: (v_1, v_2) \\mapsto d` (§5.1). LightGBM is not
installable offline, so this module provides least-squares gradient
boosting over the same CART trees used elsewhere in :mod:`repro.ml`.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.ml.tree import RegressionTree


@dataclass
class GradientBoostedRegressor:
    """L2 gradient boosting: each stage fits residuals with a shallow tree."""

    n_estimators: int = 100
    learning_rate: float = 0.1
    max_depth: int = 3
    min_samples_leaf: int = 2
    subsample: float = 1.0
    seed: int = 0
    _init: float = 0.0
    _trees: list[RegressionTree] = field(default_factory=list)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "GradientBoostedRegressor":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        rng = np.random.default_rng(self.seed)
        self._init = float(y.mean())
        pred = np.full(len(y), self._init)
        self._trees = []
        n = len(y)
        for _ in range(self.n_estimators):
            resid = y - pred
            if self.subsample < 1.0:
                idx = rng.choice(n, size=max(2, int(n * self.subsample)), replace=False)
            else:
                idx = np.arange(n)
            t = RegressionTree(
                max_depth=self.max_depth,
                min_samples_leaf=self.min_samples_leaf,
                rng=np.random.default_rng(rng.integers(2**31)),
            )
            t.fit(X[idx], resid[idx])
            pred += self.learning_rate * t.predict(X)
            self._trees.append(t)
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        if not self._trees:
            raise RuntimeError("model is not fitted")
        X = np.asarray(X, dtype=np.float64)
        out = np.full(len(X), self._init)
        for t in self._trees:
            out += self.learning_rate * t.predict(X)
        return out
