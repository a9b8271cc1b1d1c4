"""Unit tests for fANOVA importance over random forests."""
import numpy as np
import pytest

from repro.ml.fanova import fanova_importance
from repro.ml.forest import RandomForestRegressor


def _fit_forest(fn, d=4, n=400, seed=0, **kw):
    rng = np.random.default_rng(seed)
    X = rng.random((n, d))
    y = fn(X)
    return RandomForestRegressor(n_estimators=10, seed=seed, max_features=d, **kw).fit(X, y), d


class TestSingleImportance:
    def test_single_dominant_dim(self):
        f, d = _fit_forest(lambda X: 10.0 * X[:, 0] + 0.1 * X[:, 1])
        res = fanova_importance(f, np.zeros(d), np.ones(d))
        assert res.ranking()[0] == 0
        assert res.single_mean[0] > 0.7
        assert res.single_mean[2] < 0.05 and res.single_mean[3] < 0.05

    def test_two_dims_ordered(self):
        f, d = _fit_forest(lambda X: 5.0 * X[:, 1] + 2.0 * X[:, 3])
        res = fanova_importance(f, np.zeros(d), np.ones(d))
        assert list(res.ranking()[:2]) == [1, 3]

    def test_importances_are_fractions(self):
        f, d = _fit_forest(lambda X: X[:, 0] + X[:, 1] ** 2)
        res = fanova_importance(f, np.zeros(d), np.ones(d))
        assert np.all(res.single_mean >= 0)
        assert res.single_mean.sum() <= 1.0 + 1e-6

    def test_constant_function_zero(self):
        f, d = _fit_forest(lambda X: np.full(len(X), 3.0))
        res = fanova_importance(f, np.zeros(d), np.ones(d))
        assert np.allclose(res.single_mean, 0.0)

    def test_std_reported(self):
        f, d = _fit_forest(lambda X: X[:, 0])
        res = fanova_importance(f, np.zeros(d), np.ones(d))
        assert res.single_std.shape == (d,)
        assert np.all(res.single_std >= 0)

    def test_nonunit_domain(self):
        rng = np.random.default_rng(0)
        X = rng.uniform(-5, 5, (300, 3))
        y = 4.0 * X[:, 2]
        f = RandomForestRegressor(n_estimators=8, seed=0, max_features=3).fit(X, y)
        res = fanova_importance(f, np.full(3, -5.0), np.full(3, 5.0))
        assert res.ranking()[0] == 2


class TestPairImportance:
    def test_interaction_detected(self):
        # pure XOR-like interaction: no single-dim main effect
        f, d = _fit_forest(
            lambda X: np.sign((X[:, 0] - 0.5) * (X[:, 1] - 0.5)), n=600
        )
        res = fanova_importance(f, np.zeros(d), np.ones(d), pairs=True)
        assert res.pair_mean[(0, 1)] > 0.3
        assert res.pair_mean[(2, 3)] < 0.05

    def test_additive_has_no_interaction(self):
        f, d = _fit_forest(lambda X: 3 * X[:, 0] + 3 * X[:, 1], n=500)
        res = fanova_importance(f, np.zeros(d), np.ones(d), pairs=True)
        assert res.pair_mean[(0, 1)] < 0.05

    def test_pairs_off_by_default(self):
        f, d = _fit_forest(lambda X: X[:, 0])
        res = fanova_importance(f, np.zeros(d), np.ones(d))
        assert res.pair_mean == {}


class TestVarianceDecomposition:
    def test_additive_fractions_sum_near_one(self):
        f, d = _fit_forest(lambda X: 2 * X[:, 0] + 5 * X[:, 1] + 1 * X[:, 2], n=800)
        res = fanova_importance(f, np.zeros(d), np.ones(d))
        # an additive function's variance is (nearly) fully explained by singles
        assert res.single_mean.sum() > 0.85

    def test_ranking_is_permutation(self):
        f, d = _fit_forest(lambda X: X @ np.array([1.0, 2.0, 3.0, 4.0]))
        res = fanova_importance(f, np.zeros(d), np.ones(d))
        assert sorted(res.ranking()) == list(range(d))
