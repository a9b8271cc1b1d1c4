"""Unit tests for the SparkEventLog meta-feature extraction (§5.1)."""
import numpy as np
import pytest

from repro.core.config_space import ConfigSpace
from repro.core.objective import ExecResult
from repro.simcluster import ClusterSimulator, get_profile
from repro.simcluster.eventlog import (
    N_META_FEATURES, N_STAGE_FEATURES, N_TASK_FEATURES, meta_features,
)


@pytest.fixture(scope="module")
def runs():
    sim = ClusterSimulator()
    cfg = ConfigSpace().default_config()
    return {
        name: sim.run(get_profile(name), cfg, seed=0)
        for name in ("wordcount", "terasort", "kmeans")
    }


class TestShape:
    def test_paper_split_11_64(self):
        assert N_STAGE_FEATURES == 11
        assert N_TASK_FEATURES == 64
        assert N_META_FEATURES == 75

    def test_vector_length(self, runs):
        for r in runs.values():
            assert meta_features(r).shape == (75,)

    def test_finite(self, runs):
        for r in runs.values():
            assert np.all(np.isfinite(meta_features(r)))

    def test_empty_metrics_zero_vector(self):
        r = ExecResult(runtime_s=1, mem_gbh=1, cpu_coreh=1)
        assert np.allclose(meta_features(r), 0.0)


class TestDiscrimination:
    def test_deterministic(self, runs):
        a = meta_features(runs["wordcount"])
        b = meta_features(runs["wordcount"])
        assert np.array_equal(a, b)

    def test_distinguishes_workloads(self, runs):
        a = meta_features(runs["wordcount"])
        b = meta_features(runs["terasort"])
        assert not np.allclose(a, b)

    def test_op_fractions_in_unit_range(self, runs):
        for r in runs.values():
            ops = meta_features(r)[:11]
            assert np.all((ops >= 0) & (ops <= 1))

    def test_sort_op_flagged_for_terasort(self, runs):
        from repro.simcluster.profile import STAGE_OPS

        i_sort = STAGE_OPS.index("sortBy")
        assert meta_features(runs["terasort"])[i_sort] > 0
        assert meta_features(runs["kmeans"])[i_sort] == 0

    def test_similar_workloads_closer(self):
        sim = ClusterSimulator()
        cfg = ConfigSpace().default_config()
        wc = meta_features(sim.run(get_profile("wordcount"), cfg, seed=0))
        bayes = meta_features(sim.run(get_profile("bayes"), cfg, seed=0))
        kmeans = meta_features(sim.run(get_profile("kmeans"), cfg, seed=0))
        # wordcount and bayes share the flatMap+groupBy shape
        assert np.linalg.norm(wc - bayes) < np.linalg.norm(wc - kmeans)
