"""Tests for the real-workload profiling runner (simulator calibration)."""
import numpy as np
import pytest

from repro.simcluster.eventlog import meta_features
from repro.simcluster.profile import PROFILES
from repro.workloads.runner import WORKLOAD_NAMES, RunMetrics, run_workload


class TestRunner:
    def test_all_simulated_families_profilable(self):
        # every HiBench-lite + SQL simulator profile has a real runner
        for name in WORKLOAD_NAMES:
            assert name in PROFILES

    def test_wordcount_metrics(self, spark):
        m = run_workload(spark, "wordcount", sf=0.002)
        assert m.wall_s > 0 and m.input_mb > 0 and m.rows_out > 0
        assert 0.0 < m.shuffle_frac < 1.0  # aggregation shrinks data

    def test_sort_shuffles_everything(self, spark):
        m = run_workload(spark, "sort", sf=0.002)
        assert m.shuffle_frac == pytest.approx(1.0)

    def test_sql_task_runs(self, spark):
        m = run_workload(spark, "sql_data_selection", sf=0.002)
        assert m.rows_out > 0 and m.input_mb > 0

    def test_unknown_workload(self, spark):
        with pytest.raises(KeyError):
            run_workload(spark, "nope")

    def test_meta_features_from_real_run(self, spark):
        m = run_workload(spark, "wordcount", sf=0.002)

        class R:  # minimal ExecResult stand-in carrying the metrics
            metrics = m.metrics_dict()

        v = meta_features(R())
        assert v.shape == (75,) and np.all(np.isfinite(v)) and v.any()
