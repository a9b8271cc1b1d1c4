"""SparkEventLog-style meta-features (§5.1).

The paper characterizes a tuning task by 75 meta-features parsed from
the Spark event log: 11 stage-level features (which Spark actions/
transformations the job ran) and 64 task-level features (whether tasks
were read/write/CPU-intensive etc.). Production event logs are not
available offline, so we synthesize the same summary from an executed
run's per-stage metrics — real profiled runs (``workloads.runner``)
and simulated runs (:class:`repro.simcluster.ClusterSimulator`) both
emit the ``stages`` metric structure consumed here.

Layout (75 total):
- features 0..10 — fraction of stages using each op in
  :data:`repro.simcluster.profile.STAGE_OPS` (11 features);
- features 11..74 — 8 summary statistics (mean, std, min, max, p25,
  p50, p75, sum) × 8 per-task quantities (duration, cpu, gc, input MB,
  shuffle read, shuffle write, spill, peak memory), normalized
  per-quantity so heterogeneous scales don't swamp the similarity
  model (64 features).
"""
from __future__ import annotations

import numpy as np

from repro.core.objective import ExecResult
from repro.simcluster.profile import STAGE_OPS

_TASK_KEYS = (
    "duration_ms", "cpu_ms", "gc_ms", "input_mb",
    "shuffle_read_mb", "shuffle_write_mb", "spill_mb", "peak_mem_mb",
)

N_STAGE_FEATURES = len(STAGE_OPS)  # 11
N_TASK_FEATURES = len(_TASK_KEYS) * 8  # 64
N_META_FEATURES = N_STAGE_FEATURES + N_TASK_FEATURES  # 75


def _stats(v: np.ndarray) -> np.ndarray:
    return np.array([
        v.mean(), v.std(), v.min(), v.max(),
        np.percentile(v, 25), np.percentile(v, 50), np.percentile(v, 75),
        v.sum(),
    ])


def meta_features(result: ExecResult) -> np.ndarray:
    """75-dim meta-feature vector for one executed run."""
    stages = result.metrics.get("stages", [])
    if not stages:
        return np.zeros(N_META_FEATURES)
    ops_frac = np.array([
        sum(1 for s in stages if op in s.get("ops", ())) / len(stages)
        for op in STAGE_OPS
    ])
    task_feats = []
    for key in _TASK_KEYS:
        # one weighted sample per stage: value × task count gives the sum
        vals = np.array([float(s.get(key, 0.0)) for s in stages])
        counts = np.array([int(s.get("n_tasks", 1)) for s in stages])
        st = _stats(vals)
        st[7] = float((vals * counts).sum())  # true total over tasks
        # log-compress scale-heavy stats so no quantity dominates
        task_feats.append(np.sign(st) * np.log1p(np.abs(st)))
    return np.concatenate([ops_frac, np.concatenate(task_feats)])
