"""Profiling runner: execute HiBench-lite workloads on real Spark and
extract the calibration quantities behind the simulator profiles.

For each workload family this measures wall time and estimates
input/shuffle volumes from the actual data (row counts × sampled row
widths — Spark's per-stage shuffle byte counters are not exposed to
PySpark without a JVM listener, so volumes are derived from the data
the job demonstrably moved). The result carries the same ``stages``
metric structure the simulator emits, so 75-dim meta-features
(:mod:`repro.simcluster.eventlog`) can be computed for *real* runs too.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession

from repro import synth_data
from repro.workloads import bayes, kmeans, lr, nweight, pagerank, sortbench, sql_tasks, svd, wordcount


def _df_mb(df: DataFrame, rows: int | None = None, sample: int = 200) -> float:
    """Approximate in-memory MB of a DataFrame from sampled row widths."""
    n = rows if rows is not None else df.count()
    if n == 0:
        return 0.0
    pdf = df.limit(sample).toPandas()
    if len(pdf) == 0:
        return 0.0
    bytes_per_row = max(pdf.memory_usage(index=False, deep=True).sum() / len(pdf), 1.0)
    return n * bytes_per_row / 1e6


@dataclass
class RunMetrics:
    """One profiled execution of a real workload."""

    name: str
    wall_s: float
    input_mb: float
    shuffle_mb: float
    rows_in: int
    rows_out: int
    stages: list[dict] = field(default_factory=list)

    @property
    def shuffle_frac(self) -> float:
        return self.shuffle_mb / self.input_mb if self.input_mb else 0.0

    def metrics_dict(self) -> dict:
        """Shape-compatible with ``ExecResult.metrics`` for eventlog."""
        return {"stages": self.stages, "workload": self.name}


def _mk_stages(name: str, wall_s: float, input_mb: float, shuffle_mb: float,
               rows_in: int, ops_map: tuple, ops_red: tuple) -> list[dict]:
    half = wall_s * 500.0  # ms, split evenly between the two stage shapes
    return [
        {
            "n_tasks": max(1, rows_in // 10_000), "duration_ms": half,
            "cpu_ms": half * 0.7, "gc_ms": half * 0.05, "input_mb": input_mb,
            "shuffle_read_mb": 0.0, "shuffle_write_mb": shuffle_mb,
            "spill_mb": 0.0, "peak_mem_mb": input_mb, "ops": ops_map,
        },
        {
            "n_tasks": 64, "duration_ms": half, "cpu_ms": half * 0.5,
            "gc_ms": half * 0.05, "input_mb": 0.0,
            "shuffle_read_mb": shuffle_mb, "shuffle_write_mb": 0.0,
            "spill_mb": 0.0, "peak_mem_mb": shuffle_mb, "ops": ops_red,
        },
    ]


def run_workload(spark: SparkSession, name: str, *, sf: float = 0.01, seed: int = 0) -> RunMetrics:
    """Run one workload family at scale factor ``sf`` and profile it."""
    fn = _RUNNERS.get(name)
    if fn is None:
        raise KeyError(f"unknown workload {name!r}; known: {sorted(_RUNNERS)}")
    return fn(spark, sf, seed)


def _run_wordcount(spark, sf, seed):
    text = synth_data.text_corpus(spark, n_lines=max(100, int(600_000 * sf)), seed=seed)
    rows_in = text.count()
    in_mb = _df_mb(text, rows_in)
    t0 = time.perf_counter()
    out = wordcount.wordcount(text)
    rows_out = out.count()
    wall = time.perf_counter() - t0
    sh_mb = _df_mb(out, rows_out)  # word/count pairs cross the shuffle
    return RunMetrics("wordcount", wall, in_mb, sh_mb, rows_in, rows_out,
                      _mk_stages("wordcount", wall, in_mb, sh_mb, rows_in,
                                 ("flatMap", "map"), ("groupBy", "aggregate")))


def _run_sort(spark, sf, seed):
    recs = synth_data.kv_records(spark, n=max(100, int(1_000_000 * sf)), seed=seed)
    rows = recs.count()
    in_mb = _df_mb(recs, rows)
    t0 = time.perf_counter()
    out = sortbench.sort_records(recs)
    rows_out = out.count()
    wall = time.perf_counter() - t0
    return RunMetrics("sort", wall, in_mb, in_mb, rows, rows_out,
                      _mk_stages("sort", wall, in_mb, in_mb, rows,
                                 ("map", "sortBy"), ("sortBy",)))


def _run_terasort(spark, sf, seed):
    recs = synth_data.kv_records(spark, n=max(100, int(1_000_000 * sf)), seed=seed)
    rows = recs.count()
    in_mb = _df_mb(recs, rows)
    t0 = time.perf_counter()
    out = sortbench.terasort(recs, partitions=8)
    rows_out = out.count()
    wall = time.perf_counter() - t0
    return RunMetrics("terasort", wall, in_mb, in_mb, rows, rows_out,
                      _mk_stages("terasort", wall, in_mb, in_mb, rows,
                                 ("map", "sortBy"), ("sortBy", "repartition")))


def _run_pagerank(spark, sf, seed):
    edges = synth_data.edge_list(
        spark, n_nodes=max(50, int(20_000 * sf)), n_edges=max(200, int(120_000 * sf)), seed=seed
    )
    rows = edges.count()
    in_mb = _df_mb(edges, rows)
    t0 = time.perf_counter()
    ranks = pagerank.pagerank(spark, edges, iterations=3)
    rows_out = ranks.count()
    wall = time.perf_counter() - t0
    return RunMetrics("pagerank", wall, in_mb, in_mb * 0.6 * 3, rows, rows_out,
                      _mk_stages("pagerank", wall, in_mb, in_mb * 0.6, rows,
                                 ("join", "map", "cache"), ("groupBy", "aggregate")))


def _run_kmeans(spark, sf, seed):
    pts = synth_data.points(spark, n=max(200, int(500_000 * sf)), seed=seed)
    rows = pts.count()
    in_mb = _df_mb(pts, rows)
    t0 = time.perf_counter()
    kmeans.kmeans(pts, k=4, iterations=3, seed=seed)
    wall = time.perf_counter() - t0
    return RunMetrics("kmeans", wall, in_mb, in_mb * 0.02, rows, 4,
                      _mk_stages("kmeans", wall, in_mb, in_mb * 0.02, rows,
                                 ("map", "cache"), ("aggregate",)))


def _run_bayes(spark, sf, seed):
    docs = synth_data.labeled_corpus(spark, n_docs=max(100, int(200_000 * sf)), seed=seed)
    rows = docs.count()
    in_mb = _df_mb(docs, rows)
    t0 = time.perf_counter()
    model = bayes.train_naive_bayes(docs)
    rows_out = model.count()
    wall = time.perf_counter() - t0
    sh = _df_mb(model, rows_out)
    return RunMetrics("bayes", wall, in_mb, sh, rows, rows_out,
                      _mk_stages("bayes", wall, in_mb, sh, rows,
                                 ("flatMap", "map"), ("groupBy", "aggregate")))


def _run_nweight(spark, sf, seed):
    edges = synth_data.edge_list(
        spark, n_nodes=max(30, int(3_000 * sf)), n_edges=max(100, int(30_000 * sf)), seed=seed
    )
    rows = edges.count()
    in_mb = _df_mb(edges, rows)
    t0 = time.perf_counter()
    out = nweight.nweight(edges, hops=2)
    rows_out = out.count()
    wall = time.perf_counter() - t0
    sh = _df_mb(out, rows_out)
    return RunMetrics("nweight", wall, in_mb, sh, rows, rows_out,
                      _mk_stages("nweight", wall, in_mb, sh, rows,
                                 ("join", "map", "cache"), ("groupBy", "aggregate")))


def _run_lr(spark, sf, seed):
    df = synth_data.labeled_points(spark, n=max(200, int(400_000 * sf)), seed=seed)
    rows = df.count()
    in_mb = _df_mb(df, rows)
    t0 = time.perf_counter()
    lr.logistic_regression(df, iterations=3)
    wall = time.perf_counter() - t0
    return RunMetrics("lr", wall, in_mb, in_mb * 0.01, rows, 1,
                      _mk_stages("lr", wall, in_mb, in_mb * 0.01, rows,
                                 ("map", "cache"), ("aggregate",)))


def _run_svd(spark, sf, seed):
    pts = synth_data.points(spark, n=max(200, int(400_000 * sf)), seed=seed)
    rows = pts.count()
    in_mb = _df_mb(pts, rows)
    t0 = time.perf_counter()
    svd.singular_values(pts)
    wall = time.perf_counter() - t0
    return RunMetrics("svd", wall, in_mb, in_mb * 0.05, rows, 1,
                      _mk_stages("svd", wall, in_mb, in_mb * 0.05, rows,
                                 ("map", "cache"), ("aggregate",)))


def _run_sql(task_name, fn_inputs):
    def run(spark, sf, seed):
        inputs = fn_inputs(spark, sf, seed)
        rows = inputs[0].count()
        in_mb = sum(_df_mb(df) for df in inputs)
        t0 = time.perf_counter()
        out = _SQL_FNS[task_name](*inputs)
        rows_out = out.count()
        wall = time.perf_counter() - t0
        sh = max(_df_mb(out, rows_out), in_mb * 0.05)
        return RunMetrics(task_name, wall, in_mb, sh, rows, rows_out,
                          _mk_stages(task_name, wall, in_mb, sh, rows,
                                     ("filter", "map"), ("groupBy", "aggregate")))
    return run


_SQL_FNS = {
    "sql_data_selection": sql_tasks.data_selection,
    "sql_skew_detection": sql_tasks.skew_detection,
    "sql_feature_calculation": sql_tasks.feature_calculation,
    "sql_data_preprocessing": sql_tasks.data_preprocessing,
}

_RUNNERS = {
    "wordcount": _run_wordcount,
    "sort": _run_sort,
    "terasort": _run_terasort,
    "pagerank": _run_pagerank,
    "kmeans": _run_kmeans,
    "bayes": _run_bayes,
    "nweight": _run_nweight,
    "lr": _run_lr,
    "svd": _run_svd,
    "sql_data_selection": _run_sql(
        "sql_data_selection", lambda s, sf, seed: (synth_data.lineitem(s, sf=sf, seed=seed),)
    ),
    "sql_skew_detection": _run_sql(
        "sql_skew_detection", lambda s, sf, seed: (synth_data.lineitem(s, sf=sf, seed=seed),)
    ),
    "sql_feature_calculation": _run_sql(
        "sql_feature_calculation",
        lambda s, sf, seed: (synth_data.orders(s, sf=sf), synth_data.customer(s, sf=sf)),
    ),
    "sql_data_preprocessing": _run_sql(
        "sql_data_preprocessing", lambda s, sf, seed: (synth_data.orders(s, sf=sf),)
    ),
}

WORKLOAD_NAMES = tuple(_RUNNERS)
