"""Benchmark: Table 5 (fANOVA parameter importance, top-10)."""

from repro.experiments import table5


def test_table5(benchmark, save_result):
    rows = benchmark.pedantic(
        lambda: table5.run(n_samples=120, seed=0), rounds=1, iterations=1
    )
    names = [r.name for r in rows]
    # paper shape: executor instances is the dominant parameter and the
    # resource/memory/parallelism block fills the top of the ranking
    assert "spark.executor.instances" in names[:2]
    assert "spark.executor.memory" in names[:6]
    save_result("table5", table5.format_table(rows))
