"""Benchmark: Table 2 (manual vs tuned on 8 production tasks),
paper budget of 20 online iterations per task."""

from repro.experiments import table2


def test_table2(benchmark, save_result):
    rows = benchmark.pedantic(
        lambda: table2.run(budget=20, seed=0), rounds=1, iterations=1
    )
    avg = table2.avg_reduction(rows)
    # paper shape: large memory/CPU/cost reductions within ~10 iterations
    assert avg["memory"] > 40.0
    assert avg["cpu"] > 25.0
    assert avg["cost"] > 40.0
    save_result("table2", table2.format_table(rows))
