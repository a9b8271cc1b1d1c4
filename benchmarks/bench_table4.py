"""Benchmark: Table 4 (warm-starting transfer costs)."""

from repro.experiments import table4


def test_table4(benchmark, save_result):
    rows = benchmark.pedantic(
        lambda: table4.run(source_budget=30, seed=0), rounds=1, iterations=1
    )
    red = table4.reduction_vs(rows)
    # paper shape: best transferred config clearly beats the default
    assert red["default"][1] > 20.0
    save_result("table4", table4.format_table(rows))
