"""Benchmark: Table 1 (capability matrix) generation."""

from repro.experiments import table1


def test_table1(benchmark, save_result):
    rows = benchmark.pedantic(table1.run, rounds=3, iterations=1)
    assert rows == table1.PAPER_TABLE1
    save_result("table1", table1.format_table(rows))
