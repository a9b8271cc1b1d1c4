"""Benchmark: the Figure 4/5-style HiBench comparison — 7 methods × 6
tasks × 30 iterations, runtime and cost objectives."""
import numpy as np

from repro.experiments import hibench


def _avg(res, name):
    return float(np.mean(list(res.relative[name].values())))


def test_hibench_runtime(benchmark, save_result):
    res = benchmark.pedantic(
        lambda: hibench.run(objective="runtime", budget=30, seeds=(0,)),
        rounds=1, iterations=1,
    )
    # paper shape: ours beats every baseline on average speedup
    ours = _avg(res, "Ours")
    for m in res.relative:
        if m != "Ours":
            assert ours >= _avg(res, m)
    save_result("hibench_runtime", hibench.format_table(res))


def test_hibench_cost(benchmark, save_result):
    res = benchmark.pedantic(
        lambda: hibench.run(objective="cost", budget=30, seeds=(0,)),
        rounds=1, iterations=1,
    )
    ours = _avg(res, "Ours")
    for m in res.relative:
        if m != "Ours":
            assert ours >= _avg(res, m)
    save_result("hibench_cost", hibench.format_table(res))
