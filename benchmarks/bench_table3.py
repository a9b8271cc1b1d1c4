"""Benchmark: Table 3 (under-/post-tuning reductions on the production
population; N=40 tasks substitute the paper's 25K — see DESIGN.md)."""

from repro.experiments import table3


def test_table3(benchmark, save_result):
    res = benchmark.pedantic(
        lambda: table3.run(n_tasks=40, budget=20, seed=0), rounds=1, iterations=1
    )
    # paper shape: big post-tuning memory/CPU savings, modest overhead
    assert res.reduction_post["memory"] > 30.0
    assert res.reduction_post["cpu"] > 15.0
    text = table3.format_table(res)
    curve = ", ".join(f"{v:.1f}" for v in res.objective_curve)
    save_result("table3", text + f"\nobjective reduction/iter (%): {curve}")
