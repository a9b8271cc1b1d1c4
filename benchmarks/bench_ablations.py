"""Benchmark: §6.4–6.5 ablations (safety %, AGD, sub-space, meta)."""
import numpy as np

from repro.experiments import ablations


def test_safety(benchmark, save_result):
    res = benchmark.pedantic(
        lambda: ablations.safety(budget=30, seeds=(0, 1)), rounds=1, iterations=1
    )
    # paper shape: the safe region markedly raises the safe-config share
    assert res.safe_pct_with > res.safe_pct_without + 5.0
    text = (
        f"safe configs: {res.safe_pct_with:.2f}% with safe region vs "
        f"{res.safe_pct_without:.2f}% vanilla BO "
        f"(paper {ablations.PAPER['safe_pct_with']}% vs {ablations.PAPER['safe_pct_without']}%)\n"
        + "\n".join(f"  {t}: {w:.1f}% / {wo:.1f}%" for t, (w, wo) in res.per_task.items())
    )
    save_result("ablation_safety", text)


def test_agd(benchmark, save_result):
    res = benchmark.pedantic(
        lambda: ablations.agd(budget=30, seeds=(0, 1)), rounds=1, iterations=1
    )
    text = (
        f"AGD extra cost reduction vs BO-without-AGD: {res.avg_extra_reduction_pct:.2f}% "
        f"(paper {ablations.PAPER['agd_extra_reduction']}%)\n"
        + "\n".join(
            f"  {t}: with={w:.1f}, without={wo:.1f}" for t, (w, wo) in res.per_task.items()
        )
    )
    save_result("ablation_agd", text)


def test_subspace(benchmark, save_result):
    res = benchmark.pedantic(
        lambda: ablations.subspace(budget=30, seeds=(0, 1)), rounds=1, iterations=1
    )
    lines = []
    for task, modes in res.per_task.items():
        lines.append(
            f"  {task}: " + ", ".join(f"{m}={v:.2f}%" for m, v in modes.items())
        )
        # paper Fig. 7 shape: sub-spaces beat tuning the full 30-d space
        assert max(modes["small"], modes["adaptive"]) >= modes["full"] - 5.0
    save_result("ablation_subspace", "cost reduction vs default:\n" + "\n".join(lines))


def test_meta_ensemble(benchmark, save_result):
    res = benchmark.pedantic(
        lambda: ablations.meta_ensemble(budget=30, seed=0), rounds=1, iterations=1
    )
    lines = []
    for task, (with_meta, without) in res.curves.items():
        # paper Fig. 6 shape: after 10 iterations the meta-ensemble's
        # incumbent is at least as good as vanilla BO's
        assert with_meta[9] <= without[9] * 1.05
        lines.append(f"  {task} with-meta   : " + " ".join(f"{v:.0f}" for v in with_meta))
        lines.append(f"  {task} without-meta: " + " ".join(f"{v:.0f}" for v in without))
    save_result("ablation_meta", "best-objective-so-far curves:\n" + "\n".join(lines))
