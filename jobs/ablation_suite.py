"""Entrypoint: §6.4–6.5 ablations (safety %, AGD, sub-space modes,
meta-ensemble curves).

Usage: ``python jobs/ablation_suite.py [--budget 30] [--seeds 2]``.
"""
import argparse

from repro.experiments import ablations

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--budget", type=int, default=30)
    ap.add_argument("--seeds", type=int, default=2)
    args = ap.parse_args()
    seeds = tuple(range(args.seeds))

    s = ablations.safety(budget=args.budget, seeds=seeds)
    print(
        f"[safety] safe configs: {s.safe_pct_with:.2f}% with safe region vs "
        f"{s.safe_pct_without:.2f}% vanilla BO "
        f"(paper {ablations.PAPER['safe_pct_with']}% vs {ablations.PAPER['safe_pct_without']}%)"
    )
    a = ablations.agd(budget=args.budget, seeds=seeds)
    print(
        f"[agd] extra cost reduction from AGD: {a.avg_extra_reduction_pct:.2f}% "
        f"(paper {ablations.PAPER['agd_extra_reduction']}%)"
    )
    sub = ablations.subspace(budget=args.budget, seeds=seeds)
    for task, modes in sub.per_task.items():
        print(
            f"[subspace] {task}: cost reduction vs default — "
            + ", ".join(f"{m}: {v:.2f}%" for m, v in modes.items())
        )
    m = ablations.meta_ensemble(budget=args.budget)
    for task, (with_meta, without) in m.curves.items():
        print(f"[meta] {task}: best-objective curve with meta   : "
              + " ".join(f"{v:.0f}" for v in with_meta))
        print(f"[meta] {task}: best-objective curve without meta: "
              + " ".join(f"{v:.0f}" for v in without))
