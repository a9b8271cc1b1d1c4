"""Entrypoint: the Figure 4/5-style HiBench comparison (7 methods × 6
tasks, runtime and cost objectives).

Usage: ``python jobs/hibench_compare.py [--budget 30] [--seeds 3]``.
"""
import argparse

from repro.experiments import hibench

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--budget", type=int, default=30)
    ap.add_argument("--seeds", type=int, default=3)
    args = ap.parse_args()
    seeds = tuple(range(args.seeds))
    for objective in ("runtime", "cost"):
        res = hibench.run(objective=objective, budget=args.budget, seeds=seeds)
        print(hibench.format_table(res))
        print()
