"""Entrypoint: regenerate paper Table 4 (warm-starting transfer).

Usage: ``python jobs/table4.py [--source-budget 30] [--seed 0]``.
"""
import argparse

from repro.experiments import table4

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--source-budget", type=int, default=30)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    print(table4.format_table(table4.run(source_budget=args.source_budget, seed=args.seed)))
