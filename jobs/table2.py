"""Entrypoint: regenerate paper Table 2 (manual vs tuned, 8 production
tasks). Usage: ``python jobs/table2.py [--budget 20] [--seed 0]``."""
import argparse

from repro.experiments import table2

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--budget", type=int, default=20)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    print(table2.format_table(table2.run(budget=args.budget, seed=args.seed)))
