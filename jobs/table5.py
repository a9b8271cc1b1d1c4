"""Entrypoint: regenerate paper Table 5 (top-10 parameters by fANOVA
importance). Usage: ``python jobs/table5.py [--samples 120] [--seed 0]``.
"""
import argparse

from repro.experiments import table5

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--samples", type=int, default=120)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    print(table5.format_table(table5.run(n_samples=args.samples, seed=args.seed)))
