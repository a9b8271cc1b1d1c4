"""Entrypoint: regenerate paper Table 1 (method capability matrix).

Usage: ``python jobs/table1.py`` (no Spark session needed — the table
is generated from the tuner implementations' declared capabilities).
"""
from repro.experiments import table1

if __name__ == "__main__":
    print(table1.format_table())
