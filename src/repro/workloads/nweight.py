"""NWeight: n-hop neighbourhood weights (HiBench graph workload).

Computes, for each (src, dst) pair reachable in exactly ``hops`` steps,
the total path weight — repeated self-joins of the weighted edge list
with aggregation after each expansion, i.e. sparse matrix powering
expressed in DataFrames. Matches the NumPy ``W^n`` reference in tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def nweight(edges: DataFrame, *, hops: int = 2) -> DataFrame:
    """Aggregate n-hop path weights. Output: ``src, dst, weight``."""
    if hops < 1:
        raise ValueError("hops must be >= 1")
    acc = edges.select("src", "dst", "weight")
    for _ in range(hops - 1):
        nxt = acc.alias("a").join(
            edges.alias("b"), F.col("a.dst") == F.col("b.src")
        ).select(
            F.col("a.src").alias("src"),
            F.col("b.dst").alias("dst"),
            (F.col("a.weight") * F.col("b.weight")).alias("weight"),
        )
        acc = nxt.groupBy("src", "dst").agg(F.sum("weight").alias("weight"))
    return acc
