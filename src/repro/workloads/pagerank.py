"""PageRank: the iterative join-heavy graph workload.

DataFrame-only implementation of power iteration with uniform teleport:
``rank_{t+1}(v) = (1-d)/N + d * Σ_{u→v} rank_t(u) / outdeg(u)``.
Dangling-node mass is redistributed uniformly so ranks sum to 1 — the
same convention as the NumPy reference used in tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def pagerank(
    spark: SparkSession, edges: DataFrame, *, iterations: int = 5, damping: float = 0.85
) -> DataFrame:
    """Ranks after ``iterations`` power steps. Output: ``node, rank``."""
    nodes = (
        edges.select(F.col("src").alias("node"))
        .union(edges.select(F.col("dst").alias("node")))
        .distinct()
        .cache()
    )
    n = nodes.count()
    outdeg = edges.groupBy("src").agg(F.count("*").alias("deg"))
    ranks = nodes.withColumn("rank", F.lit(1.0 / n))
    for _ in range(iterations):
        contribs = (
            edges.join(ranks, edges.src == ranks.node)
            .join(outdeg, "src")
            .select(F.col("dst").alias("node"), (F.col("rank") / F.col("deg")).alias("c"))
            .groupBy("node")
            .agg(F.sum("c").alias("contrib"))
        )
        # dangling mass: rank not propagated because the node has no out-edges
        linked_mass = (
            ranks.join(outdeg, ranks.node == outdeg.src, "left")
            .where(F.col("deg").isNotNull())
            .agg(F.sum("rank"))
            .collect()[0][0]
            or 0.0
        )
        dangling = 1.0 - linked_mass
        ranks = (
            nodes.join(contribs, "node", "left")
            .select(
                "node",
                (
                    F.lit((1.0 - damping) / n)
                    + F.lit(damping)
                    * (F.coalesce(F.col("contrib"), F.lit(0.0)) + F.lit(dangling / n))
                ).alias("rank"),
            )
        )
    return ranks
