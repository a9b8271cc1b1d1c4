"""Sort and TeraSort: shuffle-heavy full-data sorts.

Sort is a global ``orderBy``; TeraSort mirrors the classic range-
partition-then-sort pattern (``repartitionByRange`` +
``sortWithinPartitions``), which produces a globally sorted output
without a single-reducer bottleneck.
"""
from __future__ import annotations

from pyspark.sql import DataFrame


def sort_records(records: DataFrame) -> DataFrame:
    """Globally sort ``key, payload`` records by key (HiBench Sort)."""
    return records.orderBy("key")


def terasort(records: DataFrame, *, partitions: int | None = None) -> DataFrame:
    """Range-partitioned sort (HiBench TeraSort shape).

    Each output partition holds a disjoint key range and is internally
    sorted, so the concatenation of partitions in order is the globally
    sorted dataset.
    """
    rp = (
        records.repartitionByRange(partitions, "key")
        if partitions
        else records.repartitionByRange("key")
    )
    return rp.sortWithinPartitions("key")
