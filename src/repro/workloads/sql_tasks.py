"""The four hourly Spark SQL production tasks of the paper's Table 2,
expressed over the TPC-H-lite schema: data selection, skew detection,
feature calculation and data preprocessing. Every function returns a
DataFrame whose SQL equivalent is oracle-checked in tests."""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def data_selection(lineitem: DataFrame) -> DataFrame:
    """Filter + aggregate: revenue per return flag for discounted items."""
    return (
        lineitem.where((F.col("l_discount") >= 0.05) & (F.col("l_quantity") < 25))
        .groupBy("l_returnflag")
        .agg(
            F.round(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))), 2).alias("revenue"),
            F.count("*").alias("cnt"),
        )
    )


def skew_detection(lineitem: DataFrame) -> DataFrame:
    """Key-frequency profile of the join key: find hot orderkeys.

    Returns keys whose row count exceeds 3× the average count —
    the classic data-skew health check run hourly on fact tables.
    """
    counts = lineitem.groupBy("l_orderkey").agg(F.count("*").alias("cnt"))
    avg = counts.agg(F.avg("cnt").alias("a"))
    return (
        counts.crossJoin(avg)
        .where(F.col("cnt") > 3 * F.col("a"))
        .select("l_orderkey", "cnt")
    )


def feature_calculation(orders: DataFrame, customer: DataFrame) -> DataFrame:
    """Join + aggregate: per-market-segment order statistics."""
    return (
        orders.join(customer, orders.o_custkey == customer.c_custkey)
        .groupBy("c_mktsegment")
        .agg(
            F.count("*").alias("n_orders"),
            F.round(F.avg("o_totalprice"), 2).alias("avg_price"),
            F.round(F.sum("o_totalprice"), 2).alias("total_price"),
        )
    )


def data_preprocessing(orders: DataFrame) -> DataFrame:
    """Filter + dedup: distinct urgent open orders per priority."""
    return (
        orders.where(F.col("o_orderstatus") == "O")
        .select("o_orderpriority", "o_custkey")
        .distinct()
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n_customers"))
    )
