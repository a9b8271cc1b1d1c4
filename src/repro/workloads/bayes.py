"""Naive Bayes training: aggregation-heavy text classification.

Training multinomial NB is one flatMap + two groupBy aggregations —
per-(class, word) counts and per-class totals — the HiBench Bayes
shape. Returns log-probabilities with add-one smoothing.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def class_word_counts(docs: DataFrame) -> DataFrame:
    """Per-(label, word) occurrence counts from ``label, doc`` rows."""
    return (
        docs.select("label", F.explode(F.split(F.col("doc"), " ")).alias("word"))
        .where(F.col("word") != "")
        .groupBy("label", "word")
        .agg(F.count("*").alias("cnt"))
    )


def train_naive_bayes(docs: DataFrame, *, alpha: float = 1.0) -> DataFrame:
    """Smoothed log P(word|class). Output: label, word, log_prob."""
    cwc = class_word_counts(docs).cache()
    vocab = cwc.select("word").distinct().count()
    totals = cwc.groupBy("label").agg(F.sum("cnt").alias("total"))
    return (
        cwc.join(totals, "label")
        .select(
            "label",
            "word",
            (
                F.log((F.col("cnt") + F.lit(alpha)) / (F.col("total") + F.lit(alpha * vocab)))
            ).alias("log_prob"),
        )
    )
