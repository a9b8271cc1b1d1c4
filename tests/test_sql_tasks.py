"""DuckDB-oracle tests for the four production Spark SQL tasks (Table 2)."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent
from repro.workloads import sql_tasks


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.005, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.005).cache()


@pytest.fixture(scope="module")
def customer(spark):
    return synth_data.customer(spark, sf=0.005).cache()


class TestDataSelection:
    def test_oracle(self, spark, li):
        out = sql_tasks.data_selection(li)
        assert_equivalent(
            out,
            """
            SELECT l_returnflag,
                   ROUND(SUM(l_extendedprice * (1 - l_discount)), 2) AS revenue,
                   COUNT(*) AS cnt
            FROM lineitem
            WHERE l_discount >= 0.05 AND l_quantity < 25
            GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_nonempty(self, spark, li):
        assert sql_tasks.data_selection(li).count() == 3  # N, R, A flags


class TestSkewDetection:
    @pytest.fixture(scope="class")
    def skewed(self, spark):
        # heavy-hitter orderkeys so the 3x-average filter bites
        g = np.random.default_rng(0)
        keys = np.concatenate([
            g.integers(1, 500, 4000),
            np.full(600, 7),      # hot key
            np.full(400, 13),     # second hot key
        ])
        return spark.createDataFrame(pd.DataFrame({"l_orderkey": keys}))

    def test_oracle(self, spark, skewed):
        out = sql_tasks.skew_detection(skewed)
        assert_equivalent(
            out,
            """
            WITH counts AS (
                SELECT l_orderkey, COUNT(*) AS cnt
                FROM lineitem GROUP BY l_orderkey
            )
            SELECT l_orderkey, cnt FROM counts
            WHERE cnt > 3 * (SELECT AVG(cnt) FROM counts)
            """,
            lineitem=skewed,
        )

    def test_finds_hot_keys(self, spark, skewed):
        hot = {r.l_orderkey for r in sql_tasks.skew_detection(skewed).collect()}
        assert {7, 13} <= hot


class TestFeatureCalculation:
    def test_oracle(self, spark, orders, customer):
        out = sql_tasks.feature_calculation(orders, customer)
        assert_equivalent(
            out,
            """
            SELECT c_mktsegment,
                   COUNT(*) AS n_orders,
                   ROUND(AVG(o_totalprice), 2) AS avg_price,
                   ROUND(SUM(o_totalprice), 2) AS total_price
            FROM orders JOIN customer ON o_custkey = c_custkey
            GROUP BY c_mktsegment
            """,
            orders=orders,
            customer=customer,
        )

    def test_all_segments_present(self, spark, orders, customer):
        segs = {r.c_mktsegment for r in sql_tasks.feature_calculation(orders, customer).collect()}
        assert len(segs) == 5


class TestDataPreprocessing:
    def test_oracle(self, spark, orders):
        out = sql_tasks.data_preprocessing(orders)
        assert_equivalent(
            out,
            """
            SELECT o_orderpriority, COUNT(*) AS n_customers
            FROM (
                SELECT DISTINCT o_orderpriority, o_custkey
                FROM orders WHERE o_orderstatus = 'O'
            )
            GROUP BY o_orderpriority
            """,
            orders=orders,
        )

    def test_dedup_reduces_rows(self, spark, orders):
        total = orders.where("o_orderstatus = 'O'").count()
        deduped = sql_tasks.data_preprocessing(orders).toPandas().n_customers.sum()
        assert deduped <= total
