"""synth_data generators + oracle-checked Spark SQL over them.

Exercises the provided TPC-H-lite generators (used as the DB-domain
corpus source) and verifies a Catalyst-planned aggregation and join
against DuckDB — the shuffle path is live because the session fixture
disables broadcast joins.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=7).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=7).toPandas()
        assert a.equals(b)

    def test_orders_keys_dense(self, spark):
        o = synth_data.orders(spark, sf=0.001).toPandas()
        assert o.o_orderkey.tolist() == list(range(1, len(o) + 1))

    def test_tpc_numeric_matrix_kinds(self):
        for kind in ("order", "store", "web", "catalog", "lineitem"):
            m = synth_data.tpc_numeric_matrix(kind, 100, 4, seed=1)
            assert m.shape == (100, 4)
            assert np.isfinite(m).all()

    def test_tpc_numeric_matrix_unknown_kind(self):
        with pytest.raises(ValueError):
            synth_data.tpc_numeric_matrix("nope", 10, 2, seed=0)

    def test_money_columns_two_decimals(self):
        m = synth_data.tpc_numeric_matrix("order", 500, 1, seed=2)
        np.testing.assert_array_equal(np.round(m, 2), m)


class TestOracleQueries:
    def test_q1_like_aggregation(self, spark):
        li = synth_data.lineitem(spark, sf=0.002)
        got = (
            li.groupBy("l_returnflag", "l_linestatus")
            .agg(
                F.sum("l_quantity").alias("sum_qty"),
                F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias(
                    "sum_disc_price"
                ),
                F.count(F.lit(1)).alias("count_order"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, l_linestatus,
                   SUM(l_quantity) AS sum_qty,
                   SUM(l_extendedprice * (1 - l_discount)) AS sum_disc_price,
                   COUNT(*) AS count_order
            FROM lineitem GROUP BY l_returnflag, l_linestatus
            """,
            lineitem=li,
        )

    def test_join_aggregation_shuffle_path(self, spark):
        li = synth_data.lineitem(spark, sf=0.002)
        o = synth_data.orders(spark, sf=0.002)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count(F.lit(1)).alias("n"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, COUNT(*) AS n
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=o,
        )
