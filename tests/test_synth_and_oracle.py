"""Provided substrate: TPC-H-lite generators + DuckDB oracle smoke tests.

The matching paper is not an OLAP paper, but the generators back the
schema-name vocabulary (DESIGN.md §2) and the oracle is the correctness
gate for every query-shaped pipeline in this repo — both must work.
"""
import pandas as pd
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_schema_and_size(self, spark):
        df = synth_data.lineitem(spark, sf=0.001, seed=0)
        assert df.count() == 6000
        assert "l_orderkey" in df.columns and "l_shipdate" in df.columns

    def test_orders_keys_sequential(self, spark):
        df = synth_data.orders(spark, sf=0.001, seed=0).toPandas()
        assert sorted(df["o_orderkey"]) == list(range(1, len(df) + 1))

    def test_customer_part_sizes(self, spark):
        assert synth_data.customer(spark, sf=0.001).count() == 150
        assert synth_data.part(spark, sf=0.001).count() == 200

    def test_deterministic_in_seed(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=7).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005, seed=7).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5, seed=0).toPandas()
        top = df["k"].value_counts().iloc[0]
        assert top > 0.2 * len(df)  # heavy head

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=50, seed=0).toPandas()
        assert df["k"].between(1, 50).all()

    def test_matching_vocabulary_nonempty(self):
        v = synth_data.matching_vocabulary()
        assert len(v) >= 20 and "o_orderdate" in v


class TestOracle:
    def test_aggregation_query(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        out = (
            li.groupBy("l_returnflag")
            .agg({"l_quantity": "sum"})
            .withColumnRenamed("sum(l_quantity)", "qty")
        )
        assert_equivalent(
            out,
            "SELECT l_returnflag, sum(l_quantity) AS qty FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_query(self, spark):
        li = synth_data.lineitem(spark, sf=0.0005, seed=0)
        o = synth_data.orders(spark, sf=0.0005, seed=1)
        out = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .count()
            .withColumnRenamed("count", "n")
        )
        assert_equivalent(
            out,
            """
            SELECT o_orderpriority, count(*) AS n
            FROM li JOIN o ON li.l_orderkey = o.o_orderkey
            GROUP BY o_orderpriority
            """,
            li=li,
            o=o,
        )

    def test_oracle_detects_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        wrong = (
            li.groupBy("l_returnflag")
            .agg({"l_quantity": "max"})  # max, but SQL says sum
            .withColumnRenamed("max(l_quantity)", "qty")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, sum(l_quantity) AS qty FROM li GROUP BY l_returnflag",
                li=li,
            )

    def test_oracle_detects_column_mismatch(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        out = li.groupBy("l_returnflag").count()
        with pytest.raises(AssertionError):
            assert_equivalent(
                out,
                "SELECT l_returnflag, count(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )
