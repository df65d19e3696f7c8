"""Sanity coverage for the provided scaffolding (synth_data + oracle),
exercised through the DuckDB oracle as required by the repo contract."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestSynthData:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=1).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=1).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_orders_aggregation_oracle(self, spark):
        o = synth_data.orders(spark, sf=0.001)
        got = o.groupBy("o_orderpriority").agg(
            F.count("*").alias("n"), F.round(F.sum("o_totalprice"), 2).alias("total")
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS n, "
            "round(sum(o_totalprice), 2) AS total "
            "FROM orders GROUP BY o_orderpriority",
            orders=o,
        )

    def test_join_oracle(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderstatus")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderstatus, count(*) AS n FROM li "
            "JOIN orders ON l_orderkey = o_orderkey GROUP BY o_orderstatus",
            li=li,
            orders=o,
        )

    def test_zipf_keys_are_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 3 * counts.iloc[-1]
