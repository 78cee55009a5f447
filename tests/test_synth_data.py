"""Tests for the provided TPC-H-lite generators + the oracle harness
itself (repro.synth_data, repro.oracle)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_shape(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert li.count() == 6000
        assert "l_orderkey" in li.columns

    def test_orders_keys_unique(self, spark):
        o = synth_data.orders(spark, sf=0.001).toPandas()
        assert o["o_orderkey"].is_unique

    def test_deterministic(self, spark):
        a = synth_data.customer(spark, sf=0.001).toPandas()
        b = synth_data.customer(spark, sf=0.001).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_zipf_keys_skewed(self, spark):
        z = synth_data.zipf_keys(spark, n=20000, n_keys=100).toPandas()
        counts = z["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.median()


class TestOracleIntegration:
    def test_aggregation_query(self, spark):
        """A join+aggregate through Catalyst equals DuckDB — exercises
        the oracle exactly as the estimator tests rely on it."""
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        q = (
            li.join(o, li["l_orderkey"] == o["o_orderkey"])
            .groupBy("o_orderpriority")
            .agg(
                F.count(F.lit(1)).alias("n"),
                F.round(F.sum("l_quantity"), 2).alias("qty"),
            )
        )
        assert_equivalent(
            q,
            """
            SELECT o_orderpriority, COUNT(*) AS n,
                   ROUND(SUM(l_quantity), 2) AS qty
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=o,
        )

    def test_oracle_catches_wrong_result(self, spark):
        """The oracle must fail loudly on a wrong Spark answer."""
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.groupBy("l_returnflag").agg(
            (F.count(F.lit(1)) + 1).alias("n")  # off-by-one on purpose
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

    def test_oracle_catches_column_mismatch(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        q = li.groupBy("l_returnflag").agg(F.count(F.lit(1)).alias("wrong_name"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                q,
                "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )


class TestDynamicGraphStreamReexport:
    def test_feasible_stream(self, spark):
        sdf = synth_data.dynamic_graph_stream(spark, dataset="tiny", seed=2)
        pdf = sdf.toPandas().sort_values("t")
        present = set()
        for _, row in pdf.iterrows():
            key = (row["user"], row["item"])
            if row["action"] == 1:
                assert key not in present
                present.add(key)
            else:
                assert key in present
                present.remove(key)
