"""Synthetic data generators and the DuckDB oracle plumbing."""
import pandas as pd
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_data(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=1).toPandas()
        assert not a.equals(b)

    def test_scale_factor(self, spark):
        small = synth_data.orders(spark, sf=0.001).count()
        big = synth_data.orders(spark, sf=0.01).count()
        assert big == 10 * small

    def test_lineitem_schema(self, spark):
        cols = synth_data.lineitem(spark, sf=0.001).columns
        assert cols[:3] == ["l_orderkey", "l_partkey", "l_linenumber"]

    def test_foreign_keys_in_range(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        n_orders = o.count()
        mx = li.agg({"l_orderkey": "max"}).collect()[0][0]
        assert 1 <= mx <= n_orders

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5).toPandas()
        top = df["k"].value_counts().iloc[0]
        assert top > 5000 / 100 * 5  # heavily skewed head


class TestOracle:
    def test_agreement_passes(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        out = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
        assert_equivalent(
            out,
            "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )

    def test_disagreement_detected(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, count(*) + 1 AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

    def test_column_mismatch_detected(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        out = li.groupBy("l_returnflag").count()
        with pytest.raises(AssertionError, match="column mismatch|alias"):
            assert_equivalent(
                out,
                "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )
