"""Tests for repro.synth_data: the provided TPC-H-lite generators keep
working, and the paper-schema wrappers return ranked datasets."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestProvidedGenerators:
    def test_lineitem_schema_and_size(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        assert li.count() == 6000
        assert "l_orderkey" in li.columns

    def test_lineitem_aggregate_against_duckdb(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        agg = li.groupBy("l_returnflag").agg(
            F.count(F.lit(1)).alias("cnt"),
            F.round(F.sum("l_quantity"), 2).alias("qty"),
        )
        assert_equivalent(
            agg,
            """
            SELECT l_returnflag, count(*) AS cnt,
                   round(sum(l_quantity), 2) AS qty
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_orders_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
        b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3)
        counts = (
            df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()
        )
        assert counts[0]["count"] > 5000 / 100 * 5  # head far above uniform


class TestPaperWrappers:
    def test_student_wrapper(self, spark):
        ds = synth_data.student(spark, n=100, seed=1)
        assert ds.n == 100
        assert len(ds.pattern_attrs) == 33

    def test_compas_wrapper(self, spark):
        ds = synth_data.compas(spark, n=200, seed=2)
        assert ds.n == 200
        assert len(ds.pattern_attrs) == 16

    def test_german_wrapper(self, spark):
        ds = synth_data.german_credit(spark, n=150, seed=3)
        assert ds.n == 150
        assert len(ds.pattern_attrs) == 20
