"""Tests for the synth_data generators (provided TPC-H-lite + the
paper's BN event-stream extension), with oracle checks on aggregations."""
import pytest

from repro import oracle, synth_data
from repro.bayesnet import networks


class TestTpchLite:
    def test_lineitem_aggregation_oracle(self, spark):
        """Sanity-check the provided scaffolding: a Spark group-by over
        lineitem matches DuckDB."""
        from pyspark.sql import functions as F

        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("qty"), F.count("*").alias("cnt")
        )
        oracle.assert_equivalent(
            got,
            "SELECT l_returnflag, SUM(l_quantity) AS qty, COUNT(*) AS cnt "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001, seed=3).toPandas()
        b = synth_data.orders(spark, sf=0.001, seed=3).toPandas()
        assert a.equals(b)


class TestBnEvents:
    def test_schema_and_scale(self, spark):
        df = synth_data.bn_events(spark, "alarm", sf=0.002, k=5, seed=1)
        net = networks.make("alarm")
        assert df.columns[:2] == ["event_id", "site"]
        assert len(df.columns) == 2 + net.n
        assert df.count() == 1000

    def test_sites_within_k(self, spark):
        df = synth_data.bn_events(spark, "alarm", sf=0.001, k=7, seed=1)
        row = df.selectExpr("min(site) lo", "max(site) hi").collect()[0]
        assert row.lo >= 0 and row.hi < 7

    def test_counts_oracle(self, spark):
        """BN event stream -> counter counts, oracle-checked end to end."""
        from repro.stream.aggregate import aggregate_events_df, duckdb_counts_sql

        net = networks.make("alarm")
        df = synth_data.bn_events(spark, "alarm", sf=0.002, k=4, seed=2)
        got = aggregate_events_df(spark, net, df, k=4)
        oracle.assert_equivalent(
            got, duckdb_counts_sql(net), events=df.toPandas()
        )
