"""Tests for the provided TPC-H-lite generators in repro.synth_data and
the event-stream re-exports added for this paper."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data


class TestTpchLite:
    def test_lineitem_schema_and_size(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert df.count() == 6000
        assert {"l_orderkey", "l_quantity", "l_shipdate"} <= set(df.columns)

    def test_orders_keys_sequential(self, spark):
        df = synth_data.orders(spark, sf=0.001)
        row = df.agg(F.min("o_orderkey").alias("lo"), F.max("o_orderkey").alias("hi")).collect()[0]
        assert (row["lo"], row["hi"]) == (1, 1500)

    def test_customer_and_part(self, spark):
        assert synth_data.customer(spark, sf=0.001).count() == 150
        assert synth_data.part(spark, sf=0.001).count() == 200

    def test_deterministic_in_seed(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=9).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005, seed=9).toPandas()
        assert a.equals(b)

    def test_zipf_keys_are_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2)
        counts = df.groupBy("k").count().toPandas().sort_values("count", ascending=False)
        top = counts["count"].iloc[0]
        assert top > 5000 / 100 * 5  # head key far above uniform share

    def test_uniform_keys_are_flat(self, spark):
        df = synth_data.uniform_keys(spark, n=5000, n_keys=10)
        counts = df.groupBy("k").count().toPandas()["count"]
        assert counts.max() / counts.min() < 2.0


class TestEventStreamReExports:
    """The paper's event-stream schemas are exposed from synth_data as
    the advertised entry point (DESIGN.md §4)."""

    @pytest.mark.parametrize(
        "name",
        ["traffic_events", "traffic_pattern", "stocks_events", "stocks_pattern"],
    )
    def test_reexported(self, name):
        assert hasattr(synth_data, name)

    def test_traffic_reexport_generates(self, spark):
        df = synth_data.traffic_events(spark, n_types=3, n_batches=2, scale=0.2)
        assert {"ts", "type", "cars", "speed", "batch"} == set(df.columns)
        assert df.count() > 0
