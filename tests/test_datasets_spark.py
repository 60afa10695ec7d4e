"""Spark integration tests for the event-stream generators (S10, S11)."""
import pytest
from pyspark.sql import functions as F

from repro.datasets.stocks import stocks_events
from repro.datasets.traffic import traffic_events, traffic_profile
from repro.streaming.microbatch import batch_ids, with_batch_id


@pytest.fixture(scope="module")
def traffic_small(spark):
    return traffic_events(
        spark, n_types=4, n_batches=8, scale=0.4, change_points=(4,), transition=2
    ).cache()


@pytest.fixture(scope="module")
def stocks_small(spark):
    return stocks_events(spark, n_types=4, n_batches=8, scale=0.5).cache()


class TestTrafficEvents:
    def test_schema(self, traffic_small):
        assert set(traffic_small.columns) == {"ts", "type", "cars", "speed", "batch"}

    def test_batch_alignment(self, traffic_small):
        # the emitted batch column equals floor(ts / window)
        derived = traffic_small.withColumn(
            "derived", F.floor(F.col("ts") / 10.0).cast("long")
        )
        assert derived.filter("derived != batch").count() == 0

    def test_all_batches_present(self, traffic_small):
        assert batch_ids(traffic_small) == list(range(8))

    def test_counts_track_expected_rates(self, traffic_small):
        prof = traffic_profile(
            n_types=4, n_batches=8, scale=0.4, change_points=(4,), transition=2
        )
        counts = (
            traffic_small.filter("batch < 2")
            .groupBy("type")
            .count()
            .toPandas()
            .set_index("type")["count"]
        )
        for i, t in enumerate(prof.types):
            expected = prof.expected_rates[:2, i].sum()
            assert counts.get(t, 0) == pytest.approx(expected, rel=1.0, abs=15)

    def test_attribute_ranges(self, traffic_small):
        row = traffic_small.agg(
            F.min("cars").alias("cmin"), F.min("speed").alias("smin")
        ).collect()[0]
        assert row["cmin"] >= 0.0
        assert row["smin"] >= 1.0

    def test_deterministic(self, spark, traffic_small):
        again = traffic_events(
            spark, n_types=4, n_batches=8, scale=0.4, change_points=(4,), transition=2
        )
        assert again.count() == traffic_small.count()


class TestStocksEvents:
    def test_schema(self, stocks_small):
        assert set(stocks_small.columns) == {"ts", "type", "diff", "batch"}

    def test_types(self, stocks_small):
        types = {r["type"] for r in stocks_small.select("type").distinct().collect()}
        assert types == {"S0", "S1", "S2", "S3"}

    def test_rates_near_uniform(self, stocks_small):
        counts = stocks_small.groupBy("type").count().toPandas()["count"]
        assert counts.max() / counts.min() < 2.5

    def test_timestamps_within_batches(self, stocks_small):
        bad = stocks_small.filter(
            (F.col("ts") < F.col("batch") * 10.0)
            | (F.col("ts") >= (F.col("batch") + 1) * 10.0)
        )
        assert bad.count() == 0
