"""Spark integration tests for micro-batch slicing and the Structured
Streaming adaptive operator (S9)."""
import os

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.adaptive import GREEDY
from repro.core.executor import evaluate_order_plan, match_sql
from repro.core.greedy import greedy_plan
from repro.core.pattern import Pattern, chain_predicates
from repro.core.stats import Statistics, per_batch_statistics
from repro.oracle import assert_equivalent
from repro.sim.runner import make_decision
from repro.streaming.microbatch import batch_ids, iter_batches, with_batch_id
from repro.streaming.structured import run_adaptive_stream

ATTRS = ("v",)
PAT = Pattern("SEQ", ("A", "B", "C"), chain_predicates("ABC", "v", "<"), 10.0)


def stream_pdf():
    """4 micro-batches; the rarest type flips from C to A at batch 2,
    leaving batch 3 for the re-optimized plan to run on."""
    rows = []
    for b in range(4):
        base = b * 10.0
        heavy, light = ("A", "C") if b < 2 else ("C", "A")
        for i in range(6):
            rows.append((base + 0.1 + i * 0.2, heavy, 1.0 + 0.1 * i))
        rows.append((base + 4.0, "B", 2.0))
        rows.append((base + 5.0, "B", 3.0))
        rows.append((base + 8.0, light, 4.0))
    return pd.DataFrame(rows, columns=["ts", "type", "v"])


class TestMicrobatch:
    def test_with_batch_id_derives(self, spark):
        ev = with_batch_id(spark.createDataFrame(stream_pdf()), window=10.0)
        assert batch_ids(ev) == [0, 1, 2, 3]

    def test_with_batch_id_keeps_existing(self, spark):
        ev = spark.createDataFrame(stream_pdf().assign(batch=7))
        assert batch_ids(with_batch_id(ev, window=10.0)) == [7]

    def test_iter_batches_partition(self, spark):
        ev = with_batch_id(spark.createDataFrame(stream_pdf()), window=10.0)
        total = 0
        for bid, batch in iter_batches(ev):
            n = batch.count()
            assert n > 0
            assert batch.filter(F.col("batch") != bid).count() == 0
            total += n
        assert total == ev.count()


class TestAdaptiveStream:
    @pytest.fixture()
    def input_dir(self, spark, tmp_path):
        """One parquet file per micro-batch (processed one per trigger)."""
        root = os.path.join(tmp_path, "stream")
        os.makedirs(root, exist_ok=True)
        pdf = stream_pdf()
        pdf["batch"] = (pdf["ts"] // 10.0).astype(int)
        for bid, batch in pdf.groupby("batch"):
            # plain files (not Spark output directories), one per batch,
            # so the file source delivers one micro-batch per trigger
            batch.drop(columns="batch").to_parquet(
                os.path.join(root, f"b{bid:04d}.parquet"), index=False
            )
        return root

    def test_stream_matches_equal_batch_union_oracle(self, spark, input_dir):
        report = run_adaptive_stream(
            spark,
            input_dir,
            "ts double, type string, v double",
            PAT,
            GREEDY,
            make_decision("invariant", k=1),
            ATTRS,
            estimator_window=1,
        )
        assert report.triggers == 4
        # oracle: per-batch DuckDB matches, unioned
        ev = with_batch_id(spark.createDataFrame(stream_pdf()), window=10.0)
        expected = 0
        for _, batch in iter_batches(ev):
            b = batch.drop("batch")
            res = evaluate_order_plan(b, PAT, greedy_plan(PAT, _snap(b)), ATTRS)
            assert_equivalent(res, match_sql(PAT, ATTRS), events=b)
            expected += res.count()
        assert len(report.matches) == expected

    def test_adaptation_happens_on_flip(self, spark, input_dir):
        report = run_adaptive_stream(
            spark,
            input_dir,
            "ts double, type string, v double",
            PAT,
            GREEDY,
            make_decision("invariant", k=1),
            ATTRS,
            estimator_window=1,
        )
        assert report.decision_fires >= 1
        assert report.replacements >= 1
        assert report.plans[0] != report.plans[-1]

    def test_static_stream_never_adapts(self, spark, input_dir):
        report = run_adaptive_stream(
            spark,
            input_dir,
            "ts double, type string, v double",
            PAT,
            GREEDY,
            make_decision("static"),
            ATTRS,
        )
        assert report.replacements == 0
        assert len({str(p) for p in report.plans}) == 1

    def test_initial_stats_seed_plan(self, spark, input_dir):
        init = Statistics(
            {"A": 6.0, "B": 2.0, "C": 1.0},
            {("A", "B"): 0.5, ("B", "C"): 0.5},
        )
        report = run_adaptive_stream(
            spark,
            input_dir,
            "ts double, type string, v double",
            PAT,
            GREEDY,
            make_decision("static"),
            ATTRS,
            initial_stats=init,
        )
        assert report.plans[0].order == greedy_plan(PAT, init).order


def _snap(batch_df):
    """Exact statistics of one batch (helper for the oracle side)."""
    from repro.core.stats import single_batch_statistics

    return single_batch_statistics(batch_df, PAT)
