"""Spark integration tests for statistics extraction (S2)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.pattern import Pattern, chain_predicates
from repro.core.stats import (
    batch_rates,
    batch_selectivities,
    per_batch_statistics,
    single_batch_statistics,
)

ATTRS = ("v",)


def two_batch_events(spark):
    """Two batches with known per-type counts and value layout."""
    rows = []
    # batch 0: A x3 (v=1), B x2 (v=2); batch 1: A x1 (v=5), B x4 (v=2)
    for i in range(3):
        rows.append((0.1 * i, "A", 1.0, 0))
    for i in range(2):
        rows.append((0.5 + 0.1 * i, "B", 2.0, 0))
    rows.append((1.1, "A", 5.0, 1))
    for i in range(4):
        rows.append((1.5 + 0.1 * i, "B", 2.0, 1))
    pdf = pd.DataFrame(rows, columns=["ts", "type", "v", "batch"])
    return spark.createDataFrame(pdf)


PAT = Pattern("SEQ", ("A", "B"), chain_predicates("AB", "v", "<"), 1.0)


class TestBatchRates:
    def test_counts(self, spark):
        got = batch_rates(two_batch_events(spark)).toPandas()
        table = {
            (int(r["batch"]), r["type"]): int(r["rate"]) for _, r in got.iterrows()
        }
        assert table == {(0, "A"): 3, (0, "B"): 2, (1, "A"): 1, (1, "B"): 4}


class TestBatchSelectivities:
    def test_deterministic_values(self, spark):
        # batch 0: all A.v=1 < B.v=2 -> sel 1.0
        # batch 1: A.v=5 > B.v=2 -> sel 0.0
        got = batch_selectivities(two_batch_events(spark), PAT).toPandas()
        sel = {int(r["batch"]): float(r["sel"]) for _, r in got.iterrows()}
        assert sel[0] == pytest.approx(1.0)
        assert sel[1] == pytest.approx(0.0)

    def test_no_predicates_empty_frame(self, spark):
        pat = Pattern("SEQ", ("A", "B"), (), 1.0)
        got = batch_selectivities(two_batch_events(spark), pat).toPandas()
        assert got.empty

    def test_sampling_estimates_mixed_selectivity(self, spark):
        g = np.random.default_rng(0)
        n = 400
        pdf = pd.DataFrame(
            {
                "ts": np.arange(n) * 1e-3,
                "type": ["A", "B"] * (n // 2),
                "v": g.random(n),
                "batch": 0,
            }
        )
        ev = spark.createDataFrame(pdf)
        got = batch_selectivities(ev, PAT, sample_per_type=64).toPandas()
        # P(a < b) for iid uniforms is 0.5
        assert got["sel"].iloc[0] == pytest.approx(0.5, abs=0.12)


class TestPerBatchStatistics:
    def test_history_structure(self, spark):
        hist = per_batch_statistics(two_batch_events(spark), PAT)
        assert [b for b, _ in hist] == [0, 1]
        s0, s1 = hist[0][1], hist[1][1]
        assert s0.rate("A") == 3 and s1.rate("B") == 4
        assert s0.sel("A", "B") == pytest.approx(1.0)
        assert s1.sel("A", "B") == pytest.approx(0.0)

    def test_missing_type_rate_zero(self, spark):
        pdf = pd.DataFrame(
            {"ts": [0.1, 1.1], "type": ["A", "A"], "v": [1.0, 1.0], "batch": [0, 1]}
        )
        ev = spark.createDataFrame(pdf)
        hist = per_batch_statistics(ev, PAT)
        assert hist[0][1].rate("B") == 0.0

    def test_missing_pair_forward_filled(self, spark):
        # batch 1 has no B events: its selectivity keeps batch 0's value
        pdf = pd.DataFrame(
            {
                "ts": [0.1, 0.2, 1.1],
                "type": ["A", "B", "A"],
                "v": [1.0, 2.0, 1.0],
                "batch": [0, 0, 1],
            }
        )
        ev = spark.createDataFrame(pdf)
        hist = per_batch_statistics(ev, PAT)
        assert hist[1][1].sel("A", "B") == hist[0][1].sel("A", "B") == pytest.approx(1.0)


class TestSingleBatchStatistics:
    def test_matches_per_batch_path(self, spark):
        ev = two_batch_events(spark)
        b0 = ev.filter(ev.batch == 0).drop("batch")
        snap = single_batch_statistics(b0, PAT)
        assert snap.rate("A") == 3 and snap.rate("B") == 2
        assert snap.sel("A", "B") == pytest.approx(1.0)

    def test_absent_type_zero_rate_default_sel(self, spark):
        pdf = pd.DataFrame({"ts": [0.1], "type": ["A"], "v": [1.0]})
        snap = single_batch_statistics(spark.createDataFrame(pdf), PAT)
        assert snap.rate("B") == 0.0
        assert snap.sel("A", "B") == 1.0
