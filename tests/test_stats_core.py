"""Unit tests for the driver-side parts of repro.core.stats (S2)."""
import pytest

from repro.core.pattern import Pattern, chain_predicates
from repro.core.stats import (
    SlidingWindowEstimator,
    Statistics,
    pair_key,
)


def make_stats(rates=None, sels=None):
    return Statistics(rates or {"A": 10.0, "B": 5.0}, sels or {("A", "B"): 0.5})


class TestPairKey:
    def test_sorted(self):
        assert pair_key("B", "A") == ("A", "B")
        assert pair_key("A", "B") == ("A", "B")

    def test_self_pair(self):
        assert pair_key("A", "A") == ("A", "A")


class TestStatistics:
    def test_rate_lookup(self):
        assert make_stats().rate("A") == 10.0

    def test_missing_rate_raises(self):
        with pytest.raises(KeyError):
            make_stats().rate("Z")

    def test_sel_lookup_order_insensitive(self):
        s = make_stats()
        assert s.sel("A", "B") == 0.5
        assert s.sel("B", "A") == 0.5

    def test_sel_default_one(self):
        assert make_stats().sel("A", "C") == 1.0
        assert make_stats().sel("A", "A") == 1.0

    def test_flat_names(self):
        flat = make_stats().flat()
        assert flat == {"rate:A": 10.0, "rate:B": 5.0, "sel:A:B": 0.5}

    def test_restricted(self):
        s = Statistics(
            {"A": 1.0, "B": 2.0, "C": 3.0},
            {("A", "B"): 0.1, ("B", "C"): 0.2},
        )
        r = s.restricted(("A", "B"))
        assert set(r.rates) == {"A", "B"}
        assert set(r.selectivities) == {("A", "B")}

    def test_for_pattern_filters_to_predicate_pairs(self):
        types = ("A", "B", "C")
        pat = Pattern("SEQ", types, chain_predicates(types, "v", "<"), 1.0)
        s = Statistics(
            {"A": 1.0, "B": 2.0, "C": 3.0, "D": 4.0},
            {("A", "B"): 0.1, ("A", "C"): 0.9, ("B", "C"): 0.2},
        )
        r = s.for_pattern(pat)
        # (A, C) carries no predicate in the chain pattern: must be
        # dropped so the cost model does not apply a spurious factor.
        assert set(r.selectivities) == {("A", "B"), ("B", "C")}
        assert set(r.rates) == {"A", "B", "C"}

    def test_for_pattern_missing_type_rate_zero(self):
        pat = Pattern("SEQ", ("A", "Z"), (), 1.0)
        r = make_stats().for_pattern(pat)
        assert r.rate("Z") == 0.0


class TestSlidingWindowEstimator:
    def test_requires_positive_window(self):
        with pytest.raises(ValueError):
            SlidingWindowEstimator(0)

    def test_empty_raises(self):
        with pytest.raises(RuntimeError):
            SlidingWindowEstimator(3).current()

    def test_single_snapshot_identity(self):
        est = SlidingWindowEstimator(3)
        out = est.update(make_stats())
        assert out.rate("A") == 10.0
        assert out.sel("A", "B") == 0.5

    def test_mean_over_window(self):
        est = SlidingWindowEstimator(2)
        est.update(Statistics({"A": 10.0}, {("A", "B"): 0.2}))
        out = est.update(Statistics({"A": 20.0}, {("A", "B"): 0.4}))
        assert out.rate("A") == pytest.approx(15.0)
        assert out.sel("A", "B") == pytest.approx(0.3)

    def test_window_evicts_old(self):
        est = SlidingWindowEstimator(2)
        for r in (10.0, 20.0, 40.0):
            out = est.update(Statistics({"A": r}, {}))
        assert out.rate("A") == pytest.approx(30.0)  # mean of 20, 40

    def test_types_union_across_snapshots(self):
        est = SlidingWindowEstimator(3)
        est.update(Statistics({"A": 10.0}, {}))
        out = est.update(Statistics({"B": 6.0}, {}))
        assert out.rate("A") == 10.0
        assert out.rate("B") == 6.0
