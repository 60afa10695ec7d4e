"""Unit tests for the decision functions 𝒟 (S6)."""
import pytest

from repro.core.greedy import greedy_plan_instrumented
from repro.core.invariants import (
    InvariantDecision,
    StaticDecision,
    ThresholdDecision,
    UnconditionalDecision,
)
from repro.core.pattern import Pattern
from repro.core.stats import Statistics


def stats(a=10.0, b=5.0, sel=0.5):
    return Statistics({"A": a, "B": b}, {("A", "B"): sel})


PAT = Pattern("SEQ", ("A", "B"), (), 10.0)


class TestTrivialDecisions:
    def test_static_never_fires(self):
        d = StaticDecision()
        d.on_plan_deployed(stats(), None)
        assert d.should_reoptimize(stats(1, 100)) is False

    def test_unconditional_always_fires(self):
        d = UnconditionalDecision()
        d.on_plan_deployed(stats(), None)
        assert d.should_reoptimize(stats()) is True

    def test_needs_instrumentation_flags(self):
        assert not StaticDecision.needs_instrumentation
        assert not UnconditionalDecision.needs_instrumentation
        assert not ThresholdDecision.needs_instrumentation
        assert InvariantDecision.needs_instrumentation


class TestThreshold:
    def test_requires_deployment(self):
        with pytest.raises(RuntimeError):
            ThresholdDecision(5.0).should_reoptimize(stats())

    def test_absolute_mode(self):
        d = ThresholdDecision(4.0)
        d.on_plan_deployed(stats(10, 5), None)
        assert not d.should_reoptimize(stats(13.9, 5))
        assert d.should_reoptimize(stats(14.1, 5))

    def test_absolute_mode_monitors_all_values(self):
        d = ThresholdDecision(0.3)
        d.on_plan_deployed(stats(10, 5, sel=0.5), None)
        assert d.should_reoptimize(stats(10, 5, sel=0.1))  # sel moved 0.4

    def test_selectivities_invisible_above_one(self):
        # An absolute threshold t >= 1 can never fire on a selectivity.
        d = ThresholdDecision(1.0)
        d.on_plan_deployed(stats(10, 5, sel=0.99), None)
        assert not d.should_reoptimize(stats(10, 5, sel=0.01))

    def test_relative_mode(self):
        d = ThresholdDecision(0.5, mode="relative")
        d.on_plan_deployed(stats(10, 5), None)
        assert not d.should_reoptimize(stats(14.9, 5))
        assert d.should_reoptimize(stats(15.1, 5))

    def test_relative_mode_zero_baseline(self):
        d = ThresholdDecision(0.5, mode="relative")
        d.on_plan_deployed(Statistics({"A": 0.0}, {}), None)
        assert not d.should_reoptimize(Statistics({"A": 0.0}, {}))
        assert d.should_reoptimize(Statistics({"A": 3.0}, {}))

    def test_baseline_resets_on_redeploy(self):
        d = ThresholdDecision(4.0)
        d.on_plan_deployed(stats(10, 5), None)
        assert d.should_reoptimize(stats(20, 5))
        d.on_plan_deployed(stats(20, 5), None)
        assert not d.should_reoptimize(stats(21, 5))

    def test_unknown_mode_rejected(self):
        with pytest.raises(ValueError):
            ThresholdDecision(1.0, mode="sigma")

    def test_missing_stat_uses_baseline(self):
        d = ThresholdDecision(1.0)
        d.on_plan_deployed(stats(10, 5), None)
        assert not d.should_reoptimize(Statistics({"A": 10.0}, {("A", "B"): 0.5}))


class TestInvariantDecision:
    def _deployed(self, k=1, d=0.0, s=None):
        s = s or Statistics({"A": 10.0, "B": 5.0, "C": 2.0}, {})
        pat = Pattern("SEQ", ("A", "B", "C"), (), 10.0)
        _, dcs = greedy_plan_instrumented(pat, s)
        dec = InvariantDecision(k=k, d=d)
        dec.on_plan_deployed(s, dcs)
        return dec, s

    def test_requires_deployment(self):
        with pytest.raises(RuntimeError):
            InvariantDecision().should_reoptimize(stats())

    def test_requires_instrumentation(self):
        with pytest.raises(ValueError):
            InvariantDecision().on_plan_deployed(stats(), None)

    def test_negative_distance_rejected(self):
        with pytest.raises(ValueError):
            InvariantDecision(d=-0.1)

    def test_no_fire_on_creation_stats(self):
        dec, s = self._deployed()
        assert not dec.should_reoptimize(s)

    def test_fires_on_order_flip(self):
        dec, s = self._deployed()
        flipped = Statistics({"A": 10.0, "B": 5.0, "C": 7.0}, {})
        assert dec.should_reoptimize(flipped)

    def test_invariant_count_k1(self):
        dec, _ = self._deployed(k=1)
        assert len(dec.invariants) == 2  # blocks with non-empty DCS

    def test_invariant_count_kall(self):
        dec, _ = self._deployed(k=None)
        assert len(dec.invariants) == 3  # 2 + 1 + 0

    def test_distance_suppresses_marginal_flip(self):
        dec0, s = self._deployed(d=0.0)
        dec_wide, _ = self._deployed(d=1.0)
        marginal = Statistics({"A": 10.0, "B": 5.0, "C": 5.5}, {})
        assert dec0.should_reoptimize(marginal)
        assert not dec_wide.should_reoptimize(marginal)

    def test_redeploy_replaces_invariants(self):
        dec, s = self._deployed()
        s2 = Statistics({"A": 1.0, "B": 5.0, "C": 20.0}, {})
        pat = Pattern("SEQ", ("A", "B", "C"), (), 10.0)
        _, dcs2 = greedy_plan_instrumented(pat, s2)
        dec.on_plan_deployed(s2, dcs2)
        assert not dec.should_reoptimize(s2)
