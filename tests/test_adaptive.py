"""Unit tests for the detection-adaptation loop (S7, Algorithm 1)."""
import pytest

from repro.core.adaptive import ALGORITHMS, GREEDY, ZSTREAM, AdaptiveEngine
from repro.core.invariants import (
    InvariantDecision,
    StaticDecision,
    ThresholdDecision,
    UnconditionalDecision,
)
from repro.core.pattern import Pattern, chain_predicates
from repro.core.plans import OrderPlan, TreePlan
from repro.core.stats import Statistics

TYPES = ("A", "B", "C")
PAT = Pattern("SEQ", TYPES, chain_predicates(TYPES, "v", "<"), 10.0)


def s(ra, rb, rc, sel=0.5):
    return Statistics(
        {"A": ra, "B": rb, "C": rc}, {("A", "B"): sel, ("B", "C"): sel}
    )


class TestEngineBasics:
    def test_initial_plan_built(self):
        eng = AdaptiveEngine(PAT, GREEDY, StaticDecision(), s(10, 5, 1))
        assert isinstance(eng.plan, OrderPlan)
        assert eng.plan.order == ("C", "B", "A")

    def test_zstream_engine_builds_tree(self):
        eng = AdaptiveEngine(PAT, ZSTREAM, StaticDecision(), s(10, 5, 1))
        assert isinstance(eng.plan, TreePlan)

    def test_algorithms_registry(self):
        assert set(ALGORITHMS) == {"greedy", "zstream"}

    def test_static_never_replaces(self):
        eng = AdaptiveEngine(PAT, GREEDY, StaticDecision(), s(10, 5, 1))
        for snap in (s(1, 5, 10), s(1, 50, 100), s(100, 1, 5)):
            rep = eng.observe_batch(snap)
            assert not rep.decision_fired and not rep.replaced
        assert eng.replacements == 0
        assert eng.plan.order == ("C", "B", "A")

    def test_unconditional_fires_every_batch(self):
        eng = AdaptiveEngine(PAT, GREEDY, UnconditionalDecision(), s(10, 5, 1))
        for _ in range(3):
            rep = eng.observe_batch(s(10, 5, 1))
            assert rep.decision_fired
        assert eng.decision_fires == 3
        assert eng.replacements == 0  # same plan remains optimal

    def test_replacement_on_real_change(self):
        eng = AdaptiveEngine(
            PAT, GREEDY, UnconditionalDecision(), s(10, 5, 1), estimator_window=1
        )
        rep = eng.observe_batch(s(1, 5, 10))
        assert rep.replaced
        assert eng.plan.order == ("A", "B", "C")
        assert rep.previous_plan.order == ("C", "B", "A")
        assert eng.replacements == 1

    def test_estimator_lag_smooths_reaction(self):
        # window=3: one outlier batch does not flip the plan.
        eng = AdaptiveEngine(
            PAT, GREEDY, UnconditionalDecision(), s(10, 5, 1), estimator_window=3
        )
        eng.observe_batch(s(10, 5, 1))
        rep = eng.observe_batch(s(1, 5, 11))
        assert not rep.replaced

    def test_timings_recorded(self):
        eng = AdaptiveEngine(PAT, GREEDY, UnconditionalDecision(), s(10, 5, 1))
        rep = eng.observe_batch(s(10, 5, 1))
        assert rep.decision_seconds >= 0
        assert rep.generation_seconds > 0  # 𝒜 ran

    def test_batch_counter(self):
        eng = AdaptiveEngine(PAT, GREEDY, StaticDecision(), s(10, 5, 1))
        reports = [eng.observe_batch(s(10, 5, 1)) for _ in range(3)]
        assert [r.batch for r in reports] == [1, 2, 3]


class TestInvariantIntegration:
    def test_invariant_engine_full_cycle(self):
        dec = InvariantDecision(k=1, d=0.0)
        eng = AdaptiveEngine(PAT, GREEDY, dec, s(10, 5, 1), estimator_window=1)
        # stable stats: no fire
        rep = eng.observe_batch(s(10, 5, 1))
        assert not rep.decision_fired
        # order flip: fire and replace, invariants refreshed
        rep = eng.observe_batch(s(1, 5, 10))
        assert rep.decision_fired and rep.replaced
        assert eng.plan.order == ("A", "B", "C")
        rep = eng.observe_batch(s(1, 5, 10))
        assert not rep.decision_fired

    def test_threshold_engine_baseline_reset(self):
        dec = ThresholdDecision(3.0)
        eng = AdaptiveEngine(PAT, GREEDY, dec, s(10, 5, 1), estimator_window=1)
        rep = eng.observe_batch(s(10, 5, 1.5))
        assert not rep.decision_fired
        rep = eng.observe_batch(s(10, 5, 20))
        assert rep.decision_fired and rep.replaced
        # after redeployment the new baseline is current: no refire
        rep = eng.observe_batch(s(10, 5, 20))
        assert not rep.decision_fired

    def test_fire_without_improvement_keeps_plan(self):
        # Threshold fires on a stat change that does not alter the plan.
        dec = ThresholdDecision(3.0)
        eng = AdaptiveEngine(PAT, GREEDY, dec, s(10, 5, 1), estimator_window=1)
        rep = eng.observe_batch(s(100, 5, 1))
        assert rep.decision_fired and not rep.replaced
        assert eng.plan.order == ("C", "B", "A")

    def test_zstream_invariant_cycle(self):
        dec = InvariantDecision(k=3, d=0.0)
        eng = AdaptiveEngine(PAT, ZSTREAM, dec, s(10, 5, 1), estimator_window=1)
        before = eng.plan
        eng.observe_batch(s(1, 5, 10))
        # plan may or may not change shape for n=3, but the engine must
        # stay consistent: invariants always match the deployed plan
        assert not eng.decision.should_reoptimize(eng.estimator.current()) or (
            eng.plan != before
        )
