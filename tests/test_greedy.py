"""Unit and property tests for the greedy order-based algorithm (S3) and
its invariant instrumentation, including the Theorem 1 / Theorem 2
guarantees of the paper."""
from itertools import permutations

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.greedy import GreedyCondition, greedy_plan, greedy_plan_instrumented
from repro.core.invariants import InvariantDecision, select_invariants
from repro.core.pattern import Pattern, chain_predicates
from repro.core.plans import OrderPlan, order_plan_cost
from repro.core.stats import Statistics

TYPES4 = ("A", "B", "C", "D")


def pattern(n=4, with_preds=True):
    types = TYPES4[:n]
    preds = chain_predicates(types, "v", "<") if with_preds else ()
    return Pattern("SEQ", types, preds, 10.0)


def stats(rates, sels=None):
    return Statistics(dict(zip(TYPES4, rates)), sels or {})


@st.composite
def random_stats(draw, n=4, with_sels=True):
    rates = [draw(st.floats(0.5, 200.0)) for _ in range(n)]
    sels = {}
    if with_sels:
        for a, b in zip(TYPES4, TYPES4[1:n]):
            sels[(a, b)] = draw(st.floats(0.01, 1.0))
    return Statistics(dict(zip(TYPES4, rates)), sels)


class TestGreedyPlan:
    def test_sorts_by_rate_without_predicates(self):
        plan = greedy_plan(pattern(4, False), stats([40, 10, 30, 20]))
        assert plan.order == ("B", "D", "C", "A")

    def test_deterministic_tie_break_by_position(self):
        plan = greedy_plan(pattern(4, False), stats([10, 10, 10, 10]))
        assert plan.order == ("A", "B", "C", "D")

    def test_selectivity_changes_order(self):
        # At step 2 (after A), B beats C only when sel(A,B) discounts it.
        s = stats([1, 20, 15, 100], {("A", "B"): 1.0})
        s2 = stats([1, 20, 15, 100], {("A", "B"): 0.1})
        p = pattern(4)
        assert greedy_plan(p, s).order[1] == "C"
        assert greedy_plan(p, s2).order[1] == "B"

    def test_greedy_matches_bruteforce_without_predicates(self):
        # With no predicates the greedy (rate-ascending) order is optimal.
        p = pattern(4, False)
        s = stats([13, 2, 40, 7])
        best = min(
            (OrderPlan(perm) for perm in permutations(TYPES4)),
            key=lambda pl: order_plan_cost(pl, p, s),
        )
        assert greedy_plan(p, s).order == best.order

    def test_plan_covers_all_types_once(self):
        plan = greedy_plan(pattern(4), stats([5, 1, 9, 3]))
        assert sorted(plan.order) == sorted(TYPES4)


class TestInstrumentation:
    def test_dcs_sizes(self):
        _, dcs = greedy_plan_instrumented(pattern(4), stats([4, 3, 2, 1]))
        assert [len(d) for d in dcs] == [3, 2, 1, 0]

    def test_dcs_winners_match_plan(self):
        plan, dcs = greedy_plan_instrumented(pattern(4), stats([4, 3, 2, 1]))
        for i, d in enumerate(dcs[:-1]):
            assert all(c.winner == plan.order[i] for c in d)
            assert all(c.prefix == plan.order[:i] for c in d)

    def test_conditions_hold_at_creation(self):
        s = stats([4, 3, 2, 1], {("A", "B"): 0.5})
        _, dcs = greedy_plan_instrumented(pattern(4), s)
        for d in dcs:
            for c in d:
                assert c.holds(s)

    def test_margin_sign(self):
        s = stats([10, 5, 1, 7])
        _, dcs = greedy_plan_instrumented(pattern(4, False), s)
        for d in dcs:
            for c in d:
                assert c.margin(s) >= 0

    def test_tie_break_condition_holds_on_equality(self):
        c = GreedyCondition("A", "B", (), winner_first=True)
        s = stats([5, 5, 1, 1])
        assert c.holds(s)
        c2 = GreedyCondition("B", "A", (), winner_first=False)
        assert not c2.holds(s)


class TestDistanceSemantics:
    def test_d_zero_fires_on_any_flip(self):
        c = GreedyCondition("A", "B", ())
        assert c.holds(stats([5, 6, 1, 1]), d=0.0)
        assert not c.holds(stats([6, 5, 1, 1]), d=0.0)

    def test_d_tolerates_small_flips(self):
        c = GreedyCondition("A", "B", ())
        # lhs=6 exceeds rhs=5 by 20% < d=0.3: still holds
        assert c.holds(stats([6, 5, 1, 1]), d=0.3)
        assert not c.holds(stats([7, 5, 1, 1]), d=0.3)

    def test_d_monotone(self):
        c = GreedyCondition("A", "B", ())
        s = stats([8, 5, 1, 1])
        fired = [not c.holds(s, d) for d in (0.0, 0.3, 0.5, 0.7, 1.0)]
        # once an invariant stops firing for some d, larger d cannot fire
        assert fired == sorted(fired, reverse=True)


class TestTheorems:
    @settings(max_examples=150, deadline=None)
    @given(s0=random_stats(), s1=random_stats())
    def test_theorem1_no_false_positives(self, s0, s1):
        """If 𝒟 (any K) fires under new statistics, 𝒜 must return a
        different plan — the paper's Theorem 1, exactly."""
        p = pattern(4)
        plan, dcs = greedy_plan_instrumented(p, s0)
        for k in (1, 2, None):
            dec = InvariantDecision(k=k)
            dec.on_plan_deployed(s0, dcs)
            if dec.should_reoptimize(s1):
                assert greedy_plan(p, s1) != plan

    @settings(max_examples=150, deadline=None)
    @given(s0=random_stats(), s1=random_stats())
    def test_theorem2_iff_with_full_dcs(self, s0, s1):
        """With every deciding condition kept (K=None), 𝒟 fires iff 𝒜
        would return a different plan — the paper's Theorem 2."""
        p = pattern(4)
        plan, dcs = greedy_plan_instrumented(p, s0)
        dec = InvariantDecision(k=None)
        dec.on_plan_deployed(s0, dcs)
        assert dec.should_reoptimize(s1) == (greedy_plan(p, s1) != plan)

    @settings(max_examples=100, deadline=None)
    @given(s0=random_stats())
    def test_no_fire_on_unchanged_stats(self, s0):
        p = pattern(4)
        _, dcs = greedy_plan_instrumented(p, s0)
        dec = InvariantDecision(k=None)
        dec.on_plan_deployed(s0, dcs)
        assert not dec.should_reoptimize(s0)

    def test_k1_can_miss_changes_theorem2_catches(self):
        """K=1 keeps only the tightest condition per block, so some plan
        changes may go undetected (false negatives are allowed). A
        selectivity change can flip an unselected condition of an early
        block while every selected invariant still holds."""
        from repro.core.pattern import Predicate

        preds = (
            Predicate("A", "v", "<", "B", "v"),
            Predicate("B", "v", "<", "C", "v"),
            Predicate("A", "v", "<", "D", "v"),
            Predicate("C", "v", "<", "D", "v"),
        )
        p = Pattern("SEQ", TYPES4, preds, 10.0)
        s0 = stats(
            [1.0, 10.0, 11.0, 50.0],
            {("A", "B"): 1.0, ("B", "C"): 0.01, ("A", "D"): 1.0, ("C", "D"): 1.0},
        )
        plan, dcs = greedy_plan_instrumented(p, s0)
        assert plan.order == ("A", "B", "C", "D")
        # sel(A,D): 1.0 -> 0.1 puts D (cost 5 after A) below B (10): the
        # unselected condition B<D of block 2 flips, the selected ones
        # (A<B, B<C, C<D-after-AB) all still hold.
        s1 = stats(
            [1.0, 10.0, 11.0, 50.0],
            {("A", "B"): 1.0, ("B", "C"): 0.01, ("A", "D"): 0.1, ("C", "D"): 1.0},
        )
        k1 = InvariantDecision(k=1)
        k1.on_plan_deployed(s0, dcs)
        kall = InvariantDecision(k=None)
        kall.on_plan_deployed(s0, dcs)
        assert greedy_plan(p, s1) != plan
        assert kall.should_reoptimize(s1)
        assert not k1.should_reoptimize(s1)


class TestSelectInvariants:
    def test_tightest_selected(self):
        s = stats([1, 10, 3, 50])  # A first; competitors B(10), C(3), D(50)
        _, dcs = greedy_plan_instrumented(pattern(4, False), s)
        inv = select_invariants([dcs[0]], s, k=1)
        assert len(inv) == 1
        assert inv[0].loser == "C"  # margin 2 is the tightest

    @pytest.mark.parametrize("k,expect", [(1, 1), (2, 2), (3, 3), (None, 3)])
    def test_k_controls_count(self, k, expect):
        s = stats([1, 10, 3, 50])
        _, dcs = greedy_plan_instrumented(pattern(4, False), s)
        assert len(select_invariants([dcs[0]], s, k=k)) == expect

    def test_block_order_preserved(self):
        s = stats([1, 10, 3, 50])
        _, dcs = greedy_plan_instrumented(pattern(4, False), s)
        inv = select_invariants(dcs, s, k=None)
        prefixes = [len(c.prefix) for c in inv]
        assert prefixes == sorted(prefixes)
