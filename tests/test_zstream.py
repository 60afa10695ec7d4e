"""Unit and property tests for the ZStream DP algorithm (S4) and its
tree-invariant instrumentation."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.invariants import InvariantDecision
from repro.core.pattern import Pattern, chain_predicates
from repro.core.plans import Internal, Leaf, tree_plan_cost
from repro.core.stats import Statistics
from repro.core.zstream import (
    Side,
    brute_force_best_tree,
    zstream_plan,
    zstream_plan_instrumented,
)

TYPES = ("A", "B", "C", "D", "E", "F")


def pattern(n, with_preds=True, op="SEQ"):
    types = TYPES[:n]
    preds = chain_predicates(types, "v", "<") if with_preds else ()
    return Pattern(op, types, preds, 10.0)


def stats(rates, sels=None):
    return Statistics(dict(zip(TYPES, rates)), sels or {})


@st.composite
def random_stats(draw, n):
    rates = [draw(st.floats(0.5, 150.0)) for _ in range(n)]
    sels = {
        (a, b): draw(st.floats(0.01, 1.0))
        for a, b in zip(TYPES, TYPES[1:n])
    }
    return Statistics(dict(zip(TYPES, rates)), sels)


class TestPlanGeneration:
    @pytest.mark.parametrize("n", [2, 3, 4, 5])
    def test_leaves_in_pattern_order(self, n):
        plan = zstream_plan(pattern(n), stats([7, 3, 9, 2, 5, 1]))
        assert plan.leaves == TYPES[:n]

    @settings(max_examples=60, deadline=None)
    @given(s=random_stats(5))
    def test_dp_matches_bruteforce(self, s):
        p = pattern(5)
        plan = zstream_plan(p, s)
        bf_cost, _ = brute_force_best_tree(p, s)
        assert tree_plan_cost(plan, p, s) == pytest.approx(bf_cost, rel=1e-9)

    def test_deterministic(self):
        p, s = pattern(5), stats([7, 3, 9, 2, 5, 1])
        assert zstream_plan(p, s) == zstream_plan(p, s)

    def test_cheap_pair_joined_deep(self):
        # A highly selective pair should be grouped at the bottom.
        s = stats([50, 50, 50, 50], {("B", "C"): 0.001, ("A", "B"): 1.0, ("C", "D"): 1.0})
        plan = zstream_plan(pattern(4), s)
        bottom_pairs = [
            n.leaves for n in plan.internal_nodes() if len(n.leaves) == 2
        ]
        assert ("B", "C") in bottom_pairs

    def test_and_pattern_supported(self):
        plan = zstream_plan(pattern(4, op="AND"), stats([4, 3, 2, 1]))
        assert plan.leaves == TYPES[:4]


class TestInstrumentation:
    def test_dcs_aligned_with_internal_nodes(self):
        s = stats([8, 1, 5, 3, 9, 2])
        plan, dcs = zstream_plan_instrumented(pattern(5), s)
        nodes = plan.internal_nodes()
        assert len(dcs) == len(nodes)
        for node, d in zip(nodes, dcs):
            span = len(node.leaves)
            assert len(d) == span - 2  # splits minus the chosen one

    def test_conditions_hold_at_creation(self):
        s = stats([8, 1, 5, 3, 9, 2], {("A", "B"): 0.3, ("C", "D"): 0.7})
        _, dcs = zstream_plan_instrumented(pattern(6), s)
        for d in dcs:
            for c in d:
                assert c.holds(s), c

    def test_margins_nonnegative_at_creation(self):
        s = stats([8, 1, 5, 3, 9, 2])
        _, dcs = zstream_plan_instrumented(pattern(6), s)
        assert all(c.margin(s) >= 0 for d in dcs for c in d)

    def test_pair_span_has_empty_dcs(self):
        _, dcs = zstream_plan_instrumented(pattern(2), stats([4, 2]))
        assert dcs == [[]]


class TestSide:
    def test_leaf_side_live(self):
        side = Side(("A",), cost_const=99.0, card_const=99.0, seq=True)
        cost, card = side.cost_card(stats([7, 1, 1, 1, 1, 1]))
        assert cost == card == 7.0

    def test_pair_side_live_with_seq_factor(self):
        side = Side(("A", "B"), 0.0, 0.0, seq=True)
        s = stats([10, 4, 1, 1, 1, 1], {("A", "B"): 0.5})
        cost, card = side.cost_card(s)
        assert card == pytest.approx(10 * 4 * 0.5 * 0.5)
        assert cost == pytest.approx(14 + card)

    def test_deep_side_frozen(self):
        side = Side(("A", "B", "C"), cost_const=123.0, card_const=45.0, seq=True)
        cost, card = side.cost_card(stats([1, 1, 1, 1, 1, 1]))
        assert (cost, card) == (123.0, 45.0)


class TestAdaptivity:
    @settings(max_examples=80, deadline=None)
    @given(s0=random_stats(5), s1=random_stats(5))
    def test_fire_implies_plan_change_mostly(self, s0, s1):
        """Tree invariants use the paper's frozen-subtree-cost
        approximation (§4.2): a fired decision overwhelmingly implies a
        plan change, but we only assert it for the exact-replay part —
        when the FIRST violated invariant has live (leaf/pair) sides
        only, the comparison is exact, so the DP must flip."""
        p = pattern(5)
        plan, dcs = zstream_plan_instrumented(p, s0)
        dec = InvariantDecision(k=None)
        dec.on_plan_deployed(s0, dcs)
        violated = [c for c in dec.invariants if not c.holds(s1)]
        if violated:
            first = violated[0]
            exact = all(
                len(side.types) <= 2
                for side in (first.win.left, first.win.right, first.lose.left, first.lose.right)
            )
            if exact and len(first.win.left.types) + len(first.win.right.types) == 3:
                # A 3-span cell is decided by exactly this comparison.
                assert zstream_plan(p, s1) != plan

    def test_rate_swap_detected(self):
        s0 = stats([100, 15, 10, 40, 3], {k: 0.3 for k in (("A", "B"), ("B", "C"), ("C", "D"), ("D", "E"))})
        p = pattern(5)
        plan, dcs = zstream_plan_instrumented(p, s0)
        s1 = Statistics({**s0.rates, "C": 25.0}, s0.selectivities)
        if zstream_plan(p, s1) != plan:
            dec = InvariantDecision(k=None)
            dec.on_plan_deployed(s0, dcs)
            assert dec.should_reoptimize(s1)

    def test_no_fire_on_same_stats(self):
        s0 = stats([9, 2, 7, 4, 1], {("A", "B"): 0.4})
        _, dcs = zstream_plan_instrumented(pattern(5), s0)
        dec = InvariantDecision(k=None)
        dec.on_plan_deployed(s0, dcs)
        assert not dec.should_reoptimize(s0)

    def test_distance_suppresses_small_changes(self):
        s0 = stats([10, 20, 30, 40], {("A", "B"): 0.5, ("B", "C"): 0.5, ("C", "D"): 0.5})
        _, dcs = zstream_plan_instrumented(pattern(4), s0)
        dec0 = InvariantDecision(k=None, d=0.0)
        dec0.on_plan_deployed(s0, dcs)
        dec_big = InvariantDecision(k=None, d=2.0)
        dec_big.on_plan_deployed(s0, dcs)
        s1 = Statistics({**s0.rates, "A": 11.5}, s0.selectivities)
        # any firing under large d must also fire under d=0
        if dec_big.should_reoptimize(s1):
            assert dec0.should_reoptimize(s1)
