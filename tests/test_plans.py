"""Unit tests for repro.core.plans (S5): plan structures and the
partial-match cost model."""
import math
from itertools import permutations

import pytest

from repro.core.pattern import Pattern, chain_predicates
from repro.core.plans import (
    Internal,
    Leaf,
    OrderPlan,
    TreePlan,
    group_cardinality,
    interleave_factor,
    left_deep_tree,
    order_plan_cost,
    order_step_cost,
    plan_cost,
    tree_node_cost,
    tree_plan_cost,
)
from repro.core.stats import Statistics


def stats3():
    return Statistics(
        {"A": 10.0, "B": 4.0, "C": 2.0},
        {("A", "B"): 0.5, ("B", "C"): 0.25},
    )


def pat3(op="SEQ"):
    return Pattern(op, ("A", "B", "C"), chain_predicates("ABC", "v", "<"), 10.0)


class TestStructures:
    def test_order_plan_rejects_duplicates(self):
        with pytest.raises(ValueError):
            OrderPlan(("A", "A"))

    def test_tree_leaves_in_order(self):
        t = TreePlan(Internal(Leaf("A"), Internal(Leaf("B"), Leaf("C"))))
        assert t.leaves == ("A", "B", "C")
        assert t.size == 3

    def test_left_deep_tree_shape(self):
        t = left_deep_tree(("A", "B", "C"))
        assert isinstance(t.root, Internal)
        assert isinstance(t.root.left, Internal)
        assert t.root.right == Leaf("C")
        assert t.leaves == ("A", "B", "C")

    def test_internal_nodes_bottom_up(self):
        t = left_deep_tree(("A", "B", "C", "D"))
        nodes = t.internal_nodes()
        sizes = [len(n.leaves) for n in nodes]
        assert sizes == [2, 3, 4]  # leaves-to-root verification order

    def test_tree_equality_structural(self):
        assert left_deep_tree(("A", "B")) == left_deep_tree(("A", "B"))
        assert left_deep_tree(("A", "B")) != left_deep_tree(("B", "A"))


class TestGroupCardinality:
    def test_single_type_is_rate(self):
        assert group_cardinality(("A",), stats3()) == 10.0

    def test_pair_with_selectivity(self):
        assert group_cardinality(("A", "B"), stats3()) == pytest.approx(10 * 4 * 0.5)

    def test_seq_factor(self):
        base = group_cardinality(("A", "B", "C"), stats3())
        seq = group_cardinality(("A", "B", "C"), stats3(), seq=True)
        assert seq == pytest.approx(base / math.factorial(3))

    def test_split_independence_vs_tree_card(self):
        # Card of any tree over the same leaves equals the group value.
        s = stats3()
        for shape in (
            Internal(Internal(Leaf("A"), Leaf("B")), Leaf("C")),
            Internal(Leaf("A"), Internal(Leaf("B"), Leaf("C"))),
        ):
            _, card = tree_node_cost(shape, s, seq=True)
            assert card == pytest.approx(group_cardinality(("A", "B", "C"), s, True))

    def test_unknown_pair_sel_defaults_one(self):
        assert group_cardinality(("A", "C"), stats3()) == pytest.approx(20.0)


class TestInterleaveFactor:
    def test_non_seq_is_one(self):
        assert interleave_factor(3, 4, seq=False) == 1.0

    @pytest.mark.parametrize("nl,nr", [(1, 1), (1, 2), (2, 2), (3, 1)])
    def test_composes_to_group_factorial(self, nl, nr):
        lhs = (
            interleave_factor(nl, nr, True)
            / math.factorial(nl)
            / math.factorial(nr)
        )
        assert lhs == pytest.approx(1.0 / math.factorial(nl + nr))


class TestOrderCost:
    def test_step_cost_includes_prefix_sels(self):
        s = stats3()
        assert order_step_cost("B", ("A",), s) == pytest.approx(4 * 0.5)
        assert order_step_cost("B", (), s) == pytest.approx(4.0)

    def test_cost_is_sum_of_prefix_cards(self):
        s, p = stats3(), pat3()
        plan = OrderPlan(("C", "B", "A"))
        expected = (
            group_cardinality(("C",), s, True)
            + group_cardinality(("C", "B"), s, True)
            + group_cardinality(("C", "B", "A"), s, True)
        )
        assert order_plan_cost(plan, p, s) == pytest.approx(expected)

    def test_final_term_order_independent(self):
        s, p = stats3(), pat3()
        full_cards = set()
        for perm in permutations(("A", "B", "C")):
            cost = order_plan_cost(OrderPlan(perm), p, s)
            # subtract the two strictly-prefix terms to isolate the last
            last = cost - sum(
                group_cardinality(perm[:i], s, True) for i in (1, 2)
            )
            full_cards.add(round(last, 9))
        assert len(full_cards) == 1

    def test_ascending_rate_order_cheapest_without_predicates(self):
        s = Statistics({"A": 10.0, "B": 4.0, "C": 2.0}, {})
        p = Pattern("SEQ", ("A", "B", "C"), (), 10.0)
        costs = {
            perm: order_plan_cost(OrderPlan(perm), p, s)
            for perm in permutations(("A", "B", "C"))
        }
        assert min(costs, key=costs.get) == ("C", "B", "A")

    def test_and_pattern_has_no_factorial(self):
        s = stats3()
        c_seq = order_plan_cost(OrderPlan(("A", "B", "C")), pat3("SEQ"), s)
        c_and = order_plan_cost(OrderPlan(("A", "B", "C")), pat3("AND"), s)
        assert c_and > c_seq


class TestTreeCost:
    def test_leaf(self):
        cost, card = tree_node_cost(Leaf("A"), stats3())
        assert cost == card == 10.0

    def test_internal_recursion(self):
        s = stats3()
        node = Internal(Leaf("A"), Leaf("B"))
        cost, card = tree_node_cost(node, s, seq=True)
        expected_card = 10 * 4 * 0.5 / 2
        assert card == pytest.approx(expected_card)
        assert cost == pytest.approx(10 + 4 + expected_card)

    def test_plan_cost_dispatch(self):
        s, p = stats3(), pat3()
        order = OrderPlan(("A", "B", "C"))
        tree = left_deep_tree(("A", "B", "C"))
        assert plan_cost(order, p, s) == order_plan_cost(order, p, s)
        assert plan_cost(tree, p, s) == tree_plan_cost(tree, p, s)

    def test_left_deep_tree_matches_order_plan_internal_cards(self):
        # A left-deep tree's internal cardinalities are the order plan's
        # prefix cardinalities of sizes >= 2.
        s, p = stats3(), pat3()
        tree = left_deep_tree(("C", "B", "A"))
        cards = [tree_node_cost(n, s, True)[1] for n in tree.internal_nodes()]
        assert cards[0] == pytest.approx(group_cardinality(("C", "B"), s, True))
        assert cards[1] == pytest.approx(group_cardinality(("C", "B", "A"), s, True))
