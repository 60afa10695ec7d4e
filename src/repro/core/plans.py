"""Evaluation plans and the paper's cost model (S5).

Two plan families, as in the paper:

* :class:`OrderPlan` — the lazy-NFA order-based plan: a processing order
  over the pattern's event types (Fig. 1(b) in the paper).
* :class:`TreePlan` — the ZStream tree-based plan: a binary join tree
  whose leaves are event types (Fig. 3).

The cost model is the expected number of partial matches kept/produced
per time window, exactly the quantities both plan generation algorithms
minimise:

* order plans: ``sum_i  prod_{j<=i} r_{p_j} * prod_{j,k<=i} sel(p_j,p_k)``,
* tree plans: ``Cost(T) = r`` for a leaf and
  ``Cost(L) + Cost(R) + Card(T)`` otherwise, with
  ``Card(T) = Card(L) * Card(R) * SEL(L, R)``.
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import combinations
from math import factorial
from typing import Union

from .pattern import Pattern
from .stats import Statistics


@dataclass(frozen=True)
class OrderPlan:
    """Order-based plan: process ``order[0]`` first, then scan history for
    ``order[1]`` matches, and so on (lazy evaluation)."""

    order: tuple[str, ...]

    def __post_init__(self) -> None:
        if len(set(self.order)) != len(self.order):
            raise ValueError("plan order must not repeat event types")

    @property
    def size(self) -> int:
        return len(self.order)


@dataclass(frozen=True)
class Leaf:
    """Tree-plan leaf: buffer of one event type's arrivals."""

    event_type: str

    @property
    def leaves(self) -> tuple[str, ...]:
        return (self.event_type,)


@dataclass(frozen=True)
class Internal:
    """Tree-plan internal node: joins the partial matches of its children."""

    left: "TreeNode"
    right: "TreeNode"

    @property
    def leaves(self) -> tuple[str, ...]:
        return self.left.leaves + self.right.leaves


TreeNode = Union[Leaf, Internal]


@dataclass(frozen=True)
class TreePlan:
    """Tree-based plan wrapping the root node."""

    root: TreeNode

    @property
    def leaves(self) -> tuple[str, ...]:
        return self.root.leaves

    @property
    def size(self) -> int:
        return len(self.leaves)

    def internal_nodes(self) -> list[Internal]:
        """Internal nodes in leaves-to-root (bottom-up, left-to-right)
        order — the invariant verification order of the paper (§3.2)."""
        out: list[Internal] = []

        def visit(node: TreeNode) -> None:
            if isinstance(node, Internal):
                visit(node.left)
                visit(node.right)
                out.append(node)

        visit(self.root)
        return out


Plan = Union[OrderPlan, TreePlan]


def left_deep_tree(order: tuple[str, ...]) -> TreePlan:
    """Left-deep tree over ``order`` — e.g. Fig. 3(a) for (A, B, C)."""
    node: TreeNode = Leaf(order[0])
    for t in order[1:]:
        node = Internal(node, Leaf(t))
    return TreePlan(node)


def group_selectivity(
    left_types: tuple[str, ...], right_types: tuple[str, ...], stats: Statistics
) -> float:
    """``SEL(L, R)``: product of all pairwise selectivities across groups."""
    sel = 1.0
    for a in left_types:
        for b in right_types:
            sel *= stats.sel(a, b)
    return sel


def group_cardinality(
    types: tuple[str, ...], stats: Statistics, seq: bool = False
) -> float:
    """Expected partial matches over ``types`` in one window: product of
    rates times the product of all within-group pair selectivities (and
    each type's self-selectivity). For SEQ patterns the temporal-ordering
    constraint keeps only tuples whose timestamps follow the pattern
    order — selectivity ``1/|types|!`` for uniform arrival times — which
    the match evaluator enforces and the cost model must therefore carry.
    Split-independent either way, so it is also the ``Card`` of any tree
    node with exactly these leaves."""
    card = 1.0
    for t in types:
        card *= stats.rate(t) * stats.sel(t, t)
    for a, b in combinations(types, 2):
        card *= stats.sel(a, b)
    if seq:
        card /= factorial(len(types))
    return card


def interleave_factor(n_left: int, n_right: int, seq: bool) -> float:
    """SEQ combination factor of ``Card(L, R)``: the probability that a
    random interleaving of two internally ordered groups follows the
    pattern order, ``|L|! |R|! / (|L|+|R|)!``. Together with the per-group
    ``1/|G|!`` factors this composes to the ``1/n!`` of
    :func:`group_cardinality`."""
    if not seq:
        return 1.0
    return (
        factorial(n_left) * factorial(n_right) / factorial(n_left + n_right)
    )


def order_step_cost(candidate: str, prefix: tuple[str, ...], stats: Statistics) -> float:
    """Marginal term minimised at each greedy step (paper §4.1):
    ``r_j * sel(j,j) * prod_{k in prefix} sel(k, j)``."""
    c = stats.rate(candidate) * stats.sel(candidate, candidate)
    for p in prefix:
        c *= stats.sel(p, candidate)
    return c


def order_plan_cost(plan: OrderPlan, pattern: Pattern, stats: Statistics) -> float:
    """Total expected partial matches of an order-based plan (sum of the
    prefix cardinalities)."""
    seq = pattern.operator == "SEQ"
    total = 0.0
    for i in range(1, len(plan.order) + 1):
        total += group_cardinality(plan.order[:i], stats, seq)
    return total


def tree_node_cost(
    node: TreeNode, stats: Statistics, seq: bool = False
) -> tuple[float, float]:
    """``(cost, cardinality)`` of a tree node per the paper's recursion."""
    if isinstance(node, Leaf):
        r = stats.rate(node.event_type) * stats.sel(node.event_type, node.event_type)
        return r, r
    lc, _ = tree_node_cost(node.left, stats, seq)
    rc, _ = tree_node_cost(node.right, stats, seq)
    card = group_cardinality(node.leaves, stats, seq)
    return lc + rc + card, card


def tree_plan_cost(plan: TreePlan, pattern: Pattern, stats: Statistics) -> float:
    """Total cost of a tree-based plan."""
    return tree_node_cost(plan.root, stats, pattern.operator == "SEQ")[0]


def plan_cost(plan: Plan, pattern: Pattern, stats: Statistics) -> float:
    """Cost of either plan family (dispatch helper for the adaptive loop)."""
    if isinstance(plan, OrderPlan):
        return order_plan_cost(plan, pattern, stats)
    return tree_plan_cost(plan, pattern, stats)
