"""ZStream tree-based plan generation (S4) — Algorithm 3 of the paper,
instrumented for invariant creation (§4.2).

Dynamic programming over *contiguous* spans of the pattern (exactly the
paper's pseudocode: cell ``[i][j]`` is the span of length ``i`` starting
at position ``j``). The cardinality of a span is split-independent
(product of leaf rates and all within-span pair selectivities), so the
candidate trees of a cell differ only in their subtree costs.

A comparison between two candidate trees of the same cell is a
block-building comparison for the cell's chosen split. Deciding
conditions are ``Cost(T_win) < Cost(T_lose)``. To keep invariant
verification non-recursive (paper §4.2), the cost and cardinality of a
*deep* subtree (3+ leaves) are frozen to their construction-time values,
while sides with one or two leaves are evaluated live — their cost is a
constant-time closed form of the monitored statistics
(``r`` resp. ``r_a + r_b + r_a·r_b·sel(a,b)``) — and the top-level
``SEL`` across the split is recomputed from the current selectivity
estimates. This is a mild strengthening of the paper's frozen-constant
rule: the paper relies on "earlier invariants" to notice changes inside
frozen subtrees, but a 2-leaf span has a single possible split and hence
no invariant of its own, so changes confined to it would otherwise be
invisible (a pure false-negative source). Changes inside deeper frozen
subtrees of the chosen plan are caught by those subtrees' own
invariants, verified earlier (leaves-to-root order), as in the paper.
"""
from __future__ import annotations

from dataclasses import dataclass
from math import prod

from .pattern import Pattern
from .plans import (
    Internal,
    Leaf,
    TreeNode,
    TreePlan,
    group_cardinality,
    interleave_factor,
    tree_node_cost,
)
from .stats import PairKey, Statistics, pair_key


@dataclass(frozen=True)
class Side:
    """One side of a candidate split: live closed form for sides with one
    or two leaves, frozen construction-time constants for deeper sides.
    ``seq`` carries the pattern operator (a SEQ pair's cardinality
    includes the 1/2! temporal-ordering factor)."""

    types: tuple[str, ...]
    cost_const: float
    card_const: float
    seq: bool

    def cost_card(self, stats: Statistics) -> tuple[float, float]:
        if len(self.types) == 1:
            (a,) = self.types
            r = stats.rate(a) * stats.sel(a, a)
            return r, r
        if len(self.types) == 2:
            a, b = self.types
            ra = stats.rate(a) * stats.sel(a, a)
            rb = stats.rate(b) * stats.sel(b, b)
            card = ra * rb * stats.sel(a, b) * (0.5 if self.seq else 1.0)
            return ra + rb + card, card
        return self.cost_const, self.card_const


@dataclass(frozen=True)
class SplitExpr:
    """Constant-time re-evaluable cost of one candidate split of a span:
    ``value(stats) = cost_L + cost_R + card_L * card_R * SEL(L,R) * IF``
    with the side semantics of :class:`Side`, ``SEL(L,R)`` the live
    product over the predicate-carrying type pairs crossing the split,
    and ``IF`` the (constant) SEQ interleave factor of the split shape."""

    left: Side
    right: Side
    cross_pairs: tuple[PairKey, ...]
    interleave: float

    def value(self, stats: Statistics) -> float:
        lc, lcard = self.left.cost_card(stats)
        rc, rcard = self.right.cost_card(stats)
        sel = prod((stats.sel(a, b) for a, b in self.cross_pairs), start=1.0)
        return lc + rc + lcard * rcard * sel * self.interleave


@dataclass(frozen=True)
class TreeCondition:
    """Deciding condition ``Cost(win split) < Cost(lose split)`` for one
    internal node (span) of a tree-based plan. ``winner_first`` records
    the deterministic tie-break (the DP keeps the smaller split point on
    exact cost ties), mirroring 𝒜's decision rule — see
    :class:`~repro.core.greedy.GreedyCondition`."""

    span: tuple[int, int]
    win: SplitExpr
    lose: SplitExpr
    winner_first: bool = True

    def lhs(self, stats: Statistics) -> float:
        return self.win.value(stats)

    def rhs(self, stats: Statistics) -> float:
        return self.lose.value(stats)

    def margin(self, stats: Statistics) -> float:
        return self.rhs(stats) - self.lhs(stats)

    def holds(self, stats: Statistics, d: float = 0.0) -> bool:
        """Violated only when the chosen split's cost exceeds the
        alternative's by relative margin ``d`` (see GreedyCondition)."""
        lhs, rhs = self.lhs(stats), self.rhs(stats)
        if lhs == rhs:
            return self.winner_first
        return lhs < (1.0 + d) * rhs


def _cross_pairs(
    pattern: Pattern, left: tuple[str, ...], right: tuple[str, ...]
) -> tuple[PairKey, ...]:
    """Predicate-carrying canonical pairs crossing the split."""
    carrying = set(pattern.predicate_pairs())
    out = []
    for a in left:
        for b in right:
            k = pair_key(a, b)
            if k in carrying:
                out.append(k)
    return tuple(out)


def zstream_plan_instrumented(
    pattern: Pattern, stats: Statistics
) -> tuple[TreePlan, list[list[TreeCondition]]]:
    """Run Algorithm 3, recording one DCS per internal node of the result.

    Returns the plan and the DCS list aligned with
    ``plan.internal_nodes()`` (leaves-to-root order). A span of length 2
    has a single possible split, hence an empty DCS.
    """
    types = pattern.event_types
    n = len(types)
    seq = pattern.operator == "SEQ"
    # DP tables keyed by (lo, hi) inclusive.
    best_cost: dict[tuple[int, int], float] = {}
    best_card: dict[tuple[int, int], float] = {}
    best_tree: dict[tuple[int, int], TreeNode] = {}
    best_split: dict[tuple[int, int], int] = {}
    for i in range(n):
        leaf_card = stats.rate(types[i]) * stats.sel(types[i], types[i])
        best_cost[(i, i)] = best_card[(i, i)] = leaf_card
        best_tree[(i, i)] = Leaf(types[i])
    for length in range(2, n + 1):
        for lo in range(0, n - length + 1):
            hi = lo + length - 1
            card = group_cardinality(types[lo : hi + 1], stats, seq)
            win_k, win_cost = -1, float("inf")
            for k in range(lo, hi):
                cost = best_cost[(lo, k)] + best_cost[(k + 1, hi)] + card
                if cost < win_cost:  # ties break on the smaller split point
                    win_k, win_cost = k, cost
            best_cost[(lo, hi)] = win_cost
            best_card[(lo, hi)] = card
            best_split[(lo, hi)] = win_k
            best_tree[(lo, hi)] = Internal(
                best_tree[(lo, win_k)], best_tree[(win_k + 1, hi)]
            )
    plan = TreePlan(best_tree[(0, n - 1)])

    def split_expr(lo: int, k: int, hi: int) -> SplitExpr:
        return SplitExpr(
            left=Side(types[lo : k + 1], best_cost[(lo, k)], best_card[(lo, k)], seq),
            right=Side(
                types[k + 1 : hi + 1], best_cost[(k + 1, hi)], best_card[(k + 1, hi)], seq
            ),
            cross_pairs=_cross_pairs(
                pattern, types[lo : k + 1], types[k + 1 : hi + 1]
            ),
            interleave=interleave_factor(k - lo + 1, hi - k, seq),
        )

    # Build one DCS per internal node of the chosen plan, bottom-up.
    index = {t: i for i, t in enumerate(types)}
    dcs_list: list[list[TreeCondition]] = []
    for node in plan.internal_nodes():
        leaves = node.leaves
        lo, hi = index[leaves[0]], index[leaves[-1]]
        k = index[node.left.leaves[-1]]
        win = split_expr(lo, k, hi)
        dcs = [
            TreeCondition((lo, hi), win, split_expr(lo, k2, hi), k < k2)
            for k2 in range(lo, hi)
            if k2 != k
        ]
        dcs_list.append(dcs)
    return plan, dcs_list


def zstream_plan(pattern: Pattern, stats: Statistics) -> TreePlan:
    """Algorithm 3 without instrumentation."""
    return zstream_plan_instrumented(pattern, stats)[0]


def brute_force_best_tree(pattern: Pattern, stats: Statistics) -> tuple[float, TreePlan]:
    """Exhaustive search over all contiguous binary trees (Catalan-many);
    test oracle for the DP."""
    types = pattern.event_types

    def enumerate_trees(lo: int, hi: int) -> list[TreeNode]:
        if lo == hi:
            return [Leaf(types[lo])]
        out: list[TreeNode] = []
        for k in range(lo, hi):
            for l in enumerate_trees(lo, k):
                for r in enumerate_trees(k + 1, hi):
                    out.append(Internal(l, r))
        return out

    best: tuple[float, TreePlan] | None = None
    for t in enumerate_trees(0, len(types) - 1):
        cost = tree_node_cost(t, stats, pattern.operator == "SEQ")[0]
        if best is None or cost < best[0]:
            best = (cost, TreePlan(t))
    assert best is not None
    return best
