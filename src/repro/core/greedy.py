"""Greedy order-based plan generation (S3) — Algorithm 2 of the paper,
instrumented for invariant creation (§3.1, §4.1).

At step ``i`` the algorithm selects, among the event types not yet in
the plan, the one minimising ``r_j * sel(j,j) * prod_{k<i} sel(p_k, j)``.
Every comparison between the winner and another candidate is a
*block-building comparison*; its deciding condition
``cost(winner) < cost(candidate)`` is appended to the step's deciding
condition set (DCS). Ties break deterministically on the pattern's
declaration order, so the algorithm is a deterministic function of the
statistics — the premise of Theorems 1 and 2.
"""
from __future__ import annotations

from dataclasses import dataclass

from .pattern import Pattern
from .plans import OrderPlan, order_step_cost
from .stats import Statistics


@dataclass(frozen=True)
class GreedyCondition:
    """Deciding condition ``cost(winner | prefix) < cost(loser | prefix)``.

    Both sides are re-evaluable on fresh statistics in
    O(len(prefix)) ≈ O(#predicates touching the candidate) time, which is
    near-constant for sparse predicate sets (paper §4.1).

    ``winner_first`` records the deterministic tie-break (the winner's
    declaration index precedes the loser's), so the condition mirrors
    𝒜's actual decision rule on exact ties — without it, two equal-cost
    candidates would fire 𝒟 on every batch while 𝒜 keeps returning the
    same plan (a false-positive loop Theorem 1 forbids).
    """

    winner: str
    loser: str
    prefix: tuple[str, ...]
    winner_first: bool = True

    def lhs(self, stats: Statistics) -> float:
        return order_step_cost(self.winner, self.prefix, stats)

    def rhs(self, stats: Statistics) -> float:
        return order_step_cost(self.loser, self.prefix, stats)

    def margin(self, stats: Statistics) -> float:
        """``rhs - lhs``; the *tightest* condition of a DCS minimises this."""
        return self.rhs(stats) - self.lhs(stats)

    def holds(self, stats: Statistics, d: float = 0.0) -> bool:
        """Distance-``d`` check (§3.4): the invariant is violated only
        when the winner's cost exceeds the loser's by the relative margin
        ``d`` (``lhs >= (1+d) * rhs``), so ``d=0`` is the basic method and
        larger ``d`` tolerates larger swings before firing — the
        semantics of the paper's "minimal distance"."""
        lhs, rhs = self.lhs(stats), self.rhs(stats)
        if lhs == rhs:
            return self.winner_first
        return lhs < (1.0 + d) * rhs


def greedy_plan_instrumented(
    pattern: Pattern, stats: Statistics
) -> tuple[OrderPlan, list[list[GreedyCondition]]]:
    """Run Algorithm 2, recording one DCS per building block.

    Returns the plan and ``dcs[i]`` = deciding conditions of the block
    "process event type ``order[i]`` at position ``i``". The DCS of the
    last block is empty (no remaining competitor), matching the paper's
    running example where ``DCS_3 = ∅``.
    """
    remaining = list(pattern.event_types)
    prefix: tuple[str, ...] = ()
    dcs_list: list[list[GreedyCondition]] = []
    while remaining:
        costs = {j: order_step_cost(j, prefix, stats) for j in remaining}
        # Deterministic tie-break: smaller declaration index wins.
        winner = min(remaining, key=lambda j: (costs[j], pattern.position(j)))
        dcs = [
            GreedyCondition(
                winner, j, prefix, pattern.position(winner) < pattern.position(j)
            )
            for j in remaining
            if j != winner
        ]
        dcs_list.append(dcs)
        prefix = prefix + (winner,)
        remaining.remove(winner)
    return OrderPlan(prefix), dcs_list


def greedy_plan(pattern: Pattern, stats: Statistics) -> OrderPlan:
    """Algorithm 2 without instrumentation."""
    return greedy_plan_instrumented(pattern, stats)[0]
