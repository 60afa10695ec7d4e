"""Spark match-evaluation executor (S8): the CEP engine's data plane.

Detecting a pattern over a micro-batch is a multi-way theta-join of the
batch's per-type event sets: an order-based (lazy NFA) plan prescribes
the *join order*, a tree-based (ZStream) plan the *join tree*. SEQ
ordering and the time window become pairwise timestamp predicates
(``last - first <= W`` is equivalent to all ordered pairs being within
``W``), so every plan for a pattern produces the same match set — which
the tests verify against a DuckDB rendering of the same join
(:func:`match_sql`).

Output schema: for each event type ``T`` of the pattern, columns
``T_ts`` and ``T_<attr>`` for every attribute.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from .pattern import Pattern
from .plans import Internal, Leaf, OrderPlan, TreeNode, TreePlan


def _col_name(event_type: str, attr: str) -> str:
    return f"{event_type}_{attr}"


def _type_df(
    events: DataFrame, event_type: str, attrs: Sequence[str]
) -> DataFrame:
    """Events of one type, columns renamed to the match-output names.

    Coalesced to one partition: a micro-batch holds at most a few
    hundred events per type, and the theta-joins below otherwise build
    partition-product stages (cartesian strategy) with thousands of
    empty tasks."""
    return (
        events.filter(F.col("type") == event_type)
        .select(
            F.col("ts").alias(_col_name(event_type, "ts")),
            *[F.col(a).alias(_col_name(event_type, a)) for a in attrs],
        )
        .coalesce(1)
    )


def _pair_conditions(pattern: Pattern, a: str, b: str) -> list[Column]:
    """All join conditions between two event types bound in one frame:
    inter-event predicates, SEQ ordering, and the window bound."""
    conds: list[Column] = [
        p.spark_condition(_col_name) for p in pattern.predicates_between(a, b)
    ]
    a_ts, b_ts = F.col(_col_name(a, "ts")), F.col(_col_name(b, "ts"))
    if pattern.operator == "SEQ":
        earlier, later = (
            (a_ts, b_ts) if pattern.position(a) < pattern.position(b) else (b_ts, a_ts)
        )
        conds.append(earlier < later)
        conds.append(later - earlier <= pattern.window)
    else:  # AND: no ordering, only the window bound
        conds.append(F.abs(a_ts - b_ts) <= pattern.window)
    return conds


def _join(
    left: DataFrame,
    right: DataFrame,
    pattern: Pattern,
    left_types: Sequence[str],
    right_types: Sequence[str],
) -> DataFrame:
    """Theta-join two partial-match frames on every cross-pair condition."""
    cond: Column | None = None
    for a in left_types:
        for b in right_types:
            for c in _pair_conditions(pattern, a, b):
                cond = c if cond is None else cond & c
    assert cond is not None, "disjoint event type groups expected"
    return left.join(right, on=cond, how="inner")


def evaluate_order_plan(
    events: DataFrame, pattern: Pattern, plan: OrderPlan, attrs: Sequence[str]
) -> DataFrame:
    """Evaluate an order-based plan: start from the first type in the
    plan's order and incrementally join each next type's events, applying
    every predicate as soon as both endpoints are bound (lazy evaluation
    with reordering, Fig. 1(b))."""
    current = _type_df(events, plan.order[0], attrs)
    bound = [plan.order[0]]
    for t in plan.order[1:]:
        current = _join(current, _type_df(events, t, attrs), pattern, bound, [t])
        bound.append(t)
    return current


def evaluate_tree_plan(
    events: DataFrame, pattern: Pattern, plan: TreePlan, attrs: Sequence[str]
) -> DataFrame:
    """Evaluate a tree-based (ZStream) plan bottom-up: each internal node
    joins its children's partial matches under the cross-group conditions."""

    def eval_node(node: TreeNode) -> DataFrame:
        if isinstance(node, Leaf):
            return _type_df(events, node.event_type, attrs)
        left, right = eval_node(node.left), eval_node(node.right)
        return _join(left, right, pattern, node.left.leaves, node.right.leaves)

    return eval_node(plan.root)


def evaluate_plan(
    events: DataFrame, pattern: Pattern, plan, attrs: Sequence[str]
) -> DataFrame:
    """Dispatch over the two plan families."""
    if isinstance(plan, OrderPlan):
        return evaluate_order_plan(events, pattern, plan, attrs)
    return evaluate_tree_plan(events, pattern, plan, attrs)


@dataclass(frozen=True)
class EvaluationProfile:
    """Matches plus the observed partial-match cardinalities — the
    empirical counterpart of the paper's cost model."""

    matches: DataFrame
    partial_match_counts: tuple[int, ...]

    @property
    def total_partial_matches(self) -> int:
        return sum(self.partial_match_counts)


def profile_order_plan(
    events: DataFrame, pattern: Pattern, plan: OrderPlan, attrs: Sequence[str]
) -> EvaluationProfile:
    """Like :func:`evaluate_order_plan` but counts every intermediate
    partial-match set (one Spark action per step)."""
    current = _type_df(events, plan.order[0], attrs)
    counts = [current.count()]
    bound = [plan.order[0]]
    for t in plan.order[1:]:
        current = _join(current, _type_df(events, t, attrs), pattern, bound, [t])
        bound.append(t)
        counts.append(current.count())
    return EvaluationProfile(current, tuple(counts))


def profile_tree_plan(
    events: DataFrame, pattern: Pattern, plan: TreePlan, attrs: Sequence[str]
) -> EvaluationProfile:
    """Counts the partial matches of every node (leaves and internal)."""
    counts: list[int] = []

    def eval_node(node: TreeNode) -> DataFrame:
        if isinstance(node, Leaf):
            df = _type_df(events, node.event_type, attrs)
        else:
            left, right = eval_node(node.left), eval_node(node.right)
            df = _join(left, right, pattern, node.left.leaves, node.right.leaves)
        counts.append(df.count())
        return df

    matches = eval_node(plan.root)
    return EvaluationProfile(matches, tuple(counts))


def handover_evaluate(
    events: DataFrame,
    pattern: Pattern,
    old_plan,
    new_plan,
    t0: float,
    attrs: Sequence[str],
) -> DataFrame:
    """Plan-replacement protocol of the paper's §2.2.

    During ``[t0, t0 + W]`` the old and the new plan run in parallel:
    the old plan ``p_old`` is responsible for every match containing at
    least one event accepted before ``t0`` (partial matches created
    before the reoptimization), while ``p_new`` processes matches built
    entirely from events accepted at or after ``t0``. The two sets are
    disjoint and their union is exactly the single-plan result — the
    property ``tests/test_handover_spark.py`` verifies against the
    DuckDB oracle.
    """
    from pyspark.sql.functions import least

    old_matches = evaluate_plan(events, pattern, old_plan, attrs).filter(
        least(*[F.col(_col_name(t, "ts")) for t in pattern.event_types]) < t0
    )
    new_matches = evaluate_plan(
        events.filter(F.col("ts") >= t0), pattern, new_plan, attrs
    )
    return old_matches.unionByName(new_matches)


def match_sql(pattern: Pattern, attrs: Sequence[str], table: str = "events") -> str:
    """The same multi-way join as SQL over a flat ``table(ts, type,
    *attrs)`` — the DuckDB oracle side of every correctness test."""
    aliases = {t: f"e{i}" for i, t in enumerate(pattern.event_types)}
    select = []
    for t in pattern.event_types:
        select.append(f"{aliases[t]}.ts AS {_col_name(t, 'ts')}")
        select.extend(
            f"{aliases[t]}.{a} AS {_col_name(t, a)}" for a in attrs
        )
    frm = ", ".join(f"{table} {aliases[t]}" for t in pattern.event_types)
    where = [f"{aliases[t]}.type = '{t}'" for t in pattern.event_types]
    for p in pattern.predicates:
        where.append(p.sql(lambda t: aliases[t]))
    types = pattern.event_types
    for i in range(len(types)):
        for j in range(i + 1, len(types)):
            a, b = aliases[types[i]], aliases[types[j]]
            if pattern.operator == "SEQ":
                where.append(f"{a}.ts < {b}.ts")
                where.append(f"{b}.ts - {a}.ts <= {pattern.window}")
            else:
                where.append(f"abs({a}.ts - {b}.ts) <= {pattern.window}")
    return (
        f"SELECT {', '.join(select)} FROM {frm} WHERE " + " AND ".join(where)
    )
