"""Spark integration tests for the match-evaluation executor (S8),
oracle-checked against DuckDB on every result."""
from itertools import permutations

import pandas as pd
import pytest

from repro.core.executor import (
    evaluate_order_plan,
    evaluate_plan,
    evaluate_tree_plan,
    match_sql,
    profile_order_plan,
    profile_tree_plan,
)
from repro.core.pattern import Pattern, Predicate, chain_predicates
from repro.core.plans import OrderPlan, left_deep_tree
from repro.core.zstream import zstream_plan
from repro.core.stats import Statistics
from repro.oracle import assert_equivalent

ATTRS = ("v",)


def tiny_events(spark):
    """Hand-built micro-batch with known matches."""
    pdf = pd.DataFrame(
        {
            "ts": [0.5, 1.0, 1.5, 2.0, 2.5, 3.0, 3.5, 4.0, 9.0],
            "type": ["A", "B", "A", "B", "C", "C", "A", "C", "B"],
            "v": [1.0, 2.0, 5.0, 4.0, 3.0, 9.0, 0.5, 6.0, 7.0],
        }
    )
    return spark.createDataFrame(pdf)


def seq_pattern(window=10.0):
    return Pattern(
        "SEQ", ("A", "B", "C"), chain_predicates("ABC", "v", "<"), window
    )


class TestOrderPlan:
    @pytest.mark.parametrize("order", list(permutations(("A", "B", "C"))))
    def test_all_orders_match_oracle(self, spark, order):
        ev = tiny_events(spark)
        pat = seq_pattern()
        res = evaluate_order_plan(ev, pat, OrderPlan(order), ATTRS)
        assert_equivalent(res, match_sql(pat, ATTRS), events=ev)

    def test_plan_invariance(self, spark):
        ev = tiny_events(spark)
        pat = seq_pattern()
        results = [
            sorted(
                evaluate_order_plan(ev, pat, OrderPlan(o), ATTRS)
                .toPandas()
                .itertuples(index=False, name=None)
            )
            for o in (("A", "B", "C"), ("C", "B", "A"))
        ]
        # same rows modulo column order
        assert len(results[0]) == len(results[1]) > 0

    def test_known_match_content(self, spark):
        ev = tiny_events(spark)
        pat = seq_pattern()
        rows = (
            evaluate_order_plan(ev, pat, OrderPlan(("A", "B", "C")), ATTRS)
            .toPandas()
            .sort_values(["A_ts", "B_ts", "C_ts"])
        )
        # every match satisfies ts order, window and the value chain
        assert (rows["A_ts"] < rows["B_ts"]).all()
        assert (rows["B_ts"] < rows["C_ts"]).all()
        assert (rows["C_ts"] - rows["A_ts"] <= pat.window).all()
        assert (rows["A_v"] < rows["B_v"]).all()
        assert (rows["B_v"] < rows["C_v"]).all()

    def test_window_excludes_late_events(self, spark):
        ev = tiny_events(spark)
        tight = seq_pattern(window=1.2)
        res = evaluate_order_plan(ev, tight, OrderPlan(("A", "B", "C")), ATTRS)
        assert_equivalent(res, match_sql(tight, ATTRS), events=ev)

    def test_empty_type_yields_no_matches(self, spark):
        pdf = pd.DataFrame(
            {"ts": [1.0, 2.0], "type": ["A", "B"], "v": [1.0, 2.0]}
        )
        ev = spark.createDataFrame(pdf)
        pat = seq_pattern()
        res = evaluate_order_plan(ev, pat, OrderPlan(("A", "B", "C")), ATTRS)
        assert res.count() == 0


class TestTreePlan:
    def test_left_deep_matches_oracle(self, spark):
        ev = tiny_events(spark)
        pat = seq_pattern()
        res = evaluate_tree_plan(ev, pat, left_deep_tree(("A", "B", "C")), ATTRS)
        assert_equivalent(res, match_sql(pat, ATTRS), events=ev)

    def test_right_deep_matches_oracle(self, spark):
        ev = tiny_events(spark)
        pat = seq_pattern()
        res = evaluate_tree_plan(ev, pat, left_deep_tree(("C", "B", "A")), ATTRS)
        assert_equivalent(res, match_sql(pat, ATTRS), events=ev)

    def test_zstream_generated_tree_matches_oracle(self, spark):
        ev = tiny_events(spark)
        pat = seq_pattern()
        stats = Statistics(
            {"A": 3.0, "B": 3.0, "C": 3.0},
            {("A", "B"): 0.5, ("B", "C"): 0.5},
        )
        plan = zstream_plan(pat, stats)
        res = evaluate_tree_plan(ev, pat, plan, ATTRS)
        assert_equivalent(res, match_sql(pat, ATTRS), events=ev)

    def test_dispatch_helper(self, spark):
        ev = tiny_events(spark)
        pat = seq_pattern()
        o = evaluate_plan(ev, pat, OrderPlan(("A", "B", "C")), ATTRS)
        t = evaluate_plan(ev, pat, left_deep_tree(("A", "B", "C")), ATTRS)
        assert o.count() == t.count()


class TestAndOperator:
    def test_and_matches_oracle(self, spark):
        ev = tiny_events(spark)
        pat = Pattern(
            "AND", ("A", "B", "C"), (Predicate("A", "v", "<", "C", "v"),), 5.0
        )
        res = evaluate_order_plan(ev, pat, OrderPlan(("B", "A", "C")), ATTRS)
        assert_equivalent(res, match_sql(pat, ATTRS), events=ev)

    def test_and_has_more_matches_than_seq(self, spark):
        ev = tiny_events(spark)
        seq = seq_pattern()
        conj = Pattern("AND", ("A", "B", "C"), seq.predicates, seq.window)
        n_seq = evaluate_order_plan(ev, seq, OrderPlan(("A", "B", "C")), ATTRS).count()
        n_and = evaluate_order_plan(ev, conj, OrderPlan(("A", "B", "C")), ATTRS).count()
        assert n_and >= n_seq


class TestProfiling:
    def test_order_profile_counts(self, spark):
        ev = tiny_events(spark)
        pat = seq_pattern()
        prof = profile_order_plan(ev, pat, OrderPlan(("A", "B", "C")), ATTRS)
        assert len(prof.partial_match_counts) == 3
        assert prof.partial_match_counts[0] == 3  # three A events
        assert prof.total_partial_matches == sum(prof.partial_match_counts)
        assert prof.matches.count() == prof.partial_match_counts[-1]

    def test_tree_profile_counts(self, spark):
        ev = tiny_events(spark)
        pat = seq_pattern()
        prof = profile_tree_plan(ev, pat, left_deep_tree(("A", "B", "C")), ATTRS)
        # 3 leaves + 2 internal nodes
        assert len(prof.partial_match_counts) == 5

    def test_good_plan_creates_fewer_partials(self, spark):
        # start with the rarest type: fewer intermediate results
        pdf = pd.DataFrame(
            {
                "ts": [float(i) / 10 for i in range(40)] + [5.0, 6.0],
                "type": ["A"] * 40 + ["B", "C"],
                "v": [1.0] * 40 + [2.0, 3.0],
            }
        )
        ev = spark.createDataFrame(pdf)
        pat = seq_pattern()
        bad = profile_order_plan(ev, pat, OrderPlan(("A", "B", "C")), ATTRS)
        good = profile_order_plan(ev, pat, OrderPlan(("C", "B", "A")), ATTRS)
        assert good.total_partial_matches < bad.total_partial_matches
        assert good.partial_match_counts[-1] == bad.partial_match_counts[-1]


class TestMatchSql:
    def test_contains_all_clauses(self):
        pat = seq_pattern()
        sql = match_sql(pat, ATTRS)
        assert "e0.type = 'A'" in sql
        assert "e0.ts < e1.ts" in sql
        assert "<= 10.0" in sql
        assert "A_v" in sql and "C_ts" in sql

    def test_and_uses_abs_window(self):
        pat = Pattern("AND", ("A", "B"), (), 5.0)
        sql = match_sql(pat, ATTRS)
        assert "abs(" in sql and "ts <" not in sql
