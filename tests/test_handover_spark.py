"""Spark tests for the plan-replacement (handover) protocol of §2.2:
running the old and the new plan in parallel across the switch point
loses no matches and duplicates none versus a single-plan run."""
import pandas as pd
import pytest

from repro.core.executor import evaluate_plan, handover_evaluate, match_sql
from repro.core.pattern import Pattern, chain_predicates
from repro.core.plans import OrderPlan, left_deep_tree
from repro.oracle import assert_equivalent

ATTRS = ("v",)
PAT = Pattern("SEQ", ("A", "B", "C"), chain_predicates("ABC", "v", "<"), 10.0)


@pytest.fixture(scope="module")
def events(spark):
    """Events straddling a switch at t0=5: matches exist that are fully
    old, fully new, and mixed."""
    pdf = pd.DataFrame(
        {
            "ts": [1.0, 2.0, 3.0, 4.0, 5.5, 6.0, 7.0, 8.0, 9.0],
            "type": ["A", "B", "C", "A", "B", "C", "A", "B", "C"],
            "v": [1.0, 2.0, 3.0, 1.5, 2.5, 3.5, 0.5, 1.0, 2.0],
        }
    )
    return spark.createDataFrame(pdf).cache()


OLD = OrderPlan(("A", "B", "C"))
NEW = OrderPlan(("C", "B", "A"))


class TestHandover:
    def test_union_equals_single_plan_run(self, events):
        combined = handover_evaluate(events, PAT, OLD, NEW, t0=5.0, attrs=ATTRS)
        assert_equivalent(combined, match_sql(PAT, ATTRS), events=events)

    def test_no_duplicates(self, events):
        combined = handover_evaluate(events, PAT, OLD, NEW, t0=5.0, attrs=ATTRS)
        assert combined.count() == combined.distinct().count()

    def test_partition_is_nontrivial(self, events):
        """The switch point actually splits responsibility: both the old
        and the new plan produce part of the output."""
        combined = handover_evaluate(events, PAT, OLD, NEW, t0=5.0, attrs=ATTRS).toPandas()
        single = evaluate_plan(events, PAT, OLD, ATTRS).toPandas()
        assert len(combined) == len(single) > 0
        all_new = (combined[["A_ts", "B_ts", "C_ts"]] >= 5.0).all(axis=1)
        assert all_new.any() and (~all_new).any()

    @pytest.mark.parametrize("t0", [0.0, 5.0, 100.0])
    def test_boundary_switch_points(self, events, t0):
        combined = handover_evaluate(events, PAT, OLD, NEW, t0=t0, attrs=ATTRS)
        assert_equivalent(combined, match_sql(PAT, ATTRS), events=events)

    def test_tree_plans_supported(self, events):
        combined = handover_evaluate(
            events,
            PAT,
            left_deep_tree(("A", "B", "C")),
            left_deep_tree(("C", "B", "A")),
            t0=5.0,
            attrs=ATTRS,
        )
        assert_equivalent(combined, match_sql(PAT, ATTRS), events=events)
