"""Micro-benchmarks of the Spark match-evaluation executor (S8): the
real join pipeline on one generated micro-batch, order- vs tree-shaped,
good vs bad plan. These ground the ``sec_per_match`` calibration used by
the table harness (DESIGN.md §2)."""
import pytest

from repro.core.executor import evaluate_order_plan, evaluate_tree_plan
from repro.core.greedy import greedy_plan
from repro.core.plans import OrderPlan, left_deep_tree
from repro.core.stats import per_batch_statistics
from repro.core.zstream import zstream_plan
from repro.datasets.traffic import ATTRS, traffic_events, traffic_pattern


@pytest.fixture(scope="module")
def batch(spark):
    ev = traffic_events(
        spark, n_types=5, n_batches=1, scale=0.8, change_points=()
    ).cache()
    ev.count()
    pat = traffic_pattern(5)
    stats = per_batch_statistics(ev, pat)[0][1].for_pattern(pat)
    return ev.drop("batch"), pat, stats


def test_order_plan_good(benchmark, batch):
    ev, pat, stats = batch
    plan = greedy_plan(pat, stats)
    benchmark.pedantic(
        lambda: evaluate_order_plan(ev, pat, plan, ATTRS).count(),
        rounds=3,
        iterations=1,
    )


def test_order_plan_bad(benchmark, batch):
    ev, pat, stats = batch
    plan = OrderPlan(tuple(reversed(greedy_plan(pat, stats).order)))
    benchmark.pedantic(
        lambda: evaluate_order_plan(ev, pat, plan, ATTRS).count(),
        rounds=3,
        iterations=1,
    )


def test_tree_plan_zstream(benchmark, batch):
    ev, pat, stats = batch
    plan = zstream_plan(pat, stats)
    benchmark.pedantic(
        lambda: evaluate_tree_plan(ev, pat, plan, ATTRS).count(),
        rounds=3,
        iterations=1,
    )


def test_tree_plan_left_deep(benchmark, batch):
    ev, pat, _ = batch
    plan = left_deep_tree(pat.event_types)
    benchmark.pedantic(
        lambda: evaluate_tree_plan(ev, pat, plan, ATTRS).count(),
        rounds=3,
        iterations=1,
    )
