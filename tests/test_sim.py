"""Unit tests for the experiment harness (S12)."""
import pytest

from repro.core.adaptive import GREEDY, ZSTREAM
from repro.core.invariants import (
    InvariantDecision,
    StaticDecision,
    ThresholdDecision,
    UnconditionalDecision,
)
from repro.core.pattern import Pattern, chain_predicates
from repro.core.stats import Statistics
from repro.sim.metrics import DEFAULT_COST_MODEL, CostModel
from repro.sim.runner import (
    compare_methods,
    distance_sweep,
    find_opt_parameter,
    format_table,
    make_decision,
    run_experiment,
)

TYPES = ("A", "B", "C")
PAT = Pattern("SEQ", TYPES, chain_predicates(TYPES, "v", "<"), 10.0)


def snap(ra, rb, rc):
    return Statistics(
        {"A": ra, "B": rb, "C": rc}, {("A", "B"): 0.4, ("B", "C"): 0.4}
    )


def history(n=12, flip_at=6):
    """Stable regime then a reversed regime."""
    return [snap(20, 8, 2) if i < flip_at else snap(2, 8, 20) for i in range(n)]


def pattern_for_size(n):
    types = TYPES[:n]
    return Pattern("SEQ", types, chain_predicates(types, "v", "<"), 10.0)


class TestCostModel:
    def test_eval_seconds(self):
        cm = CostModel(sec_per_match=1e-3, batch_base_seconds=0.1)
        assert cm.eval_seconds(100) == pytest.approx(0.2)

    def test_defaults_sane(self):
        assert DEFAULT_COST_MODEL.sec_per_match > 0
        assert DEFAULT_COST_MODEL.deploy_batches > 0


class TestMakeDecision:
    @pytest.mark.parametrize(
        "name,cls",
        [
            ("static", StaticDecision),
            ("unconditional", UnconditionalDecision),
            ("threshold", ThresholdDecision),
            ("invariant", InvariantDecision),
        ],
    )
    def test_factory(self, name, cls):
        assert isinstance(make_decision(name), cls)

    def test_unknown(self):
        with pytest.raises(ValueError):
            make_decision("oracle")


class TestRunExperiment:
    def test_requires_history(self):
        with pytest.raises(ValueError):
            run_experiment(PAT, GREEDY, StaticDecision(), [snap(1, 2, 3)])

    def test_accounting_identity(self):
        r = run_experiment(PAT, GREEDY, make_decision("unconditional"), history())
        assert r.total_seconds == pytest.approx(
            r.eval_seconds + r.decision_seconds + r.generation_seconds + r.deploy_seconds
        )
        assert r.throughput == pytest.approx(r.events / r.total_seconds)
        assert 0 <= r.overhead_pct < 100

    def test_events_counted_from_history(self):
        r = run_experiment(PAT, GREEDY, StaticDecision(), history(12))
        assert r.events == pytest.approx(sum(30 for _ in range(11)))

    def test_static_has_no_replacements_or_deploy(self):
        r = run_experiment(PAT, GREEDY, StaticDecision(), history())
        assert r.replacements == 0
        assert r.deploy_seconds == 0.0

    def test_adaptive_beats_static_after_flip(self):
        rs = run_experiment(PAT, GREEDY, StaticDecision(), history(30, 6))
        ra = run_experiment(PAT, GREEDY, make_decision("unconditional"), history(30, 6))
        assert ra.throughput > rs.throughput
        assert ra.replacements >= 1

    def test_deploy_charged_on_replacement(self):
        r = run_experiment(PAT, GREEDY, make_decision("unconditional"), history(30, 6))
        assert r.deploy_seconds > 0

    def test_zstream_runs(self):
        r = run_experiment(PAT, ZSTREAM, make_decision("invariant", k=3), history())
        assert r.throughput > 0

    def test_invariant_engine_matches_threshold_shape(self):
        ri = run_experiment(PAT, GREEDY, make_decision("invariant"), history(30, 6))
        assert ri.replacements >= 1
        assert ri.decision_fires >= ri.replacements


class TestSweeps:
    def test_find_opt_returns_grid_member(self):
        grid = (1.0, 5.0, 25.0)
        t = find_opt_parameter(PAT, GREEDY, history(), "threshold", grid)
        assert t in grid
        d = find_opt_parameter(PAT, GREEDY, history(), "invariant", (0.0, 0.5))
        assert d in (0.0, 0.5)

    def test_distance_sweep_frame(self):
        df = distance_sweep(
            pattern_for_size, GREEDY, history(), pattern_sizes=(2, 3), d_values=(0.0, 0.5)
        )
        assert len(df) == 4
        assert set(df.columns) >= {"pattern_size", "d", "throughput", "replacements"}

    def test_compare_methods_frame(self):
        df = compare_methods(
            pattern_for_size,
            GREEDY,
            history(),
            pattern_sizes=(3,),
            t_grid=(5.0, 20.0),
            d_grid=(0.0, 0.3),
        )
        assert set(df["method"]) == {"static", "unconditional", "threshold", "invariant"}
        static_rows = df[df["method"] == "static"]
        assert (static_rows["gain_vs_static"] == 1.0).all()

    def test_format_table_renders(self):
        df = distance_sweep(
            pattern_for_size, GREEDY, history(), pattern_sizes=(3,), d_values=(0.0,)
        )
        out = format_table(df)
        assert "throughput" in out and "\n" in out
