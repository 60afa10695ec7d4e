"""End-to-end integration: generated stream -> Spark statistics ->
detection-adaptation loop -> table rows, on a reduced configuration.
Also covers the Spark-calibrated cost model (S12)."""
import pytest

from repro.core.adaptive import GREEDY, ZSTREAM
from repro.core.stats import per_batch_statistics
from repro.datasets.traffic import traffic_events, traffic_pattern, traffic_stats_pattern
from repro.sim.metrics import calibrate
from repro.sim.runner import compare_methods, distance_sweep, make_decision, run_experiment


@pytest.fixture(scope="module")
def mini_history(spark):
    ev = traffic_events(
        spark,
        n_types=8,
        n_batches=24,
        scale=0.4,
        change_points=(12,),
        transition=4,
    ).cache()
    hist = [s for _, s in per_batch_statistics(ev, traffic_stats_pattern(), sample_per_type=32)]
    ev.unpersist()
    assert len(hist) == 24
    return hist


class TestEndToEnd:
    def test_all_methods_produce_valid_rows(self, mini_history):
        df = compare_methods(
            traffic_pattern,
            GREEDY,
            mini_history,
            pattern_sizes=(3,),
            t_grid=(5.0, 40.0),
            d_grid=(0.0, 0.3),
        )
        assert len(df) == 4
        assert (df["throughput"] > 0).all()
        assert (df["overhead_pct"] >= 0).all()

    def test_unconditional_adapts_on_regime_shift(self, mini_history):
        r = run_experiment(
            traffic_pattern(4), GREEDY, make_decision("unconditional"), mini_history
        )
        assert r.replacements >= 1

    def test_invariant_fires_less_than_unconditional(self, mini_history):
        ru = run_experiment(
            traffic_pattern(4), GREEDY, make_decision("unconditional"), mini_history
        )
        ri = run_experiment(
            traffic_pattern(4), GREEDY, make_decision("invariant", d=0.2), mini_history
        )
        assert ri.decision_fires < ru.decision_fires

    def test_zstream_pipeline(self, mini_history):
        r = run_experiment(
            traffic_pattern(4),
            ZSTREAM,
            make_decision("invariant", d=0.2, k=3),
            mini_history,
        )
        assert r.throughput > 0

    def test_distance_sweep_runs(self, mini_history):
        df = distance_sweep(
            traffic_pattern,
            GREEDY,
            mini_history,
            pattern_sizes=(3,),
            d_values=(0.0, 0.2),
        )
        assert len(df) == 2


class TestCalibration:
    def test_calibrate_measures_positive_rate(self, spark):
        cm = calibrate(spark, n_batches=1, scale=1.0)
        assert 0 < cm.sec_per_match < 0.1
        assert cm.batch_base_seconds > 0
