"""Unit tests for the synthetic dataset generators' statistical profiles
(S10, S11) — the driver-side (numpy) parts; event DataFrames are covered
in test_datasets_spark.py."""
import numpy as np
import pytest

from repro.datasets.stocks import stocks_pattern, stocks_profile, stocks_stats_pattern
from repro.datasets.traffic import (
    PATTERN_TYPE_SETS,
    traffic_pattern,
    traffic_profile,
    traffic_stats_pattern,
)


class TestTrafficProfile:
    def test_shapes(self):
        p = traffic_profile(n_types=8, n_batches=60)
        assert p.expected_rates.shape == (60, 8)
        assert p.cars_mean.shape == (60, 8)
        assert p.speed_base.shape == (60, 8)

    def test_rates_skewed(self):
        p = traffic_profile()
        first = p.expected_rates[0]
        assert first.max() / first.min() > 5  # ~8x skew

    def test_default_change_points(self):
        p = traffic_profile(n_batches=120)
        assert p.change_points == (30, 60, 90)

    def test_major_shift_reverses_rate_assignment(self):
        p = traffic_profile(n_batches=120, transition=1)
        pre, post = p.expected_rates[29], p.expected_rates[31]
        assert sorted(pre) == pytest.approx(sorted(post))  # same multiset
        assert not np.allclose(pre, post)

    def test_selectivity_shift_keeps_rates(self):
        # change point at 60 (odd index) moves only the pruning pair
        p = traffic_profile(n_batches=120, transition=1)
        assert np.allclose(p.expected_rates[59], p.expected_rates[62])
        assert not np.allclose(p.cars_mean[59], p.cars_mean[62])

    def test_transition_is_gradual(self):
        p = traffic_profile(n_batches=120, transition=10)
        r = p.expected_rates
        jumps = np.abs(np.diff(r[28:42], axis=0)).max(axis=1)
        # no single-batch jump during the transition is as large as the
        # total regime change
        total = np.abs(r[41] - r[28]).max()
        assert (jumps < total).all()

    def test_pruning_pair_selective(self):
        # one adjacent cars gap is strongly negative (the pruning pair)
        p = traffic_profile()
        gaps = np.diff(p.cars_mean[0])
        assert (gaps < -15).sum() == 1
        assert (gaps[gaps > -15] > 0).all()

    def test_deterministic(self):
        a, b = traffic_profile(), traffic_profile()
        assert np.array_equal(a.expected_rates, b.expected_rates)


class TestTrafficPattern:
    @pytest.mark.parametrize("n", sorted(PATTERN_TYPE_SETS))
    def test_sizes(self, n):
        pat = traffic_pattern(n)
        assert pat.size == n
        assert pat.operator == "SEQ"
        # chain predicates on both attributes between consecutive types
        assert len(pat.predicates) == 2 * (n - 1)

    @pytest.mark.parametrize("n", [4, 6, 8])
    def test_type_sets_reversal_symmetric(self, n):
        sel = PATTERN_TYPE_SETS[n]
        assert set(sel) == {7 - i for i in sel}

    def test_quasi_symmetric_sets_documented(self):
        # odd sizes cannot be exactly symmetric over 8 types
        for n in (3, 5, 7):
            sel = set(PATTERN_TYPE_SETS[n])
            mirrored = {7 - i for i in sel}
            assert len(sel ^ mirrored) <= 2

    def test_stats_pattern_covers_all_pairs(self):
        union = set(traffic_stats_pattern().predicate_pairs())
        for n in PATTERN_TYPE_SETS:
            for pair in traffic_pattern(n).predicate_pairs():
                assert pair in union

    def test_stats_pattern_no_duplicate_predicates(self):
        preds = traffic_stats_pattern().predicates
        assert len(preds) == len(set(preds))


class TestStocksProfile:
    def test_shapes(self):
        p = stocks_profile(n_types=8, n_batches=50)
        assert p.expected_rates.shape == (50, 8)
        assert p.diff_mean.shape == (50, 8)

    def test_initial_rates_near_uniform(self):
        p = stocks_profile()
        r0 = p.expected_rates[0]
        assert r0.max() / r0.min() < 1.1

    def test_rate_changes_frequent_but_minor(self):
        p = stocks_profile()
        step = np.abs(np.diff(p.expected_rates, axis=0)) / p.expected_rates[:-1]
        assert step.max() < 0.15  # minor
        assert (step > 0).mean() > 0.95  # frequent

    def test_mean_drift_bounded(self):
        p = stocks_profile()
        assert np.abs(p.diff_mean).max() <= 2.0

    def test_deterministic_in_seed(self):
        a = stocks_profile(seed=3)
        b = stocks_profile(seed=3)
        c = stocks_profile(seed=4)
        assert np.array_equal(a.expected_rates, b.expected_rates)
        assert not np.array_equal(a.expected_rates, c.expected_rates)


class TestStocksPattern:
    @pytest.mark.parametrize("n", [3, 5, 8])
    def test_chain(self, n):
        pat = stocks_pattern(n)
        assert pat.size == n
        assert len(pat.predicates) == n - 1
        assert all(p.op == "<" for p in pat.predicates)

    def test_stats_pattern_is_full_chain(self):
        assert stocks_stats_pattern().size == 8
