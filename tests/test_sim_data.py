"""Unit tests for the shared data-preparation layer (repro.sim.data)."""
import pickle

import pytest

from repro.core.stats import Statistics
from repro.datasets.stocks import stocks_pattern
from repro.datasets.traffic import traffic_pattern
from repro.sim.data import DatasetBundle, algorithm_k, load_dataset


class TestAlgorithmK:
    def test_greedy_uses_basic_method(self):
        assert algorithm_k("greedy") == 1

    def test_zstream_uses_k_invariant(self):
        assert algorithm_k("zstream") == 3


class TestLoadDataset:
    def _seed_cache(self, cache_dir, name, n=4):
        history = [
            Statistics({"T0": float(i), "T1": 2.0}, {("T0", "T1"): 0.5})
            for i in range(n)
        ]
        payload = {"history": history, "n_events": 123}
        with open(cache_dir / f"{name}-history.pkl", "wb") as f:
            pickle.dump(payload, f)
        return history

    def test_cache_hit_skips_spark(self, tmp_path):
        """With a seeded cache no SparkSession is touched (spark=None)."""
        hist = self._seed_cache(tmp_path, "traffic")
        bundle = load_dataset(None, "traffic", cache_dir=str(tmp_path))
        assert isinstance(bundle, DatasetBundle)
        assert bundle.n_events == 123
        assert len(bundle.history) == len(hist)
        assert bundle.history[1].rate("T0") == 1.0

    def test_pattern_factory_rebound(self, tmp_path):
        self._seed_cache(tmp_path, "traffic")
        self._seed_cache(tmp_path, "stocks")
        t = load_dataset(None, "traffic", cache_dir=str(tmp_path))
        s = load_dataset(None, "stocks", cache_dir=str(tmp_path))
        assert t.pattern_for_size is traffic_pattern
        assert s.pattern_for_size is stocks_pattern

    def test_unknown_dataset_rejected(self, tmp_path):
        with pytest.raises(ValueError):
            load_dataset(None, "weather", cache_dir=str(tmp_path))
