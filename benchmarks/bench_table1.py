"""Benchmark for Table 1 (paper Fig. 5): the invariant-distance sweep.

Each benchmark regenerates one dataset-algorithm panel of the table and
stores the resulting rows in ``benchmark.extra_info`` so the numbers are
inspectable from the saved benchmark JSON.
"""
import pytest

from repro.core.adaptive import ALGORITHMS
from repro.sim.data import algorithm_k
from repro.sim.runner import distance_sweep

SIZES = (3, 4, 5, 6, 7, 8)


@pytest.mark.parametrize("algo_name", ["greedy", "zstream"])
def test_table1_traffic(benchmark, traffic_bundle, algo_name):
    algo = ALGORITHMS[algo_name]
    df = benchmark.pedantic(
        distance_sweep,
        args=(traffic_bundle.pattern_for_size, algo, traffic_bundle.history),
        kwargs={"pattern_sizes": SIZES, "k": algorithm_k(algo_name)},
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["rows"] = df.to_dict("records")
    assert (df["throughput"] > 0).all()


@pytest.mark.parametrize("algo_name", ["greedy", "zstream"])
def test_table1_stocks(benchmark, stocks_bundle, algo_name):
    algo = ALGORITHMS[algo_name]
    df = benchmark.pedantic(
        distance_sweep,
        args=(stocks_bundle.pattern_for_size, algo, stocks_bundle.history),
        kwargs={"pattern_sizes": SIZES, "k": algorithm_k(algo_name)},
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["rows"] = df.to_dict("records")
    assert (df["throughput"] > 0).all()
