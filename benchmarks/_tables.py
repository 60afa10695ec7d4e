"""Shared helper for the per-table method-comparison benchmarks
(Tables 2-5, paper Figs. 6-9)."""
from repro.core.adaptive import ALGORITHMS
from repro.sim.data import algorithm_k
from repro.sim.runner import compare_methods

SIZES = (3, 4, 5, 6, 7, 8)


def run_table(benchmark, bundle, algo_name):
    """Benchmark one dataset-algorithm comparison table and sanity-check
    the qualitative shape every run must reproduce: some adaptive method
    beats the static plan at the largest pattern size."""
    algo = ALGORITHMS[algo_name]
    df = benchmark.pedantic(
        compare_methods,
        args=(bundle.pattern_for_size, algo, bundle.history),
        kwargs={"pattern_sizes": SIZES, "k": algorithm_k(algo_name)},
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["rows"] = df.to_dict("records")
    big = df[df["pattern_size"] == max(SIZES)].set_index("method")
    assert big.loc["invariant", "throughput"] > big.loc["static", "throughput"]
    return df
