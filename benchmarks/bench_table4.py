"""Benchmark: Table 4 (predicate queries) at reduced scale."""
from repro.experiments import table34

from _config import BENCH_TRIALS


def test_bench_table4_predicate(benchmark, spark, bench_streams):
    """Budget sweep x 4 algorithms x 6 datasets, predicate queries."""

    def run():
        return table34(
            spark,
            bench_streams,
            mode="pred",
            budgets=(500, 2500, 5000),
            n_trials=BENCH_TRIALS,
        )

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n", out["summary"].round(4).to_string())
    s = out["summary"]
    # Paper's Table 4 shape: InQuest ahead of both streaming baselines.
    assert s.loc["improvement_uniform", "All"] > 1.05
    assert s.loc["improvement_stratified", "All"] > 1.0
    assert s.loc["improvement_abae", "All"] > 0.6
