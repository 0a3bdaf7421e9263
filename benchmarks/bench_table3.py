"""Benchmark: Table 3 (no-predicate queries) at reduced scale."""
from repro.experiments import table34

from _config import BENCH_TRIALS


def test_bench_table3_no_predicate(benchmark, spark, bench_streams):
    """Budget sweep x 4 algorithms x 6 datasets, no-predicate queries."""

    def run():
        return table34(
            spark,
            bench_streams,
            mode="nopred",
            budgets=(500, 2500, 5000),
            n_trials=BENCH_TRIALS,
        )

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n", out["summary"].round(4).to_string())
    s = out["summary"]
    # Paper's Table 3 shape: InQuest ~2x better than both streaming
    # baselines (assert a conservative floor), ABae competitive.
    assert s.loc["improvement_uniform", "All"] > 1.4
    assert s.loc["improvement_stratified", "All"] > 1.4
    assert s.loc["improvement_abae", "All"] > 0.6
