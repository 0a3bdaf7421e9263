"""Benchmark: Table 2 reproduction (dataset stats via Spark SQL)."""
import numpy as np

from repro.experiments import table2


def test_bench_table2(benchmark, spark, bench_streams):
    """Generate + measure the six streams' p and r with Spark SQL."""

    def run():
        return table2(spark, bench_streams)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n", table.round(4).to_string(index=False))
    # The reproduction claim: measured stats land on the paper's targets.
    assert np.all(np.abs(table["p"] - table["p_paper"]) < 0.02)
    assert np.all(np.abs(table["r"] - table["r_paper"]) < 0.02)
