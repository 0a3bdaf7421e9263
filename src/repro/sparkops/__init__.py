"""Spark-facing layers: stream DataFrames, distributed trials, metrics.

Everything SQL-expressible (ground truth, Table 2 statistics, RMSE and
geometric-mean aggregation) runs on the DataFrame / Spark SQL API and is
cross-checked against DuckDB by the test suite; the sequential per-trial
sampling kernels run as numpy inside Spark tasks, distributed over the
(dataset x algorithm x budget x trial) grid.
"""
