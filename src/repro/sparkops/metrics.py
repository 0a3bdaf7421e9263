"""Spark SQL aggregation of trial results into the paper's metrics.

Implements the exact metric pipeline of Section 5.1-5.2:

1. per (dataset, algo, mode, budget, segment): RMSE over trials,
2. per (dataset, algo, mode, budget): *median* of the per-segment RMSEs
   (exact ``percentile``, not the approximate sketch — T is tiny),
3. per (algo, mode, budget): *geometric mean* of the per-dataset scores
   (``exp(avg(ln(x)))``),
4. Table 3/4 layout: one row per algorithm with the NT = 500 / 2500 /
   5000 cells, the all-budgets geometric mean, and the improvement
   ratios (baseline / InQuest) the paper prints beneath.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

__all__ = [
    "rmse_by_segment",
    "median_segment_rmse",
    "geomean_across_datasets",
    "full_query_rmse",
    "summary_table",
]

_KEY = ["dataset", "algo", "mode", "budget"]


def rmse_by_segment(results: DataFrame) -> DataFrame:
    """RMSE over trials for every per-segment estimate."""
    return (
        results.filter(F.col("segment") >= 0)
        .groupBy(*_KEY, "segment")
        .agg(F.sqrt(F.avg(F.pow(F.col("estimate") - F.col("truth"), 2))).alias("rmse"))
    )


def median_segment_rmse(results: DataFrame) -> DataFrame:
    """The paper's per-dataset score: median across segments of the RMSE."""
    return (
        rmse_by_segment(results)
        .groupBy(*_KEY)
        .agg(F.expr("percentile(rmse, 0.5)").alias("median_rmse"))
    )


def geomean_across_datasets(results: DataFrame) -> DataFrame:
    """Tables 3/4's cell value: geometric mean across datasets."""
    return (
        median_segment_rmse(results)
        .groupBy("algo", "mode", "budget")
        .agg(F.exp(F.avg(F.log("median_rmse"))).alias("geomean_rmse"))
    )


def full_query_rmse(results: DataFrame) -> DataFrame:
    """RMSE of the final full-query estimate (the Figure 6 metric)."""
    return (
        results.filter(F.col("segment") == -1)
        .groupBy(*_KEY)
        .agg(F.sqrt(F.avg(F.pow(F.col("estimate") - F.col("truth"), 2))).alias("rmse"))
    )


def summary_table(
    geomeans: pd.DataFrame,
    *,
    mode: str,
    highlight_budgets: tuple[int, ...] = (500, 2500, 5000),
    reference: str = "inquest",
) -> pd.DataFrame:
    """Render one mode's Table 3/4: algorithms x (budgets..., All).

    ``geomeans`` is the collected output of
    :func:`geomean_across_datasets`; "All" is the geometric mean of an
    algorithm's cells over every swept budget (the paper aggregates its
    full 500..5000 sweep the same way).  Improvement rows divide each
    baseline's cells by the reference algorithm's.
    """
    sub = geomeans[geomeans["mode"] == mode]
    if sub.empty:
        raise ValueError(f"no rows for mode {mode!r}")
    pivot = sub.pivot_table(index="algo", columns="budget", values="geomean_rmse")
    cols = [b for b in highlight_budgets if b in pivot.columns]
    table = pivot[cols].copy()
    table.columns = [f"NT = {b}" for b in cols]
    # Geometric mean over the full sweep, not just highlighted budgets.
    table["All"] = np.exp(np.log(pivot).mean(axis=1))
    if reference in table.index:
        for algo in table.index:
            if algo == reference:
                continue
            table.loc[f"improvement_{algo}"] = (
                table.loc[algo] / table.loc[reference]
            )
    return table
