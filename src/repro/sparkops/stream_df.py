"""Stream <-> Spark DataFrame bridge and Spark SQL ground-truth queries.

The canonical stream schema is one row per record:

    record_idx BIGINT, segment INT, statistic DOUBLE, pred BOOLEAN,
    proxy DOUBLE

Ground-truth quantities the evaluation scores against (per-segment
means, predicate positivity rates, proxy correlation) are computed here
with DataFrame aggregations so the DuckDB oracle can verify them.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.datasets.streams import StreamData

__all__ = [
    "stream_to_pandas",
    "stream_to_spark",
    "segment_truth_df",
    "table2_stats_df",
]


def stream_to_pandas(stream: StreamData) -> pd.DataFrame:
    """Flatten a stream into the canonical record-per-row frame."""
    idx = range(stream.n_records)
    return pd.DataFrame(
        {
            "record_idx": pd.array(idx, dtype="int64"),
            "segment": pd.array(
                [i // stream.seg_len for i in idx], dtype="int32"
            ),
            "statistic": stream.statistic,
            "pred": stream.pred,
            "proxy": stream.proxy,
        }
    )


def stream_to_spark(spark: SparkSession, stream: StreamData) -> DataFrame:
    """Create the canonical stream DataFrame (Arrow-accelerated)."""
    return spark.createDataFrame(stream_to_pandas(stream))


def segment_truth_df(stream_df: DataFrame, *, predicate: bool) -> DataFrame:
    """Per-segment ground truth ``mu_t`` via Spark SQL.

    Predicate mode averages the statistic over predicate-matching records
    (``avg(CASE WHEN pred ...)``); no-predicate mode over all records.
    Matches ``repro.datasets.streams.segment_truths``.
    """
    value = (
        F.avg(F.when(F.col("pred"), F.col("statistic")))
        if predicate
        else F.avg("statistic")
    )
    return (
        stream_df.groupBy("segment")
        .agg(F.coalesce(value, F.lit(0.0)).alias("truth"))
        .orderBy("segment")
    )


def table2_stats_df(stream_df: DataFrame, name: str) -> DataFrame:
    """One Table 2 row: dataset name, positivity rate p, proxy Pearson r.

    ``r`` is the correlation between the proxy and the predicate-masked
    ground-truth statistic, the quantity the generators calibrate.
    """
    masked = F.when(F.col("pred"), F.col("statistic")).otherwise(F.lit(0.0))
    return stream_df.agg(
        F.lit(name).alias("dataset"),
        F.avg(F.col("pred").cast("double")).alias("p"),
        F.corr(F.col("proxy"), masked).alias("r"),
    )
