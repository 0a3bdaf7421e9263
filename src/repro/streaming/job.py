"""Run InQuest as a Structured Streaming query over a file-source stream.

The repro-band guidance for this paper maps segments to micro-batches:
the proxy is scored on every record of the batch, the oracle columns are
read only at the sampled indices, and the running query estimate is
emitted after each batch.  :func:`write_segment_files` materialises a
stream as one parquet file per segment with strictly increasing mtimes
(Spark's file source orders batches by modification time), and
:func:`run_streaming_inquest` executes the query with
``maxFilesPerTrigger = 1`` + ``Trigger.AvailableNow`` so each micro-batch
is exactly one segment, in order.
"""
from __future__ import annotations

import os
import time
from pathlib import Path

import pyarrow as pa
import pyarrow.parquet as pq
from pyspark.sql import SparkSession
from pyspark.sql.types import (
    BooleanType,
    DoubleType,
    IntegerType,
    LongType,
    StructField,
    StructType,
)

from repro.core.inquest import InQuestConfig, InQuestState
from repro.datasets.streams import StreamData
from repro.sparkops.stream_df import stream_to_pandas

__all__ = ["STREAM_SCHEMA", "write_segment_files", "run_streaming_inquest"]

STREAM_SCHEMA = StructType(
    [
        StructField("record_idx", LongType()),
        StructField("segment", IntegerType()),
        StructField("statistic", DoubleType()),
        StructField("pred", BooleanType()),
        StructField("proxy", DoubleType()),
    ]
)


def write_segment_files(stream: StreamData, directory: str | Path) -> list[Path]:
    """One parquet file per segment, mtimes forcing arrival order."""
    directory = Path(directory)
    directory.mkdir(parents=True, exist_ok=True)
    pdf = stream_to_pandas(stream)
    base = time.time() - stream.n_segments * 10
    paths = []
    for t in range(stream.n_segments):
        path = directory / f"segment-{t:05d}.parquet"
        pq.write_table(
            pa.Table.from_pandas(pdf[pdf["segment"] == t], preserve_index=False),
            path,
        )
        os.utime(path, (base + t * 10, base + t * 10))
        paths.append(path)
    return paths


def run_streaming_inquest(
    spark: SparkSession,
    source_dir: str | Path,
    *,
    config: InQuestConfig,
    seed: int = 0,
    timeout_s: float = 300.0,
) -> list[dict]:
    """Execute InQuest over the file stream; return per-batch results.

    Each returned dict is ``InQuestState.observe_segment``'s output plus
    the observed ``segment`` ids of the batch.  Raises if any micro-batch
    spans more than one segment (would mean file/trigger misconfiguration).
    """
    state = InQuestState(config, seed=seed)
    results: list[dict] = []

    def process_batch(batch_df, batch_id: int) -> None:
        pdf = batch_df.toPandas().sort_values("record_idx")
        if pdf.empty:
            return
        segments = pdf["segment"].unique()
        if len(segments) != 1:
            raise RuntimeError(
                f"micro-batch {batch_id} spans segments {sorted(segments)}; "
                "expected exactly one tumbling-window segment per batch"
            )
        out = state.observe_segment(
            pdf["statistic"].to_numpy(),
            pdf["pred"].to_numpy(),
            pdf["proxy"].to_numpy(),
        )
        out["source_segment"] = int(segments[0])
        results.append(out)

    query = (
        spark.readStream.schema(STREAM_SCHEMA)
        .option("maxFilesPerTrigger", 1)
        .parquet(str(source_dir))
        .writeStream.foreachBatch(process_batch)
        .trigger(availableNow=True)
        .option(
            "checkpointLocation",
            str(Path(source_dir) / "_checkpoint"),
        )
        .start()
    )
    query.awaitTermination(timeout_s)
    query.stop()
    return results
