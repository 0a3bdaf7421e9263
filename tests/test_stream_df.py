"""Spark tests for repro.sparkops.stream_df, verified against DuckDB."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.datasets.streams import DATASET_NAMES, generate, segment_truths
from repro.oracle import assert_equivalent
from repro.sparkops.stream_df import (
    segment_truth_df,
    stream_to_pandas,
    stream_to_spark,
    table2_stats_df,
)

_N, _SEG = 20_000, 4_000


@pytest.fixture(scope="module")
def stream():
    return generate("archie", n_records=_N, seg_len=_SEG)


@pytest.fixture(scope="module")
def stream_df(spark, stream):
    return stream_to_spark(spark, stream).cache()


class TestStreamToSpark:
    def test_schema(self, stream_df):
        assert dict(stream_df.dtypes) == {
            "record_idx": "bigint",
            "segment": "int",
            "statistic": "double",
            "pred": "boolean",
            "proxy": "double",
        }

    def test_row_count(self, stream_df):
        assert stream_df.count() == _N

    def test_segment_assignment(self, stream_df):
        seg_sizes = (
            stream_df.groupBy("segment").count().orderBy("segment").toPandas()
        )
        assert list(seg_sizes["count"]) == [_SEG] * (_N // _SEG)

    def test_pandas_spark_roundtrip(self, stream, stream_df):
        back = stream_df.orderBy("record_idx").toPandas()
        assert np.allclose(back["statistic"].to_numpy(), stream.statistic)
        assert np.array_equal(back["pred"].to_numpy(), stream.pred)


class TestSegmentTruthDf:
    @pytest.mark.parametrize("predicate", [True, False])
    def test_matches_numpy(self, stream, stream_df, predicate):
        got = segment_truth_df(stream_df, predicate=predicate).toPandas()
        expected = segment_truths(stream, predicate=predicate)
        assert np.allclose(got["truth"].to_numpy(), expected)

    def test_against_duckdb_predicate(self, stream, stream_df):
        assert_equivalent(
            segment_truth_df(stream_df, predicate=True),
            """
            SELECT segment,
                   coalesce(avg(CASE WHEN pred THEN statistic END), 0.0) AS truth
            FROM stream GROUP BY segment ORDER BY segment
            """,
            stream=stream_to_pandas(stream),
        )

    def test_against_duckdb_no_predicate(self, stream, stream_df):
        assert_equivalent(
            segment_truth_df(stream_df, predicate=False),
            "SELECT segment, avg(statistic) AS truth FROM stream "
            "GROUP BY segment ORDER BY segment",
            stream=stream_to_pandas(stream),
        )


class TestTable2StatsDf:
    def test_against_duckdb(self, stream, stream_df):
        assert_equivalent(
            table2_stats_df(stream_df, "archie"),
            """
            SELECT 'archie' AS dataset,
                   avg(CAST(pred AS DOUBLE)) AS p,
                   corr(proxy, CASE WHEN pred THEN statistic ELSE 0.0 END) AS r
            FROM stream
            """,
            stream=stream_to_pandas(stream),
        )

    def test_matches_numpy_correlation(self, stream, stream_df):
        row = table2_stats_df(stream_df, "archie").collect()[0]
        r_np = np.corrcoef(stream.proxy, stream.statistic * stream.pred)[0, 1]
        assert abs(row["r"] - r_np) < 1e-9
        assert abs(row["p"] - stream.pred.mean()) < 1e-9

    @pytest.mark.parametrize("name", DATASET_NAMES[:3])
    def test_multiple_datasets(self, spark, name):
        s = generate(name, n_records=5_000, seg_len=1_000)
        row = table2_stats_df(stream_to_spark(spark, s), name).collect()[0]
        assert row["dataset"] == name and 0 <= row["p"] <= 1


class TestProvidedTpchGenerators:
    """Exercise the provided synth_data + oracle scaffolding end-to-end."""

    def test_lineitem_aggregate_vs_duckdb(self, spark):
        from repro import synth_data

        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count(F.lit(1)).alias("cnt"),
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS cnt "
            "FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )

    def test_orders_join_vs_duckdb(self, spark):
        from repro import synth_data

        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.avg("l_extendedprice").alias("avg_price"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, avg(l_extendedprice) AS avg_price "
            "FROM lineitem JOIN orders ON l_orderkey = o_orderkey "
            "GROUP BY o_orderpriority",
            lineitem=li,
            orders=o,
        )
