"""T10 bench: multi-dimensional aggregates (month × dimension)."""
from pyspark.sql import functions as F

from repro.baselines import formats
from repro.query.time_agg import cube_agg

ROUNDS = dict(rounds=3, iterations=1, warmup_rounds=1)


def test_m_agg_segment_view(benchmark, ep_ctx):
    view = ep_ctx.seg_view("MDB+GB")
    benchmark.pedantic(
        lambda: cube_agg(view, "month", group_cols=("measure_category",),
                         aggs=("sum",)).collect(), **ROUNDS)


def test_m_agg_segment_view_by_tid(benchmark, ep_ctx):
    view = ep_ctx.seg_view("MDB+GB")
    benchmark.pedantic(
        lambda: cube_agg(view, "month",
                         group_cols=("measure_category", "tid"),
                         aggs=("sum",)).collect(), **ROUNDS)


def test_m_agg_parquet(benchmark, ep_ctx):
    df = formats.read_format(ep_ctx.spark, ep_ctx.pq, "parquet").withColumn(
        "bucket_start", F.date_trunc("month",
                                     F.timestamp_millis(F.col("ts"))))
    benchmark.pedantic(
        lambda: df.groupBy("measure_category", "bucket_start")
        .agg(F.sum("value")).collect(), **ROUNDS)
