"""T7 bench: L-AGG on Segment View vs Data Point View vs Parquet."""
from pyspark.sql import functions as F

from repro.baselines import formats
from repro.query.aggregates import simple_agg
from repro.query.views import data_point_view

ROUNDS = dict(rounds=3, iterations=1, warmup_rounds=1)


def test_l_agg_segment_view(benchmark, ep_ctx):
    view = ep_ctx.seg_view("MDB+GB")
    benchmark.pedantic(
        lambda: simple_agg(view, group_cols=("tid",),
                           aggs=("sum", "avg")).collect(), **ROUNDS)


def test_l_agg_data_point_view(benchmark, ep_ctx):
    dpv = data_point_view(ep_ctx.spark, ep_ctx.stores["MDB+GB"])
    benchmark.pedantic(
        lambda: dpv.groupBy("tid").agg(F.sum("value"),
                                       F.avg("value")).collect(), **ROUNDS)


def test_l_agg_parquet(benchmark, ep_ctx):
    benchmark.pedantic(
        lambda: formats.agg_query(ep_ctx.spark, ep_ctx.pq, "parquet",
                                  aggs=("sum", "avg")).collect(), **ROUNDS)
