"""T9 bench: point/range extraction per system (InfluxDB-sim's strength)."""
from pyspark.sql import functions as F

from repro.baselines import cassandra_sim, formats, influx_sim
from repro.query.rewrite import gids_for
from repro.query.views import data_point_view

ROUNDS = dict(rounds=3, iterations=1, warmup_rounds=1)


def _window(ctx):
    pts = ctx.ds.points
    tid = int(ctx.ds.meta["tid"].iloc[0])
    lo = int(pts["ts"].quantile(0.45))
    hi = int(pts["ts"].quantile(0.47))
    return tid, lo, hi


def test_pr_mdbplus(benchmark, ep_ctx):
    tid, lo, hi = _window(ep_ctx)
    gids = gids_for(ep_ctx.metas["MDB+-G"], tids=[tid])
    benchmark.pedantic(
        lambda: data_point_view(ep_ctx.spark, ep_ctx.stores["MDB+-G"],
                                gids=gids, tids=[tid], min_end_time=lo,
                                max_start_time=hi)
        .filter((F.col("ts") >= lo) & (F.col("ts") <= hi)).collect(),
        **ROUNDS)


def test_pr_parquet(benchmark, ep_ctx):
    tid, lo, hi = _window(ep_ctx)
    benchmark.pedantic(
        lambda: formats.pr_query(ep_ctx.spark, ep_ctx.pq, "parquet",
                                 tid, lo, hi).collect(), **ROUNDS)


def test_pr_cassandra(benchmark, ep_ctx):
    tid, lo, hi = _window(ep_ctx)
    benchmark.pedantic(
        lambda: cassandra_sim.pr_query(ep_ctx.cas, tid, lo, hi), **ROUNDS)


def test_pr_influx(benchmark, ep_ctx):
    tid, lo, hi = _window(ep_ctx)
    benchmark.pedantic(
        lambda: influx_sim.pr_query(ep_ctx.inf, tid, lo, hi), **ROUNDS)
