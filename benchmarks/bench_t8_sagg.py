"""T8 bench: small aggregates (1 series / 5 series) per system."""
import pytest

from repro.baselines import formats, influx_sim
from repro.query.aggregates import simple_agg

ROUNDS = dict(rounds=3, iterations=1, warmup_rounds=1)


def _tids(ctx, n):
    return ctx.ds.meta["tid"].iloc[:n].astype(int).tolist()


@pytest.mark.parametrize("n", [1, 5])
def test_s_agg_segment_view(benchmark, ep_ctx, n):
    view = ep_ctx.seg_view("MDB+-G", tids=_tids(ep_ctx, n))
    benchmark.pedantic(
        lambda: simple_agg(view, group_cols=("tid",),
                           aggs=("sum", "avg")).collect(), **ROUNDS)


@pytest.mark.parametrize("n", [1, 5])
def test_s_agg_parquet(benchmark, ep_ctx, n):
    benchmark.pedantic(
        lambda: formats.agg_query(ep_ctx.spark, ep_ctx.pq, "parquet",
                                  tids=_tids(ep_ctx, n),
                                  aggs=("sum", "avg")).collect(), **ROUNDS)


def test_s_agg_influx(benchmark, ep_ctx):
    tid = _tids(ep_ctx, 1)[0]
    benchmark.pedantic(
        lambda: influx_sim.pr_query(ep_ctx.inf, tid, 0, 2**62)["value"]
        .agg(["sum", "mean"]), **ROUNDS)
