"""T6 bench: Algorithm 1 grouping cost + distance-sweep storage shape."""
from repro.core.ingest import ingest_local
from repro.dims.dimensions import auto_distance
from repro.dims.grouping import group_time_series
from repro.dims.primitives import Distance, clause
from repro.experiments import distance_table

ROUNDS = dict(rounds=3, iterations=1, warmup_rounds=0)


def test_algorithm1_grouping_time(benchmark, ep_bench):
    benchmark.pedantic(
        lambda: group_time_series(
            ep_bench.meta, list(ep_bench.dims),
            [clause(Distance.auto(ep_bench.dims,
                                  weights={"Production": 0.5}))]),
        **ROUNDS)


def test_lowest_distance_reduces_storage(ep_bench):
    t = distance_table(ep_bench,
                       distances=(0.0, auto_distance(ep_bench.dims)),
                       weights={"Production": 0.5})
    assert t["bytes"].iloc[1] < t["bytes"].iloc[0]
