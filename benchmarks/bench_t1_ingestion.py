"""T1 bench: GOLEMM bulk-load rate for each MDB+ variant vs baselines."""
import pytest

from repro.baselines import cassandra_sim, influx_sim
from repro.baselines.mdb import ingest_mdb
from repro.core.ingest import ingest_local
from repro.experiments import build_variant_metas

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.parametrize("variant", ["MDB+-G", "MDB+GB", "MDB+GA"])
def test_ingest_mdbplus(benchmark, ep_bench, variant):
    meta, _ = build_variant_metas(ep_bench)[variant]
    benchmark.pedantic(
        lambda: ingest_local(ep_bench.points, meta, 10.0), **ROUNDS)


def test_ingest_mdb_v1(benchmark, ep_bench):
    benchmark.pedantic(
        lambda: ingest_mdb(ep_bench.points, ep_bench.meta, 10.0), **ROUNDS)


def test_ingest_cassandra_sim(benchmark, ep_bench, tmp_path):
    benchmark.pedantic(
        lambda: cassandra_sim.write(ep_bench.points, str(tmp_path / "c")),
        **ROUNDS)


def test_ingest_influx_sim(benchmark, ep_bench, tmp_path):
    benchmark.pedantic(
        lambda: influx_sim.write(ep_bench.points, str(tmp_path / "i")),
        **ROUNDS)
