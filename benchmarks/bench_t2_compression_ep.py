"""T2 bench: EP-like compression per variant/ε; asserts the storage shape."""
import pytest

from repro.core.ingest import ingest_local
from repro.experiments import build_variant_metas, segments_bytes

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.parametrize("eps", [0.0, 10.0])
@pytest.mark.parametrize("variant", ["MDB+-G", "MDB+GB"])
def test_compress_ep(benchmark, ep_bench, variant, eps):
    meta, _ = build_variant_metas(ep_bench)[variant]
    segs = benchmark.pedantic(
        lambda: ingest_local(ep_bench.points, meta, eps), **ROUNDS)
    benchmark.extra_info["bytes"] = segments_bytes(segs)


def test_grouping_beats_no_grouping_at_eps10(ep_bench):
    metas = build_variant_metas(ep_bench)
    nog = segments_bytes(ingest_local(ep_bench.points, metas["MDB+-G"][0], 10.0))
    grp = segments_bytes(ingest_local(ep_bench.points, metas["MDB+GB"][0], 10.0))
    assert grp < nog
