"""T4 bench: HD-like compression; -G should beat +GA (paper Fig. 16)."""
import pytest

from repro.core.ingest import ingest_local
from repro.experiments import build_variant_metas, segments_bytes

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.parametrize("variant", ["MDB+-G", "MDB+GA"])
def test_compress_hd(benchmark, hd_bench, variant):
    meta, _ = build_variant_metas(hd_bench)[variant]
    segs = benchmark.pedantic(
        lambda: ingest_local(hd_bench.points, meta, 1.0), **ROUNDS)
    benchmark.extra_info["bytes"] = segments_bytes(segs)


def test_no_grouping_wins_on_hd(hd_bench):
    metas = build_variant_metas(hd_bench)
    nog = segments_bytes(ingest_local(hd_bench.points, metas["MDB+-G"][0], 1.0))
    ga = segments_bytes(ingest_local(hd_bench.points, metas["MDB+GA"][0], 1.0))
    assert nog < ga
