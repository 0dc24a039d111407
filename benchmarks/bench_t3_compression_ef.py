"""T3 bench: EF-like compression; grouping gain is largest here (paper 113×)."""
import pytest

from repro.core.ingest import ingest_local
from repro.experiments import build_variant_metas, segments_bytes

ROUNDS = dict(rounds=2, iterations=1, warmup_rounds=0)


@pytest.mark.parametrize("variant", ["MDB+-G", "MDB+GB", "MDB+GA"])
def test_compress_ef(benchmark, ef_bench, variant):
    meta, _ = build_variant_metas(ef_bench)[variant]
    segs = benchmark.pedantic(
        lambda: ingest_local(ef_bench.points, meta, 10.0), **ROUNDS)
    benchmark.extra_info["bytes"] = segments_bytes(segs)


def test_gb_beats_ga_beats_nogroup(ef_bench):
    metas = build_variant_metas(ef_bench)
    size = {v: segments_bytes(ingest_local(ef_bench.points, m, 10.0))
            for v, (m, _) in metas.items()}
    assert size["MDB+GB"] <= size["MDB+GA"] < size["MDB+-G"]
