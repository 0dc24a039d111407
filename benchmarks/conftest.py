"""Benchmark fixtures: one data set + query context per bench session.

Benchmarks use SF≈0.1-class sizes (hundreds of series × thousands of
points) — big enough that segment-vs-point costs separate, small
enough to finish in CI.  The ``spark`` fixture comes from the repo-root
conftest.
"""
import pytest

from repro.datasets import ef_like, ep_like, hd_like


@pytest.fixture(scope="session")
def ep_bench():
    return ep_like(n_entities=16, n_points=1024, seed=1)


@pytest.fixture(scope="session")
def ef_bench():
    return ef_like(n_parks=3, n_turbines=3, n_points=2048, seed=2)


@pytest.fixture(scope="session")
def hd_bench():
    return hd_like(n_pairs=6, n_points=2048, seed=3)


@pytest.fixture(scope="session")
def ep_ctx(spark, ep_bench, tmp_path_factory):
    from repro.experiments import QueryContext

    return QueryContext(spark, ep_bench,
                        str(tmp_path_factory.mktemp("bench_ctx")))
