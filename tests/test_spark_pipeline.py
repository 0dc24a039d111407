"""Integration tests: ingest → .mdb store → DataSourceV2 → views → aggregates.

Every result-correctness test goes through ``repro.oracle`` (DuckDB)
over the *original* generated points, so a broken model, a wrong gap
bitmask, or a bad pushdown shows up as a wrong result — not just "it
ran".  ε = 0 makes GOLEMM lossless (modulo float32, which the
generators already emit), so exact comparison is legitimate.
"""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import oracle
from repro.core.fallback import GorillaModel
from repro.core.ingest import ingest, ingest_local
from repro.datasets import ep_like
from repro.dims.grouping import group_time_series, singleton_groups
from repro.dims.primitives import Distance, clause
from repro.query.aggregates import simple_agg
from repro.query.rewrite import gids_for, rewrite_predicates
from repro.query.time_agg import cube_agg
from repro.query.views import data_point_view, segment_scan, segment_view
from repro.storage import segment_store
from repro.storage.segment_store import write_store


@pytest.fixture(scope="module")
def ds():
    return ep_like(n_entities=3, n_points=256, seed=21, gap_prob=0.3)


@pytest.fixture(scope="module")
def grouped_meta(ds):
    meta, _ = group_time_series(ds.meta, list(ds.dims),
                                [clause(Distance.auto(ds.dims))])
    return meta


@pytest.fixture(scope="module")
def store(ds, grouped_meta, tmp_path_factory):
    """Lossless (ε=0) store built through driver-side ingestion."""
    path = str(tmp_path_factory.mktemp("store_eps0"))
    segs = ingest_local(ds.points, grouped_meta, eps_pct=0.0)
    write_store(segs, grouped_meta, path, n_workers=4)
    return path


class TestSparkIngest:
    def test_spark_and_local_ingestion_agree(self, spark, ds, grouped_meta):
        seg_df = ingest(spark, ds.to_spark(spark), grouped_meta, eps_pct=0.0)
        via_spark = seg_df.groupBy().agg(
            F.count("*").alias("n"), F.sum("size").alias("points")).first()
        local = ingest_local(ds.points, grouped_meta, eps_pct=0.0)
        assert via_spark["n"] == len(local)
        assert via_spark["points"] == sum(s.size for s in local)

    def test_ingestion_covers_every_point(self, ds, grouped_meta):
        segs = ingest_local(ds.points, grouped_meta, eps_pct=0.0)
        per_series = sum(s.size * bin(~s.gaps & ((1 << 64) - 1)).count("1")
                         for s in segs)
        # Points per segment × present series must equal the raw count.
        sizes = grouped_meta.groupby("gid").size()
        total = 0
        for s in segs:
            n_present = int(sizes.loc[s.gid]) - bin(
                s.gaps & ((1 << int(sizes.loc[s.gid])) - 1)).count("1")
            total += s.size * n_present
        assert total == len(ds.points)


class TestStoreAndDataSource:
    def test_store_roundtrip(self, ds, grouped_meta, store):
        segs = list(segment_store.read_segments(store))
        assert len(segs) > 0
        assert segment_store.store_bytes(store) > 0

    def test_footer_pruning_by_gid(self, store, grouped_meta):
        gid = int(grouped_meta["gid"].iloc[0])
        all_files = segment_store.list_files(store)
        pruned = segment_store.list_files(store, gids=[gid])
        assert 1 <= len(pruned) <= len(all_files)

    def test_datasource_scan_matches_direct_read(self, spark, store):
        df = segment_scan(spark, store)
        direct = list(segment_store.read_segments(store))
        assert df.count() == len(direct)
        assert df.agg(F.sum("size")).first()[0] == sum(s.size for s in direct)

    def test_datasource_gid_pushdown(self, spark, store, grouped_meta):
        gid = int(grouped_meta["gid"].iloc[0])
        df = segment_scan(spark, store, gids=[gid])
        gids = {r["gid"] for r in df.select("gid").distinct().collect()}
        assert gids == {gid}

    def test_datasource_time_pushdown(self, spark, store, ds):
        mid_ts = int(ds.points["ts"].median())
        df = segment_scan(spark, store, min_end_time=mid_ts)
        assert df.agg(F.min("end_time")).first()[0] >= mid_ts

    def test_empty_store_scans_empty(self, spark, tmp_path, grouped_meta):
        path = str(tmp_path / "empty")
        write_store([], grouped_meta, path, n_workers=2)
        assert segment_scan(spark, path).count() == 0


class TestViews:
    def test_segment_view_excludes_gap_tids(self, spark, store, grouped_meta):
        view = segment_view(spark, store)
        bad = view.filter(
            F.expr("(shiftright(gaps, bitpos) & 1) != 0")).count()
        assert bad == 0

    def test_data_point_view_reconstructs_exactly_at_eps0(self, spark, store, ds):
        got = (data_point_view(spark, store).toPandas()
               .sort_values(["tid", "ts"]).reset_index(drop=True))
        want = (ds.points.sort_values(["tid", "ts"]).reset_index(drop=True))
        assert len(got) == len(want)
        assert (got["tid"].to_numpy() == want["tid"].to_numpy()).all()
        assert (got["ts"].to_numpy() == want["ts"].to_numpy()).all()
        np.testing.assert_allclose(got["value"], want["value"],
                                   rtol=1e-5, atol=1e-4)

    def test_data_point_view_oracle_aggregate(self, spark, store, ds):
        dpv = data_point_view(spark, store)
        res = dpv.groupBy("tid").agg(
            F.count("*").alias("c"),
            F.round(F.min("value"), 3).alias("mn"),
            F.round(F.max("value"), 3).alias("mx"))
        oracle.assert_equivalent(
            res,
            "SELECT tid, COUNT(*) AS c, ROUND(MIN(value), 3) AS mn, "
            "ROUND(MAX(value), 3) AS mx FROM pts GROUP BY tid",
            pts=ds.points)

    def test_data_point_view_supports_sql(self, spark, store, ds):
        dpv = data_point_view(spark, store, with_dims=True)
        dpv.createOrReplaceTempView("dp")
        res = spark.sql(
            "SELECT measure_category, COUNT(*) AS c FROM dp "
            "GROUP BY measure_category ORDER BY measure_category")
        pts = ds.points.merge(
            ds.meta[["tid", "measure_category"]], on="tid")
        oracle.assert_equivalent(
            res,
            "SELECT measure_category, COUNT(*) AS c FROM pts "
            "GROUP BY measure_category ORDER BY measure_category",
            pts=pts)


class TestSimpleAggregates:
    def test_count_min_max_vs_oracle(self, spark, store, ds):
        view = segment_view(spark, store)
        res = simple_agg(view, group_cols=("tid",),
                         aggs=("count", "min", "max"))
        res = res.select("tid", "count_s",
                         F.round("min_s", 3).alias("min_s"),
                         F.round("max_s", 3).alias("max_s"))
        oracle.assert_equivalent(
            res,
            "SELECT tid, COUNT(*) AS count_s, "
            "ROUND(MIN(value), 3) AS min_s, ROUND(MAX(value), 3) AS max_s "
            "FROM pts GROUP BY tid",
            pts=ds.points)

    def test_sum_avg_close_to_truth(self, spark, store, ds):
        view = segment_view(spark, store)
        got = simple_agg(view, group_cols=("tid",),
                         aggs=("sum", "avg")).toPandas().set_index("tid")
        want = ds.points.groupby("tid")["value"].agg(["sum", "mean"])
        for tid in want.index:
            assert got.loc[tid, "sum_s"] == pytest.approx(
                want.loc[tid, "sum"], rel=1e-5)
            assert got.loc[tid, "avg_s"] == pytest.approx(
                want.loc[tid, "mean"], rel=1e-5)

    def test_group_by_dimension(self, spark, store, ds):
        view = segment_view(spark, store)
        res = simple_agg(view, group_cols=("measure_category",),
                         aggs=("count",))
        pts = ds.points.merge(ds.meta[["tid", "measure_category"]], on="tid")
        oracle.assert_equivalent(
            res,
            "SELECT measure_category, COUNT(*) AS count_s FROM pts "
            "GROUP BY measure_category",
            pts=pts)

    def test_full_dataset_aggregate(self, spark, store, ds):
        view = segment_view(spark, store)
        got = simple_agg(view, group_cols=(), aggs=("count",)).first()
        assert got["count_s"] == len(ds.points)

    def test_lossy_aggregate_within_error_bound(self, spark, ds, grouped_meta,
                                                tmp_path):
        path = str(tmp_path / "lossy")
        segs = ingest_local(ds.points, grouped_meta, eps_pct=10.0)
        write_store(segs, grouped_meta, path)
        view = segment_view(spark, path)
        got = simple_agg(view, group_cols=("tid",),
                         aggs=("avg",)).toPandas().set_index("tid")
        want = ds.points.groupby("tid")["value"].mean()
        for tid in want.index:
            assert got.loc[tid, "avg_s"] == pytest.approx(
                want.loc[tid], rel=0.1)


class TestRewriting:
    def test_gids_for_tids(self, grouped_meta):
        tid = int(grouped_meta["tid"].iloc[0])
        gid = int(grouped_meta["gid"].iloc[0])
        assert gids_for(grouped_meta, tids=[tid]) == [gid]

    def test_gids_for_members(self, grouped_meta):
        gids = gids_for(grouped_meta,
                        members={"measure_category": "Weather"})
        want = set(grouped_meta.loc[
            grouped_meta["measure_category"] == "Weather", "gid"])
        assert set(gids) == want

    def test_rewrite_predicates_roundtrip(self, grouped_meta):
        gids, lo, hi = rewrite_predicates(grouped_meta, ts_min=5, ts_max=9)
        assert lo == 5 and hi == 9 and len(gids) > 0

    def test_pushed_query_equals_unpushed(self, spark, store, grouped_meta,
                                          ds):
        tids = grouped_meta["tid"].iloc[:2].astype(int).tolist()
        gids = gids_for(grouped_meta, tids=tids)
        pushed = simple_agg(
            segment_view(spark, store, gids=gids, tids=tids),
            group_cols=("tid",), aggs=("count",)).toPandas()
        truth = (ds.points[ds.points["tid"].isin(tids)]
                 .groupby("tid").size())
        got = pushed.set_index("tid")["count_s"]
        for tid in tids:
            assert got.loc[tid] == truth.loc[tid]


class TestTimeAggregates:
    def test_cube_count_sum_hour_vs_oracle(self, spark, store, ds):
        view = segment_view(spark, store)
        res = cube_agg(view, "hour", group_cols=("tid",),
                       aggs=("count", "sum"))
        res = res.select("tid", "bucket_start", "count_s",
                         F.round("sum_s", 2).alias("sum_s"))
        pts = ds.points.copy()
        pts["bucket_start"] = (pts["ts"] // 3_600_000) * 3_600_000
        oracle.assert_equivalent(
            res,
            "SELECT tid, bucket_start, COUNT(*) AS count_s, "
            "ROUND(SUM(value), 2) AS sum_s "
            "FROM pts GROUP BY tid, bucket_start",
            pts=pts)

    def test_cube_min_max_day(self, spark, store, ds):
        view = segment_view(spark, store)
        res = cube_agg(view, "day", group_cols=("tid",),
                       aggs=("min", "max"))
        res = res.select("tid", "bucket_start",
                         F.round("min_s", 3).alias("mn"),
                         F.round("max_s", 3).alias("mx"))
        pts = ds.points.copy()
        pts["bucket_start"] = (pts["ts"] // 86_400_000) * 86_400_000
        oracle.assert_equivalent(
            res,
            "SELECT tid, bucket_start, ROUND(MIN(value), 3) AS mn, "
            "ROUND(MAX(value), 3) AS mx FROM pts GROUP BY tid, bucket_start",
            pts=pts)

    def test_cube_month_group_by_dimension(self, spark, store, ds):
        view = segment_view(spark, store)
        res = cube_agg(view, "month", group_cols=("measure_category",),
                       aggs=("count",))
        pts = ds.points.merge(ds.meta[["tid", "measure_category"]], on="tid")
        months = (pd.to_datetime(pts["ts"], unit="ms")
                  .dt.to_period("M").dt.start_time)
        pts["bucket_start"] = months.astype(np.int64) // 1_000_000
        oracle.assert_equivalent(
            res,
            "SELECT measure_category, bucket_start, COUNT(*) AS count_s "
            "FROM pts GROUP BY measure_category, bucket_start",
            pts=pts)


class TestUngroupedStore:
    def test_singleton_pipeline(self, spark, ds, tmp_path):
        meta = singleton_groups(ds.meta)
        segs = ingest_local(ds.points, meta, eps_pct=0.0)
        path = str(tmp_path / "nogroup")
        write_store(segs, meta, path)
        got = simple_agg(segment_view(spark, path), group_cols=("tid",),
                         aggs=("count",)).toPandas()
        want = ds.points.groupby("tid").size()
        assert (got.set_index("tid")["count_s"].sort_index()
                == want.sort_index()).all()
