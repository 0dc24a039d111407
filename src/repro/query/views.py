"""The Segment View and Data Point View (paper §VI-A).

* **Segment View** ``(Tid, StartTime, EndTime, SI, Mid, Parameters,
  Gaps, <Dimensions>)`` — one row per (segment, member Tid); model-based
  UDAF-style aggregates run here (``aggregates.py``, ``time_agg.py``).
* **Data Point View** ``(Tid, TS, Value, <Dimensions>)`` — models are
  evaluated back into data points with ``mapInPandas``; arbitrary Spark
  SQL works on top, so every query remains answerable within ε.

Both views map Tids to Gids through the Time Series table and push Gid
and time predicates into the ``modelardb`` scan (``rewrite.py``).
"""
from __future__ import annotations

from typing import Iterator, Optional, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..storage import datasource, segment_store
from .decode import series_values

_META_CORE = ("tid", "gid", "bitpos", "scaling", "si")


def load_tsmeta(spark: SparkSession, store_path: str,
                with_dims: bool = True) -> DataFrame:
    """Time Series table with per-group size (needed to unpack models)."""
    pdf = segment_store.read_tsmeta(store_path)
    pdf = pdf.merge(pdf.groupby("gid").size().rename("group_size"),
                    left_on="gid", right_index=True)
    if not with_dims:
        pdf = pdf[list(_META_CORE) + ["group_size"]]
    return spark.createDataFrame(pdf.drop(columns=["source"],
                                          errors="ignore"))


def segment_scan(spark: SparkSession, store_path: str,
                 gids: Optional[Sequence[int]] = None,
                 min_end_time: Optional[int] = None,
                 max_start_time: Optional[int] = None) -> DataFrame:
    """Raw segment rows through the DataSourceV2 with push-down."""
    datasource.register(spark)
    r = spark.read.format("modelardb").option("path", store_path)
    if gids is not None:
        r = r.option("gids", ",".join(str(g) for g in sorted(set(gids))))
    if min_end_time is not None:
        r = r.option("min_end_time", str(min_end_time))
    if max_start_time is not None:
        r = r.option("max_start_time", str(max_start_time))
    return r.load()


def segment_view(spark: SparkSession, store_path: str,
                 gids: Optional[Sequence[int]] = None,
                 min_end_time: Optional[int] = None,
                 max_start_time: Optional[int] = None,
                 tids: Optional[Sequence[int]] = None) -> DataFrame:
    """Per-Tid Segment View: segments joined with the Time Series table.

    A Tid participates in a segment only when its gap bit is unset
    (§III-B); Gids-are-pushed / Tids-are-queried per §VI-B.
    """
    segs = segment_scan(spark, store_path, gids, min_end_time,
                        max_start_time)
    # The scan already carries SI per segment; drop the metadata copy to
    # avoid an ambiguous reference after the join.
    meta = load_tsmeta(spark, store_path).drop("si")
    if gids is not None:
        meta = meta.filter(F.col("gid").isin([int(g) for g in gids]))
    if tids is not None:
        meta = meta.filter(F.col("tid").isin([int(t) for t in tids]))
    view = segs.join(F.broadcast(meta), "gid")
    return view.filter(F.expr("(shiftright(gaps, bitpos) & 1) = 0"))


def data_point_view(spark: SparkSession, store_path: str,
                    gids: Optional[Sequence[int]] = None,
                    min_end_time: Optional[int] = None,
                    max_start_time: Optional[int] = None,
                    tids: Optional[Sequence[int]] = None,
                    with_dims: bool = False) -> DataFrame:
    """Reconstruct data points from models (within ε) as a DataFrame."""
    view = segment_view(spark, store_path, gids, min_end_time,
                        max_start_time, tids)
    cols = ["tid", "start_time", "end_time", "si", "size", "mid", "params",
            "gaps", "bitpos", "scaling", "group_size"]

    def expand(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            frames = []
            for row in pdf.itertuples(index=False):
                vals = series_values(row.mid, row.params, row.start_time,
                                     row.end_time, row.si, row.size,
                                     row.gaps, row.bitpos, row.group_size)
                frames.append(pd.DataFrame({
                    "tid": np.int32(row.tid),
                    "ts": row.start_time + row.si * np.arange(
                        row.size, dtype=np.int64),
                    "value": (vals.astype(np.float64)
                              * row.scaling).astype(np.float32),
                }))
            yield (pd.concat(frames, ignore_index=True) if frames
                   else pd.DataFrame({"tid": pd.Series(dtype="int32"),
                                      "ts": pd.Series(dtype="int64"),
                                      "value": pd.Series(dtype="float32")}))

    points = view.select(*cols).mapInPandas(
        expand, "tid int, ts long, value float")
    if with_dims:
        meta = load_tsmeta(spark, store_path)
        dim_cols = [c for c in meta.columns
                    if c not in _META_CORE + ("group_size",)]
        points = points.join(
            F.broadcast(meta.select("tid", *dim_cols)), "tid")
    return points
