"""Spark ingestion: GOLEMM as a DataFrame → DataFrame physical operator.

ModelarDB+ assigns whole groups to workers so each group is compressed
by one node (§IV-A).  The Spark-native equivalent is
``points.groupBy("gid").applyInPandas(compress, SEGMENT_SCHEMA)``: each
group's data points arrive at exactly one task, are pivoted to the
(timestamps × series) buffer GOLEMM expects (missing rows become gaps),
compressed, and emitted as segment rows.  No shuffle is needed at query
time for per-group work, matching the paper's architecture.

A JVM physical operator is out of scope in this container (no Scala
toolchain); ``applyInPandas`` preserves the execution structure
(group-local, vectorised, parallel across groups) — see DESIGN.md §4.
"""
from __future__ import annotations

import time
from typing import Dict, Optional, Sequence, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .golemm import (DEFAULT_LENGTH_BOUND, DEFAULT_MODEL_TYPES,
                     DEFAULT_SPLIT_FRACTION, CompressStats, compress_group)
from .segment import Segment

SEGMENT_SCHEMA = ("gid int, start_time long, end_time long, si int, "
                  "size int, mid int, gaps long, params binary")


def _group_info(meta: pd.DataFrame) -> Dict[int, dict]:
    """Per-gid ingestion context captured into the compress closure."""
    info: Dict[int, dict] = {}
    for gid, rows in meta.groupby("gid"):
        rows = rows.sort_values("tid")
        info[int(gid)] = {
            "tids": rows["tid"].astype(int).tolist(),
            "scalings": rows["scaling"].astype(float).to_numpy(),
            "si": int(rows["si"].iloc[0]),
        }
    return info


def pivot_group(pdf: pd.DataFrame, tids: Sequence[int], si: int
                ) -> Tuple[np.ndarray, np.ndarray]:
    """Long (tid, ts, value) → regular (timestamps, value-matrix).

    The time axis spans min..max observed timestamp at SI spacing;
    missing (tid, ts) combinations become NaN — the paper's ⊥ values of
    a regular time series with gaps (§II).
    """
    t_lo, t_hi = int(pdf["ts"].min()), int(pdf["ts"].max())
    ts = np.arange(t_lo, t_hi + si, si, dtype=np.int64)
    n_t = len(ts)
    V = np.full((n_t, len(tids)), np.nan, dtype=np.float32)
    col = {t: j for j, t in enumerate(tids)}
    rows = ((pdf["ts"].to_numpy(np.int64) - t_lo) // si).astype(np.int64)
    cols = pdf["tid"].map(col).to_numpy(np.int64)
    V[rows, cols] = pdf["value"].to_numpy(np.float32)
    return ts, V


def make_compressor(meta: pd.DataFrame, eps_pct: float,
                    model_types=DEFAULT_MODEL_TYPES,
                    length_bound: int = DEFAULT_LENGTH_BOUND,
                    split_fraction: int = DEFAULT_SPLIT_FRACTION,
                    dynamic_split: bool = True):
    """Build the applyInPandas UDF compressing one group per call."""
    info = _group_info(meta)

    def compress(pdf: pd.DataFrame) -> pd.DataFrame:
        gid = int(pdf["gid"].iloc[0])
        g = info[gid]
        ts, V = pivot_group(pdf, g["tids"], g["si"])
        V = V / g["scalings"][None, :].astype(np.float32)
        segs = compress_group(ts, V, eps_pct, gid=gid, si=g["si"],
                              model_types=model_types,
                              length_bound=length_bound,
                              split_fraction=split_fraction,
                              dynamic_split=dynamic_split)
        return pd.DataFrame({
            "gid": np.int32(gid),
            "start_time": [s.start_time for s in segs],
            "end_time": [s.end_time for s in segs],
            "si": np.int32(g["si"]),
            "size": [s.size for s in segs],
            "mid": [s.mid for s in segs],
            "gaps": np.array([s.gaps for s in segs], dtype=np.int64),
            "params": [s.params for s in segs],
        })

    return compress


def ingest(spark: SparkSession, points: DataFrame, meta: pd.DataFrame,
           eps_pct: float, *, model_types=DEFAULT_MODEL_TYPES,
           length_bound: int = DEFAULT_LENGTH_BOUND,
           split_fraction: int = DEFAULT_SPLIT_FRACTION,
           dynamic_split: bool = True) -> DataFrame:
    """Compress a long-format points DataFrame into segment rows.

    ``meta`` must carry ``gid`` assignments from the grouping layer
    (``dims/grouping.py``); the tiny tid→gid map is broadcast-joined
    onto the points so each group lands in one task.
    """
    tid_gid = spark.createDataFrame(meta[["tid", "gid"]])
    with_gid = points.join(F.broadcast(tid_gid), "tid")
    compress = make_compressor(meta, eps_pct, model_types, length_bound,
                               split_fraction, dynamic_split)
    return with_gid.groupBy("gid").applyInPandas(compress, SEGMENT_SCHEMA)


def ingest_local(points: pd.DataFrame, meta: pd.DataFrame, eps_pct: float,
                 *, model_types=DEFAULT_MODEL_TYPES,
                 length_bound: int = DEFAULT_LENGTH_BOUND,
                 split_fraction: int = DEFAULT_SPLIT_FRACTION,
                 dynamic_split: bool = True,
                 stats: Optional[CompressStats] = None) -> list[Segment]:
    """Driver-side ingestion of a pandas points frame (used by the
    instrumented compression experiments, where per-group CompressStats
    must be aggregated — applyInPandas cannot return side channels)."""
    info = _group_info(meta)
    out: list[Segment] = []
    for gid, pdf in points.groupby(points["tid"].map(
            meta.set_index("tid")["gid"])):
        g = info[int(gid)]
        ts, V = pivot_group(pdf, g["tids"], g["si"])
        V = V / g["scalings"][None, :].astype(np.float32)
        out.extend(compress_group(ts, V, eps_pct, gid=int(gid), si=g["si"],
                                  model_types=model_types,
                                  length_bound=length_bound,
                                  split_fraction=split_fraction,
                                  dynamic_split=dynamic_split, stats=stats))
    return out
