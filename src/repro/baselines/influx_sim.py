"""InfluxDB stand-in: a TSM-like per-series columnar store.

InfluxDB 1.x's TSM engine stores each series as blocks of
delta-of-delta-encoded timestamps plus XOR (Gorilla)-compressed values,
indexed by series and time range.  This simulator implements exactly
those encodings (DESIGN.md §2): per Tid, blocks of ≤ ``BLOCK_ROWS``
points with zig-zag varint delta-of-delta timestamps and the Gorilla
value codec from ``repro.core.gorilla``, plus a JSON index
(tid → [(ts_min, ts_max, offset, …)]).  It preserves InfluxDB's
evaluation profile: excellent point/range lookups and per-series
compression, but no model-based aggregates and no dynamically-sized
GROUP BY time intervals (the reason the paper excludes it from M-AGG).
"""
from __future__ import annotations

import json
import os
from typing import Dict, List, Optional, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core import gorilla

BLOCK_ROWS = 1024


def _zigzag(n: int) -> int:
    return (n << 1) ^ (n >> 63)


def _unzigzag(z: int) -> int:
    return (z >> 1) ^ -(z & 1)


def _varint(out: bytearray, n: int) -> None:
    while True:
        b = n & 0x7F
        n >>= 7
        if n:
            out.append(b | 0x80)
        else:
            out.append(b)
            return


def _read_varint(data: bytes, pos: int) -> Tuple[int, int]:
    shift = out = 0
    while True:
        b = data[pos]
        pos += 1
        out |= (b & 0x7F) << shift
        if not b & 0x80:
            return out, pos
        shift += 7


def _encode_timestamps(ts: np.ndarray) -> bytes:
    out = bytearray()
    _varint(out, _zigzag(int(ts[0])))
    prev_delta = 0
    prev = int(ts[0])
    for t in ts[1:].tolist():
        delta = t - prev
        _varint(out, _zigzag(delta - prev_delta))
        prev_delta = delta
        prev = t
    return bytes(out)


def _decode_timestamps(data: bytes, n: int) -> np.ndarray:
    out = np.empty(n, dtype=np.int64)
    z, pos = _read_varint(data, 0)
    out[0] = prev = _unzigzag(z)
    prev_delta = 0
    for i in range(1, n):
        z, pos = _read_varint(data, pos)
        prev_delta += _unzigzag(z)
        prev += prev_delta
        out[i] = prev
    return out


def write(points: pd.DataFrame, path: str) -> None:
    os.makedirs(path, exist_ok=True)
    index: Dict[str, List[dict]] = {}
    with open(os.path.join(path, "data.tsm"), "wb") as f:
        for tid, grp in points.sort_values(["tid", "ts"]).groupby("tid"):
            ts = grp["ts"].to_numpy(np.int64)
            vals = grp["value"].to_numpy(np.float32)
            blocks = []
            for start in range(0, len(ts), BLOCK_ROWS):
                end = min(start + BLOCK_ROWS, len(ts))
                tbytes = _encode_timestamps(ts[start:end])
                vbytes = gorilla.encode(vals[start:end])
                blocks.append({
                    "offset": f.tell(), "t_len": len(tbytes),
                    "v_len": len(vbytes), "rows": end - start,
                    "ts_min": int(ts[start]), "ts_max": int(ts[end - 1]),
                })
                f.write(tbytes)
                f.write(vbytes)
            index[str(int(tid))] = blocks
    with open(os.path.join(path, "index.json"), "w") as f:
        json.dump(index, f)


def store_bytes(path: str) -> int:
    return os.path.getsize(os.path.join(path, "data.tsm"))


def _read_block(f, entry) -> pd.DataFrame:
    f.seek(entry["offset"])
    tbytes = f.read(entry["t_len"])
    vbytes = f.read(entry["v_len"])
    return pd.DataFrame({
        "ts": _decode_timestamps(tbytes, entry["rows"]),
        "value": gorilla.decode(vbytes, entry["rows"]),
    })


def pr_query(path: str, tid: int, ts_min: int, ts_max: int) -> pd.DataFrame:
    """Index-directed point/range read — InfluxDB's strength."""
    with open(os.path.join(path, "index.json")) as f:
        index = json.load(f)
    frames = []
    with open(os.path.join(path, "data.tsm"), "rb") as f:
        for entry in index.get(str(int(tid)), []):
            if entry["ts_max"] < ts_min or entry["ts_min"] > ts_max:
                continue
            pdf = _read_block(f, entry)
            pdf = pdf[(pdf["ts"] >= ts_min) & (pdf["ts"] <= ts_max)]
            if len(pdf):
                pdf.insert(0, "tid", np.int32(tid))
                frames.append(pdf)
    if not frames:
        return pd.DataFrame({"tid": [], "ts": [], "value": []})
    return pd.concat(frames, ignore_index=True)


def read_all(spark: SparkSession, path: str) -> DataFrame:
    """Full scan for analytical queries (decodes every block)."""
    with open(os.path.join(path, "index.json")) as f:
        index = json.load(f)
    frames = []
    with open(os.path.join(path, "data.tsm"), "rb") as f:
        for tid, blocks in index.items():
            for entry in blocks:
                pdf = _read_block(f, entry)
                pdf.insert(0, "tid", np.int32(int(tid)))
                frames.append(pdf)
    return spark.createDataFrame(pd.concat(frames, ignore_index=True))
