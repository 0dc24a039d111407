"""Per-Tid model decoding shared by the query layer (paper §VI).

A Segment View row pairs one segment with one Tid of its group.  For
lossy models (PMC-Mean/PMC-MR: constant; Swing: linear) aggregates are
computed in *constant time* from the parameters.  Lossless models
(Gorilla, Raw) are decoded — only when actually used by a query
(Table I: "Only decompress segments when used for query processing"),
and only the requested Tid's column is extracted.
"""
from __future__ import annotations

import struct
from typing import Optional, Tuple

import numpy as np

from ..core.model_types import (MID_FALLBACK, MID_GORILLA, MID_PMC_MEAN,
                                MID_PMC_MR, MID_SWING, by_mid)

CONSTANT_MIDS = (MID_PMC_MEAN, MID_PMC_MR)


def present_count(gaps: int, group_size: int) -> int:
    """Series stored in a segment = group size − set gap bits."""
    return group_size - bin(gaps & ((1 << group_size) - 1)).count("1")


def column_rank(gaps: int, bitpos: int) -> int:
    """Column index of a Tid inside the segment's packed value matrix:
    the rank of its bit position among unset gap bits."""
    mask = (1 << bitpos) - 1
    return bitpos - bin(gaps & mask).count("1")


def series_values(mid: int, params: bytes, start: int, end: int, si: int,
                  size: int, gaps: int, bitpos: int, group_size: int
                  ) -> np.ndarray:
    """Scaled-domain values of one Tid across a segment (float32)."""
    if mid in CONSTANT_MIDS:
        (c,) = struct.unpack("<f", params)
        return np.full(size, c, dtype=np.float32)
    if mid == MID_SWING:
        v_s, v_e = struct.unpack("<ff", params)
        if size == 1:
            return np.array([v_s], dtype=np.float32)
        slope = (v_e - v_s) / float(end - start)
        return (v_s + slope * (si * np.arange(size, dtype=np.float64))
                ).astype(np.float32)
    n_present = present_count(gaps, group_size)
    ts = start + si * np.arange(size, dtype=np.int64)
    V = by_mid(mid).reconstruct(params, ts, n_present)
    return V[:, column_rank(gaps, bitpos)]


def series_partials(mid: int, params: bytes, start: int, end: int, si: int,
                    size: int, gaps: int, bitpos: int, group_size: int,
                    scaling: float) -> Tuple[int, float, float, float]:
    """(count, sum, min, max) of one Tid over a segment, in the stored
    (unscaled-by-C) query domain.  Constant time for PMC/Swing."""
    if mid in CONSTANT_MIDS:
        (c,) = struct.unpack("<f", params)
        v = c * scaling
        return size, v * size, v, v
    if mid == MID_SWING:
        v_s, v_e = struct.unpack("<ff", params)
        a, b = v_s * scaling, v_e * scaling
        return size, (a + b) / 2.0 * size, min(a, b), max(a, b)
    vals = series_values(mid, params, start, end, si, size, gaps, bitpos,
                         group_size).astype(np.float64) * scaling
    return size, float(vals.sum()), float(vals.min()), float(vals.max())
