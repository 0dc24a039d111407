"""Unit tests for per-Tid model decoding (query/decode.py)."""
import struct

import numpy as np
import pytest

from repro.core import gorilla
from repro.core.model_types import (MID_GORILLA, MID_PMC_MEAN, MID_SWING)
from repro.query.decode import (column_rank, present_count, series_partials,
                                series_values)


class TestBitmaskHelpers:
    def test_present_count_no_gaps(self):
        assert present_count(0, 5) == 5

    def test_present_count_with_gaps(self):
        assert present_count(0b101, 5) == 3

    def test_column_rank_no_gaps(self):
        assert [column_rank(0, i) for i in range(4)] == [0, 1, 2, 3]

    def test_column_rank_skips_gap_bits(self):
        # Series at bits 0 and 2 are absent; bit 1 → column 0, bit 3 → 1.
        gaps = 0b0101
        assert column_rank(gaps, 1) == 0
        assert column_rank(gaps, 3) == 1


class TestSeriesValues:
    def test_pmc_constant(self):
        p = struct.pack("<f", 4.5)
        out = series_values(MID_PMC_MEAN, p, 0, 400, 100, 5, 0, 0, 3)
        np.testing.assert_array_equal(out, np.full(5, 4.5, dtype=np.float32))

    def test_swing_linear(self):
        p = struct.pack("<ff", 0.0, 8.0)
        out = series_values(MID_SWING, p, 0, 800, 100, 9, 0, 0, 1)
        np.testing.assert_allclose(out, np.arange(9, dtype=np.float32),
                                   atol=1e-5)

    def test_swing_single_point(self):
        p = struct.pack("<ff", 3.0, 3.0)
        out = series_values(MID_SWING, p, 0, 0, 100, 1, 0, 0, 1)
        assert out[0] == pytest.approx(3.0)

    def test_gorilla_extracts_right_column(self):
        V = np.array([[1.0, 10.0], [2.0, 20.0], [3.0, 30.0]],
                     dtype=np.float32)
        params = gorilla.encode(V.ravel())
        col1 = series_values(MID_GORILLA, params, 0, 200, 100, 3, 0, 1, 2)
        np.testing.assert_array_equal(col1, V[:, 1])

    def test_gorilla_with_gap_bit(self):
        """Group of 3 where bit 1 is absent: matrix has 2 columns."""
        V = np.array([[1.0, 5.0], [2.0, 6.0]], dtype=np.float32)
        params = gorilla.encode(V.ravel())
        out = series_values(MID_GORILLA, params, 0, 100, 100, 2,
                            gaps=0b010, bitpos=2, group_size=3)
        np.testing.assert_array_equal(out, V[:, 1])


class TestSeriesPartials:
    def test_pmc_partials_constant_time(self):
        p = struct.pack("<f", 2.0)
        cnt, s, lo, hi = series_partials(MID_PMC_MEAN, p, 0, 900, 100, 10,
                                         0, 0, 1, scaling=3.0)
        assert cnt == 10 and s == pytest.approx(60.0)
        assert lo == hi == pytest.approx(6.0)

    def test_swing_partials_negative_scaling_flips_minmax(self):
        p = struct.pack("<ff", 1.0, 5.0)
        cnt, s, lo, hi = series_partials(MID_SWING, p, 0, 400, 100, 5,
                                         0, 0, 1, scaling=-1.0)
        assert lo == pytest.approx(-5.0) and hi == pytest.approx(-1.0)
        assert s == pytest.approx(-15.0)

    def test_gorilla_partials_match_decode(self):
        vals = np.array([3.0, -1.0, 7.0], dtype=np.float32)
        params = gorilla.encode(vals)
        cnt, s, lo, hi = series_partials(MID_GORILLA, params, 0, 200, 100,
                                         3, 0, 0, 1, scaling=2.0)
        assert cnt == 3
        assert s == pytest.approx(18.0)
        assert lo == pytest.approx(-2.0) and hi == pytest.approx(14.0)
