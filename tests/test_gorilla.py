"""Unit tests for the Gorilla bit codec (core/gorilla.py)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import gorilla


def roundtrip(vals):
    arr = np.asarray(vals, dtype=np.float32)
    out = gorilla.decode(gorilla.encode(arr), len(arr))
    np.testing.assert_array_equal(arr, out)


class TestBitIO:
    def test_write_read_single_bits(self):
        w = gorilla.BitWriter()
        pattern = [1, 0, 1, 1, 0, 0, 1, 0, 1, 1, 1]
        for b in pattern:
            w.write(b, 1)
        r = gorilla.BitReader(w.getvalue())
        assert [r.read(1) for _ in pattern] == pattern

    def test_write_read_multibit(self):
        w = gorilla.BitWriter()
        w.write(0b101, 3)
        w.write(0xDEADBEEF, 32)
        w.write(0x1F, 5)
        r = gorilla.BitReader(w.getvalue())
        assert r.read(3) == 0b101
        assert r.read(32) == 0xDEADBEEF
        assert r.read(5) == 0x1F

    def test_bit_length_tracks_written_bits(self):
        w = gorilla.BitWriter()
        w.write(1, 1)
        w.write(0, 7)
        w.write(0xFF, 9)
        assert w.bit_length() == 17

    def test_value_masked_to_width(self):
        w = gorilla.BitWriter()
        w.write(0xFFFF, 4)  # only low 4 bits kept
        r = gorilla.BitReader(w.getvalue())
        assert r.read(4) == 0xF


class TestGorillaRoundtrip:
    def test_empty(self):
        assert gorilla.encode(np.array([], dtype=np.float32)) == b""
        assert len(gorilla.decode(b"", 0)) == 0

    def test_single_value(self):
        roundtrip([3.25])

    def test_constant_run(self):
        roundtrip([7.5] * 100)

    def test_linear(self):
        roundtrip(np.linspace(0, 1, 64))

    def test_random_walk(self):
        g = np.random.default_rng(0)
        roundtrip(np.cumsum(g.normal(0, 0.1, 500)))

    def test_special_values(self):
        roundtrip([0.0, -0.0, np.inf, -np.inf, 1e-38, -1e38, 3.14])

    def test_nan_bitpattern_roundtrip(self):
        arr = np.array([1.0, np.nan, 2.0], dtype=np.float32)
        out = gorilla.decode(gorilla.encode(arr), 3)
        assert np.isnan(out[1]) and out[0] == 1.0 and out[2] == 2.0

    @settings(max_examples=50, deadline=None)
    @given(st.lists(st.floats(width=32, allow_nan=False), min_size=1, max_size=200))
    def test_property_roundtrip(self, vals):
        roundtrip(vals)


class TestGorillaCompression:
    def test_constant_compresses_to_one_bit_per_value(self):
        arr = np.full(1000, 42.5, dtype=np.float32)
        n_bits = gorilla.encoded_size_bits(arr)
        assert n_bits == 32 + 999  # first value + 1 bit each

    def test_size_estimate_matches_encoder(self):
        g = np.random.default_rng(1)
        arr = np.cumsum(g.normal(0, 1, 300)).astype(np.float32)
        est = gorilla.encoded_size_bits(arr)
        real = len(gorilla.encode(arr)) * 8
        assert real - 8 < est <= real  # encode pads to a whole byte

    def test_correlated_group_block_smaller_than_random(self):
        """The paper's §V layout: interleaved correlated series XOR small."""
        g = np.random.default_rng(2)
        base = np.cumsum(g.normal(0, 0.01, 200)).astype(np.float32)
        group = np.stack([base, base, base], axis=1).ravel()  # time-major
        rand = g.normal(0, 1, 600).astype(np.float32)
        assert gorilla.encoded_size_bits(group) < gorilla.encoded_size_bits(rand)
