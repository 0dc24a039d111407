"""Gorilla lossless floating-point compression (32-bit variant).

Implements the XOR-based value compression scheme from Pelkonen et al.,
"Gorilla: A Fast, Scalable, In-Memory Time Series Database" (PVLDB 2015),
adapted to 32-bit floats as used by ModelarDB+ (values are stored as
``float``).  For time series *groups* (paper §V) the values of a segment
are laid out in time-ordered blocks: ``v(t1,s1), v(t1,s2), ..., v(t2,s1),
...`` so both temporal correlation and correlation across the group's
series produce small XORs that encode in few bits.

Encoding per value:
  * first value: 32 raw bits;
  * XOR with previous value == 0: control bit ``0`` (1 bit total);
  * otherwise control bits ``10``: meaningful bits fit in the previous
    leading/meaningful-bit window — write only the meaningful bits;
  * control bits ``11``: new window — 5 bits leading-zero count, 5 bits
    (meaningful-bit count − 1), then the meaningful bits.
"""
from __future__ import annotations

import numpy as np

_MASK32 = 0xFFFFFFFF


class BitWriter:
    """Append-only MSB-first bit buffer."""

    __slots__ = ("_buf", "_acc", "_nbits")

    def __init__(self) -> None:
        self._buf = bytearray()
        self._acc = 0
        self._nbits = 0

    def write(self, value: int, nbits: int) -> None:
        """Append the low ``nbits`` bits of ``value``."""
        self._acc = (self._acc << nbits) | (value & ((1 << nbits) - 1))
        self._nbits += nbits
        while self._nbits >= 8:
            self._nbits -= 8
            self._buf.append((self._acc >> self._nbits) & 0xFF)
        self._acc &= (1 << self._nbits) - 1

    def getvalue(self) -> bytes:
        """Return the buffer, zero-padding the final partial byte."""
        if self._nbits:
            return bytes(self._buf) + bytes(
                [(self._acc << (8 - self._nbits)) & 0xFF]
            )
        return bytes(self._buf)

    def bit_length(self) -> int:
        return 8 * len(self._buf) + self._nbits


class BitReader:
    """MSB-first bit reader over a bytes object."""

    __slots__ = ("_data", "_pos")

    def __init__(self, data: bytes) -> None:
        self._data = data
        self._pos = 0

    def read(self, nbits: int) -> int:
        out = 0
        pos = self._pos
        data = self._data
        for _ in range(nbits):
            byte = data[pos >> 3]
            out = (out << 1) | ((byte >> (7 - (pos & 7))) & 1)
            pos += 1
        self._pos = pos
        return out


def _clz32(x: int) -> int:
    return 32 - x.bit_length()


def _ctz32(x: int) -> int:
    return (x & -x).bit_length() - 1


def encode(values: np.ndarray) -> bytes:
    """Compress a 1-D float32 array losslessly; returns the bitstream."""
    bits = np.ascontiguousarray(values, dtype="<f4").view("<u4")
    w = BitWriter()
    if len(bits) == 0:
        return b""
    prev = int(bits[0])
    w.write(prev, 32)
    win_lz = -1  # current leading-zeros window; -1 = none
    win_mb = 0
    for x in bits[1:].tolist():
        xor = prev ^ x
        if xor == 0:
            w.write(0, 1)
        else:
            lz = min(_clz32(xor), 31)
            tz = _ctz32(xor)
            mb = 32 - lz - tz
            if win_lz >= 0 and lz >= win_lz and 32 - lz - mb >= 32 - win_lz - win_mb:
                w.write(0b10, 2)
                w.write(xor >> (32 - win_lz - win_mb), win_mb)
            else:
                w.write(0b11, 2)
                w.write(lz, 5)
                w.write(mb - 1, 5)
                w.write(xor >> tz, mb)
                win_lz, win_mb = lz, mb
        prev = x
    return w.getvalue()


def decode(data: bytes, n: int) -> np.ndarray:
    """Decompress ``n`` float32 values from a Gorilla bitstream."""
    out = np.empty(n, dtype="<u4")
    if n == 0:
        return out.view("<f4")
    r = BitReader(data)
    prev = r.read(32)
    out[0] = prev
    win_lz = 0
    win_mb = 0
    for i in range(1, n):
        if r.read(1) == 0:
            out[i] = prev
            continue
        if r.read(1) == 0:
            xor = r.read(win_mb) << (32 - win_lz - win_mb)
        else:
            win_lz = r.read(5)
            win_mb = r.read(5) + 1
            xor = r.read(win_mb) << (32 - win_lz - win_mb)
        prev ^= xor
        out[i] = prev
    return out.view("<f4")


def encoded_size_bits(values: np.ndarray) -> int:
    """Exact bit size ``encode(values)`` would produce (without padding)."""
    bits = np.ascontiguousarray(values, dtype="<f4").view("<u4")
    if len(bits) == 0:
        return 0
    total = 32
    prev = int(bits[0])
    win_lz = -1
    win_mb = 0
    for x in bits[1:].tolist():
        xor = prev ^ x
        if xor == 0:
            total += 1
        else:
            lz = min(_clz32(xor), 31)
            tz = _ctz32(xor)
            mb = 32 - lz - tz
            if win_lz >= 0 and lz >= win_lz and 32 - lz - mb >= 32 - win_lz - win_mb:
                total += 2 + win_mb
            else:
                total += 12 + mb
                win_lz, win_mb = lz, mb
        prev = x
    return total
