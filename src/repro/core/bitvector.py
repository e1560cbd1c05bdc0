"""Existence bit vector ``V_exist`` (paper Sec. IV-B).

One bit per position of the dense key space; bit i == 1 iff the key with
dense index i exists. Backed by ``numpy.packbits`` (the paper uses the
``bitarray`` C library, which is not installed here — same semantics).
At-rest size is measured zlib-compressed, matching the paper's note that
``V_exist`` is (de)compressed ("randomness in decompressing V_exist").
"""
from __future__ import annotations

import zlib

import numpy as np

__all__ = ["BitVector"]


class BitVector:
    """Fixed-size dense bit vector with vectorized batch get/set."""

    def __init__(self, size: int):
        if size < 0:
            raise ValueError("size must be non-negative")
        self.size = int(size)
        self._bits = np.zeros((self.size + 7) // 8, dtype=np.uint8)

    # -- element access -------------------------------------------------
    def _validate(self, idx: np.ndarray) -> np.ndarray:
        idx = np.asarray(idx, dtype=np.int64)
        if idx.size and (idx.min() < 0 or idx.max() >= self.size):
            raise IndexError("bit index out of range")
        return idx

    def set(self, idx: np.ndarray, value: bool = True) -> None:
        idx = self._validate(idx)
        byte, bit = idx >> 3, 7 - (idx & 7)
        if value:
            np.bitwise_or.at(self._bits, byte, (1 << bit).astype(np.uint8))
        else:
            np.bitwise_and.at(self._bits, byte, (~(1 << bit)).astype(np.uint8))

    def get(self, idx: np.ndarray) -> np.ndarray:
        idx = self._validate(idx)
        byte, bit = idx >> 3, 7 - (idx & 7)
        return (self._bits[byte] >> bit) & 1 == 1

    def __getitem__(self, i: int) -> bool:
        return bool(self.get(np.array([i]))[0])

    # -- bulk operations -------------------------------------------------
    def count(self) -> int:
        """Number of set bits (population count)."""
        return int(np.unpackbits(self._bits, count=self.size).sum())

    def set_indices(self) -> np.ndarray:
        """Dense indices of all set bits, ascending."""
        return np.flatnonzero(np.unpackbits(self._bits, count=self.size)).astype(
            np.int64
        )

    def set_indices_in_range(self, lo: int, hi: int) -> np.ndarray:
        """Set bits with lo <= index < hi — the paper's range-query filter."""
        lo, hi = max(0, int(lo)), min(self.size, int(hi))
        if hi <= lo:
            return np.empty(0, dtype=np.int64)
        lob, hib = lo >> 3, (hi + 7) >> 3
        bits = np.unpackbits(self._bits[lob:hib])
        offs = np.flatnonzero(bits) + lob * 8
        return offs[(offs >= lo) & (offs < hi)].astype(np.int64)

    # -- serialization / size ---------------------------------------------
    def to_bytes(self) -> bytes:
        return zlib.compress(self._bits.tobytes(), 6)

    @staticmethod
    def from_bytes(data: bytes, size: int) -> "BitVector":
        bv = BitVector(size)
        raw = np.frombuffer(zlib.decompress(data), dtype=np.uint8)
        if len(raw) != len(bv._bits):
            raise ValueError("payload length does not match bit vector size")
        bv._bits = raw.copy()
        return bv

    def nbytes_stored(self) -> int:
        """At-rest (compressed) size in bytes — counts toward Eq. 1."""
        return len(self.to_bytes())

    def nbytes_resident(self) -> int:
        """In-memory size in bytes."""
        return int(self._bits.nbytes)
