"""Bloom filter used for row-group skipping and dynamic semijoin reduction.

Hive attaches Bloom filters to ORC row groups (for configured columns) and
builds them at runtime for index semijoins (§4.6). This is a standard
double-hashing Bloom filter over a NumPy bit array, sized for a target false
positive probability, with base64 serialization for the row-group sidecar
metadata files.
"""
from __future__ import annotations

import base64
import hashlib
import math
from typing import Iterable

import numpy as np

__all__ = ["BloomFilter"]


class BloomFilter:
    """Double-hashing Bloom filter: k probes derived from two SHA1 halves."""

    __slots__ = ("m", "k", "bits")

    def __init__(self, m: int, k: int, bits: np.ndarray | None = None):
        self.m = m
        self.k = k
        self.bits = bits if bits is not None else np.zeros((m + 7) // 8, dtype=np.uint8)

    @classmethod
    def for_capacity(cls, n: int, fpp: float = 0.01) -> "BloomFilter":
        """Size for ``n`` insertions at false-positive probability ``fpp``."""
        n = max(1, n)
        m = max(64, int(math.ceil(-n * math.log(fpp) / (math.log(2) ** 2))))
        k = max(1, int(round(m / n * math.log(2))))
        return cls(m, k)

    @classmethod
    def of(cls, values: Iterable, fpp: float = 0.01) -> "BloomFilter":
        vals = list(values)
        bf = cls.for_capacity(len(vals), fpp)
        for v in vals:
            bf.add(v)
        return bf

    def _hashes(self, value) -> tuple[int, int]:
        d = hashlib.sha1(repr(value).encode()).digest()
        return (
            int.from_bytes(d[:8], "big"),
            int.from_bytes(d[8:16], "big") | 1,  # odd, so probes cover [0, m)
        )

    def add(self, value) -> None:
        if value is None:
            return
        h1, h2 = self._hashes(value)
        for i in range(self.k):
            pos = (h1 + i * h2) % self.m
            self.bits[pos >> 3] |= 1 << (pos & 7)

    def might_contain(self, value) -> bool:
        if value is None:
            return False
        h1, h2 = self._hashes(value)
        for i in range(self.k):
            pos = (h1 + i * h2) % self.m
            if not (self.bits[pos >> 3] >> (pos & 7)) & 1:
                return False
        return True

    # -- serialization (sidecar metadata JSON) ----------------------------

    def to_b64(self) -> str:
        header = self.m.to_bytes(4, "big") + self.k.to_bytes(2, "big")
        return base64.b64encode(header + self.bits.tobytes()).decode()

    @classmethod
    def from_b64(cls, raw: str) -> "BloomFilter":
        buf = base64.b64decode(raw)
        m = int.from_bytes(buf[:4], "big")
        k = int.from_bytes(buf[4:6], "big")
        return cls(m, k, np.frombuffer(buf[6:], dtype=np.uint8).copy())
