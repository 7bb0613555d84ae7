"""Membership-filter hashers: HT, BF, LHBF (Section 7.1.2).

Unlike the digest hashers in :mod:`repro.core.hashes`, these set only a
few bits per value — they are Bloom-filter-style encodings whose OR
aggregation *is* a Bloom filter over the row's values:

* **HT** (hash table): a single bit per value.
* **BF**: the classic Bloom filter with the optimal number of hash
  functions ``H = (|a| / V) * ln 2`` for ``V`` expected values per row
  (the corpus' average column count), Murmur3-seeded.
* **LHBF** (Kirsch-Mitzenmacher "less hashing"): the same ``H`` bit
  positions derived from only two base hashes, ``g_i = h1 + i * h2``.
"""
from __future__ import annotations

import math

from repro.core.hashes import murmur3_64
from repro.core.xash import normalize


def optimal_num_hashes(hash_size: int, values_per_row: float) -> int:
    """``H = (|a| / V) * ln 2`` — the paper's BF configuration.

    ``values_per_row`` is the average number of columns in the corpus
    (V=5 for webtables, V=26 for open data in the paper).
    """
    if values_per_row <= 0:
        raise ValueError("values_per_row must be positive")
    return max(1, round(hash_size / values_per_row * math.log(2)))


class HashTableHasher:
    """HT: one Murmur3-derived bit per value."""

    name = "ht"

    def __init__(self, hash_size: int = 128) -> None:
        self.hash_size = hash_size
        self._cache: dict[str, int] = {}

    def _hash_str(self, s: str) -> int:
        if not s:
            return 0
        return 1 << (murmur3_64(s.encode(), seed=0x9747B28C) % self.hash_size)

    def __call__(self, value: object) -> int:
        s = normalize(value)
        h = self._cache.get(s)
        if h is None:
            h = self._cache[s] = self._hash_str(s)
        return h

    def __getstate__(self):
        state = self.__dict__.copy()
        state["_cache"] = {}
        return state


class BloomHasher:
    """BF: ``num_hashes`` independently seeded Murmur3 bits per value."""

    name = "bf"

    def __init__(self, hash_size: int = 128, values_per_row: float = 5.0) -> None:
        self.hash_size = hash_size
        self.num_hashes = optimal_num_hashes(hash_size, values_per_row)
        self._cache: dict[str, int] = {}

    def _hash_str(self, s: str) -> int:
        if not s:
            return 0
        data = s.encode()
        out = 0
        for i in range(self.num_hashes):
            out |= 1 << (murmur3_64(data, seed=i + 1) % self.hash_size)
        return out

    def __call__(self, value: object) -> int:
        s = normalize(value)
        h = self._cache.get(s)
        if h is None:
            h = self._cache[s] = self._hash_str(s)
        return h

    def __getstate__(self):
        state = self.__dict__.copy()
        state["_cache"] = {}
        return state


class LessHashingBloomHasher:
    """LHBF: Kirsch-Mitzenmacher double hashing, two base Murmur3 hashes."""

    name = "lhbf"

    def __init__(self, hash_size: int = 128, values_per_row: float = 5.0) -> None:
        self.hash_size = hash_size
        self.num_hashes = optimal_num_hashes(hash_size, values_per_row)
        self._cache: dict[str, int] = {}

    def _hash_str(self, s: str) -> int:
        if not s:
            return 0
        data = s.encode()
        h1 = murmur3_64(data, seed=0xA5A5A5A5)
        h2 = murmur3_64(data, seed=0x5A5A5A5A) | 1  # odd -> cycles all slots
        out = 0
        for i in range(self.num_hashes):
            out |= 1 << ((h1 + i * h2) % self.hash_size)
        return out

    def __call__(self, value: object) -> int:
        s = normalize(value)
        h = self._cache.get(s)
        if h is None:
            h = self._cache[s] = self._hash_str(s)
        return h

    def __getstate__(self):
        state = self.__dict__.copy()
        state["_cache"] = {}
        return state
