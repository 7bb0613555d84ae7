"""Baseline hash functions for super-key generation (Section 7.1.2).

Each hasher maps a cell value to an int with ``hash_size`` bits. These are
the "standard hash functions" the paper compares XASH against: they
produce uniformly distributed digests (~50% 1-bits), which is exactly why
their OR-aggregated super keys saturate and filter poorly.

All hashers normalise the value with :func:`repro.core.xash.normalize`
first so every filter in the registry sees identical input strings —
this keeps the comparison fair and preserves the no-false-negative
contract (hash is a deterministic function of the cell value).

Substitution note (see DESIGN.md): CityHash is not available offline, so
``city`` is a BLAKE2b-derived digest — interchangeable here because the
experiments only exercise the uniform-distribution property shared by all
general-purpose hashes.
"""
from __future__ import annotations

import hashlib

from repro.core.xash import normalize

_MASK64 = (1 << 64) - 1


def _rotl64(x: int, r: int) -> int:
    return ((x << r) | (x >> (64 - r))) & _MASK64


def _fmix64(k: int) -> int:
    k ^= k >> 33
    k = (k * 0xFF51AFD7ED558CCD) & _MASK64
    k ^= k >> 33
    k = (k * 0xC4CEB9FE1A85EC53) & _MASK64
    k ^= k >> 33
    return k


def murmur3_x64_128(data: bytes, seed: int = 0) -> int:
    """MurmurHash3 x64 128-bit variant (pure Python, reference algorithm)."""
    c1 = 0x87C37B91114253D5
    c2 = 0x4CF5AD432745937F
    h1 = h2 = seed & _MASK64
    length = len(data)
    n_blocks = length // 16

    for i in range(n_blocks):
        block = data[i * 16 : (i + 1) * 16]
        k1 = int.from_bytes(block[:8], "little")
        k2 = int.from_bytes(block[8:], "little")
        k1 = (k1 * c1) & _MASK64
        k1 = _rotl64(k1, 31)
        k1 = (k1 * c2) & _MASK64
        h1 ^= k1
        h1 = _rotl64(h1, 27)
        h1 = (h1 + h2) & _MASK64
        h1 = (h1 * 5 + 0x52DCE729) & _MASK64
        k2 = (k2 * c2) & _MASK64
        k2 = _rotl64(k2, 33)
        k2 = (k2 * c1) & _MASK64
        h2 ^= k2
        h2 = _rotl64(h2, 31)
        h2 = (h2 + h1) & _MASK64
        h2 = (h2 * 5 + 0x38495AB5) & _MASK64

    tail = data[n_blocks * 16 :]
    k1 = k2 = 0
    if len(tail) > 8:
        k2 = int.from_bytes(tail[8:].ljust(8, b"\0"), "little")
        k2 = (k2 * c2) & _MASK64
        k2 = _rotl64(k2, 33)
        k2 = (k2 * c1) & _MASK64
        h2 ^= k2
    if tail:
        k1 = int.from_bytes(tail[:8].ljust(8, b"\0"), "little")
        k1 = (k1 * c1) & _MASK64
        k1 = _rotl64(k1, 31)
        k1 = (k1 * c2) & _MASK64
        h1 ^= k1

    h1 ^= length
    h2 ^= length
    h1 = (h1 + h2) & _MASK64
    h2 = (h2 + h1) & _MASK64
    h1 = _fmix64(h1)
    h2 = _fmix64(h2)
    h1 = (h1 + h2) & _MASK64
    h2 = (h2 + h1) & _MASK64
    return (h1 << 64) | h2


def murmur3_64(data: bytes, seed: int = 0) -> int:
    """A 64-bit slice of Murmur3 — used by the membership filters."""
    return murmur3_x64_128(data, seed) & _MASK64


def _stretch(digest_fn, data: bytes, hash_size: int) -> int:
    """Concatenate seeded 128-bit digests up to ``hash_size`` bits."""
    out = 0
    for i in range(hash_size // 128):
        out = (out << 128) | digest_fn(data + bytes([i]))
    return out


class _BaseHasher:
    """Shared memoisation over distinct (normalised) values.

    Picklable for Spark pandas UDFs: the memo dict is dropped when the
    hasher is serialised to executors.
    """

    name = "base"

    def __init__(self, hash_size: int = 128) -> None:
        if hash_size % 128:
            raise ValueError("hash_size must be a multiple of 128")
        self.hash_size = hash_size
        self._cache: dict[str, int] = {}

    def _hash_str(self, s: str) -> int:  # pragma: no cover - abstract
        raise NotImplementedError

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


class Md5Hasher(_BaseHasher):
    """MD5 digest as the super-key contribution (paper's MD5 column)."""

    name = "md5"

    def _hash_str(self, s: str) -> int:
        if not s:
            return 0
        data = s.encode()
        fn = lambda d: int.from_bytes(hashlib.md5(d).digest(), "big")  # noqa: E731
        return _stretch(fn, data, self.hash_size)


class MurmurHasher(_BaseHasher):
    """Murmur3 x64-128 digest (paper's Murmur column)."""

    name = "murmur"

    def _hash_str(self, s: str) -> int:
        if not s:
            return 0
        return _stretch(murmur3_x64_128, s.encode(), self.hash_size)


class CityHasher(_BaseHasher):
    """CityHash stand-in: BLAKE2b-128 digests (see module docstring)."""

    name = "city"

    def _hash_str(self, s: str) -> int:
        if not s:
            return 0
        fn = lambda d: int.from_bytes(  # noqa: E731
            hashlib.blake2b(d, digest_size=16).digest(), "big"
        )
        return _stretch(fn, s.encode(), self.hash_size)


class SimHasher(_BaseHasher):
    """SimHash over character 3-grams (Charikar's scheme).

    Each 3-gram of the padded value votes +1/-1 per bit position using a
    seeded BLAKE2b gram hash; the output bit is 1 where the vote sum is
    positive. Similar strings get similar hashes — which, as the paper
    observes, does not help subset masking.
    """

    name = "simhash"

    def _hash_str(self, s: str) -> int:
        if not s:
            return 0
        padded = f" {s} "
        grams = [padded[i : i + 3] for i in range(len(padded) - 2)]
        votes = [0] * self.hash_size
        for g in grams:
            gh = _stretch(
                lambda d: int.from_bytes(
                    hashlib.blake2b(d, digest_size=16).digest(), "big"
                ),
                g.encode(),
                self.hash_size,
            )
            for b in range(self.hash_size):
                votes[b] += 1 if (gh >> b) & 1 else -1
        out = 0
        for b in range(self.hash_size):
            if votes[b] > 0:
                out |= 1 << b
        return out
