"""Registry of super-key hashers, keyed the way the paper's tables are.

A *hash spec* is the (name, size) pair heading each column of Tables 2-3:
``xash/128``, ``bf/512``, ... ``scr`` denotes "no super key" (the SCR
baseline verifies every candidate row exactly).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.filters import BloomHasher, HashTableHasher, LessHashingBloomHasher
from repro.core.hashes import CityHasher, Md5Hasher, MurmurHasher, SimHasher
from repro.core.xash import XashConfig, XashHasher

HASH_NAMES = ("md5", "murmur", "city", "simhash", "ht", "bf", "lhbf", "xash")
HASH_SIZES = (128, 256, 512)


@dataclass(frozen=True)
class HashSpec:
    """Identifier of one filter configuration (a Table 2/3 column)."""

    name: str
    hash_size: int = 128

    def __post_init__(self) -> None:
        if self.name != "scr" and self.name not in HASH_NAMES:
            raise ValueError(f"unknown hash {self.name!r}")
        if self.hash_size not in HASH_SIZES:
            raise ValueError(f"unsupported hash size {self.hash_size}")

    @property
    def key(self) -> str:
        """Stable string key for cache paths and result tables."""
        return self.name if self.name == "scr" else f"{self.name}_{self.hash_size}"

    def __str__(self) -> str:
        return self.key


def make_hasher(
    spec: HashSpec,
    *,
    values_per_row: float = 5.0,
    alpha: int = 6,
):
    """Instantiate the value->int hasher for ``spec``.

    ``values_per_row`` parameterises BF/LHBF (the paper sets it to the
    corpus' average column count); ``alpha`` parameterises XASH (Eq. 5,
    paper operating point 6). Returns ``None`` for ``scr``.
    """
    if spec.name == "scr":
        return None
    if spec.name == "xash":
        return XashHasher(XashConfig(hash_size=spec.hash_size, alpha=alpha))
    if spec.name == "md5":
        return Md5Hasher(spec.hash_size)
    if spec.name == "murmur":
        return MurmurHasher(spec.hash_size)
    if spec.name == "city":
        return CityHasher(spec.hash_size)
    if spec.name == "simhash":
        return SimHasher(spec.hash_size)
    if spec.name == "ht":
        return HashTableHasher(spec.hash_size)
    if spec.name == "bf":
        return BloomHasher(spec.hash_size, values_per_row)
    if spec.name == "lhbf":
        return LessHashingBloomHasher(spec.hash_size, values_per_row)
    raise AssertionError(spec)


def parse_spec(key: str) -> HashSpec:
    """Inverse of :attr:`HashSpec.key` (``"xash_128"`` -> spec)."""
    if key == "scr":
        return HashSpec("scr")
    name, _, size = key.rpartition("_")
    return HashSpec(name, int(size))
