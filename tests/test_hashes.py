"""Unit tests for the baseline digest hashers (Section 7.1.2)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import bitops
from repro.core.hashes import (
    CityHasher,
    Md5Hasher,
    MurmurHasher,
    SimHasher,
    murmur3_64,
    murmur3_x64_128,
)
from repro.core.superkey import or_fold

ALL_HASHERS = [Md5Hasher, MurmurHasher, CityHasher, SimHasher]


def _digest_hex(h: int) -> str:
    """Our int -> the canonical little-endian digest hex (h1 || h2)."""
    h1, h2 = h >> 64, h & ((1 << 64) - 1)
    return (h1.to_bytes(8, "little") + h2.to_bytes(8, "little")).hex()


class TestMurmur3Reference:
    """Vectors from the canonical MurmurHash3 x64_128 implementation."""

    def test_empty_seed0(self):
        assert murmur3_x64_128(b"") == 0

    def test_known_vector_hello(self):
        # smhasher reference digest of "hello", seed 0.
        h = murmur3_x64_128(b"hello")
        assert _digest_hex(h) == "029bbd41b3a7d8cb191dae486a901e5b"

    def test_known_vector_quick_fox(self):
        h = murmur3_x64_128(b"The quick brown fox jumps over the lazy dog")
        assert _digest_hex(h) == "6c1b07bc7bbc4be347939ac4a93c437a"

    def test_seed_changes_result(self):
        assert murmur3_x64_128(b"hello", 1) != murmur3_x64_128(b"hello", 0)

    def test_tail_lengths_all_distinct(self):
        # Exercise every tail branch (1..16 bytes).
        hashes = {murmur3_x64_128(b"x" * n + bytes([n])) for n in range(1, 17)}
        assert len(hashes) == 16

    def test_64bit_slice(self):
        assert murmur3_64(b"hello") == murmur3_x64_128(b"hello") & ((1 << 64) - 1)


@pytest.mark.parametrize("cls", ALL_HASHERS, ids=lambda c: c.name)
class TestDigestHashers:
    def test_fits_size(self, cls):
        for size in (128, 256, 512):
            h = cls(size)
            assert 0 <= h("germany") < (1 << size)

    def test_deterministic(self, cls):
        h = cls(128)
        assert h("Muhammad") == h("Muhammad")

    def test_normalised_input(self, cls):
        h = cls(128)
        assert h("Muhammad") == h("muhammad")

    def test_empty_is_zero(self, cls):
        h = cls(128)
        assert h("") == 0
        assert h(None) == 0

    def test_distinct_values_distinct_hashes(self, cls):
        h = cls(128)
        vals = ["germany", "france", "spain", "boxer", "birder", "12345"]
        assert len({h(v) for v in vals}) == len(vals)

    def test_size_must_be_multiple_of_128(self, cls):
        with pytest.raises(ValueError):
            cls(100)


class TestUniformDensity:
    """The paper's observation: general-purpose hashes set ~50% of bits,
    which saturates OR-aggregated super keys (Section 7.3)."""

    @pytest.mark.parametrize("cls", [Md5Hasher, MurmurHasher, CityHasher])
    def test_density_near_half(self, cls):
        h = cls(128)
        vals = [f"value {i} padding" for i in range(200)]
        mean_ones = sum(bitops.popcount(h(v)) for v in vals) / len(vals)
        assert 50 <= mean_ones <= 78  # ~64 expected

    def test_six_value_superkey_saturates(self):
        # "if a table contains six columns the aggregation ... will on
        # average turn 98% of the super key to 1s" (Section 7.3).
        h = Md5Hasher(128)
        sk = or_fold(h(f"col value {i}") for i in range(6))
        assert bitops.popcount(sk) >= 110  # >=86% of 128 bits


class TestSimHashSimilarity:
    def test_similar_strings_close(self):
        h = SimHasher(128)
        d_sim = bitops.popcount(h("michael jordan") ^ h("michael jordon"))
        d_diff = bitops.popcount(h("michael jordan") ^ h("7301 main street"))
        assert d_sim < d_diff


class TestNoFalseNegativesAllHashers:
    @pytest.mark.parametrize("cls", ALL_HASHERS, ids=lambda c: c.name)
    @given(row=st.lists(st.text(max_size=12), min_size=1, max_size=6))
    @settings(max_examples=40, deadline=None)
    def test_subset_subsumed(self, cls, row):
        h = cls(128)
        sk = or_fold(h(v) for v in row)
        q = or_fold(h(v) for v in row[: max(1, len(row) // 2)])
        assert bitops.is_subsumed(q, sk)
