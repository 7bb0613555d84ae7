"""Unit tests for the membership-filter hashers (HT, BF, LHBF)."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import bitops
from repro.core.filters import (
    BloomHasher,
    HashTableHasher,
    LessHashingBloomHasher,
    optimal_num_hashes,
)
from repro.core.superkey import or_fold


class TestOptimalNumHashes:
    def test_paper_webtable_setting(self):
        # |a|=128, V=5 -> H = 128/5 * ln2 ~= 17.7 -> 18.
        assert optimal_num_hashes(128, 5) == round(128 / 5 * math.log(2))

    def test_paper_opendata_setting(self):
        # |a|=128, V=26 -> H ~= 3.4 -> 3.
        assert optimal_num_hashes(128, 26) == 3

    def test_at_least_one(self):
        assert optimal_num_hashes(128, 10_000) == 1

    def test_scales_with_hash_size(self):
        assert optimal_num_hashes(512, 5) == 4 * optimal_num_hashes(128, 5) or (
            abs(optimal_num_hashes(512, 5) - 4 * optimal_num_hashes(128, 5)) <= 2
        )

    def test_rejects_nonpositive(self):
        with pytest.raises(ValueError):
            optimal_num_hashes(128, 0)


class TestHashTable:
    def test_exactly_one_bit(self):
        h = HashTableHasher(128)
        for v in ["us", "germany", "12345", "a b c"]:
            assert bitops.popcount(h(v)) == 1

    def test_empty_zero(self):
        assert HashTableHasher(128)("") == 0

    def test_fits_size(self):
        h = HashTableHasher(128)
        assert all(h(f"v{i}") < (1 << 128) for i in range(50))

    def test_deterministic_and_normalised(self):
        h = HashTableHasher(128)
        assert h("Lee") == h("lee")


class TestBloom:
    def test_sets_at_most_h_bits(self):
        h = BloomHasher(128, values_per_row=5)
        for v in ["germany", "photographer", "1992"]:
            assert 1 <= bitops.popcount(h(v)) <= h.num_hashes

    def test_num_hashes_from_values_per_row(self):
        assert BloomHasher(128, 5).num_hashes == optimal_num_hashes(128, 5)
        assert BloomHasher(128, 26).num_hashes == 3

    def test_distinct_values_distinct_patterns(self):
        h = BloomHasher(128, 26)
        vals = [f"value-{i}" for i in range(40)]
        assert len({h(v) for v in vals}) >= 39  # collisions possible but rare

    def test_empty_zero(self):
        assert BloomHasher(128, 5)("") == 0


class TestLessHashingBloom:
    def test_same_num_hashes_as_bf(self):
        assert (
            LessHashingBloomHasher(128, 5).num_hashes == BloomHasher(128, 5).num_hashes
        )

    def test_sets_at_most_h_bits(self):
        h = LessHashingBloomHasher(128, 5)
        for v in ["germany", "photographer", "1992"]:
            assert 1 <= bitops.popcount(h(v)) <= h.num_hashes

    def test_differs_from_bf_bit_pattern(self):
        bf, lh = BloomHasher(128, 5), LessHashingBloomHasher(128, 5)
        assert any(bf(f"v{i}") != lh(f"v{i}") for i in range(10))

    def test_empty_zero(self):
        assert LessHashingBloomHasher(128, 5)("") == 0


@pytest.mark.parametrize(
    "make",
    [
        lambda: HashTableHasher(128),
        lambda: BloomHasher(128, 5),
        lambda: LessHashingBloomHasher(128, 5),
    ],
    ids=["ht", "bf", "lhbf"],
)
class TestNoFalseNegatives:
    @given(row=st.lists(st.text(max_size=10), min_size=1, max_size=8), data=st.data())
    @settings(max_examples=40, deadline=None)
    def test_subset_subsumed(self, make, row, data):
        h = make()
        sk = or_fold(h(v) for v in row)
        size = data.draw(st.integers(1, len(row)))
        q = or_fold(h(v) for v in row[:size])
        assert bitops.is_subsumed(q, sk)


class TestFilteringPower:
    """BF should reject most non-member probes at OD-like load."""

    def test_bf_rejects_nonmembers(self):
        h = BloomHasher(128, 26)
        sk = or_fold(h(f"member-{i}") for i in range(26))
        probes = [h(f"other-{i}") for i in range(200)]
        rejected = sum(not bitops.is_subsumed(p, sk) for p in probes)
        assert rejected > 150

    def test_ht_weaker_than_bf_at_low_load(self):
        # With few values per row, BF's extra bits reject more probes.
        bf, ht = BloomHasher(128, 5), HashTableHasher(128)
        row = [f"member-{i}" for i in range(5)]
        sk_bf = or_fold(bf(v) for v in row)
        sk_ht = or_fold(ht(v) for v in row)
        probes = [f"probe-{i}" for i in range(300)]
        rej_bf = sum(not bitops.is_subsumed(bf(p), sk_bf) for p in probes)
        rej_ht = sum(not bitops.is_subsumed(ht(p), sk_ht) for p in probes)
        assert rej_bf >= rej_ht
