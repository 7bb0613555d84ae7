"""Unit tests for XASH (paper Section 5)."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import bitops
from repro.core.superkey import or_fold
from repro.core.xash import (
    CHARSET,
    XashConfig,
    XashHasher,
    beta_for,
    normalize,
    optimal_alpha,
    xash,
)

CFG128 = XashConfig(hash_size=128, alpha=6)
CFG256 = XashConfig(hash_size=256, alpha=6)
CFG512 = XashConfig(hash_size=512, alpha=6)
ALL_CFGS = [CFG128, CFG256, CFG512]

values_strategy = st.text(
    alphabet=st.characters(min_codepoint=32, max_codepoint=126), max_size=25
)


class TestParameters:
    def test_charset_is_37_symbols(self):
        assert len(CHARSET) == 37
        assert len(set(CHARSET)) == 37

    @pytest.mark.parametrize(
        "size,beta", [(128, 3), (256, 6), (512, 13)]
    )
    def test_beta_matches_paper(self, size, beta):
        # Eq. 6: 128->3, and the paper derives |a_l|=31 for 512 => beta=13.
        assert beta_for(size) == beta

    @pytest.mark.parametrize(
        "size,length_bits", [(128, 17), (256, 34), (512, 31)]
    )
    def test_length_segment_matches_paper(self, size, length_bits):
        # Paper: 128 - 37*3 = 17 bits; 512 -> 31 bits.
        assert XashConfig(hash_size=size).length_bits == length_bits

    def test_alpha_eq5_paper_operating_point(self):
        # 128-bit space, 700M unique values -> alpha = 6 (Section 5.3.1).
        assert optimal_alpha(128, 700_000_000) == 6

    def test_alpha_eq5_minimality(self):
        a = optimal_alpha(128, 700_000_000)
        assert math.comb(128, a) > 700_000_000
        assert math.comb(128, a - 1) <= 700_000_000

    def test_alpha_eq5_small_corpus(self):
        # C(128,1)=128 > 100 -> 1; C(128,2)=8128 > 500 -> 2.
        assert optimal_alpha(128, 100) == 1
        assert optimal_alpha(128, 500) == 2

    def test_alpha_eq5_rejects_bad_input(self):
        with pytest.raises(ValueError):
            optimal_alpha(128, 0)

    def test_invalid_hash_size_rejected(self):
        with pytest.raises(ValueError):
            XashConfig(hash_size=100)

    def test_invalid_alpha_rejected(self):
        with pytest.raises(ValueError):
            XashConfig(alpha=1)


class TestNormalize:
    def test_lowercases(self):
        assert normalize("MuHaMMad") == "muhammad"

    def test_drops_punctuation(self):
        assert normalize("O'Brien-Smith!") == "obriensmith"

    def test_keeps_digits_and_space(self):
        assert normalize("Route 66") == "route 66"

    def test_none_is_empty(self):
        assert normalize(None) == ""

    def test_numbers_stringified(self):
        assert normalize(60.5) == "605"

    def test_unicode_dropped(self):
        assert normalize("Zürich") == "zrich"


class TestXashStructure:
    @pytest.mark.parametrize("cfg", ALL_CFGS, ids=lambda c: str(c.hash_size))
    def test_fits_hash_size(self, cfg):
        for v in ["muhammad", "lee", "us", "a" * 40, "12345"]:
            assert 0 <= xash(v, cfg) < (1 << cfg.hash_size)

    @pytest.mark.parametrize("cfg", ALL_CFGS, ids=lambda c: str(c.hash_size))
    def test_empty_value_hashes_to_zero(self, cfg):
        assert xash("", cfg) == 0
        assert xash(None, cfg) == 0
        assert xash("!!!", cfg) == 0  # nothing survives normalisation

    def test_deterministic(self):
        assert xash("germany", CFG128) == xash("germany", CFG128)

    def test_case_insensitive(self):
        assert xash("Germany", CFG128) == xash("germany", CFG128)

    @given(values_strategy)
    @settings(max_examples=200)
    def test_at_most_alpha_bits(self, v):
        # Section 5.3.1: one length bit + at most alpha-1 character bits.
        h = xash(v, CFG128)
        if normalize(v):
            assert 1 <= bitops.popcount(h) <= CFG128.alpha

    @given(values_strategy)
    def test_exactly_one_length_bit(self, v):
        h = xash(v, CFG128)
        if normalize(v):
            length_region = h >> CFG128.char_region_bits
            assert bitops.popcount(length_region) == 1

    def test_length_bit_position(self):
        # "us" -> l_v = 2 -> bit (2 mod 17) of the length segment.
        h = xash("us", CFG128)
        assert (h >> CFG128.char_region_bits) == 1 << 2

    def test_length_wraps_modulo_segment(self):
        # l_v = 17 -> same length bit as l_v = 34 (mod 17 = 0).
        h17 = xash("a" * 17, CFG128) >> CFG128.char_region_bits
        h34 = xash("b" * 34, CFG128) >> CFG128.char_region_bits
        assert h17 == h34 == 1

    def test_short_value_fewer_distinct_chars_than_alpha(self):
        # "us": 2 distinct chars < alpha-1=5 -> 2 char bits + 1 length bit.
        assert bitops.popcount(xash("us", CFG128)) == 3

    def test_different_lengths_distinguish_same_prefix(self):
        # Paper's "Boxer" vs "Birder" discussion (Section 5.3.4).
        assert xash("boxer", CFG128) != xash("birder", CFG128)

    def test_different_positions_distinguish_anagrams(self):
        # Same chars, same length, different positions.
        a, b = xash("abcdef", CFG128), xash("fedcba", CFG128)
        assert a != b


class TestPositionEncoding:
    def test_paper_position_buckets(self):
        # For l_v=8, beta=3: ceil(lam*3/8) buckets positions 1-2 / 3-5 / 6-8
        # (the paper's "muhammad" walkthrough).
        l_v, beta = 8, 3
        buckets = [math.ceil(lam * beta / l_v) for lam in range(1, 9)]
        assert buckets == [1, 1, 2, 2, 2, 3, 3, 3]

    def test_repeated_chars_use_mean_position(self):
        # "aba" vs "aab": 'a' mean positions 2 vs 1.5; 'b' positions 2 vs 3.
        assert xash("aba", CFG128) != xash("aab", CFG128)


class TestRotation:
    def test_rotation_only_touches_char_region(self):
        for v in ["muhammad", "x", "hello world"]:
            h = xash(v, CFG128)
            length_region = h >> CFG128.char_region_bits
            assert bitops.popcount(length_region) == 1

    def test_same_word_rotated_consistently(self):
        # Same value => same hash regardless of surrounding row.
        assert xash("lee", CFG128) == xash("lee", CFG128)


class TestNoFalseNegatives:
    """The super-key contract (Section 6.3 lemma): never miss a joinable row."""

    @given(st.lists(values_strategy, min_size=1, max_size=8), st.data())
    @settings(max_examples=150)
    def test_key_subset_always_subsumed(self, row, data):
        cfg = CFG128
        sk = or_fold(xash(v, cfg) for v in row)
        size = data.draw(st.integers(1, len(row)))
        key = data.draw(st.permutations(row)).copy()[:size]
        q = or_fold(xash(v, cfg) for v in key)
        assert bitops.is_subsumed(q, sk)

    @pytest.mark.parametrize("cfg", ALL_CFGS, ids=lambda c: str(c.hash_size))
    def test_running_example_row(self, cfg):
        row = ["Muhammad", "Lee", "US", "Dancer"]
        sk = or_fold(xash(v, cfg) for v in row)
        q = or_fold(xash(v, cfg) for v in ["Muhammad", "Lee", "US"])
        assert bitops.is_subsumed(q, sk)

    def test_non_member_usually_rejected(self):
        # Not a correctness guarantee, but the filter must actually filter:
        # a value absent from the row should usually add an unmasked bit.
        row_sk = or_fold(
            xash(v, CFG128) for v in ["Muhammad", "Ali", "US", "Boxer"]
        )
        q = or_fold(xash(v, CFG128) for v in ["Muhammad", "Lee", "US"])
        assert not bitops.is_subsumed(q, row_sk)


class TestXashHasher:
    def test_memoised_consistency(self):
        h = XashHasher(CFG128)
        assert h("Lee") == xash("Lee", CFG128)
        assert h("Lee") == h("lee")  # same normalised form

    def test_hash_size_property(self):
        assert XashHasher(CFG512).hash_size == 512
