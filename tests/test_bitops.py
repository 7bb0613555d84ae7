"""Unit tests for repro.core.bitops."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core import bitops


class TestRotateLeft:
    def test_zero_shift_identity(self):
        assert bitops.rotate_left(0b1011, 0, 8) == 0b1011

    def test_simple_rotation(self):
        # The paper's example: 3-bit rotation of 01100101 -> 00101011.
        assert bitops.rotate_left(0b01100101, 3, 8) == 0b00101011

    def test_full_width_rotation_is_identity(self):
        assert bitops.rotate_left(0b1011, 8, 8) == 0b1011

    def test_shift_wraps_modulo_width(self):
        assert bitops.rotate_left(0b1011, 11, 8) == bitops.rotate_left(0b1011, 3, 8)

    def test_single_bit_wraps(self):
        assert bitops.rotate_left(1 << 7, 1, 8) == 1

    def test_width_must_be_positive(self):
        with pytest.raises(ValueError):
            bitops.rotate_left(1, 1, 0)

    @given(st.integers(0, 2**64 - 1), st.integers(0, 200), st.integers(1, 64))
    def test_preserves_popcount(self, value, shift, width):
        value &= (1 << width) - 1
        rotated = bitops.rotate_left(value, shift, width)
        assert bitops.popcount(rotated) == bitops.popcount(value)

    @given(st.integers(0, 2**32 - 1), st.integers(0, 100))
    def test_invertible(self, value, shift):
        width = 32
        rotated = bitops.rotate_left(value, shift, width)
        back = bitops.rotate_left(rotated, width - (shift % width), width)
        assert back == value


class TestRotateRegionLeft:
    def test_high_bits_untouched(self):
        value = (0b1101 << 8) | 0b00000001
        out = bitops.rotate_region_left(value, 2, 8)
        assert out >> 8 == 0b1101
        assert out & 0xFF == 0b100

    def test_region_only_rotation(self):
        assert bitops.rotate_region_left(0b01100101, 3, 8) == 0b00101011

    @given(st.integers(0, 2**40 - 1), st.integers(0, 64))
    def test_popcount_preserved(self, value, shift):
        out = bitops.rotate_region_left(value, shift, 16)
        assert bitops.popcount(out) == bitops.popcount(value)


class TestSubsumption:
    def test_subset_is_subsumed(self):
        assert bitops.is_subsumed(0b0101, 0b1101)

    def test_equal_is_subsumed(self):
        assert bitops.is_subsumed(0b1101, 0b1101)

    def test_extra_bit_not_subsumed(self):
        assert not bitops.is_subsumed(0b0111, 0b1101)

    def test_zero_always_subsumed(self):
        assert bitops.is_subsumed(0, 0b10110)
        assert bitops.is_subsumed(0, 0)

    @given(st.integers(0, 2**128 - 1), st.integers(0, 2**128 - 1))
    def test_matches_paper_or_definition(self, q, r):
        # Paper (Line 18 of Algorithm 1): candidate iff q OR r == r.
        assert bitops.is_subsumed(q, r) == ((q | r) == r)


class TestByteCodec:
    @given(st.integers(0, 2**128 - 1))
    def test_roundtrip_128(self, value):
        assert bitops.from_bytes(bitops.to_bytes(value, 128)) == value

    @given(st.integers(0, 2**512 - 1))
    def test_roundtrip_512(self, value):
        assert bitops.from_bytes(bitops.to_bytes(value, 512)) == value

    def test_fixed_width(self):
        assert len(bitops.to_bytes(1, 128)) == 16
        assert len(bitops.to_bytes(1, 512)) == 64

    def test_big_endian_order(self):
        assert bitops.to_bytes(1, 128)[-1] == 1
        assert bitops.to_bytes(1 << 127, 128)[0] == 0x80
