"""Bit-vector helpers for super keys.

Super keys are fixed-width bit arrays. We represent them as Python ints
(arbitrary precision, cheap bitwise ops) inside the driver/pandas-UDF
kernels, and as fixed-width big-endian ``bytes`` inside Spark DataFrames
(BinaryType survives Arrow round-trips losslessly, unlike 128-bit ints).

Bit numbering convention: bit 0 is the least significant bit of the int.
"Left-most segment" in the paper maps to the *most* significant bits here
(see ``repro.core.xash`` for the layout).
"""
from __future__ import annotations


def rotate_left(value: int, shift: int, width: int) -> int:
    """Rotate the low ``width`` bits of ``value`` left by ``shift``.

    Bits shifted past the top wrap around to bit 0. Bits of ``value``
    above ``width`` must be zero (callers rotate a masked region).
    """
    if width <= 0:
        raise ValueError("width must be positive")
    shift %= width
    if shift == 0:
        return value
    mask = (1 << width) - 1
    value &= mask
    return ((value << shift) | (value >> (width - shift))) & mask


def rotate_region_left(value: int, shift: int, region_width: int) -> int:
    """Rotate only the low ``region_width`` bits of ``value``; keep the rest.

    XASH rotates the character region (low 37*beta bits) while the length
    segment (high bits) stays fixed.
    """
    region_mask = (1 << region_width) - 1
    region = value & region_mask
    return (value & ~region_mask) | rotate_left(region, shift, region_width)


def popcount(value: int) -> int:
    """Number of set bits."""
    return value.bit_count()


def is_subsumed(query: int, row: int) -> bool:
    """True iff every set bit of ``query`` is also set in ``row``.

    This is the paper's row-filter check: ``q OR r == r``.
    """
    return query & ~row == 0


def to_bytes(value: int, n_bits: int) -> bytes:
    """Fixed-width big-endian encoding for storage in BinaryType columns."""
    return value.to_bytes(n_bits // 8, "big")


def from_bytes(raw: bytes) -> int:
    """Inverse of :func:`to_bytes`."""
    return int.from_bytes(raw, "big")
