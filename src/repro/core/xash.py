"""XASH — the paper's hash function for super-key generation (Section 5).

XASH encodes three syntactic features of a cell value into a fixed-size
bit array ``a``:

* the ``alpha - 1`` *least frequent characters* of the (normalised) value,
  one bit each inside a per-character segment of ``beta`` bits,
* the *relative position* of each such character (which of the ``beta``
  bits in its segment is set),
* the *value length*, one-hot in a dedicated segment of
  ``|a| - 37*beta`` bits,

and finally rotates the character region left by the value length so that
partial matches across columns stop colliding (Section 5.3.5).

Bit layout (int representation, bit 0 = LSB):

    [ length segment: bits 37*beta .. |a|-1 ][ 37 char segments * beta bits ]
      ^ paper's "left-most" segment            segment i = bits [i*beta, (i+1)*beta)

The paper's ``alpha`` (Eq. 5) counts total 1-bits per hash: one length bit
plus ``alpha - 1`` character bits.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

CHARSET = "0123456789abcdefghijklmnopqrstuvwxyz "
"""The 37 alphanumeric characters (incl. space) from Section 5.3.2."""

_CHAR_INDEX = {c: i for i, c in enumerate(CHARSET)}

SUPPORTED_SIZES = (128, 256, 512)


def beta_for(hash_size: int) -> int:
    """Eq. 6: the largest ``beta`` with ``37 * beta < |a|``.

    128 -> 3, 256 -> 6, 512 -> 13 (the paper's values).
    """
    if hash_size <= 37:
        raise ValueError(f"hash size {hash_size} too small for 37 segments")
    return (hash_size - 1) // 37


def optimal_alpha(hash_size: int, n_unique: int) -> int:
    """Eq. 5: ``argmin_alpha C(|a|, alpha) > C_unique``.

    The smallest number of 1-bits whose combinations can distinguish all
    unique values of the corpus. For |a|=128 and 700M uniques this is 6,
    the paper's operating point.
    """
    if n_unique < 1:
        raise ValueError("n_unique must be >= 1")
    for alpha in range(1, hash_size + 1):
        if math.comb(hash_size, alpha) > n_unique:
            return alpha
    raise ValueError("hash space too small for corpus")


@dataclass(frozen=True)
class XashConfig:
    """Parameters of one XASH instance.

    ``alpha`` is the total number of 1-bits per hash: 1 for the length
    bit + ``alpha - 1`` character bits. The paper derives alpha from the
    corpus via Eq. 5; experiments default to the paper's alpha = 6.
    """

    hash_size: int = 128
    alpha: int = 6
    # Component flags for the paper's ablation (Figure 5): full XASH has
    # all four on; variants disable rotation, the length bit, the
    # position encoding (every char uses its segment's first bit), or the
    # character bits entirely.
    use_chars: bool = True
    use_location: bool = True
    use_length: bool = True
    use_rotation: bool = True

    def __post_init__(self) -> None:
        if self.hash_size not in SUPPORTED_SIZES:
            raise ValueError(f"hash_size must be one of {SUPPORTED_SIZES}")
        if self.alpha < 2:
            raise ValueError("alpha must be >= 2 (1 length bit + >=1 char bit)")
        if not (self.use_chars or self.use_length):
            raise ValueError("at least one feature family must be enabled")

    @property
    def beta(self) -> int:
        return beta_for(self.hash_size)

    @property
    def char_region_bits(self) -> int:
        """Width of the rotating character region (low bits)."""
        return 37 * self.beta

    @property
    def length_bits(self) -> int:
        """Width of the one-hot length segment (high bits): |a| - 37*beta."""
        return self.hash_size - self.char_region_bits

    @property
    def n_chars(self) -> int:
        """Number of least-frequent characters encoded per value."""
        return self.alpha - 1


def normalize(value: object) -> str:
    """Canonical string form hashed by XASH.

    Lower-cased, restricted to the 37-character alphabet; all other
    characters (punctuation, unicode, …) are dropped, mirroring the
    paper's alphanumeric treatment. ``None``/NaN normalise to "".
    """
    if value is None:
        return ""
    s = str(value).lower()
    return "".join(c for c in s if c in _CHAR_INDEX)


def _select_chars(s: str, k: int) -> list[str]:
    """The ``k`` least frequent characters of ``s``.

    Frequency is counted *within the value* (Section 5.3.2); ties are
    broken lexicographically, which also covers the flat-distribution
    case the paper resolves by lexicographic order.
    """
    counts: dict[str, int] = {}
    for c in s:
        counts[c] = counts.get(c, 0) + 1
    ranked = sorted(counts, key=lambda c: (counts[c], c))
    return ranked[:k]


def xash(value: object, config: XashConfig = XashConfig()) -> int:
    """Hash one cell value. Deterministic; returns an int < 2**hash_size.

    Values that normalise to the empty string hash to 0 — a zero hash
    masks nothing, so it can only produce false positives, never false
    negatives (the super-key contract).
    """
    s = normalize(value)
    if not s:
        return 0
    beta = config.beta
    l_v = len(s)

    # Length segment: one-hot bit at l_v mod |a_l| (Section 5.3.4).
    h = 0
    if config.use_length:
        h = 1 << (config.char_region_bits + (l_v % config.length_bits))

    # Character segments with position encoding (Sections 5.3.2-5.3.3).
    chars = 0
    if config.use_chars:
        positions: dict[str, list[int]] = {}
        for i, c in enumerate(s, start=1):
            positions.setdefault(c, []).append(i)
        for c in _select_chars(s, config.n_chars):
            if config.use_location:
                lam = sum(positions[c]) / len(positions[c])  # mean 1-indexed pos
                x = math.ceil(lam * beta / l_v)  # 1..beta, paper's buckets
                x = min(max(x, 1), beta)
            else:
                x = 1  # presence only: always the segment's first bit
            segment = _CHAR_INDEX[c] * beta
            chars |= 1 << (segment + (beta - x))  # x=1 -> left-most segment bit

        # Rotation of the character region by the value length (Section 5.3.5).
        if config.use_rotation:
            chars = _rotate(chars, l_v, config.char_region_bits)
    return h | chars


def _rotate(value: int, shift: int, width: int) -> int:
    shift %= width
    if shift == 0:
        return value
    mask = (1 << width) - 1
    return ((value << shift) | (value >> (width - shift))) & mask


COMPONENT_VARIANTS = (
    "length", "char", "char+location", "char+length+location", "xash"
)


def component_variant(name: str, hash_size: int = 128, alpha: int = 6) -> XashConfig:
    """Figure 5's ablation ladder, weakest to full XASH."""
    flags = {
        "length": dict(use_chars=False, use_location=False, use_rotation=False),
        "char": dict(use_length=False, use_location=False, use_rotation=False),
        "char+location": dict(use_length=False, use_rotation=False),
        "char+length+location": dict(use_rotation=False),
        "xash": {},
    }[name]
    return XashConfig(hash_size=hash_size, alpha=alpha, **flags)


class XashHasher:
    """Callable value->int hasher with memoisation over distinct values.

    Corpora have far fewer distinct values than cells; hashing each
    distinct value once makes index construction linear in distinct
    values, not cells. Picklable (the memo is dropped on serialisation)
    so it can ship inside Spark pandas UDFs.
    """

    def __init__(self, config: XashConfig = XashConfig()) -> None:
        self.config = config
        self._cache: dict[str, int] = {}

    @property
    def hash_size(self) -> int:
        return self.config.hash_size

    def __call__(self, value: object) -> int:
        s = normalize(value)
        h = self._cache.get(s)
        if h is None:
            h = self._cache[s] = xash(s, self.config)
        return h

    def __getstate__(self):
        return {"config": self.config}

    def __setstate__(self, state):
        self.config = state["config"]
        self._cache = {}
