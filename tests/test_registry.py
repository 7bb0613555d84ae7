"""Unit tests for the hash registry."""
import pytest

from repro.core import bitops
from repro.core.registry import HASH_NAMES, HashSpec, make_hasher, parse_spec


class TestHashSpec:
    def test_key_format(self):
        assert HashSpec("xash", 128).key == "xash_128"
        assert HashSpec("scr").key == "scr"

    def test_parse_roundtrip(self):
        for name in HASH_NAMES:
            for size in (128, 256, 512):
                spec = HashSpec(name, size)
                assert parse_spec(spec.key) == spec
        assert parse_spec("scr") == HashSpec("scr")

    def test_unknown_name_rejected(self):
        with pytest.raises(ValueError):
            HashSpec("sha1")

    def test_unknown_size_rejected(self):
        with pytest.raises(ValueError):
            HashSpec("xash", 96)

    def test_str(self):
        assert str(HashSpec("bf", 256)) == "bf_256"


class TestMakeHasher:
    @pytest.mark.parametrize("name", HASH_NAMES)
    @pytest.mark.parametrize("size", [128, 256, 512])
    def test_every_spec_instantiates(self, name, size):
        h = make_hasher(HashSpec(name, size))
        assert h.hash_size == size
        out = h("Muhammad Lee")
        assert 0 <= out < (1 << size)

    def test_scr_has_no_hasher(self):
        assert make_hasher(HashSpec("scr")) is None

    def test_bf_uses_values_per_row(self):
        wide = make_hasher(HashSpec("bf", 128), values_per_row=26)
        narrow = make_hasher(HashSpec("bf", 128), values_per_row=5)
        assert wide.num_hashes < narrow.num_hashes

    def test_xash_uses_alpha(self):
        h3 = make_hasher(HashSpec("xash", 128), alpha=3)
        assert bitops.popcount(h3("photographer")) <= 3

    @pytest.mark.parametrize("name", HASH_NAMES)
    def test_all_hashers_zero_on_empty(self, name):
        assert make_hasher(HashSpec(name, 128))("") == 0
