"""Tests for the experiment harness (small scale, no disk cache)."""
import pandas as pd
import pytest

from repro.core.registry import HashSpec
from repro.core.xash import COMPONENT_VARIANTS, XashConfig, component_variant
from repro.eval.harness import (
    TABLE2_SPECS,
    TABLE3_SPECS,
    ExperimentContext,
    format_table,
    run_config,
    table1_rows,
)


@pytest.fixture(scope="module")
def ctx(spark):
    return ExperimentContext(
        spark, scale=0.02, k=3, use_disk_cache=False, n_queries=2
    )


class TestGrids:
    def test_table2_grid_covers_paper_columns(self):
        keys = {s.key for s in TABLE2_SPECS}
        assert "scr" in keys and "xash_512" in keys and "bf_256" in keys
        assert len(TABLE2_SPECS) == 19  # 1 SCR + 3 digest@128 + 5 hashes x 3 sizes

    def test_table3_grid(self):
        keys = {s.key for s in TABLE3_SPECS}
        assert "xash_128" in keys and "xash_512" in keys
        assert "murmur_128" not in keys  # paper's Table 3 drops Murmur

    def test_run_config_mate(self, ctx):
        row = run_config(ctx, "WT (100)", HashSpec("xash", 128), use_store=False)
        assert row["set_name"] == "WT (100)"
        assert row["wall_seconds"] > 0
        assert row["verif_pairs"] <= row["surv_pairs"] <= row["cand_pairs"]
        assert 0 <= row["precision_mean"] <= 1

    def test_run_config_scr_more_work(self, ctx):
        mate = run_config(ctx, "WT (100)", HashSpec("xash", 128), use_store=False)
        scr = run_config(ctx, "WT (100)", HashSpec("scr"), use_store=False)
        assert scr["verif_pairs"] >= mate["verif_pairs"]

    def test_run_config_systems(self, ctx):
        for system in ("mcr", "scr_josie", "mcr_josie"):
            row = run_config(ctx, "WT (100)", system=system, use_store=False)
            assert row["system"] == system
            assert row["wall_seconds"] > 0

    def test_unknown_system(self, ctx):
        with pytest.raises(ValueError):
            run_config(ctx, "WT (100)", system="nope", use_store=False)

    def test_format_table_pivot(self):
        df = pd.DataFrame(
            [
                {"set_name": "A", "spec": "x", "wall_per_query": 1.0},
                {"set_name": "A", "spec": "y", "wall_per_query": 2.0},
            ]
        )
        piv = format_table(df, "wall_per_query")
        assert piv.loc["A", "y"] == 2.0


class TestTable1:
    def test_rows_structure(self, ctx):
        # Restrict to two sets for speed by monkeypatching the set list.
        import repro.eval.harness as h

        orig = h.QUERY_SET_NAMES
        h.QUERY_SET_NAMES = ("WT (10)", "WT (100)")
        try:
            t1 = table1_rows(ctx)
        finally:
            h.QUERY_SET_NAMES = orig
        assert list(t1["query_set"]) == ["WT (10)", "WT (100)"]
        assert (t1["avg_cardinality"] > 0).all()
        assert (t1["n_tables"] == 2).all()


class TestStore:
    def test_store_roundtrip(self, spark, tmp_path, monkeypatch):
        monkeypatch.setenv("REPRO_CACHE", str(tmp_path))
        ctx = ExperimentContext(spark, scale=0.02, k=2, use_disk_cache=True, n_queries=2)
        row1 = run_config(ctx, "WT (10)", HashSpec("xash", 128))
        row2 = run_config(ctx, "WT (10)", HashSpec("xash", 128))
        # Second call must come from the store (identical values).
        assert row2["wall_seconds"] == row1["wall_seconds"]


class TestComponentVariants:
    def test_all_variants_construct(self):
        for name in COMPONENT_VARIANTS:
            cfg = component_variant(name)
            assert isinstance(cfg, XashConfig)

    def test_full_variant_is_default(self):
        assert component_variant("xash") == XashConfig(128, 6)

    def test_length_only_single_bit(self):
        from repro.core import bitops
        from repro.core.xash import xash

        cfg = component_variant("length")
        assert bitops.popcount(xash("photographer", cfg)) == 1

    def test_char_variant_no_length_bit(self):
        from repro.core.xash import xash

        cfg = component_variant("char")
        h = xash("photographer", cfg)
        assert h >> cfg.char_region_bits == 0

    def test_variant_ladder_monotone_bits(self):
        # More features -> at least as many set bits.
        from repro.core import bitops
        from repro.core.xash import xash

        v = "photographer"
        b_len = bitops.popcount(xash(v, component_variant("length")))
        b_char = bitops.popcount(xash(v, component_variant("char")))
        b_full = bitops.popcount(xash(v, component_variant("xash")))
        assert b_len <= b_full and b_char <= b_full

    def test_invalid_flags_rejected(self):
        with pytest.raises(ValueError):
            XashConfig(use_chars=False, use_length=False)
