"""Benchmark regenerating Table 2 (discovery runtime per hash function).

One benchmark per (query set, hash spec) cell on a representative subset
of the full 8x19 grid (the full grid is `jobs/table2_runtime.py`; at
bench scale the full grid takes ~1 h). The measured operation is one
complete online discovery over all query tables of the set.

The paper's shape to reproduce: SCR slowest, digest hashes (MD5) in the
middle, XASH fastest; 512-bit no slower than 128-bit for XASH.
"""
import pytest

from repro.core.registry import HashSpec, parse_spec
from repro.eval.harness import run_config

CELLS = [
    ("WT (100)", "scr"),
    ("WT (100)", "md5_128"),
    ("WT (100)", "bf_128"),
    ("WT (100)", "lhbf_128"),
    ("WT (100)", "xash_128"),
    ("WT (100)", "xash_512"),
    ("OD (1k)", "scr"),
    ("OD (1k)", "md5_128"),
    ("OD (1k)", "bf_128"),
    ("OD (1k)", "xash_128"),
    ("School", "scr"),
    ("School", "xash_128"),
]


@pytest.mark.parametrize("set_name,spec_key", CELLS, ids=[f"{s}-{h}" for s, h in CELLS])
def test_table2_cell(benchmark, ctx, set_name, spec_key):
    spec = parse_spec(spec_key)
    # Warm the offline phase (index build) outside the timed region.
    index = ctx.index(ctx.query_set(set_name).corpus_name)
    index.cells.count()
    if spec.name != "scr":
        index.superkeys(spec).count()

    row = benchmark.pedantic(
        lambda: run_config(ctx, set_name, spec, use_store=False),
        rounds=1, iterations=1,
    )
    assert row["verif_pairs"] >= 0
    assert row["wall_seconds"] > 0


def test_table2_shape_xash_beats_scr(ctx):
    """The headline Table 2 ordering on WT (100): XASH verifies no more
    rows than BF, which verifies no more than SCR."""
    scr = run_config(ctx, "WT (100)", HashSpec("scr"))
    bf = run_config(ctx, "WT (100)", HashSpec("bf", 128))
    xash = run_config(ctx, "WT (100)", HashSpec("xash", 128))
    assert xash["verif_pairs"] <= bf["verif_pairs"] <= scr["verif_pairs"]
