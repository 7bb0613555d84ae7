"""Benchmark regenerating Table 3 (row-filter precision).

One benchmark per (query set, hash spec) cell on a representative
subset; the measured operation is the discovery run whose TP/FP counts
yield the precision (full grid: `jobs/table3_precision.py`).

The paper's shape to reproduce: XASH's precision is the highest on
average, 512-bit beats 128-bit, and digest hashes (MD5) collapse on the
wide-table School corpus.
"""
import pytest

from repro.core.registry import parse_spec
from repro.eval.harness import run_config

CELLS = [
    ("WT (100)", "md5_128"),
    ("WT (100)", "ht_128"),
    ("WT (100)", "bf_128"),
    ("WT (100)", "xash_128"),
    ("WT (100)", "xash_512"),
    ("OD (1k)", "bf_128"),
    ("OD (1k)", "xash_128"),
    ("School", "md5_128"),
    ("School", "xash_512"),
]


@pytest.mark.parametrize("set_name,spec_key", CELLS, ids=[f"{s}-{h}" for s, h in CELLS])
def test_table3_cell(benchmark, ctx, set_name, spec_key):
    spec = parse_spec(spec_key)
    index = ctx.index(ctx.query_set(set_name).corpus_name)
    index.cells.count()
    index.superkeys(spec).count()

    row = benchmark.pedantic(
        lambda: run_config(ctx, set_name, spec, use_store=False),
        rounds=1, iterations=1,
    )
    assert 0.0 <= row["precision_mean"] <= 1.0


def test_table3_shape_xash_most_precise(ctx):
    """Average-precision ordering on WT (100): XASH >= BF >= MD5."""
    md5 = run_config(ctx, "WT (100)", parse_spec("md5_128"))
    bf = run_config(ctx, "WT (100)", parse_spec("bf_128"))
    xash = run_config(ctx, "WT (100)", parse_spec("xash_128"))
    assert xash["precision_mean"] >= bf["precision_mean"] >= md5["precision_mean"]
