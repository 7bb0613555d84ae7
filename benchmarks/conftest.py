"""Shared benchmark fixtures.

Benchmarks run at the lite-bench scale (BENCH_SCALE, default 0.5 ≈ 0.5M
cells across the three corpora — the same scale as the EXPERIMENTS.md
grid, so the parquet index cache is shared) with caching enabled, so
pytest-benchmark times the *online discovery phase* — the paper's
reported quantity — not index construction.
"""
import os

import pytest

BENCH_SCALE = float(os.environ.get("BENCH_SCALE", "0.5"))
BENCH_K = 10


@pytest.fixture(scope="session")
def ctx(spark):
    from repro.eval.harness import ExperimentContext

    return ExperimentContext(
        spark, scale=BENCH_SCALE, k=BENCH_K, use_disk_cache=True
    )
