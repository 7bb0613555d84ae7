"""Parquet artifact cache for index structures.

The paper's offline phase materialises the inverted index once (35 h for
web tables in Vertica); the online phase only reads it. We mirror that
split: index DataFrames are written to parquet under a cache root the
first time they are built, and read back afterwards, so benchmark runs
time the *discovery* phase, not index construction.

Cache keys include the corpus name, scale, and hash spec; all generators
are deterministic, so a cache hit is always coherent. Set ``REPRO_CACHE``
to relocate the root; delete the directory to force a rebuild.
"""
from __future__ import annotations

import os
from pathlib import Path

from pyspark.sql import DataFrame, SparkSession


def cache_root() -> Path:
    return Path(os.environ.get("REPRO_CACHE", Path(__file__).resolve().parents[3] / ".cache"))


def dataset_path(*parts: str) -> Path:
    """Path for a named parquet artifact, e.g. (corpus, "sk_xash_128")."""
    return cache_root().joinpath(*parts[:-1], f"{parts[-1]}.parquet")


def load_or_build(
    spark: SparkSession,
    path: Path | None,
    build,
) -> DataFrame:
    """Read ``path`` if it exists, else build, persist, and re-read.

    ``path=None`` disables disk caching (tests): the built DataFrame is
    returned directly with in-memory caching only.
    """
    if path is None:
        return build().cache()
    if not (path / "_SUCCESS").exists():
        path.parent.mkdir(parents=True, exist_ok=True)
        build().write.mode("overwrite").parquet(str(path))
    return spark.read.parquet(str(path))
