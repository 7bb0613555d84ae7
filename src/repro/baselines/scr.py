"""SCR — Single-Column Retrieval baseline (paper Section 7.1.1).

SCR is MATE without the super key: same initial-column posting-list
fetch, same table-filtering bounds and exact verification, but every
candidate row goes to in-memory value comparison because there is no
row filter. In our dataflow that is exactly ``discover`` with the
``scr`` hash spec; this wrapper exists so call sites read like the
paper's system names.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.mate import DiscoveryResult, discover
from repro.core.registry import HashSpec
from repro.corpus.queries import QueryTable
from repro.index.inverted import CorpusIndex


def discover_scr(
    spark: SparkSession,
    index: CorpusIndex,
    queries: list[QueryTable],
    *,
    k: int = 10,
    **kwargs,
) -> DiscoveryResult:
    """Top-k joinable tables with exact verification of every candidate."""
    return discover(spark, index, queries, HashSpec("scr"), k=k, **kwargs)
