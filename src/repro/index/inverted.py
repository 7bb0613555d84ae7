"""The MATE index substrate (paper Sections 3 and 5).

The single-attribute inverted index (Eq. 4) maps every cell value to its
posting list of (table, column, row) triples. In a relational dataflow
this *is* the long-format cells DataFrame — ``value`` is the join key.
MATE extends each PL item with the row's **super key** (Section 5.1);
here that is a second DataFrame keyed by (table_id, row_id) that joins
onto the posting lists.

:class:`CorpusIndex` owns both structures for one corpus, builds the
super-key sides lazily per hash spec (offline phase), and parquet-caches
them via :mod:`repro.index.cache`.
"""
from __future__ import annotations

from pathlib import Path

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.registry import HashSpec, make_hasher
from repro.core.superkey import row_superkeys
from repro.corpus.generators import Corpus
from repro.index.cache import dataset_path, load_or_build


class CorpusIndex:
    """Inverted index + per-hash super-key index for one corpus.

    ``cache_key`` enables parquet caching (benchmarks); tests pass
    ``cache_key=None`` for purely in-memory indexes. ``alpha`` is XASH's
    1-bit budget (Eq. 5; paper operating point 6).
    """

    def __init__(
        self,
        spark: SparkSession,
        corpus: Corpus,
        *,
        cache_key: str | None = None,
        alpha: int = 6,
    ) -> None:
        self.spark = spark
        self.corpus = corpus
        self.alpha = alpha
        self._cache_key = cache_key
        self._cells: DataFrame | None = None
        self._superkeys: dict[str, DataFrame] = {}
        # BF/LHBF are parameterised by the corpus' average column count
        # (the paper sets V to 5 for web tables, 26 for open data).
        self.values_per_row = corpus.avg_cols

    def _path(self, name: str) -> Path | None:
        if self._cache_key is None:
            return None
        return dataset_path(self._cache_key, name)

    @property
    def cells(self) -> DataFrame:
        """Posting lists (Eq. 4): (table_id, col_id, row_id, value)."""
        if self._cells is None:
            self._cells = load_or_build(
                self.spark,
                self._path("cells"),
                lambda: self.corpus.cells_spark(self.spark),
            )
        return self._cells

    def hasher(self, spec: HashSpec):
        """The value->int hasher for ``spec``, corpus-parameterised."""
        return make_hasher(
            spec, values_per_row=self.values_per_row, alpha=self.alpha
        )

    def superkeys(self, spec: HashSpec) -> DataFrame:
        """Per-row super keys: (table_id, row_id, sk binary). Offline phase."""
        if spec.name == "scr":
            raise ValueError("SCR has no super-key index")
        if spec.key not in self._superkeys:
            hasher = self.hasher(spec)
            self._superkeys[spec.key] = load_or_build(
                self.spark,
                self._path(f"sk_{spec.key}"),
                lambda: row_superkeys(self.cells, hasher),
            )
        return self._superkeys[spec.key]

    def superkeys_custom(self, key: str, hasher) -> DataFrame:
        """Per-row super keys for a non-registry hasher (XASH ablation).

        ``key`` must be unique per hasher configuration — it names the
        cache slot exactly like a registry spec's key does.
        """
        if key not in self._superkeys:
            self._superkeys[key] = load_or_build(
                self.spark,
                self._path(f"sk_{key}"),
                lambda: row_superkeys(self.cells, hasher),
            )
        return self._superkeys[key]

    def extended_posting_lists(self, spec: HashSpec) -> DataFrame:
        """Eq. 4 extended with S_ij: (value, table_id, col_id, row_id, sk)."""
        return self.cells.join(self.superkeys(spec), ["table_id", "row_id"])

    def table_counts(self) -> DataFrame:
        """(table_id, n_rows) — used by pruning bounds and stats."""
        return self.cells.groupBy("table_id").agg(
            F.countDistinct("row_id").alias("n_rows")
        )

    def warm(self, specs: list[HashSpec]) -> None:
        """Materialise the offline phase for ``specs`` (index generation)."""
        self.cells.count()
        for spec in specs:
            if spec.name != "scr":
                self.superkeys(spec).count()
