"""Synthetic table corpora — lite stand-ins for the paper's three corpora.

Substitution (DESIGN.md section 4): we cannot ship the 145M-table Dresden
Web Table Corpus, the German Open Data repository, or the School corpus.
Each generator below reproduces the *structural* properties the MATE
experiments depend on:

* ``webtable_lite``  — many small, narrow tables (paper: avg cardinality
  3-151, ~5 columns) over person/movie/airline entities.
* ``opendata_lite``  — fewer, larger, wider tables (paper: avg 26
  columns) over air-quality measurements keyed by station/city/date.
* ``school_lite``    — few very wide tables (paper: 27+ columns, 30k
  rows) over school entities; wide rows saturate small super keys, the
  regime where the paper's School precision row collapses to ~0 for
  digest hashes.

Entities are drawn from shared registries (:mod:`repro.corpus.entities`)
so multi-attribute keys join across tables while single attributes
collide far more often — the paper's false-positive regime.

All generators are deterministic in ``seed`` and linear in ``scale``.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import lru_cache

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.corpus import entities as ent

CELLS_SCHEMA = "table_id long, col_id long, row_id long, value string"


@dataclass
class CorpusTable:
    """One corpus table: string cells + which columns carry entity values."""

    table_id: int
    name: str
    df: pd.DataFrame
    domain_cols: list[str] = field(default_factory=list)

    @property
    def n_rows(self) -> int:
        return len(self.df)

    @property
    def n_cols(self) -> int:
        return len(self.df.columns)


@dataclass
class Corpus:
    """A named collection of tables with long-format cell access."""

    name: str
    tables: list[CorpusTable]

    def __post_init__(self) -> None:
        self._by_id = {t.table_id: t for t in self.tables}
        if len(self._by_id) != len(self.tables):
            raise ValueError("duplicate table_id in corpus")

    def table(self, table_id: int) -> CorpusTable:
        return self._by_id[table_id]

    def cells_pdf(self) -> pd.DataFrame:
        """Long format: (table_id, col_id, row_id, value) — the index input."""
        parts = []
        for t in self.tables:
            n = t.n_rows
            for col_id, col in enumerate(t.df.columns):
                parts.append(
                    pd.DataFrame(
                        {
                            "table_id": np.full(n, t.table_id, dtype="int64"),
                            "col_id": np.full(n, col_id, dtype="int64"),
                            "row_id": np.arange(n, dtype="int64"),
                            "value": t.df[col].astype(str).to_numpy(),
                        }
                    )
                )
        return pd.concat(parts, ignore_index=True)

    def cells_spark(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.cells_pdf(), schema=CELLS_SCHEMA)

    @property
    def n_tables(self) -> int:
        return len(self.tables)

    @property
    def avg_cols(self) -> float:
        """Average column count — the paper's ``V`` for BF/LHBF sizing."""
        return float(np.mean([t.n_cols for t in self.tables]))

    def n_unique_values(self) -> int:
        """Distinct cell values — the paper's ``C_unique`` for Eq. 5."""
        return int(self.cells_pdf()["value"].nunique())


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _sample_table(
    g: np.random.Generator,
    registry: pd.DataFrame,
    n_rows: int,
    n_domain_cols: int,
    noise_cols: int,
) -> tuple[pd.DataFrame, list[str]]:
    """Sample ``n_rows`` entities and project a random column subset.

    ``noise_cols`` appends high-cardinality numeric columns (ids, scores)
    that join nothing but do inflate row super keys, as real tables do.
    """
    rows = registry.iloc[g.integers(0, len(registry), n_rows)].reset_index(drop=True)
    cols = list(registry.columns)
    chosen = sorted(g.choice(len(cols), size=n_domain_cols, replace=False))
    out = rows.iloc[:, chosen].copy()
    domain_cols = list(out.columns)
    for i in range(noise_cols):
        out[f"noise {i}"] = (g.random(n_rows) * 10_000).round(1).astype(str)
    return out, domain_cols


def webtable_lite(*, scale: float = 1.0, seed: int = 7) -> Corpus:
    """~800·scale narrow tables over person/movie/airline entities."""
    g = _rng(seed)
    n_tables = max(3, int(800 * scale))
    persons = ent.person_registry()
    movies = ent.movie_registry()
    airlines = ent.airline_registry()
    tables: list[CorpusTable] = []
    for tid in range(n_tables):
        domain = g.choice(["person", "movie", "airline"], p=[0.6, 0.25, 0.15])
        registry = {"person": persons, "movie": movies, "airline": airlines}[domain]
        # Web tables are small; lognormal gives the paper's skew to tiny tables.
        n_rows = int(np.clip(g.lognormal(2.3, 0.9), 3, 150))
        n_domain = int(g.integers(3, len(registry.columns) + 1))
        df, domain_cols = _sample_table(g, registry, n_rows, n_domain, int(g.integers(0, 3)))
        tables.append(CorpusTable(tid, f"wt_{domain}_{tid}", df, domain_cols))
    return Corpus("webtable", tables)


def opendata_lite(*, scale: float = 1.0, seed: int = 8) -> Corpus:
    """~50·scale mid-size, wide tables over measurement entities."""
    g = _rng(seed)
    n_tables = max(2, int(50 * scale))
    stations = ent.station_registry()
    dates = ent.date_pool()
    tables: list[CorpusTable] = []
    for tid in range(n_tables):
        n_rows = int(g.integers(120, 420) * max(scale, 0.05)) or 10
        rows = stations.iloc[g.integers(0, len(stations), n_rows)].reset_index(drop=True)
        rows["date"] = g.choice(dates, n_rows)
        domain_cols = list(rows.columns)
        # Wide numeric payload: the paper's OD tables average 26 columns.
        for i in range(int(g.integers(6, 14))):
            rows[f"metric {i}"] = (g.random(n_rows) * 500).round(2).astype(str)
        tables.append(CorpusTable(tid, f"od_{tid}", rows, domain_cols))
    return Corpus("opendata", tables)


def school_lite(*, scale: float = 1.0, seed: int = 9) -> Corpus:
    """~25·scale very wide tables over school entities."""
    g = _rng(seed)
    n_tables = max(2, int(25 * scale))
    schools = ent.school_registry()
    tables: list[CorpusTable] = []
    for tid in range(n_tables):
        n_rows = int(g.integers(300, 900) * max(scale, 0.02)) or 10
        rows = schools.iloc[g.integers(0, len(schools), n_rows)].reset_index(drop=True)
        domain_cols = list(rows.columns)
        # 14-20 extra stat columns -> 20-26 columns total, the saturation regime.
        for i in range(int(g.integers(14, 21))):
            rows[f"stat {i}"] = (g.random(n_rows) * 100).round(1).astype(str)
        tables.append(CorpusTable(tid, f"school_{tid}", rows, domain_cols))
    return Corpus("school", tables)


@lru_cache(maxsize=8)
def get_corpus(name: str, scale: float = 1.0) -> Corpus:
    """Memoised corpus accessor used by the harness and benchmarks."""
    builders = {
        "webtable": webtable_lite,
        "opendata": opendata_lite,
        "school": school_lite,
    }
    return builders[name](scale=scale)
