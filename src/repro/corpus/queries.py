"""Query-table sets — the lite analogue of the paper's Table 1.

The paper probes 900 query tables in six cardinality-stratified groups
(WT 10/100/1000 against the web-table corpus, OD 100/1000/10000 against
open data) plus Kaggle ML tables (vs. web tables) and School-corpus
tables. We reproduce the same eight groups at lite scale (~1:10
cardinalities, 6-8 query tables per group — DESIGN.md section 4).

WT/OD/School query tables are drawn *from the corpus* (like the paper's
random corpus samples): a corpus table's key columns are projected and
row-subsampled to the group's cardinality band. Kaggle query tables are
drawn from the entity registries directly — external tables that only
partially overlap the corpus, like real Kaggle datasets vs. web tables.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.corpus import entities as ent
from repro.corpus.generators import Corpus

QUERY_SET_NAMES = (
    "WT (10)", "WT (100)", "WT (1k)",
    "OD (100)", "OD (1k)", "OD (10k)",
    "Kaggle", "School",
)


@dataclass
class QueryTable:
    """One discovery request: a key-column projection + composite key Q."""

    qid: int
    df: pd.DataFrame
    key_cols: list[str]

    @property
    def cardinality(self) -> int:
        """Distinct composite-key tuples (the paper's cardinality stat)."""
        return len(self.df[self.key_cols].drop_duplicates())


@dataclass
class QuerySet:
    """A named group of query tables probed against one corpus."""

    name: str
    corpus_name: str
    queries: list[QueryTable]

    @property
    def avg_cardinality(self) -> float:
        return float(np.mean([q.cardinality for q in self.queries]))


_SPECS: dict[str, dict] = {
    "WT (10)": dict(corpus="webtable", lo=3, hi=10, n=8, seed=21),
    "WT (100)": dict(corpus="webtable", lo=11, hi=40, n=8, seed=22),
    "WT (1k)": dict(corpus="webtable", lo=41, hi=150, n=8, seed=23),
    "OD (100)": dict(corpus="opendata", lo=8, hi=30, n=8, seed=24),
    "OD (1k)": dict(corpus="opendata", lo=60, hi=160, n=8, seed=25),
    "OD (10k)": dict(corpus="opendata", lo=161, hi=420, n=8, seed=26),
    "Kaggle": dict(corpus="webtable", special="kaggle", n=6, seed=27),
    "School": dict(corpus="school", special="school", n=6, seed=28),
}


def corpus_for(set_name: str) -> str:
    """Which corpus a query set is probed against (Table 1's Corpus col)."""
    return _SPECS[set_name]["corpus"]


def _from_corpus(
    corpus: Corpus, lo: int, hi: int, n: int, g: np.random.Generator
) -> list[QueryTable]:
    """Sample ``n`` query tables in the cardinality band [lo, hi]."""
    eligible = [
        t for t in corpus.tables if t.n_rows >= lo and len(t.domain_cols) >= 2
    ]
    if not eligible:
        # Down-scaled corpora (tests) may not reach the band's lower bound;
        # clamp the band to the largest tables available instead of failing.
        candidates = [t for t in corpus.tables if len(t.domain_cols) >= 2]
        if not candidates:
            raise ValueError("no corpus table with >= 2 domain columns")
        top = max(t.n_rows for t in candidates)
        lo = max(2, top // 2)
        hi = max(lo, min(hi, top))
        eligible = [t for t in candidates if t.n_rows >= lo]
    queries = []
    for qid in range(n):
        t = eligible[g.integers(0, len(eligible))]
        m = int(g.integers(2, 4))  # |Q| in {2, 3}, like the paper's random picks
        m = min(m, len(t.domain_cols))
        key_cols = sorted(g.choice(t.domain_cols, size=m, replace=False))
        distinct = t.df[key_cols].drop_duplicates().reset_index(drop=True)
        target = min(len(distinct), int(g.integers(lo, hi + 1)))
        sub = distinct.iloc[g.choice(len(distinct), size=target, replace=False)]
        queries.append(QueryTable(qid, sub.reset_index(drop=True), list(key_cols)))
    return queries


def _kaggle(n: int, g: np.random.Generator) -> list[QueryTable]:
    """External high-cardinality query tables (movies + airlines)."""
    movies = ent.movie_registry(n=2200, seed=301)
    airlines = ent.airline_registry(n=900, seed=302)
    queries = []
    for qid in range(n):
        if qid % 2 == 0:
            key_cols = ["director name", "movie title"]
            pool = movies
        else:
            key_cols = ["airline name", "country"]
            pool = airlines
        distinct = pool[key_cols].drop_duplicates().reset_index(drop=True)
        target = min(len(distinct), int(g.integers(250, 600)))
        sub = distinct.iloc[g.choice(len(distinct), size=target, replace=False)]
        queries.append(QueryTable(qid, sub.reset_index(drop=True), key_cols))
    return queries


def _school(corpus: Corpus, n: int, g: np.random.Generator) -> list[QueryTable]:
    """School queries: the paper extends tables with Program Type + School
    Name keys (Section 7.1)."""
    key_cols = ["program type", "school name"]
    queries = []
    for qid in range(n):
        t = corpus.tables[int(g.integers(0, corpus.n_tables))]
        distinct = t.df[key_cols].drop_duplicates().reset_index(drop=True)
        target = min(len(distinct), int(g.integers(150, 500)))
        sub = distinct.iloc[g.choice(len(distinct), size=target, replace=False)]
        queries.append(QueryTable(qid, sub.reset_index(drop=True), key_cols))
    return queries


def build_query_set(set_name: str, corpus: Corpus, *, n_queries: int | None = None) -> QuerySet:
    """Deterministically build one of the eight Table-1 query sets."""
    spec = _SPECS[set_name]
    if corpus.name != spec["corpus"]:
        raise ValueError(
            f"{set_name} runs against {spec['corpus']!r}, got {corpus.name!r}"
        )
    g = np.random.default_rng(spec["seed"])
    n = n_queries or spec["n"]
    if spec.get("special") == "kaggle":
        queries = _kaggle(n, g)
    elif spec.get("special") == "school":
        queries = _school(corpus, n, g)
    else:
        queries = _from_corpus(corpus, spec["lo"], spec["hi"], n, g)
    return QuerySet(set_name, corpus.name, queries)
