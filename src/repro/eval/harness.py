"""Experiment harness — builds the grids behind the paper's Tables 1-3
and the Section 7.5 micro-benchmarks, with a CSV run store so Table 2
(runtime) and Table 3 (precision) share the same discovery runs.

Scale: ``ExperimentContext(scale=...)`` multiplies corpus sizes; the
default bench scale (1.0) gives lite corpora of ~1M cells total
(DESIGN.md section 4). Indexes are parquet-cached per (corpus, scale).
"""
from __future__ import annotations

import os
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.josie import discover_mcr_josie, discover_scr_josie
from repro.baselines.mcr import discover_mcr
from repro.core.mate import discover
from repro.core.registry import HashSpec
from repro.corpus.generators import Corpus, get_corpus
from repro.corpus.queries import QUERY_SET_NAMES, QuerySet, build_query_set, corpus_for
from repro.eval.metrics import summarize
from repro.index.cache import cache_root
from repro.index.inverted import CorpusIndex

# The grid of Table 2: every column of the paper's runtime experiment.
TABLE2_SPECS: list[HashSpec] = [
    HashSpec("scr"),
    HashSpec("md5", 128),
    HashSpec("murmur", 128),
    HashSpec("city", 128),
    *[HashSpec(n, s) for n in ("simhash", "ht", "bf", "lhbf", "xash")
      for s in (128, 256, 512)],
]
# Table 3 reports 128- and 512-bit precision for these hashes.
TABLE3_SPECS: list[HashSpec] = [
    HashSpec(n, s)
    for n in ("md5", "city", "simhash", "ht", "bf", "lhbf", "xash")
    for s in (128, 512)
]
SYSTEMS = ("mate", "scr", "mcr", "scr_josie", "mcr_josie")  # Figure 4


@dataclass
class ExperimentContext:
    """Memoised corpora, indexes, and query sets for one Spark session."""

    spark: SparkSession
    scale: float = 1.0
    k: int = 10
    use_disk_cache: bool = True
    n_queries: int | None = None  # None -> each set's default size
    _corpora: dict[str, Corpus] = field(default_factory=dict)
    _indexes: dict[str, CorpusIndex] = field(default_factory=dict)
    _query_sets: dict[str, QuerySet] = field(default_factory=dict)

    def corpus(self, name: str) -> Corpus:
        if name not in self._corpora:
            self._corpora[name] = get_corpus(name, self.scale)
        return self._corpora[name]

    def index(self, corpus_name: str) -> CorpusIndex:
        if corpus_name not in self._indexes:
            key = (
                f"{corpus_name}_s{self.scale}" if self.use_disk_cache else None
            )
            self._indexes[corpus_name] = CorpusIndex(
                self.spark, self.corpus(corpus_name), cache_key=key
            )
        return self._indexes[corpus_name]

    def query_set(self, set_name: str) -> QuerySet:
        if set_name not in self._query_sets:
            self._query_sets[set_name] = build_query_set(
                set_name, self.corpus(corpus_for(set_name)), n_queries=self.n_queries
            )
        return self._query_sets[set_name]


def _store_path() -> str:
    root = cache_root() / "results"
    os.makedirs(root, exist_ok=True)
    return str(root / "runs.csv")


def _load_store() -> pd.DataFrame:
    path = _store_path()
    if os.path.exists(path):
        return pd.read_csv(path)
    return pd.DataFrame()


def _append_store(row: dict) -> None:
    store = _load_store()
    store = pd.concat([store, pd.DataFrame([row])], ignore_index=True)
    store.to_csv(_store_path(), index=False)


def run_config(
    ctx: ExperimentContext,
    set_name: str,
    spec: HashSpec | None = None,
    *,
    system: str = "mate",
    use_store: bool = True,
) -> dict:
    """Run (or fetch from the store) one (query set, system/spec) cell.

    ``system='mate'`` uses ``spec`` as the row filter (``scr`` spec =
    SCR baseline); other systems ignore ``spec``.
    """
    spec_key = spec.key if spec is not None else system
    ident = {
        "set_name": set_name,
        "system": system,
        "spec": spec_key,
        "k": ctx.k,
        "scale": ctx.scale,
    }
    if use_store and ctx.use_disk_cache:
        store = _load_store()
        if len(store):
            hit = store.loc[
                (store.set_name == set_name)
                & (store.system == system)
                & (store.spec == spec_key)
                & (store.k == ctx.k)
                & (store.scale == ctx.scale)
            ]
            if len(hit):
                return hit.iloc[-1].to_dict()

    qs = ctx.query_set(set_name)
    index = ctx.index(qs.corpus_name)
    if system == "mate":
        assert spec is not None
        res = discover(ctx.spark, index, qs.queries, spec, k=ctx.k)
    elif system == "scr":
        res = discover(ctx.spark, index, qs.queries, HashSpec("scr"), k=ctx.k)
    elif system == "mcr":
        res = discover_mcr(ctx.spark, index, qs.queries, k=ctx.k)
    elif system == "scr_josie":
        res = discover_scr_josie(ctx.spark, index, qs.queries, k=ctx.k)
    elif system == "mcr_josie":
        res = discover_mcr_josie(ctx.spark, index, qs.queries, k=ctx.k)
    else:
        raise ValueError(f"unknown system {system!r}")
    row = {**ident, **summarize(res, n_queries=len(qs.queries))}
    if ctx.use_disk_cache:
        _append_store(row)
    return row


def table1_rows(ctx: ExperimentContext) -> pd.DataFrame:
    """Reproduce Table 1: per query set, #tables, corpus, avg cardinality,
    avg joinability (avg best j found by MATE+XASH)."""
    rows = []
    for set_name in QUERY_SET_NAMES:
        qs = ctx.query_set(set_name)
        run = run_config(ctx, set_name, HashSpec("xash", 128))
        rows.append(
            {
                "query_set": set_name,
                "n_tables": len(qs.queries),
                "corpus": qs.corpus_name,
                "avg_cardinality": round(qs.avg_cardinality, 1),
                "avg_joinability": run["avg_top1_j"],
            }
        )
    return pd.DataFrame(rows)


def table2_rows(ctx: ExperimentContext, set_names=QUERY_SET_NAMES) -> pd.DataFrame:
    """Reproduce Table 2: per query set x spec, discovery runtime (s) and
    the work counters that drive it."""
    rows = []
    for set_name in set_names:
        for spec in TABLE2_SPECS:
            run = run_config(ctx, set_name, spec)
            rows.append(run)
    return pd.DataFrame(rows)


def table3_rows(ctx: ExperimentContext, set_names=QUERY_SET_NAMES) -> pd.DataFrame:
    """Reproduce Table 3: per query set x spec, precision mean ± std.
    Reuses Table 2's runs where the spec overlaps."""
    rows = []
    for set_name in set_names:
        for spec in TABLE3_SPECS:
            run = run_config(ctx, set_name, spec)
            rows.append(run)
    return pd.DataFrame(rows)


def fig4_rows(
    ctx: ExperimentContext, set_names=("WT (100)", "OD (1k)")
) -> pd.DataFrame:
    """Figure 4 (shape only): MATE vs SCR / MCR / SCR-Josie / MCR-Josie."""
    rows = []
    for set_name in set_names:
        for system in SYSTEMS:
            spec = HashSpec("xash", 128) if system == "mate" else None
            rows.append(run_config(ctx, set_name, spec, system=system))
    return pd.DataFrame(rows)


def format_table(df: pd.DataFrame, value: str, *, index="set_name", columns="spec") -> pd.DataFrame:
    """Pivot run rows into the paper's table layout."""
    return df.pivot_table(index=index, columns=columns, values=value, aggfunc="last")


# ---------------------------------------------------------------------------
# Section 7.5 micro-benchmarks (Figures 5-6 and the in-text experiments).
# These run fresh (no store) and return tidy frames for their jobs.
# ---------------------------------------------------------------------------

def with_k(ctx: ExperimentContext, k: int) -> ExperimentContext:
    """A context sharing ctx's corpora/indexes/query sets with another k."""
    clone = ExperimentContext(
        ctx.spark, scale=ctx.scale, k=k,
        use_disk_cache=ctx.use_disk_cache, n_queries=ctx.n_queries,
    )
    clone._corpora = ctx._corpora
    clone._indexes = ctx._indexes
    clone._query_sets = ctx._query_sets
    return clone


def topk_sweep_rows(
    ctx: ExperimentContext,
    set_name: str = "WT (100)",
    ks=(2, 5, 10, 15, 20),
    specs=(HashSpec("xash", 128), HashSpec("bf", 128), HashSpec("ht", 128),
           HashSpec("md5", 128)),
) -> pd.DataFrame:
    """Section 7.5.1: precision as k varies (paper: XASH best for all k)."""
    rows = []
    for k in ks:
        kctx = with_k(ctx, k)
        for spec in specs:
            run = run_config(kctx, set_name, spec, use_store=False)
            rows.append({"k": k, **run})
    return pd.DataFrame(rows)


def xash_component_rows(
    ctx: ExperimentContext, set_name: str = "WT (100)"
) -> pd.DataFrame:
    """Figure 5: precision/FPs of the XASH feature ladder on WT (100)."""
    from repro.core.xash import COMPONENT_VARIANTS, XashHasher, component_variant

    qs = ctx.query_set(set_name)
    index = ctx.index(qs.corpus_name)
    rows = []
    for name in COMPONENT_VARIANTS:
        hasher = XashHasher(component_variant(name))
        res = discover(
            ctx.spark, index, qs.queries, HashSpec("xash", 128), k=ctx.k,
            hasher_override=hasher, override_key=f"xvar_{name.replace('+', '_')}",
        )
        summary = summarize(res, n_queries=len(qs.queries))
        rows.append({"variant": name, "set_name": set_name, **summary})
    return pd.DataFrame(rows)


def keysize_rows(
    ctx: ExperimentContext, sizes=(2, 3, 4, 5, 6), spec=HashSpec("xash", 128)
) -> pd.DataFrame:
    """Figure 6: runtime/precision vs composite-key size |Q|.

    Uses the widest open-data tables (the paper uses a 33-column OD
    table); the key grows over the station-domain columns + date.
    """
    from repro.corpus.queries import QueryTable

    corpus = ctx.corpus("opendata")
    index = ctx.index("opendata")
    table = max(corpus.tables, key=lambda t: (len(t.domain_cols), t.n_rows))
    rows = []
    for m in sizes:
        if m > len(table.domain_cols):
            break
        key_cols = table.domain_cols[:m]
        qdf = table.df[key_cols].drop_duplicates().reset_index(drop=True)
        if len(qdf) > 300:
            qdf = qdf.head(300)
        query = QueryTable(0, qdf, list(key_cols))
        res = discover(ctx.spark, index, [query], spec, k=ctx.k)
        rows.append({"key_size": m, **summarize(res, n_queries=1)})
    return pd.DataFrame(rows)


def init_column_rows(
    ctx: ExperimentContext, set_name: str = "OD (10k)"
) -> pd.DataFrame:
    """Section 7.5.4: posting-list items fetched per init-column strategy.

    Paper (OD 10k): cardinality 179 < column order 202 < TLS 248 <<
    worst 728; ground-truth best 83.
    """
    qs = ctx.query_set(set_name)
    index = ctx.index(qs.corpus_name)
    rows = []
    for strategy in ("best", "cardinality", "order", "tls", "worst"):
        res = discover(
            ctx.spark, index, qs.queries, HashSpec("xash", 128), k=ctx.k,
            init_strategy=strategy,
        )
        rows.append(
            {
                "strategy": strategy,
                "avg_pl_items": round(
                    res.per_qid["pl_items"].mean(), 1
                ),
                **summarize(res, n_queries=len(qs.queries)),
            }
        )
    return pd.DataFrame(rows)
