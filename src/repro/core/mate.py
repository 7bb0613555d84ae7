"""MATE's online discovery phase (paper Section 6, Algorithm 1) as a
Spark dataflow.

The four steps map onto the distributed plan like this:

* **Initialization** — pick the initial query column per query table
  (min-cardinality heuristic, Section 6.1), hash the composite keys into
  query super keys (driver side; query tables are small), and fetch the
  initial column's posting lists with a value-equality join against the
  corpus cells DataFrame.
* **Row filtering** — join candidates with the per-row super-key index
  and apply the subsumption mask ``q_sk OR r_sk == r_sk`` in a
  vectorised pandas UDF (Section 6.3).
* **Table filtering** — Algorithm 1's heap-driven early termination is
  sequential, so we run the *sound two-round dataflow adaptation*
  (DESIGN.md section 3): verify the tables with the largest
  filtered-candidate upper bounds first, obtain the k-th best exact
  score j_k, then verify only remaining tables whose bound exceeds j_k.
  Everything else is pruned exactly as by the paper's rule 1; rule 2's
  partial-row effect is subsumed because bounds are computed *after* row
  filtering.
* **Joinability calculation** — exact verification + best-mapping j in
  :mod:`repro.core.verify`.

``spec = HashSpec("scr")`` degrades this into the SCR baseline: no row
filter, bounds from raw candidate counts, every candidate row verified.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf

from repro.core.bitops import to_bytes
from repro.core.registry import HashSpec
from repro.core.superkey import query_superkeys
from repro.core.verify import melt_query_keys, verify_pairs
from repro.corpus.queries import QueryTable
from repro.index.inverted import CorpusIndex

QKEYS_SCHEMA = "qid long, qrow_id long, key_pos long, value string"
QINIT_SCHEMA = "qid long, qrow_id long, value string, qsk binary"


def _subsumed_udf():
    """Row filter as a vectorised pandas UDF: every 1-bit of the query
    super key must be set in the row's. Built lazily — pandas_udf needs
    an active SparkSession to resolve its return type."""

    @pandas_udf("boolean")
    def subsumed(qsk: pd.Series, sk: pd.Series) -> pd.Series:
        return pd.Series(
            [
                int.from_bytes(q, "big") & ~int.from_bytes(r, "big") == 0
                for q, r in zip(qsk, sk)
            ]
        )

    return subsumed


@dataclass
class DiscoveryResult:
    """Top-k joinable tables + work counters for one discovery run."""

    topk: pd.DataFrame  # (qid, rank, table_id, j)
    per_qid: pd.DataFrame  # counters per query table (see discover())
    wall_seconds: float
    matches: pd.DataFrame | None = None  # verified pairs (precision ground truth)
    init_columns: dict[int, str] = field(default_factory=dict)

    @property
    def precision_by_qid(self) -> pd.Series:
        """Row-filter precision TP/(TP+FP) per query table (Table 3)."""
        p = self.per_qid.set_index("qid")
        denom = (p["tp"] + p["fp"]).replace(0, pd.NA)
        return (p["tp"] / denom).fillna(1.0)


def select_init_column(
    query: QueryTable,
    strategy: str = "cardinality",
    index: CorpusIndex | None = None,
) -> str:
    """Initial-column heuristics (Sections 6.1 and 7.5.4).

    ``cardinality`` — MATE's heuristic: fewest distinct values.
    ``order``      — first key column in table column order.
    ``tls``        — column holding the longest string.
    ``best``/``worst`` — oracle bounds: fewest/most posting-list items,
    computed against the actual index (requires ``index``).
    """
    cols = [c for c in query.df.columns if c in query.key_cols]
    if strategy == "cardinality":
        return min(cols, key=lambda c: (query.df[c].nunique(), cols.index(c)))
    if strategy == "order":
        return cols[0]
    if strategy == "tls":
        return max(cols, key=lambda c: (query.df[c].astype(str).str.len().max(), -cols.index(c)))
    if strategy in ("best", "worst"):
        if index is None:
            raise ValueError(f"{strategy!r} strategy needs the corpus index")
        values = {v for c in cols for v in query.df[c].astype(str)}
        counts = (
            index.cells.filter(F.col("value").isin(list(values)))
            .groupBy("value")
            .count()
            .toPandas()
            .set_index("value")["count"]
        )
        def pl_items(c: str) -> int:
            return int(
                sum(counts.get(v, 0) for v in query.df[c].astype(str).unique())
            )
        return (min if strategy == "best" else max)(cols, key=lambda c: (pl_items(c), cols.index(c)))
    raise ValueError(f"unknown strategy {strategy!r}")


def _query_side_frames(
    queries: list[QueryTable],
    hasher,
    hash_size: int,
    init_strategy: str,
    index: CorpusIndex | None,
) -> tuple[pd.DataFrame, pd.DataFrame, dict[int, int], dict[int, str]]:
    """Driver-side initialization: distinct key tuples, init columns,
    query super keys. Returns (qkeys_long, qinit, m_by_qid, init_cols)."""
    qkeys_parts, qinit_parts = [], []
    m_by_qid: dict[int, int] = {}
    init_cols: dict[int, str] = {}
    for q in queries:
        keys = (
            q.df[q.key_cols].astype(str).drop_duplicates().reset_index(drop=True)
        )
        m_by_qid[q.qid] = len(q.key_cols)
        init_col = select_init_column(q, init_strategy, index)
        init_cols[q.qid] = init_col
        qkeys_parts.append(melt_query_keys(keys, q.key_cols, q.qid))
        qinit = pd.DataFrame(
            {
                "qid": q.qid,
                "qrow_id": keys.index.to_numpy(),
                "value": keys[init_col].to_numpy(),
            }
        )
        if hasher is not None:
            sks = query_superkeys(keys, q.key_cols, hasher)
            qinit["qsk"] = [to_bytes(h, hash_size) for h in sks]
        else:
            qinit["qsk"] = None
        qinit_parts.append(qinit)
    return (
        pd.concat(qkeys_parts, ignore_index=True),
        pd.concat(qinit_parts, ignore_index=True),
        m_by_qid,
        init_cols,
    )


def _pair_filter(selected: set[tuple[int, int]]):
    """A Column predicate keeping (qid, table_id) pairs in ``selected``."""
    keys = [q * 10_000_000 + t for q, t in selected]
    return (F.col("qid") * 10_000_000 + F.col("table_id")).isin(keys)


def discover(
    spark: SparkSession,
    index: CorpusIndex,
    queries: list[QueryTable],
    spec: HashSpec,
    *,
    k: int = 10,
    margin: int = 5,
    init_strategy: str = "cardinality",
    prune_tables: bool = True,
    collect_matches: bool = False,
    hasher_override=None,
    override_key: str | None = None,
) -> DiscoveryResult:
    """Find the top-k joinable tables for every query table in ``queries``.

    All query tables run in one Spark pipeline (they are independent;
    tagging rows with ``qid`` batches the paper's per-query loop into
    joins/groupBys). Counters per qid:

    ``pl_items``          posting-list items fetched for the init column
    ``cand_pairs``        candidate (query-row, table-row) pairs
    ``cand_tables``       tables containing at least one candidate
    ``surv_pairs``        pairs surviving the super-key row filter
    ``verif_pairs``       pairs exactly verified (after table pruning)
    ``tp`` / ``fp``       verified pairs that are / are not true matches
    ``tables_pruned``     candidate tables never verified
    """
    t0 = time.perf_counter()
    if hasher_override is not None and override_key is None:
        raise ValueError("hasher_override requires override_key for the index cache")
    hasher = hasher_override if hasher_override is not None else index.hasher(spec)
    hash_size = 0 if hasher is None else hasher.hash_size
    qkeys_long_pdf, qinit_pdf, m_by_qid, init_cols = _query_side_frames(
        queries, hasher, hash_size, init_strategy, index
    )
    qkeys_long = spark.createDataFrame(qkeys_long_pdf, schema=QKEYS_SCHEMA)
    qinit = spark.createDataFrame(qinit_pdf, schema=QINIT_SCHEMA)

    # --- Initialization: fetch posting lists of the initial column. ---
    cand_cells = index.cells.join(F.broadcast(qinit), "value")
    pl_items = cand_cells  # every hit is one fetched PL item
    pairs = cand_cells.select("qid", "table_id", "row_id", "qrow_id", "qsk").distinct()

    # --- Row filtering: super-key subsumption (skipped for SCR). ---
    if spec.name == "scr":
        survivors = pairs.select("qid", "table_id", "row_id", "qrow_id")
    else:
        sk = (
            index.superkeys_custom(override_key, hasher)
            if hasher_override is not None
            else index.superkeys(spec)
        )
        survivors = (
            pairs.join(sk, ["table_id", "row_id"])
            .filter(_subsumed_udf()(F.col("qsk"), F.col("sk")))
            .select("qid", "table_id", "row_id", "qrow_id")
        )
    survivors = survivors.persist()

    # --- Bounds for table filtering (one small collect). ---
    bounds_pdf = (
        survivors.groupBy("qid", "table_id")
        .agg(
            F.countDistinct("qrow_id").alias("ub"),
            F.count(F.lit(1)).alias("n_pairs"),
        )
        .toPandas()
    )
    raw_counts_pdf = (
        pairs.groupBy("qid")
        .agg(
            F.count(F.lit(1)).alias("cand_pairs"),
            F.countDistinct("table_id").alias("cand_tables"),
        )
        .join(pl_items.groupBy("qid").agg(F.count(F.lit(1)).alias("pl_items")), "qid")
        .toPandas()
    )

    # --- Table filtering: two-round sound pruning. ---
    def verify_selection(selected: set[tuple[int, int]]) -> pd.DataFrame:
        if not selected:
            return pd.DataFrame(
                columns=["qid", "table_id", "row_id", "qrow_id", "is_match", "j"]
            )
        subset = survivors.filter(_pair_filter(selected))
        return verify_pairs(
            spark, index.cells, qkeys_long, subset, m_by_qid
        ).toPandas()

    all_tables = {
        (int(r.qid), int(r.table_id)) for r in bounds_pdf.itertuples()
    }
    if prune_tables:
        round_a: set[tuple[int, int]] = set()
        for qid, grp in bounds_pdf.groupby("qid"):
            top = grp.sort_values(["ub", "table_id"], ascending=[False, True]).head(
                k + margin
            )
            round_a |= {(int(qid), int(t)) for t in top["table_id"]}
        verified_a = verify_selection(round_a)
        jk_by_qid: dict[int, int] = {}
        for qid, grp in verified_a.groupby("qid"):
            js = grp.groupby("table_id")["j"].first().sort_values(ascending=False)
            # Rule 1 only applies once k tables are known (Section 6.2);
            # with fewer, nothing may be pruned, so the threshold is 0.
            jk_by_qid[int(qid)] = int(js.iloc[k - 1]) if len(js) >= k else 0
        round_b = {
            (int(r.qid), int(r.table_id))
            for r in bounds_pdf.itertuples()
            if (int(r.qid), int(r.table_id)) not in round_a
            and int(r.ub) > jk_by_qid.get(int(r.qid), 0)
        }
        verified_b = verify_selection(round_b)
        verified = pd.concat([verified_a, verified_b], ignore_index=True)
        verified_tables = round_a | round_b
    else:
        verified = verify_selection(all_tables)
        verified_tables = all_tables
    survivors.unpersist()

    # --- Assemble top-k and counters. ---
    if len(verified):
        j_by_table = (
            verified.groupby(["qid", "table_id"])["j"].first().reset_index()
        )
        # A table with j = 0 is not joinable at all — never reported
        # (SCR reaches verification with such tables; MATE's filter
        # usually removes them earlier).
        j_by_table = j_by_table[j_by_table["j"] > 0]
    else:
        j_by_table = pd.DataFrame(columns=["qid", "table_id", "j"])
    topk_parts = []
    for q in queries:
        grp = j_by_table[j_by_table.qid == q.qid].sort_values(
            ["j", "table_id"], ascending=[False, True]
        ).head(k)
        grp = grp.assign(rank=range(1, len(grp) + 1))
        topk_parts.append(grp[["qid", "rank", "table_id", "j"]])
    topk = (
        pd.concat(topk_parts, ignore_index=True)
        if topk_parts
        else pd.DataFrame(columns=["qid", "rank", "table_id", "j"])
    )

    per_qid_rows = []
    for q in queries:
        qid = q.qid
        raw = raw_counts_pdf[raw_counts_pdf.qid == qid]
        b = bounds_pdf[bounds_pdf.qid == qid]
        v = verified[verified.qid == qid] if len(verified) else verified
        n_ver_tables = len({t for (qq, t) in verified_tables if qq == qid})
        per_qid_rows.append(
            {
                "qid": qid,
                "pl_items": int(raw["pl_items"].iloc[0]) if len(raw) else 0,
                "cand_pairs": int(raw["cand_pairs"].iloc[0]) if len(raw) else 0,
                "cand_tables": int(raw["cand_tables"].iloc[0]) if len(raw) else 0,
                "surv_pairs": int(b["n_pairs"].sum()),
                "verif_pairs": int(len(v)),
                # astype(bool): toPandas can yield object dtype, where
                # ``~`` is integer complement, not logical negation.
                "tp": int(v["is_match"].astype(bool).sum()) if len(v) else 0,
                "fp": int(len(v) - v["is_match"].astype(bool).sum()) if len(v) else 0,
                "tables_pruned": int(len(b) - n_ver_tables),
            }
        )
    result = DiscoveryResult(
        topk=topk,
        per_qid=pd.DataFrame(per_qid_rows),
        wall_seconds=time.perf_counter() - t0,
        matches=verified if collect_matches else None,
        init_columns=init_cols,
    )
    return result
