"""JOSIE-lite and its n-ary adaptations (paper Section 7.1.1).

JOSIE [Zhu et al., SIGMOD'19] is a single-column top-k joinable-table
search: columns are token sets, ranked by exact overlap with the query
column. Our lite version keeps the ranking exact but drops JOSIE's
query-time cost model (DESIGN.md section 4) — the adaptation experiments
only consume the ranking itself.

* **SCR-Josie**: rank tables by overlap on MATE's initial column, keep
  the top-N, then verify their candidate rows via the SCR index.
* **MCR-Josie**: run the ranking per query column, intersect the
  per-column top-N table sets, verify the intersection.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.mate import DiscoveryResult, _query_side_frames, QKEYS_SCHEMA
from repro.core.verify import verify_pairs
from repro.corpus.queries import QueryTable
from repro.index.inverted import CorpusIndex


def josie_rank_tables(
    spark: SparkSession,
    index: CorpusIndex,
    query_values: pd.DataFrame,
) -> pd.DataFrame:
    """Exact single-column set-overlap ranking (JOSIE's output).

    ``query_values``: (qid, key_pos, value) distinct query-column tokens.
    Returns (qid, key_pos, table_id, overlap) sorted by overlap desc —
    per column, the joinability ranking of every candidate table.
    """
    qv = spark.createDataFrame(query_values, schema="qid long, key_pos long, value string")
    col_sets = index.cells.select("table_id", "col_id", "value").distinct()
    overlaps = (
        col_sets.join(F.broadcast(qv), "value")
        .groupBy("qid", "key_pos", "table_id", "col_id")
        .agg(F.countDistinct("value").alias("overlap"))
        # A table's score is its best column's overlap (set semantics).
        .groupBy("qid", "key_pos", "table_id")
        .agg(F.max("overlap").alias("overlap"))
    )
    return overlaps.toPandas().sort_values(
        ["qid", "key_pos", "overlap"], ascending=[True, True, False]
    )


def _finalize(
    spark: SparkSession,
    index: CorpusIndex,
    queries: list[QueryTable],
    qkeys_long: DataFrame,
    pairs: DataFrame,
    m_by_qid: dict[int, int],
    init_cols: dict[int, str],
    pl_items_by_qid: dict[int, int],
    k: int,
    t0: float,
) -> DiscoveryResult:
    """Shared verification + top-k assembly for the Josie adaptations."""
    pairs = pairs.persist()
    counts = (
        pairs.groupBy("qid")
        .agg(
            F.count(F.lit(1)).alias("cand_pairs"),
            F.countDistinct("table_id").alias("cand_tables"),
        )
        .toPandas()
    )
    verified = verify_pairs(spark, index.cells, qkeys_long, pairs, m_by_qid).toPandas()
    pairs.unpersist()
    j_by_table = (
        verified.groupby(["qid", "table_id"])["j"].first().reset_index()
        if len(verified)
        else pd.DataFrame(columns=["qid", "table_id", "j"])
    )
    if len(j_by_table):
        j_by_table = j_by_table[j_by_table["j"] > 0]
    topk_parts, per_qid_rows = [], []
    for q in queries:
        grp = (
            j_by_table[j_by_table.qid == q.qid]
            .sort_values(["j", "table_id"], ascending=[False, True])
            .head(k)
        )
        topk_parts.append(
            grp.assign(rank=range(1, len(grp) + 1))[["qid", "rank", "table_id", "j"]]
        )
        c = counts[counts.qid == q.qid]
        v = verified[verified.qid == q.qid] if len(verified) else verified
        tp = int(v["is_match"].astype(bool).sum()) if len(v) else 0
        per_qid_rows.append(
            {
                "qid": q.qid,
                "pl_items": pl_items_by_qid.get(q.qid, 0),
                "cand_pairs": int(c["cand_pairs"].iloc[0]) if len(c) else 0,
                "cand_tables": int(c["cand_tables"].iloc[0]) if len(c) else 0,
                "surv_pairs": int(c["cand_pairs"].iloc[0]) if len(c) else 0,
                "verif_pairs": int(len(v)),
                "tp": tp,
                "fp": int(len(v) - tp),
                "tables_pruned": 0,
            }
        )
    topk = (
        pd.concat(topk_parts, ignore_index=True)
        if topk_parts
        else pd.DataFrame(columns=["qid", "rank", "table_id", "j"])
    )
    return DiscoveryResult(
        topk=topk,
        per_qid=pd.DataFrame(per_qid_rows),
        wall_seconds=time.perf_counter() - t0,
        init_columns=init_cols,
    )


def discover_scr_josie(
    spark: SparkSession,
    index: CorpusIndex,
    queries: list[QueryTable],
    *,
    k: int = 10,
    candidate_factor: int = 5,
) -> DiscoveryResult:
    """SCR-Josie: JOSIE ranking on the initial column gates SCR verification."""
    t0 = time.perf_counter()
    qkeys_long_pdf, qinit_pdf, m_by_qid, init_cols = _query_side_frames(
        queries, None, 0, "cardinality", index
    )
    qkeys_long = spark.createDataFrame(qkeys_long_pdf, schema=QKEYS_SCHEMA)
    init_values = (
        qinit_pdf[["qid", "value"]]
        .drop_duplicates()
        .assign(key_pos=0)[["qid", "key_pos", "value"]]
    )
    ranking = josie_rank_tables(spark, index, init_values)
    keep: set[tuple[int, int]] = set()
    pl_items_by_qid: dict[int, int] = {}
    for qid, grp in ranking.groupby("qid"):
        top = grp.head(k * candidate_factor)
        keep |= {(int(qid), int(t)) for t in top["table_id"]}
        pl_items_by_qid[int(qid)] = int(grp["overlap"].sum())
    qinit = spark.createDataFrame(
        qinit_pdf[["qid", "qrow_id", "value"]], schema="qid long, qrow_id long, value string"
    )
    pairs = (
        index.cells.join(F.broadcast(qinit), "value")
        .select("qid", "table_id", "row_id", "qrow_id")
        .distinct()
    )
    keys = [q * 10_000_000 + t for q, t in keep]
    pairs = pairs.filter((F.col("qid") * 10_000_000 + F.col("table_id")).isin(keys))
    return _finalize(
        spark, index, queries, qkeys_long, pairs, m_by_qid, init_cols,
        pl_items_by_qid, k, t0,
    )


def discover_mcr_josie(
    spark: SparkSession,
    index: CorpusIndex,
    queries: list[QueryTable],
    *,
    k: int = 10,
    candidate_factor: int = 5,
) -> DiscoveryResult:
    """MCR-Josie: per-column JOSIE rankings, intersect table sets, verify."""
    t0 = time.perf_counter()
    qkeys_long_pdf, qinit_pdf, m_by_qid, init_cols = _query_side_frames(
        queries, None, 0, "cardinality", index
    )
    qkeys_long = spark.createDataFrame(qkeys_long_pdf, schema=QKEYS_SCHEMA)
    all_values = qkeys_long_pdf[["qid", "key_pos", "value"]].drop_duplicates()
    ranking = josie_rank_tables(spark, index, all_values)
    keep: set[tuple[int, int]] = set()
    pl_items_by_qid: dict[int, int] = {}
    for qid, grp in ranking.groupby("qid"):
        pl_items_by_qid[int(qid)] = int(grp["overlap"].sum())
        sets = [
            set(pos_grp.head(k * candidate_factor)["table_id"].astype(int))
            for _, pos_grp in grp.groupby("key_pos")
        ]
        inter = set.intersection(*sets) if sets else set()
        keep |= {(int(qid), t) for t in inter}
    qinit = spark.createDataFrame(
        qinit_pdf[["qid", "qrow_id", "value"]], schema="qid long, qrow_id long, value string"
    )
    pairs = (
        index.cells.join(F.broadcast(qinit), "value")
        .select("qid", "table_id", "row_id", "qrow_id")
        .distinct()
    )
    if keep:
        keys = [q * 10_000_000 + t for q, t in keep]
        pairs = pairs.filter(
            (F.col("qid") * 10_000_000 + F.col("table_id")).isin(keys)
        )
    else:
        pairs = pairs.filter(F.lit(False))
    return _finalize(
        spark, index, queries, qkeys_long, pairs, m_by_qid, init_cols,
        pl_items_by_qid, k, t0,
    )
