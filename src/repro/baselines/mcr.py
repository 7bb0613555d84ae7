"""MCR — Multi-Column Retrieval baseline (paper Section 7.1.1).

MCR adapts a unary-join index to n-ary discovery the expensive way: it
fetches the posting lists for *every* query column, intersects the
(table, row) hits across columns, and verifies the intersection. It
needs no super key, but touches |Q| times more posting lists than MATE's
single initial-column fetch — the paper's Figure 4 shows this dominating
on the web-table corpus.

Dataflow: one value-equality join per composite key melted long, then a
groupBy requiring all |Q| key positions to hit the same (table, row).
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.mate import DiscoveryResult, _query_side_frames, QKEYS_SCHEMA
from repro.core.verify import verify_pairs
from repro.corpus.queries import QueryTable
from repro.index.inverted import CorpusIndex


def discover_mcr(
    spark: SparkSession,
    index: CorpusIndex,
    queries: list[QueryTable],
    *,
    k: int = 10,
) -> DiscoveryResult:
    """Top-k joinable tables via per-column PL intersection + verification."""
    t0 = time.perf_counter()
    qkeys_long_pdf, _, m_by_qid, init_cols = _query_side_frames(
        queries, None, 0, "cardinality", index
    )
    qkeys_long = spark.createDataFrame(qkeys_long_pdf, schema=QKEYS_SCHEMA)

    # Fetch PLs for every key value of every query column.
    hits = index.cells.join(F.broadcast(qkeys_long), "value").select(
        "qid", "table_id", "row_id", "qrow_id", "key_pos"
    )
    hits = hits.persist()
    # A (table, row) is a candidate for a query row iff all |Q| positions hit.
    m_df = F.broadcast(
        spark.createDataFrame(
            pd.DataFrame(
                {"qid": list(m_by_qid), "m": [m_by_qid[q] for q in m_by_qid]}
            ),
            schema="qid long, m long",
        )
    )
    pairs = (
        hits.distinct()
        .groupBy("qid", "table_id", "row_id", "qrow_id")
        .agg(F.countDistinct("key_pos").alias("hit_positions"))
        .join(m_df, "qid")
        .filter(F.col("hit_positions") == F.col("m"))
        .select("qid", "table_id", "row_id", "qrow_id")
    )
    pairs = pairs.persist()

    counts_pdf = (
        hits.groupBy("qid")
        .agg(F.count(F.lit(1)).alias("pl_items"))
        .join(
            pairs.groupBy("qid").agg(
                F.count(F.lit(1)).alias("cand_pairs"),
                F.countDistinct("table_id").alias("cand_tables"),
            ),
            "qid",
            "left",
        )
        .toPandas()
        .fillna(0)
    )
    verified = verify_pairs(spark, index.cells, qkeys_long, pairs, m_by_qid).toPandas()
    hits.unpersist()
    pairs.unpersist()

    j_by_table = (
        verified.groupby(["qid", "table_id"])["j"].first().reset_index()
        if len(verified)
        else pd.DataFrame(columns=["qid", "table_id", "j"])
    )
    j_by_table = j_by_table[j_by_table["j"] > 0] if len(j_by_table) else j_by_table
    topk_parts = []
    for q in queries:
        grp = (
            j_by_table[j_by_table.qid == q.qid]
            .sort_values(["j", "table_id"], ascending=[False, True])
            .head(k)
        )
        grp = grp.assign(rank=range(1, len(grp) + 1))
        topk_parts.append(grp[["qid", "rank", "table_id", "j"]])
    topk = (
        pd.concat(topk_parts, ignore_index=True)
        if topk_parts
        else pd.DataFrame(columns=["qid", "rank", "table_id", "j"])
    )

    per_qid_rows = []
    for q in queries:
        c = counts_pdf[counts_pdf.qid == q.qid]
        v = verified[verified.qid == q.qid] if len(verified) else verified
        tp = int(v["is_match"].astype(bool).sum()) if len(v) else 0
        per_qid_rows.append(
            {
                "qid": q.qid,
                "pl_items": int(c["pl_items"].iloc[0]) if len(c) else 0,
                "cand_pairs": int(c["cand_pairs"].iloc[0]) if len(c) else 0,
                "cand_tables": int(c["cand_tables"].iloc[0]) if len(c) else 0,
                "surv_pairs": int(c["cand_pairs"].iloc[0]) if len(c) else 0,
                "verif_pairs": int(len(v)),
                "tp": tp,
                "fp": int(len(v) - tp),
                "tables_pruned": 0,
            }
        )
    return DiscoveryResult(
        topk=topk,
        per_qid=pd.DataFrame(per_qid_rows),
        wall_seconds=time.perf_counter() - t0,
        init_columns=init_cols,
    )
