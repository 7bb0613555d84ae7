"""Exact joinability verification (Algorithm 1's calculateJ step).

Given candidate (query-row, table-row) pairs that survived filtering,
this module fetches the actual cell values and computes, per
(query, table):

* ``is_match`` per pair — does the table row contain *every* value of
  the composite key, each in a distinct column (an injective assignment
  key position -> column)?
* ``j`` — the paper's joinability (Eq. 2): the maximum, over injective
  column mappings ``Y'``, of the number of distinct query key tuples
  matched under that *single table-wide* mapping.

Dataflow: candidate rows' cells are joined against the melted query key
values (a value-equality join finds, for every pair, which columns hold
which key positions), then a ``applyInPandas`` over (qid, table_id)
groups enumerates assignments. Enumeration is bounded: a row value
rarely occurs in more than a couple of columns, and |Q| <= ~6.
"""
from __future__ import annotations

from itertools import product

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

VERIFY_SCHEMA = (
    "qid long, table_id long, row_id long, qrow_id long, is_match boolean, j long"
)
_MAX_ASSIGNMENTS = 500  # safety cap per (row, qrow); beyond this we keep the first 500


def melt_query_keys(qkeys_wide: pd.DataFrame, key_cols: list[str], qid: int) -> pd.DataFrame:
    """Wide query key tuples -> long (qid, qrow_id, key_pos, value)."""
    parts = []
    for pos, col in enumerate(key_cols):
        parts.append(
            pd.DataFrame(
                {
                    "qid": qid,
                    "qrow_id": qkeys_wide.index.to_numpy(),
                    "key_pos": pos,
                    "value": qkeys_wide[col].astype(str).to_numpy(),
                }
            )
        )
    return pd.concat(parts, ignore_index=True)


def _assignments(cols_by_pos: dict[int, list[int]], m: int):
    """Injective assignments key_pos -> col_id covering all m positions."""
    if len(cols_by_pos) < m:
        return []
    positions = sorted(cols_by_pos)
    out = []
    for combo in product(*(cols_by_pos[p] for p in positions)):
        if len(set(combo)) == m:
            out.append(combo)
            if len(out) >= _MAX_ASSIGNMENTS:
                break
    return out


def make_group_checker(m_by_qid: dict[int, int]):
    """Build the applyInPandas function checking one (qid, table) group.

    Input rows: (qid, table_id, row_id, qrow_id, key_pos, col_id) — every
    (key position, column) value hit for the group's candidate pairs.
    Output per pair: is_match, plus the group-constant joinability j.

    Vectorised fast paths keep the Python-level assignment enumeration
    off the hot path: a pair is rejected outright when it misses a key
    position or spans fewer distinct columns than |Q| (the overwhelming
    majority of SCR's false positives), and accepted directly when every
    position hits exactly one column and all columns differ.
    """

    def check(keys, pdf: pd.DataFrame) -> pd.DataFrame:
        qid, table_id = int(keys[0]), int(keys[1])
        m = m_by_qid[qid]
        d = pdf.drop_duplicates(["row_id", "qrow_id", "key_pos", "col_id"])
        stats = d.groupby(["row_id", "qrow_id"]).agg(
            npos=("key_pos", "nunique"),
            ncol=("col_id", "nunique"),
            n=("key_pos", "size"),
        )
        reject = (stats["npos"] < m) | (stats["ncol"] < m)
        fast = ~reject & (stats["n"] == m) & (stats["ncol"] == m)
        slow = ~reject & ~fast

        mapping_qrows: dict[tuple, set] = {}
        is_match = pd.Series(False, index=stats.index)

        if fast.any():
            # Each position hits exactly one column, all distinct — the
            # unique assignment is the per-pair (key_pos-sorted) col tuple.
            fast_idx = stats.index[fast]
            dd = d.set_index(["row_id", "qrow_id"]).loc[fast_idx].reset_index()
            assigns = (
                dd.sort_values("key_pos")
                .groupby(["row_id", "qrow_id"])["col_id"]
                .agg(tuple)
            )
            is_match.loc[fast_idx] = True
            for (row_id, qrow_id), a in assigns.items():
                mapping_qrows.setdefault(a, set()).add(int(qrow_id))

        if slow.any():
            slow_idx = set(stats.index[slow])
            sub = d[
                pd.MultiIndex.from_frame(d[["row_id", "qrow_id"]]).isin(slow_idx)
            ]
            for (row_id, qrow_id), grp in sub.groupby(["row_id", "qrow_id"], sort=False):
                cols_by_pos: dict[int, list[int]] = {
                    int(pos): sorted(set(int(c) for c in cs))
                    for pos, cs in grp.groupby("key_pos")["col_id"]
                }
                assigns = _assignments(cols_by_pos, m)
                if assigns:
                    is_match.loc[(row_id, qrow_id)] = True
                for a in assigns:
                    mapping_qrows.setdefault(a, set()).add(int(qrow_id))

        j = max((len(s) for s in mapping_qrows.values()), default=0)
        out = stats.reset_index()[["row_id", "qrow_id"]]
        out["is_match"] = is_match.to_numpy()
        out.insert(0, "qid", qid)
        out.insert(1, "table_id", table_id)
        out["j"] = j
        return out

    return check


def verify_pairs(
    spark: SparkSession,
    cells: DataFrame,
    qkeys_long: DataFrame,
    pairs: DataFrame,
    m_by_qid: dict[int, int],
) -> DataFrame:
    """Verify candidate pairs exactly; see module docstring.

    ``pairs``: (qid, table_id, row_id, qrow_id) — already deduplicated.
    ``qkeys_long``: (qid, qrow_id, key_pos, value).
    Returns (qid, table_id, row_id, qrow_id, is_match, j) — one row per
    input pair; ``j`` is constant within (qid, table_id).
    """
    rows_needed = pairs.select("table_id", "row_id").distinct()
    row_cells = cells.join(rows_needed, ["table_id", "row_id"])
    # Which columns of each candidate row hold which key values:
    hits = row_cells.join(F.broadcast(qkeys_long), "value").select(
        "qid", "table_id", "row_id", "qrow_id", "key_pos", "col_id"
    )
    # Keep only hits belonging to actual candidate pairs (a row may match
    # a key value without having been a candidate for that query row).
    hits = hits.join(pairs, ["qid", "table_id", "row_id", "qrow_id"]).distinct()
    return hits.groupBy("qid", "table_id").applyInPandas(
        make_group_checker(m_by_qid), schema=VERIFY_SCHEMA
    )
