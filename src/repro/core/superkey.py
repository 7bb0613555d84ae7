"""Super-key construction (Section 5.1).

The super key of a row is the bitwise OR of the hash of every cell value
in the row; probing it with the OR of a composite key's value hashes
answers "could this row contain the whole key?" with no false negatives.

Two entry points:

* :func:`row_superkeys` — distributed: cells DataFrame -> per-row super
  keys, computed with ``groupBy(table_id).applyInPandas`` (one pandas
  group per corpus table, vectorised OR-fold inside — the "DataFrame UDF"
  dataflow from the reproduction brief).
* :func:`query_superkeys` — driver-side: a (small) query table's key
  columns -> one super key per distinct key combination.
"""
from __future__ import annotations

from functools import reduce
from operator import or_

import pandas as pd
from pyspark.sql import DataFrame

from repro.core.bitops import to_bytes


def or_fold(hashes) -> int:
    """OR-aggregate an iterable of int hashes (0 if empty)."""
    return reduce(or_, hashes, 0)


def row_superkeys(cells: DataFrame, hasher) -> DataFrame:
    """Per-row super keys for a corpus cells DataFrame.

    ``cells`` columns: table_id (long), col_id (long), row_id (long),
    value (string). Returns (table_id, row_id, sk: binary), one row per
    corpus table row; ``sk`` is the big-endian fixed-width OR of the
    XASH/BF/... hash of every cell in the row.
    """
    n_bits = hasher.hash_size

    def build(pdf: pd.DataFrame) -> pd.DataFrame:
        hashed = pdf["value"].map(hasher)
        sk = (
            hashed.groupby([pdf["table_id"], pdf["row_id"]])
            .agg(or_fold)
            .reset_index()
        )
        sk["sk"] = sk["value"].map(lambda h: to_bytes(h, n_bits))
        return sk[["table_id", "row_id", "sk"]]

    return cells.groupBy("table_id").applyInPandas(
        build, schema="table_id long, row_id long, sk binary"
    )


def query_superkeys(query_pdf: pd.DataFrame, key_cols: list[str], hasher) -> pd.Series:
    """Super key per query-table row over its composite-key columns.

    Returns a Series of Python ints aligned with ``query_pdf``'s index:
    ``OR(hash(row[c]) for c in key_cols)``.
    """
    # Plain Python fold: pandas' combine() may try to downcast the
    # arbitrary-precision hash ints to int64 and overflow.
    totals = [0] * len(query_pdf)
    for c in key_cols:
        totals = [t | hasher(v) for t, v in zip(totals, query_pdf[c])]
    return pd.Series(totals, index=query_pdf.index, dtype=object)
