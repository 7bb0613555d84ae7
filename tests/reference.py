"""Brute-force reference implementations used as test ground truth.

Pure pandas/python, exponential where the paper's problem is exponential
(explicit enumeration of column mappings, Eq. 2/3) — only usable on tiny
corpora, which is exactly the point: the Spark implementations must
agree with these on small inputs.
"""
from __future__ import annotations

from itertools import permutations

import pandas as pd

from repro.corpus.generators import Corpus
from repro.corpus.queries import QueryTable


def joinability(query_keys: pd.DataFrame, table_df: pd.DataFrame) -> int:
    """Eq. 2: max over column permutations Y' of |π_X(d) ∩ π_Y'(T)|.

    ``query_keys``: distinct composite key tuples (one column per key
    attribute, order = X). Enumerates every size-m permutation of the
    candidate table's columns.
    """
    m = len(query_keys.columns)
    if m > len(table_df.columns):
        return 0
    qset = {tuple(r) for r in query_keys.astype(str).itertuples(index=False)}
    best = 0
    cols = list(table_df.columns)
    str_cols = {c: table_df[c].astype(str) for c in cols}
    for combo in permutations(cols, m):
        tset = set(zip(*(str_cols[c] for c in combo)))
        best = max(best, len(qset & tset))
    return best


def row_matches(
    query_keys: pd.DataFrame, table_df: pd.DataFrame
) -> set[tuple[int, int]]:
    """All (qrow_id, row_id) pairs where the table row contains the whole
    key tuple in distinct columns (the per-row ground truth behind
    precision; mapping need not be table-wide consistent)."""
    m = len(query_keys.columns)
    out = set()
    table_str = table_df.astype(str)
    for qrow_id, key in enumerate(query_keys.astype(str).itertuples(index=False)):
        for row_id in range(len(table_str)):
            row = list(table_str.iloc[row_id])
            cols_by_pos = [
                [c for c, v in enumerate(row) if v == key[p]] for p in range(m)
            ]
            if _has_injective(cols_by_pos):
                out.add((qrow_id, row_id))
    return out


def _has_injective(cols_by_pos: list[list[int]], used: frozenset = frozenset()) -> bool:
    if not cols_by_pos:
        return True
    head, *rest = cols_by_pos
    return any(
        c not in used and _has_injective(rest, used | {c}) for c in head
    )


def brute_force_topk(corpus: Corpus, query: QueryTable, k: int) -> list[int]:
    """The exact sorted top-k joinability scores over the whole corpus."""
    keys = query.df[query.key_cols].astype(str).drop_duplicates()
    js = sorted(
        (joinability(keys, t.df) for t in corpus.tables), reverse=True
    )
    return js[:k]
