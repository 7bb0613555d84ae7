"""Tests for the inverted index + super-key substrate (Spark)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import bitops
from repro.core.registry import HashSpec
from repro.core.superkey import or_fold, query_superkeys, row_superkeys
from repro.corpus.generators import Corpus, CorpusTable, webtable_lite
from repro.index.inverted import CorpusIndex
from repro.oracle import assert_equivalent

XASH = HashSpec("xash", 128)


@pytest.fixture(scope="module")
def running_example() -> Corpus:
    """Figure 1's candidate table T1 plus a second small table."""
    t1 = pd.DataFrame(
        {
            "vorname": ["helmut", "muhammad", "ansel", "ansel", "muhammad",
                        "muhammad", "gretchen", "adam"],
            "nachname": ["newton", "lee", "adams", "adams", "ali", "lee",
                         "lee", "sandler"],
            "land": ["germany", "us", "uk", "us", "us", "germany", "germany", "us"],
            "besetzung": ["photographer", "dancer", "dancer", "photographer",
                          "boxer", "birder", "artist", "actor"],
        }
    )
    t2 = pd.DataFrame(
        {
            "name": ["muhammad", "helmut"],
            "country": ["us", "germany"],
        }
    )
    return Corpus(
        "example",
        [
            CorpusTable(0, "t1", t1, list(t1.columns)),
            CorpusTable(1, "t2", t2, list(t2.columns)),
        ],
    )


@pytest.fixture(scope="module")
def index(spark, running_example) -> CorpusIndex:
    return CorpusIndex(spark, running_example)


class TestCells:
    def test_posting_list_lookup_matches_sql(self, spark, index, running_example):
        # PL fetch for one value is a plain filter — check against DuckDB.
        got = index.cells.filter(F.col("value") == "muhammad").select(
            "table_id", "col_id", "row_id"
        )
        assert_equivalent(
            got,
            "SELECT table_id, col_id, row_id FROM cells WHERE value = 'muhammad'",
            cells=running_example.cells_pdf(),
        )

    def test_muhammad_hits_rows_2_5_6(self, index):
        # Paper Example 2: "muhammad" occurs in rows 2, 5, 6 of T1 (1-based).
        rows = (
            index.cells.filter(
                (F.col("value") == "muhammad") & (F.col("table_id") == 0)
            )
            .select("row_id")
            .toPandas()["row_id"]
            .tolist()
        )
        assert sorted(rows) == [1, 4, 5]  # 0-based

    def test_pl_counts_match_sql(self, spark, index, running_example):
        got = index.cells.groupBy("value").agg(F.count("*").alias("n"))
        assert_equivalent(
            got,
            "SELECT value, COUNT(*) AS n FROM cells GROUP BY value",
            cells=running_example.cells_pdf(),
        )

    def test_table_counts(self, index):
        counts = {
            r["table_id"]: r["n_rows"] for r in index.table_counts().collect()
        }
        assert counts == {0: 8, 1: 2}


class TestRowSuperkeys:
    def test_one_superkey_per_row(self, spark, index, running_example):
        sk = index.superkeys(XASH).toPandas()
        n_rows = sum(t.n_rows for t in running_example.tables)
        assert len(sk) == n_rows
        assert sk.duplicated(["table_id", "row_id"]).sum() == 0

    def test_superkey_is_or_of_cell_hashes(self, index, running_example):
        hasher = index.hasher(XASH)
        sk = index.superkeys(XASH).toPandas()
        sk_map = {
            (r.table_id, r.row_id): bitops.from_bytes(r.sk)
            for r in sk.itertuples()
        }
        t1 = running_example.tables[0].df
        for row_id in range(len(t1)):
            expected = or_fold(hasher(v) for v in t1.iloc[row_id])
            assert sk_map[(0, row_id)] == expected

    def test_fixed_width_binary(self, index):
        sk = index.superkeys(XASH).toPandas()
        assert sk["sk"].map(len).eq(16).all()  # 128 bits

    def test_spec_512(self, index):
        sk = index.superkeys(HashSpec("xash", 512)).toPandas()
        assert sk["sk"].map(len).eq(64).all()

    def test_scr_has_no_superkeys(self, index):
        with pytest.raises(ValueError):
            index.superkeys(HashSpec("scr"))

    def test_extended_posting_lists_join(self, index):
        ext = index.extended_posting_lists(XASH)
        assert ext.count() == index.cells.count()
        assert "sk" in ext.columns

    def test_row_superkeys_distributed_matches_driver(self, spark):
        # groupBy(table).applyInPandas must agree with a driver-side fold
        # on a larger multi-table corpus.
        corpus = webtable_lite(scale=0.02)
        idx = CorpusIndex(spark, corpus)
        hasher = idx.hasher(XASH)
        got = idx.superkeys(XASH).toPandas()
        got_map = {
            (r.table_id, r.row_id): bitops.from_bytes(r.sk) for r in got.itertuples()
        }
        for t in corpus.tables[:5]:
            for row_id in range(t.n_rows):
                expected = or_fold(hasher(v) for v in t.df.iloc[row_id].astype(str))
                assert got_map[(t.table_id, row_id)] == expected


class TestQuerySuperkeys:
    def test_query_row_subsumed_by_matching_corpus_row(self, index, running_example):
        # Figure 1: query key <muhammad, lee, us> must be subsumed by the
        # super key of T1 row 2 (0-based row 1), which contains all three.
        hasher = index.hasher(XASH)
        qdf = pd.DataFrame(
            {"f": ["muhammad"], "l": ["lee"], "c": ["us"]}
        )
        qsk = query_superkeys(qdf, ["f", "l", "c"], hasher).iloc[0]
        sk = index.superkeys(XASH).toPandas()
        sk_map = {
            (r.table_id, r.row_id): bitops.from_bytes(r.sk) for r in sk.itertuples()
        }
        assert bitops.is_subsumed(qsk, sk_map[(0, 1)])

    def test_rows_5_6_filtered(self, index):
        # Paper Example 3: rows 5 and 6 (0-based 4, 5) contain "muhammad"
        # but not <lee, us>; XASH must reject at least one of them (the
        # paper's filter drops both; a filter is allowed FPs but we check
        # it actually discriminates here).
        hasher = index.hasher(XASH)
        qdf = pd.DataFrame({"f": ["muhammad"], "l": ["lee"], "c": ["us"]})
        qsk = query_superkeys(qdf, ["f", "l", "c"], hasher).iloc[0]
        sk = index.superkeys(XASH).toPandas()
        sk_map = {
            (r.table_id, r.row_id): bitops.from_bytes(r.sk) for r in sk.itertuples()
        }
        assert not bitops.is_subsumed(qsk, sk_map[(0, 4)])
        assert not bitops.is_subsumed(qsk, sk_map[(0, 5)])

    def test_multi_row_query(self, index):
        hasher = index.hasher(XASH)
        qdf = pd.DataFrame(
            {"a": ["ansel", "helmut"], "b": ["adams", "newton"]}
        )
        sks = query_superkeys(qdf, ["a", "b"], hasher)
        assert len(sks) == 2
        assert sks.iloc[0] == hasher("ansel") | hasher("adams")


class TestNoFalseNegativesEndToEnd:
    @pytest.mark.parametrize(
        "spec",
        [HashSpec(n, 128) for n in ("xash", "bf", "lhbf", "ht", "md5", "simhash")],
        ids=str,
    )
    def test_every_full_key_row_passes_filter(self, index, running_example, spec):
        # For every row and every 2-subset of its values, the query super
        # key must be subsumed by the row super key (Section 6.3 lemma).
        hasher = index.hasher(spec)
        sk = index.superkeys(spec).toPandas()
        sk_map = {
            (r.table_id, r.row_id): bitops.from_bytes(r.sk) for r in sk.itertuples()
        }
        t1 = running_example.tables[0].df
        for row_id in range(len(t1)):
            vals = list(t1.iloc[row_id])
            for i in range(len(vals)):
                for j in range(i + 1, len(vals)):
                    q = hasher(vals[i]) | hasher(vals[j])
                    assert bitops.is_subsumed(q, sk_map[(0, row_id)])


class TestCacheModule:
    def test_parquet_cache_roundtrip(self, spark, running_example, tmp_path, monkeypatch):
        monkeypatch.setenv("REPRO_CACHE", str(tmp_path))
        idx = CorpusIndex(spark, running_example, cache_key="example")
        n = idx.cells.count()
        assert (tmp_path / "example" / "cells.parquet" / "_SUCCESS").exists()
        idx2 = CorpusIndex(spark, running_example, cache_key="example")
        assert idx2.cells.count() == n

    def test_superkey_cache_roundtrip(self, spark, running_example, tmp_path, monkeypatch):
        monkeypatch.setenv("REPRO_CACHE", str(tmp_path))
        idx = CorpusIndex(spark, running_example, cache_key="example")
        a = idx.superkeys(XASH).toPandas().sort_values(["table_id", "row_id"])
        idx2 = CorpusIndex(spark, running_example, cache_key="example")
        b = idx2.superkeys(XASH).toPandas().sort_values(["table_id", "row_id"])
        assert a["sk"].tolist() == b["sk"].tolist()
