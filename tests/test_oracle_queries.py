"""DuckDB-oracle checks for the query-shaped building blocks.

Also exercises the provided TPC-H-lite generators (`repro.synth_data`)
as an alternative corpus source: the MATE index is schema-agnostic, so
posting lists built over lineitem/orders cells must obey the same SQL
invariants as the web-table corpora.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.registry import HashSpec
from repro.corpus.generators import Corpus, CorpusTable
from repro.index.inverted import CorpusIndex
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tpch_corpus(spark) -> Corpus:
    """A corpus whose tables are TPC-H-lite orders/customer projections."""
    orders = synth_data.orders(spark, sf=0.002).toPandas()
    customer = synth_data.customer(spark, sf=0.002).toPandas()
    t_orders = orders[["o_orderkey", "o_custkey", "o_orderpriority"]].astype(str)
    t_cust = customer[["c_custkey", "c_mktsegment", "c_nationkey"]].astype(str)
    return Corpus(
        "tpch",
        [
            CorpusTable(0, "orders", t_orders, list(t_orders.columns)),
            CorpusTable(1, "customer", t_cust, list(t_cust.columns)),
        ],
    )


@pytest.fixture(scope="module")
def tpch_index(spark, tpch_corpus) -> CorpusIndex:
    return CorpusIndex(spark, tpch_corpus)


class TestPostingListInvariants:
    def test_pl_count_equals_cells(self, spark, tpch_index, tpch_corpus):
        got = tpch_index.cells.groupBy("table_id").agg(
            F.count(F.lit(1)).alias("n")
        )
        assert_equivalent(
            got,
            "SELECT table_id, COUNT(*) AS n FROM cells GROUP BY table_id",
            cells=tpch_corpus.cells_pdf(),
        )

    def test_distinct_values_per_column(self, spark, tpch_index, tpch_corpus):
        got = tpch_index.cells.groupBy("table_id", "col_id").agg(
            F.countDistinct("value").alias("n_distinct")
        )
        assert_equivalent(
            got,
            """
            SELECT table_id, col_id, COUNT(DISTINCT value) AS n_distinct
            FROM cells GROUP BY table_id, col_id
            """,
            cells=tpch_corpus.cells_pdf(),
        )

    def test_value_lookup_matches_sql(self, spark, tpch_index, tpch_corpus):
        cells_pdf = tpch_corpus.cells_pdf()
        probe = cells_pdf["value"].iloc[0]
        got = tpch_index.cells.filter(F.col("value") == probe).select(
            "table_id", "col_id", "row_id"
        )
        assert_equivalent(
            got,
            f"SELECT table_id, col_id, row_id FROM cells WHERE value = '{probe}'",
            cells=cells_pdf,
        )

    def test_superkeys_cover_all_rows(self, spark, tpch_index, tpch_corpus):
        got = (
            tpch_index.superkeys(HashSpec("xash", 128))
            .groupBy("table_id")
            .agg(F.count(F.lit(1)).alias("n_rows"))
        )
        assert_equivalent(
            got,
            """
            SELECT table_id, COUNT(*) AS n_rows
            FROM (SELECT DISTINCT table_id, row_id FROM cells)
            GROUP BY table_id
            """,
            cells=tpch_corpus.cells_pdf(),
        )


class TestCandidateFetchOracle:
    def test_init_column_fetch_matches_sql(self, spark, tpch_index, tpch_corpus):
        # The initialization step's PL fetch is a value-equality join;
        # check candidate (table, row) sets against DuckDB.
        cust = tpch_corpus.tables[1].df
        init_values = pd.DataFrame({"value": cust["c_custkey"].head(20)})
        got = (
            tpch_index.cells.join(
                F.broadcast(spark.createDataFrame(init_values)), "value"
            )
            .select("table_id", "row_id")
            .distinct()
        )
        assert_equivalent(
            got,
            """
            SELECT DISTINCT c.table_id, c.row_id
            FROM cells c JOIN init_values v ON c.value = v.value
            """,
            cells=tpch_corpus.cells_pdf(),
            init_values=init_values,
        )

    def test_tpch_join_key_discovery(self, spark, tpch_index, tpch_corpus):
        # o_custkey joins customer.c_custkey: a 1-column MATE query over
        # the TPC-H corpus must rank the customer table with a j equal to
        # the SQL distinct-intersection size.
        from repro.core.mate import discover
        from repro.corpus.queries import QueryTable

        orders = tpch_corpus.tables[0].df
        q = QueryTable(0, orders[["o_custkey"]].drop_duplicates().head(50), ["o_custkey"])
        res = discover(spark, tpch_index, [q], HashSpec("xash", 128), k=2)
        j_customer = res.topk[res.topk.table_id == 1]["j"]
        expected = (
            q.df["o_custkey"]
            .isin(tpch_corpus.tables[1].df["c_custkey"])
            .sum()
        )
        assert len(j_customer) == 1 and int(j_customer.iloc[0]) == int(expected)
