"""Tests for the baseline systems: SCR, MCR, SCR-Josie, MCR-Josie."""
import pandas as pd
import pytest

from repro.baselines.josie import (
    discover_mcr_josie,
    discover_scr_josie,
    josie_rank_tables,
)
from repro.baselines.mcr import discover_mcr
from repro.baselines.scr import discover_scr
from repro.core.mate import discover
from repro.core.registry import HashSpec
from repro.corpus.generators import webtable_lite
from repro.corpus.queries import build_query_set
from repro.index.inverted import CorpusIndex
from repro.oracle import assert_equivalent
from tests.reference import brute_force_topk

XASH = HashSpec("xash", 128)


@pytest.fixture(scope="module")
def corpus():
    return webtable_lite(scale=0.02)


@pytest.fixture(scope="module")
def index(spark, corpus):
    return CorpusIndex(spark, corpus)


@pytest.fixture(scope="module")
def queries(corpus):
    return build_query_set("WT (100)", corpus, n_queries=2).queries


@pytest.fixture(scope="module")
def mate_result(spark, index, queries):
    return discover(spark, index, queries, XASH, k=4)


class TestScr:
    def test_matches_mate_topk(self, spark, index, queries, mate_result):
        scr = discover_scr(spark, index, queries, k=4)
        for qid in {q.qid for q in queries}:
            a = sorted(mate_result.topk[mate_result.topk.qid == qid]["j"], reverse=True)
            b = sorted(scr.topk[scr.topk.qid == qid]["j"], reverse=True)
            assert a == b

    def test_verifies_more_pairs_than_mate(self, spark, index, queries, mate_result):
        scr = discover_scr(spark, index, queries, k=4)
        assert (
            scr.per_qid["verif_pairs"].sum()
            >= mate_result.per_qid["verif_pairs"].sum()
        )


class TestMcr:
    def test_matches_brute_force(self, spark, corpus, index, queries):
        res = discover_mcr(spark, index, queries, k=4)
        for q in queries:
            expected = [j for j in brute_force_topk(corpus, q, 4) if j > 0]
            got = sorted(res.topk[res.topk.qid == q.qid]["j"].astype(int), reverse=True)
            assert got == expected[: len(got)] and len(got) == len(expected)

    def test_fetches_more_pl_items_than_mate(self, spark, index, queries, mate_result):
        # MCR touches every query column's posting lists; MATE only the
        # initial column's (the paper's core efficiency argument).
        mcr = discover_mcr(spark, index, queries, k=4)
        assert mcr.per_qid["pl_items"].sum() > mate_result.per_qid["pl_items"].sum()

    def test_candidates_contain_all_positions(self, spark, index, queries):
        # Every MCR candidate pair must be a row where all |Q| values hit,
        # so its verification TP rate is at least MATE-SCR's.
        mcr = discover_mcr(spark, index, queries, k=4)
        p = mcr.per_qid
        assert (p["cand_pairs"] == p["surv_pairs"]).all()
        assert (p["verif_pairs"] <= p["cand_pairs"]).all()


class TestJosieRanking:
    def test_overlap_matches_sql(self, spark, index, corpus, queries):
        # JOSIE's column overlap is a distinct-set intersection; check the
        # Spark computation against DuckDB on the same inputs.
        q = queries[0]
        init_col = q.key_cols[0]
        qv = pd.DataFrame(
            {
                "qid": q.qid,
                "key_pos": 0,
                "value": q.df[init_col].astype(str).unique(),
            }
        )
        got_pdf = josie_rank_tables(spark, index, qv)
        got = spark.createDataFrame(
            got_pdf[["table_id", "overlap"]],
            schema="table_id long, overlap long",
        )
        assert_equivalent(
            got,
            """
            SELECT table_id, MAX(overlap) AS overlap FROM (
              SELECT c.table_id, c.col_id, COUNT(DISTINCT c.value) AS overlap
              FROM (SELECT DISTINCT table_id, col_id, value FROM cells) c
              JOIN qv ON qv.value = c.value
              GROUP BY c.table_id, c.col_id
            ) GROUP BY table_id
            """,
            cells=corpus.cells_pdf(),
            qv=qv,
        )

    def test_ranking_sorted_desc(self, spark, index, queries):
        q = queries[0]
        qv = pd.DataFrame(
            {"qid": q.qid, "key_pos": 0, "value": q.df[q.key_cols[0]].astype(str).unique()}
        )
        r = josie_rank_tables(spark, index, qv)
        assert (r.groupby(["qid", "key_pos"])["overlap"].apply(
            lambda s: s.is_monotonic_decreasing
        )).all()


class TestJosieAdaptations:
    def test_scr_josie_finds_top_table(self, spark, index, queries, mate_result):
        # With a generous candidate factor the gated search must still
        # find the best table (ranking by one column is only a heuristic
        # for n-ary joins, so we check top-1, not the full top-k).
        res = discover_scr_josie(spark, index, queries, k=4, candidate_factor=10)
        for qid in {q.qid for q in queries}:
            best_mate = mate_result.topk[
                (mate_result.topk.qid == qid) & (mate_result.topk["rank"] == 1)
            ]["j"]
            best_josie = res.topk[(res.topk.qid == qid) & (res.topk["rank"] == 1)]["j"]
            if len(best_mate):
                assert len(best_josie) and int(best_josie.iloc[0]) == int(best_mate.iloc[0])

    def test_mcr_josie_finds_top_table(self, spark, index, queries, mate_result):
        res = discover_mcr_josie(spark, index, queries, k=4, candidate_factor=10)
        for qid in {q.qid for q in queries}:
            best_mate = mate_result.topk[
                (mate_result.topk.qid == qid) & (mate_result.topk["rank"] == 1)
            ]["j"]
            best_josie = res.topk[(res.topk.qid == qid) & (res.topk["rank"] == 1)]["j"]
            if len(best_mate):
                assert len(best_josie) and int(best_josie.iloc[0]) == int(best_mate.iloc[0])

    def test_mcr_josie_intersection_smaller(self, spark, index, queries):
        scr_j = discover_scr_josie(spark, index, queries, k=4, candidate_factor=10)
        mcr_j = discover_mcr_josie(spark, index, queries, k=4, candidate_factor=10)
        assert (
            mcr_j.per_qid["cand_tables"].sum() <= scr_j.per_qid["cand_tables"].sum()
        )

    def test_counters_consistent(self, spark, index, queries):
        for res in [
            discover_scr_josie(spark, index, queries, k=3),
            discover_mcr_josie(spark, index, queries, k=3),
        ]:
            p = res.per_qid
            assert (p["tp"] + p["fp"] == p["verif_pairs"]).all()
