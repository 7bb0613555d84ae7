"""End-to-end tests for the MATE discovery dataflow (Algorithm 1)."""
import pandas as pd
import pytest

from repro.core.mate import DiscoveryResult, discover, select_init_column
from repro.core.registry import HashSpec
from repro.corpus.generators import Corpus, CorpusTable, webtable_lite
from repro.corpus.queries import QueryTable, build_query_set
from repro.index.inverted import CorpusIndex
from repro.oracle import assert_equivalent
from tests.reference import brute_force_topk, joinability, row_matches

XASH = HashSpec("xash", 128)
SCR = HashSpec("scr")


@pytest.fixture(scope="module")
def example_corpus() -> Corpus:
    """Figure 1's T1 plus distractor tables."""
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
    t2 = pd.DataFrame(  # joins on 2 of 5 keys only
        {
            "first": ["muhammad", "ansel", "helmut"],
            "last": ["lee", "adams", "newton"],
            "country": ["brazil", "uk", "germany"],
        }
    )
    t3 = pd.DataFrame(  # no overlap at all
        {
            "x": ["aaa", "bbb"],
            "y": ["ccc", "ddd"],
            "z": ["eee", "fff"],
        }
    )
    return Corpus(
        "figure1",
        [
            CorpusTable(0, "t1", t1, list(t1.columns)),
            CorpusTable(1, "t2", t2, list(t2.columns)),
            CorpusTable(2, "t3", t3, list(t3.columns)),
        ],
    )


@pytest.fixture(scope="module")
def example_index(spark, example_corpus) -> CorpusIndex:
    return CorpusIndex(spark, example_corpus)


@pytest.fixture(scope="module")
def figure1_query() -> QueryTable:
    """The paper's input table d with Q = {F. Name, L. Name, Country}."""
    d = pd.DataFrame(
        {
            "f name": ["muhammad", "ansel", "ansel", "muhammad", "helmut"],
            "l name": ["lee", "adams", "adams", "lee", "newton"],
            "country": ["us", "uk", "us", "germany", "germany"],
            "salary": ["60k", "50k", "400k", "90k", "300k"],
        }
    )
    return QueryTable(0, d, ["f name", "l name", "country"])


@pytest.fixture(scope="module")
def tiny_corpus() -> Corpus:
    return webtable_lite(scale=0.025)


@pytest.fixture(scope="module")
def tiny_index(spark, tiny_corpus) -> CorpusIndex:
    return CorpusIndex(spark, tiny_corpus)


@pytest.fixture(scope="module")
def tiny_queries(tiny_corpus):
    return build_query_set("WT (100)", tiny_corpus, n_queries=3).queries


class TestRunningExample:
    def test_figure1_joinability_is_5(self, spark, example_index, figure1_query):
        # The paper: best mapping gives j = 5 for T1.
        res = discover(spark, example_index, [figure1_query], XASH, k=3)
        top = res.topk
        assert int(top[top["rank"] == 1]["table_id"].iloc[0]) == 0
        assert int(top[top["rank"] == 1]["j"].iloc[0]) == 5

    def test_partial_key_table_scores_lower(self, spark, example_index, figure1_query):
        res = discover(spark, example_index, [figure1_query], XASH, k=3)
        js = dict(zip(res.topk["table_id"], res.topk["j"]))
        # T2 matches <muhammad,lee,?>/<ansel,adams,uk>/<helmut,newton,germany>:
        # only rows with the right country count; brute force says which.
        expected = joinability(
            figure1_query.df[figure1_query.key_cols].drop_duplicates(),
            pd.DataFrame(
                {
                    "first": ["muhammad", "ansel", "helmut"],
                    "last": ["lee", "adams", "newton"],
                    "country": ["brazil", "uk", "germany"],
                }
            ),
        )
        assert js.get(1, 0) == expected
        assert 2 not in js or js[2] == 0  # no-overlap table never ranks

    def test_scr_and_mate_same_topk(self, spark, example_index, figure1_query):
        # The row filter has no FNs => identical joinability results.
        a = discover(spark, example_index, [figure1_query], XASH, k=3)
        b = discover(spark, example_index, [figure1_query], SCR, k=3)
        pd.testing.assert_frame_equal(
            a.topk.reset_index(drop=True), b.topk.reset_index(drop=True)
        )

    def test_filter_reduces_verification_work(self, spark, example_index, figure1_query):
        mate = discover(spark, example_index, [figure1_query], XASH, k=3)
        scr = discover(spark, example_index, [figure1_query], SCR, k=3)
        assert (
            mate.per_qid["verif_pairs"].iloc[0]
            <= scr.per_qid["verif_pairs"].iloc[0]
        )
        assert (
            mate.per_qid["surv_pairs"].iloc[0] < mate.per_qid["cand_pairs"].iloc[0]
        )


class TestAgainstBruteForce:
    @pytest.mark.parametrize("spec", [XASH, SCR], ids=str)
    def test_topk_scores_match_reference(
        self, spark, tiny_corpus, tiny_index, tiny_queries, spec
    ):
        k = 5
        res = discover(spark, tiny_index, tiny_queries, spec, k=k)
        for q in tiny_queries:
            expected = [j for j in brute_force_topk(tiny_corpus, q, k) if j > 0]
            got = sorted(
                res.topk[res.topk.qid == q.qid]["j"].astype(int), reverse=True
            )
            assert got == expected[: len(got)] and len(got) == len(expected), (
                f"qid={q.qid}: got {got}, expected {expected}"
            )

    def test_pruning_does_not_change_topk(
        self, spark, tiny_index, tiny_queries
    ):
        a = discover(spark, tiny_index, tiny_queries, XASH, k=4, prune_tables=True)
        b = discover(spark, tiny_index, tiny_queries, XASH, k=4, prune_tables=False)
        for qid in {q.qid for q in tiny_queries}:
            ja = sorted(a.topk[a.topk.qid == qid]["j"], reverse=True)
            jb = sorted(b.topk[b.topk.qid == qid]["j"], reverse=True)
            assert ja == jb

    def test_pruning_skips_tables(self, spark, tiny_index, tiny_queries):
        res = discover(spark, tiny_index, tiny_queries, XASH, k=2, margin=1)
        assert res.per_qid["tables_pruned"].sum() >= 0  # counter exists
        assert (res.per_qid["tables_pruned"] <= res.per_qid["cand_tables"]).all()

    def test_row_truth_matches_reference(
        self, spark, tiny_corpus, tiny_index, tiny_queries
    ):
        # Verified (qrow, row) match flags == brute-force row membership.
        res = discover(
            spark, tiny_index, tiny_queries, SCR, k=3,
            prune_tables=False, collect_matches=True,
        )
        q = tiny_queries[0]
        keys = q.df[q.key_cols].astype(str).drop_duplicates().reset_index(drop=True)
        m = res.matches
        checked = 0
        for t in tiny_corpus.tables:
            if checked >= 5:
                break
            truth = row_matches(keys, t.df)
            got = m[(m.qid == q.qid) & (m.table_id == t.table_id) & m.is_match]
            got_pairs = {(int(r.qrow_id), int(r.row_id)) for r in got.itertuples()}
            # Every verified match must be in the truth set; every truth
            # pair whose row was a candidate must be flagged.
            assert got_pairs <= truth
            cand = m[(m.qid == q.qid) & (m.table_id == t.table_id)]
            cand_pairs = {(int(r.qrow_id), int(r.row_id)) for r in cand.itertuples()}
            assert truth & cand_pairs == got_pairs
            checked += len(truth)
        assert checked > 0


class TestJoinabilityOracle:
    def test_fixed_mapping_joinability_vs_duckdb(self, spark, example_corpus, figure1_query):
        # For the *known* best mapping, j is a plain SQL intersection —
        # check the Spark-side computation against DuckDB.
        t1 = example_corpus.tables[0].df
        keys = figure1_query.df[figure1_query.key_cols].drop_duplicates()
        keys_sdf = spark.createDataFrame(keys)
        t1_sdf = spark.createDataFrame(t1)
        keys_sdf.createOrReplaceTempView("qkeys")
        t1_sdf.createOrReplaceTempView("t1")
        got = spark.sql(
            """
            SELECT COUNT(*) AS j FROM (
              SELECT DISTINCT `f name`, `l name`, country FROM qkeys
              INTERSECT
              SELECT DISTINCT vorname, nachname, land FROM t1
            )
            """
        )
        assert_equivalent(
            got,
            """
            SELECT COUNT(*) AS j FROM (
              SELECT DISTINCT "f name", "l name", country FROM qkeys
              INTERSECT
              SELECT DISTINCT vorname, nachname, land FROM t1
            )
            """,
            qkeys=keys,
            t1=t1,
        )


class TestInitColumnSelection:
    def test_cardinality_picks_min_distinct(self, figure1_query):
        # country has 3 distinct, f/l name have 3/3... salary not in Q.
        col = select_init_column(figure1_query, "cardinality")
        assert col in figure1_query.key_cols
        n = figure1_query.df[col].nunique()
        assert n == min(
            figure1_query.df[c].nunique() for c in figure1_query.key_cols
        )

    def test_order_picks_first_key_column(self, figure1_query):
        assert select_init_column(figure1_query, "order") == "f name"

    def test_tls_picks_longest_string(self, figure1_query):
        col = select_init_column(figure1_query, "tls")
        best = max(
            figure1_query.key_cols,
            key=lambda c: figure1_query.df[c].astype(str).str.len().max(),
        )
        assert figure1_query.df[col].astype(str).str.len().max() == \
            figure1_query.df[best].astype(str).str.len().max()

    def test_best_worst_need_index(self, figure1_query):
        with pytest.raises(ValueError):
            select_init_column(figure1_query, "best")

    def test_best_fetches_fewer_than_worst(self, spark, example_index, figure1_query):
        best = select_init_column(figure1_query, "best", example_index)
        worst = select_init_column(figure1_query, "worst", example_index)
        assert best in figure1_query.key_cols
        assert worst in figure1_query.key_cols

    def test_unknown_strategy(self, figure1_query):
        with pytest.raises(ValueError):
            select_init_column(figure1_query, "nope")

    def test_init_column_recorded_in_result(self, spark, example_index, figure1_query):
        res = discover(spark, example_index, [figure1_query], XASH, k=2)
        assert res.init_columns[0] in figure1_query.key_cols


class TestResultShape:
    def test_counters_monotonic(self, spark, tiny_index, tiny_queries):
        res = discover(spark, tiny_index, tiny_queries, XASH, k=3)
        p = res.per_qid
        assert (p["surv_pairs"] <= p["cand_pairs"]).all()
        assert (p["verif_pairs"] <= p["surv_pairs"]).all()
        assert (p["tp"] + p["fp"] == p["verif_pairs"]).all()
        assert (p["pl_items"] >= p["cand_pairs"]).all()

    def test_precision_property(self, spark, tiny_index, tiny_queries):
        res = discover(spark, tiny_index, tiny_queries, XASH, k=3)
        prec = res.precision_by_qid
        assert ((prec >= 0) & (prec <= 1)).all()

    def test_wall_seconds_positive(self, spark, tiny_index, tiny_queries):
        res = discover(spark, tiny_index, tiny_queries, XASH, k=2)
        assert res.wall_seconds > 0

    def test_multiple_queries_independent(self, spark, tiny_index, tiny_queries):
        # Batched run == each query alone.
        batched = discover(spark, tiny_index, tiny_queries, XASH, k=3)
        for q in tiny_queries:
            solo = discover(spark, tiny_index, [q], XASH, k=3)
            ja = sorted(batched.topk[batched.topk.qid == q.qid]["j"], reverse=True)
            jb = sorted(solo.topk["j"], reverse=True)
            assert ja == jb
