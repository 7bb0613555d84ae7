"""Unit tests for exact verification (calculateJ)."""
import pandas as pd
import pytest

from repro.core.verify import (
    _assignments,
    make_group_checker,
    melt_query_keys,
    verify_pairs,
)
from repro.corpus.generators import Corpus, CorpusTable
from repro.index.inverted import CorpusIndex
from tests.reference import joinability, row_matches


class TestAssignments:
    def test_single_position(self):
        assert _assignments({0: [2]}, 1) == [(2,)]

    def test_injective_only(self):
        # Both positions only hit column 3 -> no injective assignment.
        assert _assignments({0: [3], 1: [3]}, 2) == []

    def test_multiple_assignments(self):
        out = _assignments({0: [1, 2], 1: [1, 2]}, 2)
        assert set(out) == {(1, 2), (2, 1)}

    def test_missing_position(self):
        assert _assignments({0: [1]}, 2) == []

    def test_three_way(self):
        out = _assignments({0: [1], 1: [2], 2: [3]}, 3)
        assert out == [(1, 2, 3)]


class TestGroupChecker:
    def make_pdf(self, rows):
        return pd.DataFrame(
            rows, columns=["qid", "table_id", "row_id", "qrow_id", "key_pos", "col_id"]
        )

    def test_simple_match(self):
        check = make_group_checker({0: 2})
        pdf = self.make_pdf([[0, 5, 0, 0, 0, 0], [0, 5, 0, 0, 1, 1]])
        out = check((0, 5), pdf)
        assert out["is_match"].tolist() == [True]
        assert out["j"].tolist() == [1]

    def test_missing_position_no_match(self):
        check = make_group_checker({0: 2})
        pdf = self.make_pdf([[0, 5, 0, 0, 0, 0]])
        out = check((0, 5), pdf)
        assert out["is_match"].tolist() == [False]
        assert out["j"].tolist() == [0]

    def test_same_column_both_positions_no_match(self):
        # Key <x, x> where the row has x in a single column only.
        check = make_group_checker({0: 2})
        pdf = self.make_pdf([[0, 5, 0, 0, 0, 2], [0, 5, 0, 0, 1, 2]])
        out = check((0, 5), pdf)
        assert out["is_match"].tolist() == [False]

    def test_slow_path_multi_column(self):
        # Position 0 hits cols {0,1}, position 1 hits col {0}: the only
        # injective assignment is (1, 0).
        check = make_group_checker({0: 2})
        pdf = self.make_pdf(
            [[0, 5, 0, 0, 0, 0], [0, 5, 0, 0, 0, 1], [0, 5, 0, 0, 1, 0]]
        )
        out = check((0, 5), pdf)
        assert out["is_match"].tolist() == [True]
        assert out["j"].tolist() == [1]

    def test_j_requires_consistent_mapping(self):
        # Two query rows matched under *different* mappings: j = 1, not 2.
        check = make_group_checker({0: 2})
        pdf = self.make_pdf(
            [
                [0, 5, 0, 0, 0, 0], [0, 5, 0, 0, 1, 1],  # qrow 0 via (0,1)
                [0, 5, 1, 1, 0, 2], [0, 5, 1, 1, 1, 3],  # qrow 1 via (2,3)
            ]
        )
        out = check((0, 5), pdf)
        assert out["is_match"].all()
        assert out["j"].unique().tolist() == [1]

    def test_j_counts_distinct_qrows_same_mapping(self):
        check = make_group_checker({0: 2})
        pdf = self.make_pdf(
            [
                [0, 5, 0, 0, 0, 0], [0, 5, 0, 0, 1, 1],
                [0, 5, 1, 1, 0, 0], [0, 5, 1, 1, 1, 1],
            ]
        )
        out = check((0, 5), pdf)
        assert out["j"].unique().tolist() == [2]

    def test_duplicate_rows_same_qrow_counted_once(self):
        # Two table rows matching the same qrow under one mapping: j = 1
        # (joinability is a distinct-tuple intersection).
        check = make_group_checker({0: 2})
        pdf = self.make_pdf(
            [
                [0, 5, 0, 0, 0, 0], [0, 5, 0, 0, 1, 1],
                [0, 5, 2, 0, 0, 0], [0, 5, 2, 0, 1, 1],
            ]
        )
        out = check((0, 5), pdf)
        assert out["j"].unique().tolist() == [1]
        assert len(out) == 2


class TestMeltQueryKeys:
    def test_melt_shape(self):
        wide = pd.DataFrame({"a": ["x", "y"], "b": ["1", "2"]})
        out = melt_query_keys(wide, ["a", "b"], qid=7)
        assert len(out) == 4
        assert set(out["key_pos"]) == {0, 1}
        assert set(out["qid"]) == {7}

    def test_position_order_follows_key_cols(self):
        wide = pd.DataFrame({"a": ["x"], "b": ["1"]})
        out = melt_query_keys(wide, ["b", "a"], qid=0)
        assert out[out.key_pos == 0]["value"].iloc[0] == "1"


class TestVerifyPairsSpark:
    @pytest.fixture(scope="class")
    def setup(self, spark):
        t = pd.DataFrame(
            {
                "c0": ["alpha", "alpha", "gamma"],
                "c1": ["beta", "zeta", "beta"],
                "c2": ["x", "y", "z"],
            }
        )
        corpus = Corpus("v", [CorpusTable(0, "t", t, list(t.columns))])
        index = CorpusIndex(spark, corpus)
        keys = pd.DataFrame({"k0": ["alpha", "alpha"], "k1": ["beta", "zeta"]})
        qkeys = spark.createDataFrame(
            melt_query_keys(keys, ["k0", "k1"], qid=0),
            schema="qid long, qrow_id long, key_pos long, value string",
        )
        return corpus, index, keys, qkeys

    def test_matches_reference(self, spark, setup):
        corpus, index, keys, qkeys = setup
        pairs = spark.createDataFrame(
            pd.DataFrame(
                {
                    "qid": [0] * 6,
                    "table_id": [0] * 6,
                    "row_id": [0, 0, 1, 1, 2, 2],
                    "qrow_id": [0, 1, 0, 1, 0, 1],
                }
            ),
            schema="qid long, table_id long, row_id long, qrow_id long",
        )
        out = verify_pairs(spark, index.cells, qkeys, pairs, {0: 2}).toPandas()
        truth = row_matches(keys, corpus.tables[0].df)
        got = {
            (int(r.qrow_id), int(r.row_id))
            for r in out[out.is_match.astype(bool)].itertuples()
        }
        assert got == truth
        assert out["j"].unique().tolist() == [joinability(keys, corpus.tables[0].df)]
