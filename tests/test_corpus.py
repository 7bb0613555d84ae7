"""Tests for the synthetic corpora and query sets."""
import numpy as np
import pandas as pd
import pytest

from repro.corpus import entities as ent
from repro.corpus.generators import (
    Corpus,
    CorpusTable,
    get_corpus,
    opendata_lite,
    school_lite,
    webtable_lite,
)
from repro.corpus.queries import (
    QUERY_SET_NAMES,
    build_query_set,
    corpus_for,
)

TINY = 0.05


@pytest.fixture(scope="module")
def wt():
    return webtable_lite(scale=TINY)


@pytest.fixture(scope="module")
def od():
    return opendata_lite(scale=TINY)


@pytest.fixture(scope="module")
def school():
    return school_lite(scale=0.2)


class TestEntities:
    def test_person_registry_deterministic(self):
        a, b = ent.person_registry(100, seed=1), ent.person_registry(100, seed=1)
        pd.testing.assert_frame_equal(a, b)

    def test_person_registry_seed_sensitivity(self):
        a, b = ent.person_registry(100, seed=1), ent.person_registry(100, seed=2)
        assert not a.equals(b)

    def test_city_country_correlated(self):
        reg = ent.person_registry(500)
        for _, row in reg.head(50).iterrows():
            assert row["city"] in ent.GEOGRAPHY[row["country"]]

    def test_all_registries_are_strings(self):
        for reg in [
            ent.person_registry(50),
            ent.movie_registry(50),
            ent.airline_registry(50),
            ent.school_registry(50),
            ent.station_registry(50),
        ]:
            for col in reg.columns:
                assert reg[col].map(type).eq(str).all(), col

    def test_registries_values_normalisable(self):
        # Values stay inside the 37-char XASH alphabet (lowercase+digits+space).
        from repro.core.xash import normalize

        reg = ent.person_registry(200)
        for col in reg.columns:
            assert (reg[col].map(normalize) == reg[col]).all()

    def test_date_pool_shared_values(self):
        assert len(set(ent.date_pool())) < len(ent.date_pool()) + 1


class TestCorpusStructure:
    def test_webtable_shape(self, wt):
        assert wt.name == "webtable"
        assert wt.n_tables >= 3
        for t in wt.tables:
            assert 3 <= t.n_rows <= 150
            assert t.n_cols >= 3
            assert set(t.domain_cols) <= set(t.df.columns)

    def test_opendata_wider_than_webtable(self, wt, od):
        assert od.avg_cols > wt.avg_cols

    def test_school_is_widest(self, od, school):
        assert school.avg_cols > od.avg_cols
        assert school.avg_cols >= 18

    def test_deterministic(self):
        a, b = webtable_lite(scale=TINY), webtable_lite(scale=TINY)
        for ta, tb in zip(a.tables, b.tables):
            pd.testing.assert_frame_equal(ta.df, tb.df)

    def test_duplicate_table_id_rejected(self):
        t = CorpusTable(0, "x", pd.DataFrame({"a": ["1"]}))
        with pytest.raises(ValueError):
            Corpus("bad", [t, t])

    def test_table_lookup(self, wt):
        t = wt.tables[0]
        assert wt.table(t.table_id) is t

    def test_entity_overlap_across_tables(self, wt):
        # The FP regime requires values recurring across tables.
        cells = wt.cells_pdf()
        counts = cells.groupby("value")["table_id"].nunique()
        assert (counts > 1).sum() > 20


class TestCellsPdf:
    def test_long_format_size(self, wt):
        cells = wt.cells_pdf()
        expected = sum(t.n_rows * t.n_cols for t in wt.tables)
        assert len(cells) == expected

    def test_cell_values_match_source(self, wt):
        cells = wt.cells_pdf()
        t = wt.tables[1]
        sub = cells[cells.table_id == t.table_id]
        for col_id, col in enumerate(t.df.columns):
            got = sub[sub.col_id == col_id].sort_values("row_id")["value"].tolist()
            assert got == t.df[col].astype(str).tolist()

    def test_row_ids_dense(self, wt):
        cells = wt.cells_pdf()
        t = wt.tables[0]
        rows = cells[(cells.table_id == t.table_id) & (cells.col_id == 0)]["row_id"]
        assert sorted(rows) == list(range(t.n_rows))

    def test_cells_spark_roundtrip(self, spark, wt):
        sdf = wt.cells_spark(spark)
        assert sdf.count() == len(wt.cells_pdf())
        assert dict(sdf.dtypes)["value"] == "string"

    def test_n_unique_values(self, wt):
        cells = wt.cells_pdf()
        assert wt.n_unique_values() == cells["value"].nunique()


class TestGetCorpus:
    def test_memoised(self):
        assert get_corpus("webtable", TINY) is get_corpus("webtable", TINY)

    def test_unknown_name(self):
        with pytest.raises(KeyError):
            get_corpus("nope")


class TestQuerySets:
    def test_all_eight_sets_build(self, wt, od, school):
        corpora = {"webtable": wt, "opendata": od, "school": school}
        for name in QUERY_SET_NAMES:
            qs = build_query_set(name, corpora[corpus_for(name)], n_queries=3)
            assert qs.name == name
            assert len(qs.queries) == 3
            for q in qs.queries:
                assert len(q.key_cols) >= 2
                assert set(q.key_cols) <= set(q.df.columns)
                assert q.cardinality >= 2

    def test_cardinality_bands_ordered(self, wt):
        small = build_query_set("WT (10)", wt, n_queries=4)
        large = build_query_set("WT (1k)", wt, n_queries=4)
        assert small.avg_cardinality < large.avg_cardinality

    def test_deterministic(self, wt):
        a = build_query_set("WT (100)", wt, n_queries=3)
        b = build_query_set("WT (100)", wt, n_queries=3)
        for qa, qb in zip(a.queries, b.queries):
            pd.testing.assert_frame_equal(qa.df, qb.df)
            assert qa.key_cols == qb.key_cols

    def test_wrong_corpus_rejected(self, wt):
        with pytest.raises(ValueError):
            build_query_set("OD (100)", wt)

    def test_school_uses_paper_key(self, school):
        qs = build_query_set("School", school, n_queries=2)
        for q in qs.queries:
            assert q.key_cols == ["program type", "school name"]

    def test_kaggle_composite_keys(self, wt):
        qs = build_query_set("Kaggle", wt, n_queries=4)
        keys = {tuple(q.key_cols) for q in qs.queries}
        assert ("director name", "movie title") in keys
        assert ("airline name", "country") in keys

    def test_query_tables_join_their_corpus(self, wt):
        # A WT query drawn from the corpus must share whole key tuples
        # with at least one corpus table (itself).
        qs = build_query_set("WT (100)", wt, n_queries=3)
        for q in qs.queries:
            found = False
            for t in wt.tables:
                if set(q.key_cols) <= set(t.df.columns):
                    merged = q.df.merge(t.df[q.key_cols].drop_duplicates())
                    if len(merged) >= q.cardinality * 0.5:
                        found = True
                        break
            assert found, f"query {q.qid} joins nothing"
