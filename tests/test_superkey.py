"""Unit tests for super-key aggregation."""
import pandas as pd
import pytest

from repro.core.registry import HashSpec, make_hasher
from repro.core.superkey import or_fold, query_superkeys, row_superkeys
from repro.core.bitops import from_bytes


class TestOrFold:
    def test_empty_is_zero(self):
        assert or_fold([]) == 0

    def test_single(self):
        assert or_fold([5]) == 5

    def test_mask_property(self):
        hs = [0b001, 0b010, 0b100]
        assert or_fold(hs) == 0b111

    def test_idempotent(self):
        assert or_fold([7, 7, 7]) == 7


class TestQuerySuperkeys:
    def test_per_row_or(self):
        h = make_hasher(HashSpec("xash", 128))
        pdf = pd.DataFrame({"a": ["x", "y"], "b": ["1", "2"]})
        out = query_superkeys(pdf, ["a", "b"], h)
        assert out.iloc[0] == h("x") | h("1")
        assert out.iloc[1] == h("y") | h("2")

    def test_subset_of_full_row(self):
        h = make_hasher(HashSpec("bf", 128))
        pdf = pd.DataFrame({"a": ["x"], "b": ["1"], "c": ["zz"]})
        two = query_superkeys(pdf, ["a", "b"], h).iloc[0]
        three = query_superkeys(pdf, ["a", "b", "c"], h).iloc[0]
        assert two & ~three == 0

    def test_index_preserved(self):
        h = make_hasher(HashSpec("ht", 128))
        pdf = pd.DataFrame({"a": ["x", "y"]}, index=[10, 20])
        out = query_superkeys(pdf, ["a"], h)
        assert list(out.index) == [10, 20]


class TestRowSuperkeysSpark:
    def test_width_and_content(self, spark):
        h = make_hasher(HashSpec("xash", 256))
        cells = spark.createDataFrame(
            pd.DataFrame(
                {
                    "table_id": [0, 0, 0, 0],
                    "col_id": [0, 1, 0, 1],
                    "row_id": [0, 0, 1, 1],
                    "value": ["a", "b", "c", "d"],
                }
            ),
            schema="table_id long, col_id long, row_id long, value string",
        )
        out = row_superkeys(cells, h).toPandas().sort_values("row_id")
        assert out["sk"].map(len).eq(32).all()
        assert from_bytes(out.iloc[0]["sk"]) == h("a") | h("b")
        assert from_bytes(out.iloc[1]["sk"]) == h("c") | h("d")

    def test_multiple_tables(self, spark):
        h = make_hasher(HashSpec("md5", 128))
        cells = spark.createDataFrame(
            pd.DataFrame(
                {
                    "table_id": [0, 1],
                    "col_id": [0, 0],
                    "row_id": [0, 0],
                    "value": ["only", "lonely"],
                }
            ),
            schema="table_id long, col_id long, row_id long, value string",
        )
        out = row_superkeys(cells, h).toPandas()
        assert len(out) == 2
        sk = {int(r.table_id): from_bytes(r.sk) for r in out.itertuples()}
        assert sk[0] == h("only") and sk[1] == h("lonely")
