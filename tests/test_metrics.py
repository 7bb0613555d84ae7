"""Tests for metric aggregation."""
import pandas as pd
import pytest

from repro.core.mate import DiscoveryResult
from repro.eval.metrics import fp_ratio, precision_stats, summarize


def make_result(per_qid_rows, topk_rows=None) -> DiscoveryResult:
    topk = pd.DataFrame(
        topk_rows or [], columns=["qid", "rank", "table_id", "j"]
    )
    return DiscoveryResult(
        topk=topk, per_qid=pd.DataFrame(per_qid_rows), wall_seconds=2.0
    )


BASE = {
    "pl_items": 100, "cand_pairs": 80, "cand_tables": 10,
    "surv_pairs": 40, "verif_pairs": 40, "tables_pruned": 2,
}


class TestPrecisionStats:
    def test_simple_mean(self):
        res = make_result(
            [
                {"qid": 0, **BASE, "tp": 30, "fp": 10},
                {"qid": 1, **BASE, "tp": 10, "fp": 30},
            ]
        )
        mean, std = precision_stats(res)
        assert mean == pytest.approx(0.5)
        assert std == pytest.approx(0.25)

    def test_no_verified_pairs_counts_as_one(self):
        res = make_result([{"qid": 0, **BASE, "tp": 0, "fp": 0}])
        mean, std = precision_stats(res)
        assert mean == 1.0 and std == 0.0

    def test_all_fp_is_zero(self):
        res = make_result([{"qid": 0, **BASE, "tp": 0, "fp": 40}])
        mean, _ = precision_stats(res)
        assert mean == 0.0


class TestSummarize:
    def test_totals_and_rates(self):
        res = make_result(
            [
                {"qid": 0, **BASE, "tp": 30, "fp": 10},
                {"qid": 1, **BASE, "tp": 10, "fp": 30},
            ],
            topk_rows=[[0, 1, 7, 12], [1, 1, 9, 8]],
        )
        s = summarize(res, n_queries=2)
        assert s["tp"] == 40 and s["fp"] == 40
        assert s["wall_per_query"] == 1.0
        assert s["cand_pairs"] == 160
        assert s["avg_top1_j"] == 10.0
        assert 0 <= s["precision_mean"] <= 1

    def test_fp_ratio(self):
        assert fp_ratio({"tp": 10, "fp": 100}) == 10.0
        assert fp_ratio({"tp": 0, "fp": 5}) == float("inf")

    def test_empty_topk(self):
        res = make_result([{"qid": 0, **BASE, "tp": 1, "fp": 0}])
        s = summarize(res, n_queries=1)
        assert s["avg_top1_j"] == 0.0
