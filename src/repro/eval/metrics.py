"""Aggregation of discovery results into the paper's reported metrics."""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.mate import DiscoveryResult


def precision_stats(result: DiscoveryResult) -> tuple[float, float]:
    """Mean ± population std of per-query row-filter precision (Table 3).

    Precision per query table: TP / (TP + FP) over exactly verified
    filter survivors; queries with no verified pairs count as 1.0 (the
    filter let nothing wrong through).
    """
    p = result.precision_by_qid.astype(float)
    if len(p) == 0:
        return 1.0, 0.0
    return float(p.mean()), float(p.std(ddof=0))


def summarize(result: DiscoveryResult, *, n_queries: int) -> dict:
    """One flat record per run — the unit stored by the harness."""
    totals = result.per_qid[
        ["pl_items", "cand_pairs", "surv_pairs", "verif_pairs", "tp", "fp",
         "tables_pruned"]
    ].sum()
    pm, ps = precision_stats(result)
    top1 = result.topk[result.topk["rank"] == 1]["j"] if len(result.topk) else pd.Series(dtype=float)
    return {
        "n_queries": n_queries,
        "wall_seconds": round(result.wall_seconds, 3),
        "wall_per_query": round(result.wall_seconds / max(n_queries, 1), 3),
        **{k: int(v) for k, v in totals.items()},
        "precision_mean": round(pm, 4),
        "precision_std": round(ps, 4),
        "avg_top1_j": round(float(top1.mean()), 2) if len(top1) else 0.0,
    }


def fp_ratio(summary_row: dict) -> float:
    """FP rows per TP row — the paper's 'up to 1000x more irrelevant rows'."""
    tp = summary_row["tp"]
    return float(np.inf) if tp == 0 else summary_row["fp"] / tp
