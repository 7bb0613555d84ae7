"""Render the cached experiment CSVs as the markdown tables used in
EXPERIMENTS.md.

Usage: python jobs/report_markdown.py   (after running the table jobs)
Reads .cache/results/*.csv; no Spark needed.
"""
import os
import sys

import pandas as pd

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))

from repro.index.cache import cache_root  # noqa: E402

SET_ORDER = [
    "WT (10)", "WT (100)", "WT (1k)",
    "OD (100)", "OD (1k)", "OD (10k)", "Kaggle", "School",
]
SPEC_ORDER = [
    "scr", "md5_128", "murmur_128", "city_128",
    "simhash_128", "simhash_256", "simhash_512",
    "ht_128", "ht_256", "ht_512",
    "bf_128", "bf_256", "bf_512",
    "lhbf_128", "lhbf_256", "lhbf_512",
    "xash_128", "xash_256", "xash_512",
]


def _pivot(df: pd.DataFrame, value: str, columns: str = "spec") -> pd.DataFrame:
    piv = df.pivot_table(index="set_name", columns=columns, values=value, aggfunc="last")
    piv = piv.reindex([s for s in SET_ORDER if s in piv.index])
    cols = [c for c in SPEC_ORDER if c in piv.columns] or list(piv.columns)
    return piv[cols]


def emit(title: str, piv: pd.DataFrame, fmt: str = "{:.2f}") -> None:
    print(f"\n#### {title}\n")
    print("| set | " + " | ".join(str(c) for c in piv.columns) + " |")
    print("|---" * (len(piv.columns) + 1) + "|")
    for idx, row in piv.iterrows():
        cells = [
            fmt.format(v) if pd.notna(v) else "-" for v in row
        ]
        print(f"| {idx} | " + " | ".join(cells) + " |")


def main() -> None:
    results = cache_root() / "results"
    runs = pd.read_csv(results / "runs.csv")
    mate = runs[runs.system == "mate"]
    emit("Table 2 — seconds per query table", _pivot(mate, "wall_per_query"))
    emit("Table 2 companion — rows exactly verified", _pivot(mate, "verif_pairs"), "{:.0f}")
    emit("Table 3 — mean precision", _pivot(mate, "precision_mean"))
    emit("Table 3 — precision std", _pivot(mate, "precision_std"))
    for name in ("table1", "fig4_runs", "topk_sweep", "xash_components",
                 "keysize_sweep", "init_column"):
        path = results / f"{name}.csv"
        if path.exists():
            df = pd.read_csv(path)
            print(f"\n#### {name}\n")
            print(df.to_markdown(index=False))


if __name__ == "__main__":
    main()
