"""Reproduce Table 3: row-filter precision per query set x hash function.

Precision = TP/(TP+FP) over filter survivors, mean ± std across the
set's query tables, for the paper's 128- and 512-bit columns. Shares the
run store with Table 2, so overlapping specs are not re-run.

Usage: python jobs/table3_precision.py [--scale 1.0]
"""
from _session import get_spark, make_context, save_and_print, standard_parser


def main() -> None:
    p = standard_parser(__doc__)
    p.add_argument("--sets", nargs="*", default=None, help="subset of query sets")
    args = p.parse_args()
    spark = get_spark("mate-table3")
    ctx = make_context(spark, args)
    from repro.corpus.queries import QUERY_SET_NAMES
    from repro.eval.harness import format_table, table3_rows

    sets = tuple(args.sets) if args.sets else QUERY_SET_NAMES
    rows = table3_rows(ctx, set_names=sets)
    rows["precision"] = rows.apply(
        lambda r: f"{r.precision_mean:.2f}±{r.precision_std:.2f}", axis=1
    )
    save_and_print(rows, "table3_runs", "Table 3 — raw runs")
    piv = format_table(rows, "precision_mean").round(3)
    save_and_print(
        piv.reset_index(), "table3_precision",
        "Table 3 — mean row-filter precision (paper Table 3 layout)",
    )
    spark.stop()


if __name__ == "__main__":
    main()
