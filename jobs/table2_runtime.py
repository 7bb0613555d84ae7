"""Reproduce Table 2: discovery runtime per query set x hash function.

Runs the full 19-spec grid (SCR; MD5/Murmur/City at 128; SimHash, HT,
BF, LHBF, XASH at 128/256/512) over all eight query sets, printing both
the paper-style seconds-per-query pivot and the work counters (rows
verified) that drive the runtime shape at lite scale.

Usage: python jobs/table2_runtime.py [--scale 1.0] [--sets "WT (100)" ...]
"""
from _session import get_spark, make_context, save_and_print, standard_parser


def main() -> None:
    p = standard_parser(__doc__)
    p.add_argument("--sets", nargs="*", default=None, help="subset of query sets")
    args = p.parse_args()
    spark = get_spark("mate-table2")
    ctx = make_context(spark, args)
    from repro.corpus.queries import QUERY_SET_NAMES
    from repro.eval.harness import format_table, table2_rows

    sets = tuple(args.sets) if args.sets else QUERY_SET_NAMES
    rows = table2_rows(ctx, set_names=sets)
    save_and_print(rows, "table2_runs", "Table 2 — raw runs")
    piv = format_table(rows, "wall_per_query").round(2)
    save_and_print(
        piv.reset_index(), "table2_runtime",
        "Table 2 — seconds per query table (paper Table 2 layout)",
    )
    piv_v = format_table(rows, "verif_pairs")
    save_and_print(
        piv_v.reset_index(), "table2_verified_rows",
        "Table 2 companion — rows exactly verified (work counter)",
    )
    spark.stop()


if __name__ == "__main__":
    main()
