"""Figure 4 (shape only): MATE vs SCR, MCR, SCR-Josie, MCR-Josie.

Figures are out of scope; this job records the numbers behind the
comparison — wall seconds and candidate/verified volumes per system —
on two representative query sets.

Usage: python jobs/fig4_systems.py [--scale 1.0]
"""
from _session import get_spark, make_context, save_and_print, standard_parser


def main() -> None:
    p = standard_parser(__doc__)
    p.add_argument(
        "--sets", nargs="*", default=["WT (100)", "OD (1k)"],
        help="query sets to compare systems on",
    )
    args = p.parse_args()
    spark = get_spark("mate-fig4")
    ctx = make_context(spark, args)
    from repro.eval.harness import fig4_rows, format_table

    rows = fig4_rows(ctx, set_names=tuple(args.sets))
    save_and_print(rows, "fig4_runs", "Figure 4 — raw runs")
    piv = format_table(rows, "wall_per_query", columns="system").round(2)
    save_and_print(
        piv.reset_index(), "fig4_systems",
        "Figure 4 — seconds per query table by system",
    )
    spark.stop()


if __name__ == "__main__":
    main()
