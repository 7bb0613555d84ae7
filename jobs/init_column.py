"""Section 7.5.4: initial-column selection strategies on OD (10k).

Paper: avg posting-list items fetched — ground-truth best 83 <
cardinality heuristic 179 < column order 202 < TLS 248 < worst case 728.
The shape to reproduce: best < cardinality < order/TLS << worst.

Usage: python jobs/init_column.py [--scale 1.0]
"""
from _session import get_spark, make_context, save_and_print, standard_parser


def main() -> None:
    args = standard_parser(__doc__).parse_args()
    spark = get_spark("mate-init-column")
    ctx = make_context(spark, args)
    from repro.eval.harness import init_column_rows

    rows = init_column_rows(ctx)
    save_and_print(
        rows[["strategy", "avg_pl_items", "wall_per_query", "cand_pairs"]],
        "init_column", "Section 7.5.4 — init-column strategies",
    )
    spark.stop()


if __name__ == "__main__":
    main()
