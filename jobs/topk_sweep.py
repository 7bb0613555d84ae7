"""Section 7.5.1: precision as k varies (2..20) on WT (100).

Paper: XASH keeps the highest precision for every k; growing k adds
tables with fewer candidate rows, which XASH filters best.

Usage: python jobs/topk_sweep.py [--scale 1.0]
"""
from _session import get_spark, make_context, save_and_print, standard_parser


def main() -> None:
    args = standard_parser(__doc__).parse_args()
    spark = get_spark("mate-topk-sweep")
    ctx = make_context(spark, args)
    from repro.eval.harness import topk_sweep_rows

    rows = topk_sweep_rows(ctx)
    save_and_print(
        rows[["k", "spec", "set_name", "precision_mean", "precision_std",
              "verif_pairs", "wall_per_query"]],
        "topk_sweep", "Section 7.5.1 — precision vs k",
    )
    spark.stop()


if __name__ == "__main__":
    main()
