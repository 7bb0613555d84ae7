"""Figure 5: impact of each XASH component on precision (WT (100)).

Ladder: length -> char -> char+location -> char+length+location -> full
XASH (+rotation). Paper: characters+location filter more than length
alone; rotation removes ~20% of the remaining FPs.

Usage: python jobs/xash_components.py [--scale 1.0]
"""
from _session import get_spark, make_context, save_and_print, standard_parser


def main() -> None:
    args = standard_parser(__doc__).parse_args()
    spark = get_spark("mate-xash-components")
    ctx = make_context(spark, args)
    from repro.eval.harness import xash_component_rows

    rows = xash_component_rows(ctx)
    save_and_print(
        rows[["variant", "set_name", "precision_mean", "precision_std",
              "fp", "tp", "surv_pairs"]],
        "xash_components", "Figure 5 — XASH component ablation",
    )
    spark.stop()


if __name__ == "__main__":
    main()
