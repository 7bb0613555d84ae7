"""Figure 6: runtime and precision vs composite-key size |Q|.

Paper (OD corpus, up to 10 key columns): runtime falls as |Q| grows
(more 1-bits in the query super key -> harder to mask -> fewer FPs and
more table pruning); precision dips at |Q|=3 then recovers.

Usage: python jobs/keysize_sweep.py [--scale 1.0]
"""
from _session import get_spark, make_context, save_and_print, standard_parser


def main() -> None:
    args = standard_parser(__doc__).parse_args()
    spark = get_spark("mate-keysize")
    ctx = make_context(spark, args)
    from repro.eval.harness import keysize_rows

    rows = keysize_rows(ctx)
    save_and_print(
        rows[["key_size", "wall_seconds", "precision_mean", "fp",
              "surv_pairs", "cand_pairs", "tables_pruned"]],
        "keysize_sweep", "Figure 6 — key-size sweep",
    )
    spark.stop()


if __name__ == "__main__":
    main()
