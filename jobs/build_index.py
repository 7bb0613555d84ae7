"""Offline phase: build and parquet-cache every index artifact.

Mirrors the paper's index-generation step (Section 7.1): posting lists
plus per-row super keys for every hash spec in the Table 2 grid, for all
three corpora. Running this first makes the experiment jobs time only
the online discovery phase.

Usage: python jobs/build_index.py [--scale 1.0]
"""
from _session import get_spark, make_context, standard_parser


def main() -> None:
    args = standard_parser(__doc__).parse_args()
    spark = get_spark("mate-build-index")
    ctx = make_context(spark, args)
    from repro.eval.harness import TABLE2_SPECS, TABLE3_SPECS

    specs = {s.key: s for s in [*TABLE2_SPECS, *TABLE3_SPECS]}.values()
    for corpus_name in ("webtable", "opendata", "school"):
        index = ctx.index(corpus_name)
        print(
            f"[{corpus_name}] tables={index.corpus.n_tables} "
            f"avg_cols={index.corpus.avg_cols:.1f} "
            f"cells={index.cells.count()}"
        )
        index.warm(list(specs))
        print(f"[{corpus_name}] super keys materialised for {len(list(specs))} specs")
    spark.stop()


if __name__ == "__main__":
    main()
