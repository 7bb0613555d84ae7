"""Reproduce Table 1: the query-set statistics.

Paper's row per set: number of query tables, corpus probed, average
cardinality, average joinability. Ours reports the same stats for the
lite query sets (joinability = average best j found by MATE+XASH).

Usage: python jobs/table1_query_stats.py [--scale 1.0]
"""
from _session import get_spark, make_context, save_and_print, standard_parser


def main() -> None:
    args = standard_parser(__doc__).parse_args()
    spark = get_spark("mate-table1")
    ctx = make_context(spark, args)
    from repro.eval.harness import table1_rows

    save_and_print(table1_rows(ctx), "table1", "Table 1 — query sets (lite)")
    spark.stop()


if __name__ == "__main__":
    main()
