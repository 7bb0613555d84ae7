"""Benchmark regenerating Table 1 (query-set statistics).

One benchmark per query-set family; the measured operation is query-set
construction + cardinality statistics (the joinability column of
Table 1 comes from the discovery benchmarks, not re-run here).
"""
import pytest

from repro.corpus.queries import QUERY_SET_NAMES, build_query_set, corpus_for


@pytest.mark.parametrize("set_name", QUERY_SET_NAMES)
def test_table1_query_set_stats(benchmark, ctx, set_name):
    corpus = ctx.corpus(corpus_for(set_name))

    def build():
        qs = build_query_set(set_name, corpus)
        return qs.avg_cardinality, len(qs.queries)

    avg_card, n = benchmark.pedantic(build, rounds=1, iterations=1)
    assert n >= 2
    assert avg_card >= 2
