"""E4 benchmark: query-language latency per query class at SF=0.1.

Each benchmark compiles + executes one representative query end-to-end
(parse -> Catalyst plan -> collect ids). The printed E4 table additionally
verifies result equality against DuckDB.
"""
import pytest

from repro.experiments import e4_search_suite
from repro.jobs_util import print_table

QUERIES = {
    "column_predicate": "type: table",
    "side_table_semijoin": "badged: endorsed",
    "free_text": "sales",
    "conjunction": "type: table & badged: endorsed",
    "disjunction": "type: dashboard | badged: deprecated",
    "negation": "!type: table",
    "flagship": (
        "type: table owned_by: 'Alex' badged: endorsed badged_by: 'Mike' & 'sales'"
    ),
    "provider_call": ":recent_documents() & sales",
}


@pytest.mark.parametrize("name", list(QUERIES))
def test_bench_query(benchmark, bench_humboldt, name):
    eng = bench_humboldt.search_engine

    def run():
        return eng.match_ids(QUERIES[name]).collect()

    rows = benchmark.pedantic(run, rounds=3, iterations=1)
    assert isinstance(rows, list)


def test_bench_ranked_search(benchmark, bench_humboldt):
    def run():
        return bench_humboldt.search("type: table", limit=20).collect()

    rows = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(rows) == 20


def test_bench_e4_table(benchmark, bench_humboldt, bench_corpus):
    rows = benchmark.pedantic(
        e4_search_suite, args=(bench_humboldt, bench_corpus), rounds=1, iterations=1
    )
    print_table("E4: query suite (bench lake)", rows)
    assert all(r["oracle_match"] for r in rows)
