"""Catalog substrate benchmark: lake scans + DataSource metadata extraction."""
from repro.catalog.builder import build_catalog
from repro.catalog.datasource import read_lake_metadata


def test_bench_metadata_datasource_scan(benchmark, spark, bench_root):
    def run():
        return read_lake_metadata(spark, bench_root).collect()

    rows = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(rows) > 40


def test_bench_catalog_build_no_profiles(benchmark, spark, bench_root):
    def run():
        cat = build_catalog(spark, bench_root, with_profiles=False, cache=False)
        return cat.artifacts.count()

    n = benchmark.pedantic(run, rounds=3, iterations=1)
    assert n == 2000


def test_bench_exploration(benchmark, bench_humboldt, bench_corpus):
    def run():
        views = bench_humboldt.explore(bench_corpus.airlines_id)
        return [v.items.limit(5).collect() for v in views]

    views = benchmark.pedantic(run, rounds=1, iterations=1)
    assert views
