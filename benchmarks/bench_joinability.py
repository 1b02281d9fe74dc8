"""E5 benchmark: MinHash profiling + joinability estimation at SF=0.1."""
from pyspark.sql import functions as F

from repro.catalog import profiles as profiling
from repro.experiments import e5_joinability
from repro.jobs_util import print_table


def test_bench_profile_columns(benchmark, spark, bench_root):
    def run():
        return profiling.profile_columns(spark, bench_root).collect()

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(rows) > 30


def test_bench_estimate_joinability(benchmark, bench_catalog):
    prof = bench_catalog.column_profiles

    def run():
        return profiling.estimate_joinability(prof, threshold=0.5).collect()

    edges = benchmark.pedantic(run, rounds=3, iterations=1)
    assert edges


def test_bench_joinable_provider_fetch(benchmark, bench_humboldt, bench_catalog):
    provider = bench_humboldt.registry.get("joinable")

    def run():
        res = provider.fetch(bench_catalog, {"table": "orders"})
        return res.edges.collect()

    edges = benchmark.pedantic(run, rounds=3, iterations=1)
    assert edges


def test_bench_e5_table(benchmark, spark, bench_root):
    rows = benchmark.pedantic(
        e5_joinability,
        args=(spark, bench_root),
        kwargs={"thresholds": (0.3, 0.5, 0.7, 0.9)},
        rounds=1,
        iterations=1,
    )
    print_table("E5: joinability quality (bench lake)", rows)
    at_05 = next(r for r in rows if r["threshold"] == 0.5)
    # All planted PK-FK edges must be recovered at the default threshold;
    # recall over *all* exact-containment edges is reported, not asserted
    # (coincidental integer-range containments are a known estimator
    # blind spot — see EXPERIMENTS.md E5).
    assert at_05["planted_fk_recall"] == 1.0
    assert at_05["recall"] >= 0.5
