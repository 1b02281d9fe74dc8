"""E1 benchmark: spec -> generated discovery surface, at SF=0.1.

Times the generation path (spec parse + registry + every overview view
materialized) and prints the E1 table once.
"""
from repro.core.default_spec import default_spec
from repro.core.framework import Humboldt
from repro.core.spec import HumboldtSpec
from repro.experiments import e1_expressivity
from repro.jobs_util import print_table


def test_bench_spec_parse_and_validate(benchmark):
    text = default_spec().to_json()
    spec = benchmark(HumboldtSpec.from_json, text)
    assert len(spec.providers) == 11


def test_bench_ui_generation(benchmark, spark, bench_root, bench_catalog):
    """Full surface generation: facade init + all overview views collected."""

    def generate():
        h = Humboldt(spark, bench_root, catalog=bench_catalog)
        views = h.overview_views()
        # Materialize each view's top rows, as a UI would.
        return [v.items.limit(10).collect() for v in views]

    views = benchmark.pedantic(generate, rounds=3, iterations=1)
    assert len(views) >= 8


def test_bench_e1_table(benchmark, bench_humboldt):
    rows = benchmark.pedantic(
        e1_expressivity, args=(bench_humboldt,), rounds=3, iterations=1
    )
    print_table("E1: expressivity (bench lake)", rows)
    assert {r["metric"]: r["measured"] for r in rows}["n_view_types"] == 6
