"""E2/E3 benchmark: simulated study + questionnaire pipeline at SF=0.1."""
from repro.experiments import e2_completion, e3_questionnaire
from repro.jobs_util import print_table
from repro.study.likert import reconstruct_ratings


def test_bench_likert_reconstruction(benchmark):
    df = benchmark(reconstruct_ratings)
    assert len(df) == 72


def test_bench_e3_pipeline(benchmark, spark):
    rows = benchmark.pedantic(e3_questionnaire, args=(spark,), rounds=3, iterations=1)
    print_table("E3: questionnaire (paper vs measured)", rows)
    assert all(r["measured_mean"] == r["paper_mean"] for r in rows)


def test_bench_e2_full_study(benchmark, spark, bench_root, bench_catalog, bench_corpus):
    from repro.core.framework import Humboldt

    def run():
        h = Humboldt(spark, bench_root, catalog=bench_catalog)
        return e2_completion(h, bench_corpus)

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    print_table("E2: task completion (paper vs measured)", rows)
    assert all(r["measured"] == r["paper"] for r in rows)
