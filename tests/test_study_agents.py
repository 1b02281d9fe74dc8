"""Tests for the simulated user study (experiment E2's harness)."""
import pytest

from repro.study.agents import (
    PROFILES,
    completion_table,
    run_study,
    run_task1,
    run_task2,
    run_task3,
    run_task4,
)


@pytest.fixture(scope="module")
def h(spark, lake_root, catalog):
    """Module-scoped fresh framework: Task 4 mutates team configuration."""
    from repro.core.framework import Humboldt

    return Humboldt(spark, lake_root, catalog=catalog)


class TestIndividualTasks:
    def test_task1_search_route(self, h, corpus):
        ok, hints, _ = run_task1(h, corpus, "search")
        assert ok and hints == 0

    def test_task1_views_route(self, h, corpus):
        ok, hints, _ = run_task1(h, corpus, "views")
        assert ok and hints == 0

    def test_task2_direct(self, h, corpus):
        ok, hints, detail = run_task2(h, corpus, needs_reminder=False)
        assert ok and hints == 0 and detail["n_same_badge"] > 0

    def test_task2_with_reminder(self, h, corpus):
        ok, hints, _ = run_task2(h, corpus, needs_reminder=True)
        assert ok and hints == 1

    def test_task3_direct(self, h, corpus):
        ok, hints, detail = run_task3(h, corpus, misses_condition=False)
        assert ok and hints == 0
        assert detail["n_found"] == len(corpus.john_doe_workbook_ids)

    def test_task3_missed_condition_recovers(self, h, corpus):
        ok, hints, _ = run_task3(h, corpus, misses_condition=True)
        assert ok and hints == 1

    def test_task4_configures_home_page(self, h):
        ok, hints, detail = run_task4(h, needs_help=False)
        assert ok and hints == 0
        assert detail["served"] == ["favorites", "typed", "recent_documents"]

    def test_task4_with_help(self, h):
        ok, hints, _ = run_task4(h, needs_help=True)
        assert ok and hints == 1


class TestFullStudy:
    @pytest.fixture(scope="class")
    def results(self, h, corpus):
        return run_study(h, corpus)

    def test_all_tasks_completed_by_all(self, results):
        """§7.2: 'All participants were able to complete all four tasks.'"""
        assert all(r.completed for r in results)
        assert len(results) == 24  # 6 participants x 4 tasks

    def test_completion_table_matches_paper_narrative(self, results):
        table = {row["task"]: row for row in completion_table(results)}
        # Task 1: completed without help; 3 search-first, 3 views-first.
        assert table[1]["n_completed"] == 6 and table[1]["n_assisted"] == 0
        assert table[1]["n_search_first"] == 3
        assert table[1]["n_views_first"] == 3
        # Task 2: three were reminded that selection populates views.
        assert table[2]["n_completed"] == 6 and table[2]["n_assisted"] == 3
        # Task 3: half missed the first condition, then completed.
        assert table[3]["n_completed"] == 6 and table[3]["n_assisted"] == 3
        # Task 4: two needed help finding the configuration setting.
        assert table[4]["n_completed"] == 6 and table[4]["n_assisted"] == 2

    def test_profiles_match_paper_counts(self):
        assert len(PROFILES) == 6
        assert sum(1 for p in PROFILES if p[1] == "search") == 3
        assert sum(1 for p in PROFILES if p[2]) == 3
        assert sum(1 for p in PROFILES if p[3]) == 3
        assert sum(1 for p in PROFILES if p[4]) == 2
