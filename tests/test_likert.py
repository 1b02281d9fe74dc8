"""Tests for the Likert reconstruction pipeline (experiment E3)."""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.study import likert


@pytest.fixture(scope="module")
def ratings_pdf():
    return likert.reconstruct_ratings()


@pytest.fixture(scope="module")
def ratings(spark, ratings_pdf):
    return spark.createDataFrame(ratings_pdf).cache()


class TestReconstruction:
    def test_shape(self, ratings_pdf):
        assert len(ratings_pdf) == 72  # 6 participants x 12 statements
        assert set(ratings_pdf["participant"]) == {f"P{i}" for i in range(1, 7)}

    def test_scale_bounds(self, ratings_pdf):
        assert ratings_pdf["rating"].between(1, 5).all()

    def test_deterministic(self, ratings_pdf):
        again = likert.reconstruct_ratings()
        assert again.equals(ratings_pdf)

    def test_candidates_match_reported_rounding(self):
        for ms in likert.candidates_for(4.33, 0.75):
            assert round(sum(ms) / 6, 2) == 4.33
            assert round(likert._pop_std(ms), 2) == 0.75

    def test_candidates_empty_for_impossible_stats(self):
        assert likert.candidates_for(1.0, 2.0) == []

    def test_overall_targets_unique(self):
        total, sq = likert._overall_targets()
        assert total == 286 and sq == 1188

    def test_categories_complete(self, ratings_pdf):
        assert set(ratings_pdf["category"]) == set(likert.CATEGORIES)
        per_cat = ratings_pdf.groupby("category")["statement"].nunique()
        assert (per_cat == 3).all()


class TestSparkAggregation:
    def test_statement_stats_vs_oracle(self, ratings, ratings_pdf):
        got = likert.statement_stats(ratings)
        assert_equivalent(
            got,
            """
            SELECT statement, category,
                   round(avg(rating), 2) AS mean,
                   round(stddev_pop(rating), 2) AS std
            FROM ratings GROUP BY statement, category
            """,
            ratings=ratings_pdf,
        )

    def test_category_stats_vs_oracle(self, ratings, ratings_pdf):
        got = likert.category_stats(ratings)
        assert_equivalent(
            got,
            """
            SELECT category,
                   round(avg(rating), 2) AS mean,
                   round(stddev_pop(rating), 2) AS std
            FROM ratings GROUP BY category
            """,
            ratings=ratings_pdf,
        )

    def test_overall_stats_vs_oracle(self, ratings, ratings_pdf):
        got = likert.overall_stats(ratings)
        assert_equivalent(
            got,
            "SELECT round(avg(rating),2) AS mean, "
            "round(stddev_pop(rating),2) AS std FROM ratings",
            ratings=ratings_pdf,
        )


class TestPaperNumbers:
    """The reconstructed ratings reproduce every reported statistic exactly."""

    def test_every_reported_statement_stat(self, spark):
        rows = likert.paper_vs_measured(spark)
        for row in rows:
            assert row["measured_mean"] == pytest.approx(row["paper_mean"]), row
            assert row["measured_std"] == pytest.approx(row["paper_std"]), row

    def test_reported_scopes_present(self, spark):
        scopes = {r["scope"] for r in likert.paper_vs_measured(spark)}
        assert scopes == {
            "metadata_search", "previews", "finding_data_views",
            "layout_design", "customization", "extension", "overall",
        }

    def test_overall_matches_exactly(self, ratings):
        row = likert.overall_stats(ratings).first()
        assert float(row["mean"]) == 3.97
        assert float(row["std"]) == 0.85

    def test_entry_points_least_affirmative(self, ratings):
        """Fig. 8: 'Entry points received the most mixed responses.'"""
        cats = {r["category"]: r["mean"] for r in likert.category_stats(ratings).collect()}
        assert all(cats["Entry points"] <= v for v in cats.values())
