"""Tests for catalog assembly and enrichment (oracle-checked)."""
import pandas as pd
from pyspark.sql import functions as F

from repro.catalog.builder import build_catalog
from repro.lake.corpus import NOW
from repro.oracle import assert_equivalent


class TestEnrichment:
    def test_one_row_per_artifact(self, catalog, corpus):
        assert catalog.artifacts.count() == len(corpus.artifacts)

    def test_owner_names_vs_oracle(self, catalog, corpus):
        got = catalog.artifacts.select("artifact_id", "owner_name")
        assert_equivalent(
            got,
            """
            SELECT a.artifact_id, u.user_name AS owner_name
            FROM artifacts a LEFT JOIN users u ON a.owner_id = u.user_id
            """,
            artifacts=corpus.artifacts,
            users=corpus.users,
        )

    def test_creator_names_vs_oracle(self, catalog, corpus):
        got = catalog.artifacts.select("artifact_id", "created_by_name")
        assert_equivalent(
            got,
            """
            SELECT a.artifact_id, u.user_name AS created_by_name
            FROM artifacts a LEFT JOIN users u ON a.created_by_id = u.user_id
            """,
            artifacts=corpus.artifacts,
            users=corpus.users,
        )

    def test_team_names_vs_oracle(self, catalog, corpus):
        got = catalog.artifacts.select("artifact_id", "team_name")
        assert_equivalent(
            got,
            """
            SELECT a.artifact_id, t.team_name
            FROM artifacts a LEFT JOIN teams t ON a.team_id = t.team_id
            """,
            artifacts=corpus.artifacts,
            users=corpus.users,
            teams=corpus.teams,
        )

    def test_recency_days_matches_pandas(self, catalog, corpus):
        got = (
            catalog.artifacts.select("artifact_id", "recency_days")
            .orderBy("artifact_id")
            .toPandas()
        )
        src = corpus.artifacts.sort_values("artifact_id")
        expected = (
            NOW.normalize() - pd.to_datetime(src["modified_at"]).dt.normalize()
        ).dt.days.to_numpy()
        assert (got["recency_days"].to_numpy() == expected).all()

    def test_badges_carry_display_names(self, catalog, corpus):
        mike_badges = catalog.badges.where(F.col("badged_by") == "Mike").count()
        expected = (corpus.badges["badged_by_id"] == 2).sum()
        assert mike_badges == expected


class TestDatasetMeta:
    def test_dataset_level_rollup(self, catalog):
        roll = catalog.dataset_level_meta()
        li = roll.where(F.col("dataset") == "lineitem").first()
        assert li["n_rows"] == 60_000
        assert li["n_cols"] == 10

    def test_rollup_one_row_per_dataset(self, catalog):
        roll = catalog.dataset_level_meta()
        assert roll.count() == roll.select("dataset").distinct().count() == 9


class TestOptions:
    def test_without_profiles(self, spark, lake_root):
        cat = build_catalog(spark, lake_root, with_profiles=False, cache=False)
        assert cat.column_profiles is None
        assert cat.artifacts.count() > 0

    def test_artifact_ids_helper(self, catalog):
        ids = catalog.artifact_ids()
        assert ids.columns == ["artifact_id"]
        assert ids.count() == catalog.artifacts.count()
