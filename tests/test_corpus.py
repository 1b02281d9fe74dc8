"""Tests for the artifact corpus generator (pure pandas level)."""
import pandas as pd
import pytest

from repro.lake.corpus import (
    ARTIFACT_TYPES,
    BADGE_KINDS,
    NOW,
    PHYSICAL_DATASETS,
    build_corpus,
    n_artifacts_for_sf,
)


@pytest.fixture(scope="module")
def c():
    return build_corpus(sf=0.01, seed=7)


class TestShapes:
    def test_artifact_count_matches_sf(self, c):
        assert len(c.artifacts) == n_artifacts_for_sf(0.01) == 200

    def test_sf_scaling(self):
        assert n_artifacts_for_sf(0.1) == 2000
        assert n_artifacts_for_sf(0.0001) == 80  # floor

    def test_artifact_ids_dense_unique(self, c):
        assert sorted(c.artifacts["artifact_id"]) == list(
            range(1, len(c.artifacts) + 1)
        )

    def test_types_valid(self, c):
        assert set(c.artifacts["artifact_type"]) <= set(ARTIFACT_TYPES)

    def test_badge_kinds_valid(self, c):
        assert set(c.badges["badge"]) <= set(BADGE_KINDS)

    def test_all_columns_scalar(self, c):
        # Oracle comparability: no array/map/struct columns anywhere.
        for frame in (c.users, c.teams, c.artifacts, c.badges, c.tags, c.lineage):
            assert not any(isinstance(v, (list, dict)) for v in frame.iloc[0])


class TestPlantedFacts:
    def test_named_principals(self, c):
        names = dict(zip(c.users["user_id"], c.users["user_name"]))
        assert names[1] == "Alex" and names[2] == "Mike" and names[3] == "John Doe"

    def test_a_team_exists(self, c):
        assert "A Team" in set(c.teams["team_name"])

    def test_airlines_artifact_is_endorsed_table(self, c):
        row = c.artifacts[c.artifacts["artifact_id"] == c.airlines_id].iloc[0]
        assert row["name"] == "AIRLINES"
        assert row["artifact_type"] == "table"
        assert row["dataset_name"] == "airlines"
        b = c.badges[c.badges["artifact_id"] == c.airlines_id]
        assert ("endorsed", 2) in set(zip(b["badge"], b["badged_by_id"]))

    def test_flagship_ground_truth_nonempty_and_correct(self, c):
        assert len(c.flagship_ids) >= 3
        endorsed_by_mike = set(
            c.badges.loc[
                (c.badges["badge"] == "endorsed") & (c.badges["badged_by_id"] == 2),
                "artifact_id",
            ]
        )
        for aid in c.flagship_ids:
            row = c.artifacts[c.artifacts["artifact_id"] == aid].iloc[0]
            assert row["artifact_type"] == "table"
            assert row["owner_id"] == 1  # Alex
            assert (
                "sales" in row["name"].lower()
                or "sales" in row["description"].lower()
            )
            assert aid in endorsed_by_mike

    def test_john_doe_workbooks_ground_truth(self, c):
        assert len(c.john_doe_workbook_ids) >= 4
        computed = set(
            c.artifacts.loc[
                (c.artifacts["artifact_type"] == "workbook")
                & (c.artifacts["created_by_id"] == 3),
                "artifact_id",
            ]
        )
        assert set(c.john_doe_workbook_ids) == computed

    def test_john_doe_also_creates_non_workbooks(self, c):
        # Task 3's distractor requires it.
        types = set(
            c.artifacts.loc[c.artifacts["created_by_id"] == 3, "artifact_type"]
        )
        assert types - {"workbook"}

    def test_physical_datasets_bound(self, c):
        bound = set(c.artifacts["dataset_name"].dropna())
        assert bound == set(PHYSICAL_DATASETS)


class TestIntegrity:
    def test_owner_fk(self, c):
        assert set(c.artifacts["owner_id"]) <= set(c.users["user_id"])

    def test_creator_fk(self, c):
        assert set(c.artifacts["created_by_id"]) <= set(c.users["user_id"])

    def test_badge_fk(self, c):
        assert set(c.badges["artifact_id"]) <= set(c.artifacts["artifact_id"])
        assert set(c.badges["badged_by_id"]) <= set(c.users["user_id"])

    def test_tag_fk(self, c):
        assert set(c.tags["artifact_id"]) <= set(c.artifacts["artifact_id"])

    def test_lineage_fks_and_type_order(self, c):
        arts = c.artifacts.set_index("artifact_id")["artifact_type"]
        order = {t: i for i, t in enumerate(ARTIFACT_TYPES)}
        for p, ch in zip(c.lineage["parent_id"], c.lineage["child_id"]):
            assert order[arts[p]] < order[arts[ch]]  # DAG by construction

    def test_timestamps_ordered(self, c):
        assert (c.artifacts["modified_at"] >= c.artifacts["created_at"]).all()
        assert (c.artifacts["modified_at"] <= NOW).all()

    def test_counts_nonnegative(self, c):
        assert (c.artifacts["view_count"] >= 0).all()
        assert (c.artifacts["favorite_count"] >= 0).all()


class TestDeterminism:
    def test_same_seed_same_corpus(self):
        a = build_corpus(sf=0.01, seed=7)
        b = build_corpus(sf=0.01, seed=7)
        pd.testing.assert_frame_equal(a.artifacts, b.artifacts)
        pd.testing.assert_frame_equal(a.badges, b.badges)
        assert a.flagship_ids == b.flagship_ids

    def test_different_seed_differs(self):
        a = build_corpus(sf=0.01, seed=7)
        b = build_corpus(sf=0.01, seed=8)
        assert not a.artifacts.equals(b.artifacts)

    def test_larger_sf_has_planted_facts_too(self):
        big = build_corpus(sf=0.05, seed=7)
        assert big.airlines_id > 0
        assert len(big.flagship_ids) >= 3
        assert len(big.john_doe_workbook_ids) >= 4
