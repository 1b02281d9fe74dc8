"""Tests for the exploration engine (paper §5.2/§6.3)."""
import pytest
from pyspark.sql import functions as F

from repro.ui.explore import ArtifactNotFound


@pytest.fixture(scope="module")
def airlines_views(humboldt, corpus):
    return {v.provider: v for v in humboldt.explore(corpus.airlines_id)}


class TestBindingRules:
    def test_typed_binds_to_selection_type(self, airlines_views):
        types = {
            r["artifact_type"]
            for r in airlines_views["typed"].items.select("artifact_type").distinct().collect()
        }
        assert types == {"table"}

    def test_owned_by_binds_to_owner(self, airlines_views, catalog, corpus):
        owner = (
            catalog.artifacts.where(F.col("artifact_id") == corpus.airlines_id)
            .first()["owner_name"]
        )
        owners = {
            r["owner_name"]
            for r in airlines_views["owned_by"].items.select("owner_name").distinct().collect()
        }
        assert owners == {owner}

    def test_badged_binds_to_shared_badges(self, airlines_views, catalog, corpus):
        own = {
            r["badge"]
            for r in catalog.badges.where(
                F.col("artifact_id") == corpus.airlines_id
            ).collect()
        }
        cats = {
            r["category"]
            for r in airlines_views["badged"].items.select("category").distinct().collect()
        }
        assert cats <= own

    def test_selection_excluded_from_category_views(self, airlines_views, corpus):
        for name in ("typed", "owned_by", "badged"):
            hit = airlines_views[name].items.where(
                F.col("artifact_id") == corpus.airlines_id
            )
            assert hit.count() == 0, name

    def test_lineage_rooted_at_selection(self, airlines_views, corpus):
        edges = airlines_views["lineage"].edges
        if edges.count() > 0:
            roots = {r["parent_id"] for r in edges.where(F.col("depth") == 1).collect()}
            assert roots == {corpus.airlines_id}

    def test_joinable_bound_to_dataset(self, airlines_views):
        vm = airlines_views["joinable"]
        assert vm.meta["bound_to"] == "airlines"
        names = {r["dataset_name"] for r in vm.items.collect()}
        assert "flights" in names  # flights.airline_id -> airlines.airline_id

    def test_embedding_neighborhood_size(self, airlines_views):
        assert airlines_views["similar_embedding"].items.count() <= 20

    def test_embedding_sorted_by_distance(self, airlines_views):
        d = [r["distance"] for r in airlines_views["similar_embedding"].items.collect()]
        assert d == sorted(d)


class TestConditionalSurfacing:
    def test_artifact_without_dataset_skips_joinable(self, humboldt, corpus):
        wb = corpus.john_doe_workbook_ids[0]
        views = {v.provider for v in humboldt.explore(wb)}
        assert "joinable" not in views

    def test_artifact_without_badges_skips_badged(self, humboldt, catalog, corpus):
        badged_ids = {r["artifact_id"] for r in catalog.badges.collect()}
        unbadged = next(
            aid
            for aid in corpus.artifacts["artifact_id"]
            if aid not in badged_ids
        )
        views = {v.provider for v in humboldt.explore(int(unbadged))}
        assert "badged" not in views

    def test_interaction_providers_not_surfaced(self, airlines_views):
        assert "recent_documents" not in airlines_views
        assert "most_viewed" not in airlines_views

    def test_views_marked_with_selection(self, airlines_views, corpus):
        for vm in airlines_views.values():
            assert vm.meta.get("selection") == corpus.airlines_id


class TestErrors:
    def test_unknown_artifact(self, humboldt):
        with pytest.raises(ArtifactNotFound):
            humboldt.explore(10_000_000)
