"""Tests for view-model generation (paper §5.1/§6.2)."""
import pytest
from pyspark.sql import functions as F

from repro.core.spec import RankingWeight
from repro.oracle import assert_equivalent
from repro.ui.views import generate_view


@pytest.fixture(scope="module")
def views(humboldt):
    return {v.provider: v for v in humboldt.overview_views()}


class TestGeneration:
    def test_every_overview_provider_generates_a_view(self, humboldt, views):
        expected = {
            p.name
            for p in humboldt.spec.visible("overview")
            if not p.required_inputs()
        }
        assert set(views) == expected

    def test_representations_follow_spec(self, humboldt, views):
        for name, vm in views.items():
            assert vm.representation == humboldt.spec.provider(name).representation

    def test_titles_humanized(self, views):
        assert views["recent_documents"].title == "Recent Documents"

    def test_item_ids_distinct(self, views):
        ids = views["badged"].item_ids()
        assert ids.count() == ids.distinct().count()


class TestRepresentationPayloads:
    def test_tiles_ordered_by_provider_ranking(self, views):
        rec = [r["recency_days"] for r in views["recent_documents"].items.collect()]
        assert rec == sorted(rec)

    def test_list_ordered_by_views(self, views):
        v = [r["view_count"] for r in views["most_viewed"].items.collect()]
        assert v == sorted(v, reverse=True)

    def test_categories_rollup_vs_oracle(self, views, corpus):
        got = views["typed"].categories
        assert_equivalent(
            got,
            "SELECT artifact_type AS category, count(*) AS n "
            "FROM artifacts GROUP BY 1",
            artifacts=corpus.artifacts,
        )

    def test_categories_ordered_by_size(self, views):
        ns = [r["n"] for r in views["badged"].categories.collect()]
        assert ns == sorted(ns, reverse=True)

    def test_hierarchy_has_edges(self, views):
        assert views["lineage"].edges is not None
        assert {"parent_id", "child_id", "depth"} <= set(
            views["lineage"].edges.columns
        )

    def test_embedding_has_coordinates(self, views):
        items = views["similar_embedding"].items
        assert {"x", "y"} <= set(items.columns)


class TestRankingIntegration:
    def test_global_fallback_when_provider_has_no_weights(self, humboldt, views):
        """typed has no ranking -> items ordered by the global weights."""
        scores = [r["score"] for r in views["typed"].items.limit(50).collect()]
        assert scores == sorted(scores, reverse=True)

    def test_generate_view_direct(self, humboldt, catalog):
        pspec = humboldt.spec.provider("most_viewed")
        result = humboldt.registry.get("most_viewed").fetch(catalog)
        vm = generate_view(
            pspec, result, global_ranking=[RankingWeight("view_count", 1.0)]
        )
        assert vm.items.first()["view_count"] == result.items.agg(
            F.max("view_count")
        ).first()[0]
