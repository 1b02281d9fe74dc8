"""End-to-end tests for the Humboldt facade."""
import pytest

from repro.core.spec import HumboldtSpec, ProviderSpec


class TestSurfaceStats:
    def test_expressivity_counts(self, humboldt):
        s = humboldt.surface_stats()
        assert s.n_providers == 11
        assert s.n_view_types == 6
        assert s.n_categories == 4
        assert s.n_search_interfaces == 2
        assert s.n_search_fields == 7
        assert s.spec_lines > 0

    def test_stats_scale_with_spec(self, fresh_humboldt):
        small = HumboldtSpec(
            providers=[
                ProviderSpec(
                    "only", "interaction", "", "list", "catalog://most_viewed"
                )
            ]
        )
        h = fresh_humboldt(spec=small)
        s = h.surface_stats()
        assert s.n_providers == 1
        assert s.n_view_types == 1
        assert s.n_search_fields == 0
        assert s.spec_lines < humboldt_lines_upper_bound()


def humboldt_lines_upper_bound():
    from repro.core.default_spec import default_spec

    return default_spec().line_count()


class TestPreview:
    def test_preview_of_dataset_artifact(self, humboldt, corpus):
        meta, snippet = humboldt.preview(corpus.airlines_id, n_rows=3)
        assert meta["name"] == "AIRLINES"
        assert snippet is not None and snippet.count() == 3
        assert "airline_id" in snippet.columns

    def test_preview_of_logical_artifact(self, humboldt, corpus):
        wb = corpus.john_doe_workbook_ids[0]
        meta, snippet = humboldt.preview(wb)
        assert meta["artifact_type"] == "workbook"
        assert snippet is None

    def test_preview_unknown_artifact(self, humboldt):
        with pytest.raises(KeyError):
            humboldt.preview(99_999_999)


class TestEndToEnd:
    def test_search_then_explore_then_preview(self, humboldt, corpus):
        """The paper's core journey: search -> select -> explore -> preview."""
        hits = humboldt.search("badged: endorsed & 'AIRLINES'").collect()
        assert hits[0]["name"] == "AIRLINES"
        aid = hits[0]["artifact_id"]
        related = humboldt.explore(aid)
        assert related
        meta, snippet = humboldt.preview(aid)
        assert meta["dataset_name"] == "airlines"

    def test_scoped_search_via_view(self, humboldt):
        views = {v.provider: v for v in humboldt.overview_views()}
        scoped = humboldt.search("type: table", scope=views["most_viewed"])
        in_view = {r["artifact_id"] for r in views["most_viewed"].items.collect()}
        got = {r["artifact_id"] for r in scoped.collect()}
        assert got <= in_view

    def test_custom_spec_changes_overview(self, fresh_humboldt):
        spec = HumboldtSpec(
            providers=[
                ProviderSpec(
                    "solo", "interaction", "", "tiles", "catalog://favorites"
                )
            ]
        )
        h = fresh_humboldt(spec=spec)
        views = h.overview_views()
        assert [v.provider for v in views] == ["solo"]

    def test_search_limit_and_order(self, humboldt):
        top = humboldt.search("type: table", limit=3).collect()
        assert len(top) == 3
        scores = [r["score"] for r in top]
        assert scores == sorted(scores, reverse=True)
