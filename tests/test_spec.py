"""Tests for the Humboldt specification model (pure Python)."""
import pytest

from repro.core.default_spec import default_spec
from repro.core.spec import (
    HumboldtSpec,
    InputSpec,
    ProviderSpec,
    RankingWeight,
    SearchField,
    SpecError,
    TeamHomePage,
)


def mini_spec(**overrides) -> HumboldtSpec:
    p = dict(
        name="p1",
        category="annotations",
        description="d",
        representation="list",
        endpoint="catalog://most_viewed",
    )
    p.update(overrides)
    return HumboldtSpec(providers=[ProviderSpec(**p)])


class TestValidation:
    def test_default_spec_is_valid(self):
        default_spec().validate()

    def test_duplicate_provider_names_rejected(self):
        s = HumboldtSpec(
            providers=[
                ProviderSpec("x", "c", "", "list", "e"),
                ProviderSpec("x", "c", "", "tiles", "e"),
            ]
        )
        with pytest.raises(SpecError, match="duplicate"):
            s.validate()

    def test_unknown_representation_rejected(self):
        with pytest.raises(SpecError, match="representation"):
            mini_spec(representation="pie_chart").validate()

    def test_unknown_surface_rejected(self):
        with pytest.raises(SpecError, match="surface"):
            mini_spec(visibility=("overview", "sidebar")).validate()

    def test_unknown_input_type_rejected(self):
        with pytest.raises(SpecError, match="input type"):
            mini_spec(inputs=(InputSpec("x", "blob"),)).validate()

    def test_conflicting_search_fields_rejected(self):
        s = HumboldtSpec(
            providers=[
                ProviderSpec(
                    "a", "c", "", "list", "e",
                    search_fields=(SearchField("owner", (), "artifacts", "o"),),
                ),
                ProviderSpec(
                    "b", "c", "", "list", "e",
                    search_fields=(SearchField("owner", (), "artifacts", "o"),),
                ),
            ]
        )
        with pytest.raises(SpecError, match="owner"):
            s.validate()

    def test_alias_conflict_rejected(self):
        s = HumboldtSpec(
            providers=[
                ProviderSpec(
                    "a", "c", "", "list", "e",
                    search_fields=(SearchField("f1", ("shared",), "artifacts", "x"),),
                ),
                ProviderSpec(
                    "b", "c", "", "list", "e",
                    search_fields=(SearchField("shared", (), "artifacts", "y"),),
                ),
            ]
        )
        with pytest.raises(SpecError):
            s.validate()

    def test_dangling_home_page_reference_rejected(self):
        s = mini_spec()
        s.team_home_pages = [TeamHomePage("T", ("ghost_provider",))]
        with pytest.raises(SpecError, match="ghost_provider"):
            s.validate()

    def test_nonnumeric_weight_rejected(self):
        with pytest.raises(SpecError, match="numeric"):
            mini_spec(ranking=(RankingWeight("views", "high"),)).validate()


class TestAccess:
    def test_provider_lookup(self):
        s = default_spec()
        assert s.provider("badged").representation == "categories"
        with pytest.raises(KeyError):
            s.provider("nonexistent")

    def test_visible_filters_by_surface(self):
        s = default_spec()
        overview = {p.name for p in s.visible("overview")}
        assert "joinable" not in overview  # exploration/search only
        assert "recent_documents" in overview

    def test_visible_rejects_unknown_surface(self):
        with pytest.raises(SpecError):
            default_spec().visible("dashboard")

    def test_home_page_lookup(self):
        s = default_spec()
        assert s.home_page("A Team") is not None
        assert s.home_page("No Such Team") is None

    def test_required_inputs(self):
        s = default_spec()
        req = s.provider("joinable").required_inputs()
        assert [i.name for i in req] == ["table"]
        assert s.provider("badged").required_inputs() == []


class TestSerialization:
    def test_json_roundtrip_identity(self):
        s = default_spec()
        again = HumboldtSpec.from_json(s.to_json())
        assert again.to_dict() == s.to_dict()

    def test_roundtrip_preserves_search_fields(self):
        s = HumboldtSpec.from_json(default_spec().to_json())
        badged = s.provider("badged")
        assert {sf.name for sf in badged.search_fields} == {"badged", "badged_by"}

    def test_roundtrip_preserves_ranking(self):
        s = HumboldtSpec.from_json(default_spec().to_json())
        fav = s.provider("favorites")
        assert [(r.field, r.weight) for r in fav.ranking] == [
            ("favorite_count", 4.3),
            ("view_count", 1.5),
        ]

    def test_from_dict_validates(self):
        d = default_spec().to_dict()
        d["providers"][0]["representation"] = "hologram"
        with pytest.raises(SpecError):
            HumboldtSpec.from_dict(d)

    def test_unknown_custom_fields_ignored_but_preserved(self):
        # Paper §4.3: unsupported custom fields are ignored by the UI.
        d = default_spec().to_dict()
        d["custom"]["onboarding_banner"] = {"text": "hi"}
        s = HumboldtSpec.from_dict(d)
        assert s.custom["onboarding_banner"] == {"text": "hi"}

    def test_line_count_positive_and_stable(self):
        s = default_spec()
        assert s.line_count() == len(s.to_json().splitlines()) > 50


class TestDefaultSpec:
    def test_eleven_providers_four_categories(self):
        s = default_spec()
        assert len(s.providers) == 11
        assert len({p.category for p in s.providers}) == 4

    def test_all_six_representations_used(self):
        s = default_spec()
        assert {p.representation for p in s.providers} == {
            "list", "tiles", "hierarchy", "graph", "categories", "embedding",
        }

    def test_global_ranking_fallback_defined(self):
        assert default_spec().global_ranking

    def test_flagship_query_fields_declared(self):
        # The abstract's query needs these four fields.
        names = set()
        for p in default_spec().providers:
            for sf in p.search_fields:
                names.add(sf.name)
        assert {"type", "owned_by", "badged", "badged_by"} <= names
