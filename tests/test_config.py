"""Tests for customization (paper §4.4 and study Task 4)."""
import pytest

from repro.core.default_spec import default_spec
from repro.core.spec import HumboldtSpec, SpecError
from repro.ui.config import ConfigStore


@pytest.fixture()
def store():
    return ConfigStore(default_spec())


class TestTeamHomePages:
    def test_set_and_get(self, store):
        store.set_team_home_page("B Team", ["most_viewed", "badged"])
        assert store.team_home_page("B Team").providers == ("most_viewed", "badged")

    def test_overwrite_existing(self, store):
        store.set_team_home_page("A Team", ["favorites"])
        assert store.team_home_page("A Team").providers == ("favorites",)

    def test_unknown_provider_rejected(self, store):
        with pytest.raises(SpecError, match="ghost"):
            store.set_team_home_page("A Team", ["ghost"])

    def test_round_trips_through_spec_json(self, store):
        store.set_team_home_page("C Team", ["typed"])
        again = HumboldtSpec.from_json(store.spec.to_json())
        assert again.home_page("C Team").providers == ("typed",)


class TestUserPrefs:
    def test_hide_and_unhide(self, store):
        store.hide_provider("u1", "most_viewed")
        assert "most_viewed" not in store.effective_providers("overview", user="u1")
        store.unhide_provider("u1", "most_viewed")
        assert "most_viewed" in store.effective_providers("overview", user="u1")

    def test_hide_unknown_provider_rejected(self, store):
        with pytest.raises(SpecError):
            store.hide_provider("u1", "ghost")

    def test_reorder(self, store):
        store.reorder("u1", ["badged", "recent_documents"])
        names = store.effective_providers("overview", user="u1")
        assert names.index("badged") < names.index("recent_documents")
        assert names[0] == "badged"

    def test_reorder_unknown_rejected(self, store):
        with pytest.raises(SpecError):
            store.reorder("u1", ["ghost"])

    def test_prefs_are_per_user(self, store):
        store.hide_provider("u1", "most_viewed")
        assert "most_viewed" in store.effective_providers("overview", user="u2")


class TestResolution:
    def test_default_is_spec_order(self, store):
        assert store.effective_providers("overview") == [
            p.name for p in store.spec.visible("overview")
        ]

    def test_team_page_applies_to_overview_only(self, store):
        store.set_team_home_page("A Team", ["favorites", "typed"])
        assert store.effective_providers("overview", team="A Team") == [
            "favorites", "typed",
        ]
        # exploration surface unaffected by team home page
        explo = store.effective_providers("exploration", team="A Team")
        assert len(explo) > 2

    def test_team_page_cannot_expose_hidden_surface_providers(self, store):
        # joinable is not visible on overview; a team page listing it
        # would be filtered out.
        store.set_team_home_page("A Team", ["joinable", "typed"])
        assert store.effective_providers("overview", team="A Team") == ["typed"]

    def test_user_hide_applies_on_top_of_team_page(self, store):
        store.set_team_home_page("A Team", ["favorites", "typed"])
        store.hide_provider("u1", "typed")
        assert store.effective_providers("overview", user="u1", team="A Team") == [
            "favorites",
        ]
