"""Tests for spec-driven autocomplete (paper §5.3/§6.4)."""
import pytest

from repro.search.autocomplete import Autocomplete


@pytest.fixture(scope="module")
def ac(humboldt):
    return humboldt.autocomplete_engine


class TestAdmissibleFields:
    def test_all_spec_fields_present(self, ac):
        fields = ac.admissible_fields()
        for f in ("type", "owned_by", "badged", "badged_by", "tag", "created_by"):
            assert f in fields

    def test_aliases_included(self, ac):
        fields = ac.admissible_fields()
        assert "owned by" in fields and "badged by" in fields

    def test_sorted(self, ac):
        fields = ac.admissible_fields()
        assert fields == sorted(fields)


class TestAdmissibleValues:
    def test_type_values_from_catalog(self, ac):
        assert set(ac.admissible_values("type")) == {
            "table", "visualization", "workbook", "dashboard",
        }

    def test_badge_values(self, ac):
        vals = set(ac.admissible_values("badged"))
        assert "endorsed" in vals
        assert vals <= {"endorsed", "warning", "deprecated"}

    def test_owner_prefix_filter(self, ac):
        vals = ac.admissible_values("owned_by", prefix="Al")
        assert vals == ["Alex"]

    def test_prefix_case_insensitive(self, ac):
        assert ac.admissible_values("owned_by", prefix="al") == ["Alex"]

    def test_limit_respected(self, ac):
        assert len(ac.admissible_values("tag", limit=3)) == 3

    def test_provider_field_suggests_datasets(self, ac):
        vals = ac.admissible_values("joinable_with")
        assert "orders" in vals and "airlines" in vals

    def test_unknown_field_raises(self, ac):
        with pytest.raises(KeyError, match="admissible"):
            ac.admissible_values("nonexistent")


class TestContextualSuggest:
    def test_field_prefix(self, ac):
        texts = [s.text for s in ac.suggest("ba")]
        assert "badged:" in texts and "badged by:" in texts

    def test_value_context(self, ac):
        sugg = ac.suggest("badged: e")
        assert [s.text for s in sugg] == ["endorsed"]
        assert sugg[0].kind == "value"

    def test_value_context_after_operator(self, ac):
        sugg = ac.suggest("type: table & owned_by: Al")
        assert [s.text for s in sugg] == ["Alex"]

    def test_provider_call_context(self, ac):
        texts = [s.text for s in ac.suggest(":rec")]
        assert texts == [":recent_documents()"]

    def test_provider_suggestions_respect_visibility(self, ac):
        # lineage is not visible on the search surface.
        texts = [s.text for s in ac.suggest(":")]
        assert ":lineage()" not in texts
        assert ":most_viewed()" in texts

    def test_empty_input_lists_fields(self, ac):
        sugg = ac.suggest("")
        assert all(s.kind == "field" for s in sugg)
        assert sugg

    def test_suggestions_carry_provider_detail(self, ac):
        sugg = [s for s in ac.suggest("badg") if s.text == "badged:"]
        assert sugg and sugg[0].detail == "badged"
