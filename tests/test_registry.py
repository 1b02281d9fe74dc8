"""Tests for the provider registry (extensibility story)."""
import pytest

from repro.core.default_spec import default_spec
from repro.core.registry import ProviderRegistry, UnknownEndpointError
from repro.core.spec import ProviderSpec, RankingWeight, SpecError
from repro.providers.base import FetchResult, MetadataProvider


@pytest.fixture()
def reg():
    return ProviderRegistry(default_spec())


class TestConstruction:
    def test_all_spec_providers_instantiated(self, reg):
        assert set(reg.names()) == set(default_spec().provider_names())

    def test_unknown_endpoint_raises(self):
        spec = default_spec()
        spec.providers.append(
            ProviderSpec("weird", "c", "", "list", "quantum://entangle")
        )
        with pytest.raises(UnknownEndpointError, match="quantum"):
            ProviderRegistry(spec)

    def test_get_unknown_name(self, reg):
        with pytest.raises(KeyError, match="spec declares"):
            reg.get("ghost")

    def test_category_grouping(self, reg):
        groups = reg.by_category()
        assert set(groups) == {"interaction", "annotations", "relatedness", "content"}
        assert len(groups["annotations"]) == 5

    def test_visible_matches_spec_order(self, reg):
        names = [p.spec.name for p in reg.visible("search")]
        assert names == [p.name for p in default_spec().visible("search")]


class TestRuntimeExtension:
    def test_add_provider_spec_only(self, reg, catalog):
        """Paper §1: adding a provider is 'a few lines of specification'."""
        reg.add_provider(
            ProviderSpec(
                name="trending",
                category="interaction",
                description="most viewed, alternate weights",
                representation="list",
                endpoint="catalog://most_viewed",
                ranking=(RankingWeight("view_count", 2.0),),
            )
        )
        assert "trending" in reg.names()
        items = reg.get("trending").fetch(catalog).items
        assert items.count() > 0

    def test_add_duplicate_name_rejected(self, reg):
        with pytest.raises(SpecError, match="duplicate"):
            reg.add_provider(
                ProviderSpec("badged", "x", "", "list", "catalog://most_viewed")
            )

    def test_remove_provider(self, reg):
        reg.remove_provider("tagged")
        assert "tagged" not in reg.names()
        assert "tagged" not in reg.spec.provider_names()

    def test_register_custom_endpoint_factory(self, reg, catalog):
        """A genuinely new metadata source kind: one factory + one spec line."""

        class StaticProvider(MetadataProvider):
            def _fetch(self, catalog, inputs):
                return FetchResult(
                    items=catalog.artifacts.limit(3)
                )

        reg.register("static://three", StaticProvider)
        reg.add_provider(
            ProviderSpec("three", "custom", "", "list", "static://three")
        )
        assert reg.get("three").fetch(catalog).items.count() == 3
