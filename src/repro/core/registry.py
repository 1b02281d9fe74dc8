"""Provider registry: resolves spec entries to provider implementations.

The spec names an *endpoint* per provider (paper §4.1 — "an endpoint for
the data discovery system to retrieve that data from"); this registry maps
endpoint identifiers to implementation factories. Adding a brand-new kind
of metadata source means registering one endpoint factory; adding another
provider over an *existing* endpoint kind (e.g. a second ranked list with
different weights) is a pure spec edit — exactly the extensibility story
the paper claims.
"""
from __future__ import annotations

from typing import Callable

from repro.core.spec import HumboldtSpec, ProviderSpec
from repro.providers.annotations import (
    BadgedProvider,
    CreatedByProvider,
    OwnedByProvider,
    TaggedProvider,
    TypedProvider,
)
from repro.providers.base import MetadataProvider
from repro.providers.embedding import EmbeddingProvider
from repro.providers.interaction import RankedListProvider
from repro.providers.joinability import JoinableProvider
from repro.providers.lineage import LineageProvider

ProviderFactory = Callable[[ProviderSpec], MetadataProvider]


class UnknownEndpointError(KeyError):
    """No factory is registered for a spec's endpoint."""


#: Built-in endpoint factories (extensible via :meth:`ProviderRegistry.register`).
_BUILTIN_FACTORIES: dict[str, ProviderFactory] = {
    "catalog://recent_documents": RankedListProvider,
    "catalog://most_viewed": RankedListProvider,
    "catalog://favorites": RankedListProvider,
    "catalog://typed": TypedProvider,
    "catalog://owned_by": OwnedByProvider,
    "catalog://created_by": CreatedByProvider,
    "catalog://badged": BadgedProvider,
    "catalog://tagged": TaggedProvider,
    "catalog://lineage": LineageProvider,
    "profiles://joinable": JoinableProvider,
    "embedding://similar": EmbeddingProvider,
}


class ProviderRegistry:
    """Instantiated providers for one spec, grouped and orderable."""

    def __init__(self, spec: HumboldtSpec, extra_factories: dict[str, ProviderFactory] | None = None):
        self.spec = spec
        self._factories = dict(_BUILTIN_FACTORIES)
        if extra_factories:
            self._factories.update(extra_factories)
        self._providers: dict[str, MetadataProvider] = {}
        for p in spec.providers:
            self._providers[p.name] = self._build(p)

    def _build(self, pspec: ProviderSpec) -> MetadataProvider:
        factory = self._factories.get(pspec.endpoint)
        if factory is None:
            raise UnknownEndpointError(
                f"provider {pspec.name!r}: no factory for endpoint "
                f"{pspec.endpoint!r}; registered: {sorted(self._factories)}"
            )
        return factory(pspec)

    # -- access --------------------------------------------------------------
    def get(self, name: str) -> MetadataProvider:
        try:
            return self._providers[name]
        except KeyError:
            raise KeyError(
                f"unknown provider {name!r}; spec declares "
                f"{sorted(self._providers)}"
            ) from None

    def names(self) -> list[str]:
        return list(self._providers)

    def by_category(self) -> dict[str, list[MetadataProvider]]:
        """Providers grouped by spec category (UI grouping, paper §4.1)."""
        out: dict[str, list[MetadataProvider]] = {}
        for p in self._providers.values():
            out.setdefault(p.spec.category, []).append(p)
        return out

    def visible(self, surface: str) -> list[MetadataProvider]:
        return [self._providers[p.name] for p in self.spec.visible(surface)]

    # -- extensibility --------------------------------------------------------
    def register(self, endpoint: str, factory: ProviderFactory) -> None:
        """Register an endpoint factory (new metadata source kind)."""
        self._factories[endpoint] = factory

    def add_provider(self, pspec: ProviderSpec) -> None:
        """Add a provider at runtime: spec entry in, provider out (§4.4)."""
        self.spec.providers.append(pspec)
        self.spec.validate()
        self._providers[pspec.name] = self._build(pspec)

    def remove_provider(self, name: str) -> None:
        """Drop a provider from spec and registry (§4.4)."""
        self.spec.providers = [p for p in self.spec.providers if p.name != name]
        self._providers.pop(name, None)
