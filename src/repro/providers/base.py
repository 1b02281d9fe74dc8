"""Metadata provider contract (paper §4.1).

A provider's *implementation* is opaque to Humboldt — the spec only declares
what to expect (representation, inputs). Concretely every provider maps
``(catalog, inputs) -> FetchResult`` where the result's shape follows the
declared representation:

=============  ==========================================================
representation  FetchResult contract
=============  ==========================================================
list / tiles    ``items``: artifact rows (enriched catalog columns)
categories      ``items`` plus a ``category`` string column
hierarchy       ``items`` plus ``edges (parent_id, child_id, depth)``
graph           ``items`` plus ``edges (src_id, dst_id, weight)``
embedding       ``items`` plus ``x`` and ``y`` double columns
=============  ==========================================================

``MetadataProvider.fetch`` validates inputs against the spec (required
inputs missing -> :class:`ProviderInputError`, mirroring the UI's "this
provider needs an input" state) and the result against the contract, so a
provider that breaks its declared representation fails loudly.
"""
from __future__ import annotations

import abc
from dataclasses import dataclass, field

from pyspark.sql import DataFrame

from repro.catalog.builder import Catalog
from repro.core.spec import ProviderSpec


class ProviderInputError(ValueError):
    """A required input value was not supplied (or had the wrong name)."""


@dataclass
class FetchResult:
    """What a provider returns; shape depends on the representation."""

    items: DataFrame
    edges: DataFrame | None = None
    meta: dict = field(default_factory=dict)


_REQUIRED_ITEM_COLS = {"artifact_id", "name", "artifact_type"}
_EDGE_COLS = {
    "hierarchy": {"parent_id", "child_id", "depth"},
    "graph": {"src_id", "dst_id", "weight"},
}


class MetadataProvider(abc.ABC):
    """Base class; subclasses implement :meth:`_fetch` only."""

    def __init__(self, spec: ProviderSpec):
        self.spec = spec

    # -- public API ----------------------------------------------------------
    def fetch(self, catalog: Catalog, inputs: dict | None = None) -> FetchResult:
        """Validate inputs, fetch, validate the representation contract."""
        inputs = dict(inputs or {})
        declared = {i.name for i in self.spec.inputs}
        unknown = set(inputs) - declared
        if unknown:
            raise ProviderInputError(
                f"provider {self.spec.name!r}: unknown inputs {sorted(unknown)}; "
                f"declared: {sorted(declared)}"
            )
        missing = [i.name for i in self.spec.required_inputs() if i.name not in inputs]
        if missing:
            raise ProviderInputError(
                f"provider {self.spec.name!r} requires inputs {missing}"
            )
        result = self._fetch(catalog, inputs)
        self._check_contract(result)
        return result

    def can_fetch(self, inputs: dict | None = None) -> bool:
        """True when all required inputs are supplied (UI readiness check)."""
        have = set(inputs or {})
        return all(i.name in have for i in self.spec.required_inputs())

    # -- subclass hook -------------------------------------------------------
    @abc.abstractmethod
    def _fetch(self, catalog: Catalog, inputs: dict) -> FetchResult:
        ...

    # -- contract ------------------------------------------------------------
    def _check_contract(self, result: FetchResult) -> None:
        rep = self.spec.representation
        cols = set(result.items.columns)
        missing = _REQUIRED_ITEM_COLS - cols
        if missing:
            raise TypeError(
                f"provider {self.spec.name!r} ({rep}): items missing {sorted(missing)}"
            )
        if rep == "categories" and "category" not in cols:
            raise TypeError(
                f"provider {self.spec.name!r}: categories representation "
                "requires a 'category' column"
            )
        if rep == "embedding" and not {"x", "y"} <= cols:
            raise TypeError(
                f"provider {self.spec.name!r}: embedding representation "
                "requires 'x' and 'y' columns"
            )
        if rep in _EDGE_COLS:
            if result.edges is None:
                raise TypeError(
                    f"provider {self.spec.name!r}: {rep} representation "
                    "requires an edges frame"
                )
            have = set(result.edges.columns)
            need = _EDGE_COLS[rep]
            if not need <= have:
                raise TypeError(
                    f"provider {self.spec.name!r}: edges missing "
                    f"{sorted(need - have)}"
                )
