"""Exploration engine (paper §5.2, §6.3).

"Whenever a user interacts with a data element, the metadata of this
element can be used to inform and surface more metadata providers." Given
a selected artifact, the engine walks the providers visible on the
``exploration`` surface and *binds* each one to the selection:

* annotation providers filter to the selection's annotation value (same
  type, same owner/creator, shared badges, shared tags);
* ``lineage`` roots its hierarchy at the selection;
* ``joinable`` receives the selection's physical dataset as its required
  input (skipped when the selection is not bound to a dataset — exactly
  the paper's "depending on the metadata" behavior);
* the embedding provider is narrowed to the selection's nearest neighbors.

Providers whose data does not depend on a selection (pure interaction
rankings) are skipped here — they belong to the overview surface.
"""
from __future__ import annotations

from pyspark.sql import Row
from pyspark.sql import functions as F

from repro.catalog.builder import Catalog
from repro.core.registry import ProviderRegistry
from repro.core.spec import HumboldtSpec
from repro.providers.base import MetadataProvider
from repro.ui.views import ViewModel, generate_view

NEIGHBORHOOD_SIZE = 20


class ArtifactNotFound(KeyError):
    """The selected artifact id is not in the catalog."""


class ExplorationEngine:
    """Selected artifact -> related provider views."""

    def __init__(
        self, catalog: Catalog, spec: HumboldtSpec, registry: ProviderRegistry
    ):
        self.catalog = catalog
        self.spec = spec
        self.registry = registry

    def _artifact_row(self, artifact_id: int) -> Row:
        rows = self.catalog.artifacts.where(
            F.col("artifact_id") == int(artifact_id)
        ).collect()
        if not rows:
            raise ArtifactNotFound(f"artifact {artifact_id} not in catalog")
        return rows[0]

    def related_views(self, artifact_id: int) -> list[ViewModel]:
        """Views surfaced for the selection, in spec order."""
        row = self._artifact_row(artifact_id)
        views: list[ViewModel] = []
        for provider in self.registry.visible("exploration"):
            vm = self._bind(provider, row)
            if vm is not None:
                views.append(vm)
        return views

    # -- per-endpoint binding rules -------------------------------------------
    def _bind(self, provider: MetadataProvider, row: Row) -> ViewModel | None:
        endpoint = provider.spec.endpoint
        aid = row["artifact_id"]
        gr = self.spec.global_ranking

        def view(result, *, exclude_self: bool = True, **meta) -> ViewModel:
            if exclude_self:
                result.items = result.items.where(F.col("artifact_id") != aid)
            result.meta.update({"selection": aid, **meta})
            return generate_view(provider.spec, result, global_ranking=gr)

        if endpoint == "catalog://typed":
            res = provider.fetch(self.catalog)
            res.items = res.items.where(F.col("category") == row["artifact_type"])
            return view(res, bound_to=row["artifact_type"])
        if endpoint == "catalog://owned_by":
            res = provider.fetch(self.catalog, {"user": row["owner_name"]})
            return view(res, bound_to=row["owner_name"])
        if endpoint == "catalog://created_by":
            res = provider.fetch(self.catalog, {"user": row["created_by_name"]})
            return view(res, bound_to=row["created_by_name"])
        if endpoint == "catalog://badged":
            own = [
                r["badge"]
                for r in self.catalog.badges.where(
                    F.col("artifact_id") == aid
                ).collect()
            ]
            if not own:
                return None
            res = provider.fetch(self.catalog)
            res.items = res.items.where(F.col("category").isin(own))
            return view(res, bound_to=sorted(set(own)))
        if endpoint == "catalog://tagged":
            own = [
                r["tag"]
                for r in self.catalog.tags.where(
                    F.col("artifact_id") == aid
                ).collect()
            ]
            if not own:
                return None
            res = provider.fetch(self.catalog)
            res.items = res.items.where(F.col("category").isin(own))
            return view(res, bound_to=sorted(set(own)))
        if endpoint == "catalog://lineage":
            res = provider.fetch(self.catalog, {"root": aid})
            return view(res, exclude_self=False, bound_to=aid)
        if endpoint == "profiles://joinable":
            ds = row["dataset_name"]
            if ds is None:
                return None
            res = provider.fetch(self.catalog, {"table": ds})
            return view(res, exclude_self=False, bound_to=ds)
        if endpoint == "embedding://similar":
            res = provider.fetch(self.catalog)
            sel = res.items.where(F.col("artifact_id") == aid).collect()
            if not sel:
                return None
            x0, y0 = sel[0]["x"], sel[0]["y"]
            res.items = (
                res.items.withColumn(
                    "distance",
                    F.sqrt(
                        (F.col("x") - F.lit(x0)) ** 2 + (F.col("y") - F.lit(y0)) ** 2
                    ),
                )
                .where(F.col("artifact_id") != aid)
                .orderBy("distance")
                .limit(NEIGHBORHOOD_SIZE)
            )
            res.meta["selection"] = aid
            return generate_view(provider.spec, res, global_ranking=[])
        return None  # selection-independent provider: overview surface only
