"""The Humboldt facade: spec in, data discovery system out (paper Figure 1).

``Humboldt(spark, lake_root, spec)`` wires together the catalog (DataFrame
scans + the ``humboldt_metadata`` DataSource), the provider registry, the
view generator, the exploration engine, the search engine, autocomplete and
the customization store. The public methods correspond to the three data
discovery features the spec drives (§5): overviews, exploration, search —
plus configuration (§4.4) and the generated-surface statistics used by the
expressivity experiment (E1).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

from repro.catalog.builder import Catalog, build_catalog
from repro.core.default_spec import default_spec
from repro.core.registry import ProviderRegistry
from repro.core.spec import HumboldtSpec
from repro.search.autocomplete import Autocomplete, Suggestion
from repro.search.compiler import SearchEngine, build_bindings
from repro.ui.config import ConfigStore
from repro.ui.explore import ExplorationEngine
from repro.ui.views import ViewModel, generate_view


@dataclass(frozen=True)
class SurfaceStats:
    """What one spec generated — the paper's expressivity claim, counted."""

    spec_lines: int
    n_providers: int
    n_categories: int
    n_view_types: int
    n_overview_views: int
    n_exploration_providers: int
    n_search_fields: int
    n_search_aliases: int
    n_search_interfaces: int  # pill-based + prefix-based (paper §5.3)


class Humboldt:
    """One generated data discovery system over one lake."""

    def __init__(
        self,
        spark: SparkSession,
        lake_root: str,
        spec: HumboldtSpec | None = None,
        *,
        with_profiles: bool = True,
        catalog: Catalog | None = None,
    ):
        self.spark = spark
        self.spec = spec or default_spec()
        self.spec.validate()
        self.catalog = catalog or build_catalog(
            spark, lake_root, with_profiles=with_profiles
        )
        self.registry = ProviderRegistry(self.spec)
        self.search_engine = SearchEngine(self.catalog, self.spec, self.registry)
        self.explorer = ExplorationEngine(self.catalog, self.spec, self.registry)
        self.autocomplete_engine = Autocomplete(self.catalog, self.spec)
        self.config = ConfigStore(self.spec)

    # -- overviews (§5.1) ------------------------------------------------------
    def overview_views(
        self, *, user: str | None = None, team: str | None = None
    ) -> list[ViewModel]:
        """Entry-point views for a user/team after customization."""
        names = self.config.effective_providers("overview", user=user, team=team)
        views = []
        for name in names:
            provider = self.registry.get(name)
            if not provider.can_fetch():
                continue  # requires input: surfaced on exploration instead
            result = provider.fetch(self.catalog)
            views.append(
                generate_view(
                    provider.spec, result, global_ranking=self.spec.global_ranking
                )
            )
        return views

    # -- exploration (§5.2) ----------------------------------------------------
    def explore(self, artifact_id: int) -> list[ViewModel]:
        return self.explorer.related_views(artifact_id)

    # -- search and filters (§5.3) --------------------------------------------
    def search(
        self,
        query: str,
        *,
        scope: ViewModel | DataFrame | None = None,
        limit: int | None = None,
    ) -> DataFrame:
        """Global search, or a filter when ``scope`` is a view/id frame."""
        scope_ids = None
        if isinstance(scope, ViewModel):
            scope_ids = scope.item_ids()
        elif scope is not None:
            scope_ids = scope
        return self.search_engine.run(query, scope_ids=scope_ids, limit=limit)

    def autocomplete(self, text: str) -> list[Suggestion]:
        return self.autocomplete_engine.suggest(text)

    # -- artifact preview (Figure 7 D) ----------------------------------------
    def preview(self, artifact_id: int, *, n_rows: int = 5):
        """Content preview of a selected artifact: metadata row + data
        snippet when the artifact is bound to a physical dataset."""
        from pyspark.sql import functions as F

        from repro.lake import writer

        rows = self.catalog.artifacts.where(
            F.col("artifact_id") == int(artifact_id)
        ).collect()
        if not rows:
            raise KeyError(f"artifact {artifact_id} not in catalog")
        meta = rows[0].asDict()
        snippet = None
        if meta.get("dataset_name"):
            snippet = writer.read_dataset(
                self.spark, self.catalog.lake_root, meta["dataset_name"]
            ).limit(n_rows)
        return meta, snippet

    # -- expressivity accounting (E1) -----------------------------------------
    def surface_stats(self) -> SurfaceStats:
        spec = self.spec
        fields = build_bindings(spec)
        n_aliases = sum(
            len(sf.aliases) for p in spec.providers for sf in p.search_fields
        )
        return SurfaceStats(
            spec_lines=spec.line_count(),
            n_providers=len(spec.providers),
            n_categories=len({p.category for p in spec.providers}),
            n_view_types=len({p.representation for p in spec.providers}),
            n_overview_views=len(spec.visible("overview")),
            n_exploration_providers=len(spec.visible("exploration")),
            n_search_fields=len(fields),
            n_search_aliases=n_aliases,
            n_search_interfaces=2,
        )
