"""View-model generation (paper §5.1, §6.2, Figure 6).

Humboldt generates the *right* view for each provider from its declared
representation. We reproduce the generation step: a :class:`ViewModel` is
the renderable structure a frontend would bind — items ordered by the
spec's ranking for tiles/lists, category rollups for the categories view,
node/edge frames for hierarchy and graph, (x, y) positions for the
embedding view. The pixels themselves are out of scope (see DESIGN.md
substitution 1); every decision the paper's generator makes is here.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.spec import ProviderSpec, RankingWeight
from repro.providers.base import FetchResult
from repro.ranking.scorer import effective_weights, rank


@dataclass
class ViewModel:
    """What the UI renders for one provider."""

    provider: str
    title: str
    representation: str
    items: DataFrame
    edges: DataFrame | None = None
    categories: DataFrame | None = None  # (category, n) for categories views
    meta: dict = field(default_factory=dict)

    def item_ids(self) -> DataFrame:
        """Distinct artifact ids shown by this view (filter scope)."""
        return self.items.select("artifact_id").distinct()


def generate_view(
    pspec: ProviderSpec,
    result: FetchResult,
    *,
    global_ranking: list[RankingWeight] | tuple = (),
) -> ViewModel:
    """Build the view model a provider's fetch result renders as.

    Ranking weights follow §4.2: the provider's own list, else the global
    fallback. Ranked orderings apply to list/tiles (and the items inside
    every other view, so e.g. category drill-downs come out ranked too).
    """
    weights = effective_weights(pspec.ranking, global_ranking)
    items = rank(result.items, weights) if weights else result.items
    categories = None
    if pspec.representation == "categories":
        categories = (
            result.items.groupBy("category")
            .agg(F.count("*").alias("n"))
            .orderBy(F.col("n").desc(), F.col("category"))
        )
    return ViewModel(
        provider=pspec.name,
        title=pspec.name.replace("_", " ").title(),
        representation=pspec.representation,
        items=items,
        edges=result.edges,
        categories=categories,
        meta=dict(result.meta),
    )
