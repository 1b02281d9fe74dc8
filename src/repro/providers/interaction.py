"""Interaction-metadata providers: recency, view counts, favorites.

These return ``list``/``tiles`` representations: the top-N artifacts by the
provider's own ranking spec (paper §4.2 — the ordering comes from the
spec's ``ranking`` weights, not from provider code; re-weighting the spec
re-orders these views with zero code changes).
"""
from __future__ import annotations

from repro.catalog.builder import Catalog
from repro.providers.base import FetchResult, MetadataProvider
from repro.ranking.scorer import score_artifacts

DEFAULT_TOP_N = 50


class RankedListProvider(MetadataProvider):
    """Top-N artifacts ordered by the provider's spec ranking weights.

    One implementation serves ``recent_documents``, ``most_viewed`` and
    ``favorites`` — they differ only in their spec's ranking list, which is
    the paper's point: new interaction views are spec entries, not code.
    """

    def __init__(self, spec, *, top_n: int = DEFAULT_TOP_N):
        super().__init__(spec)
        self.top_n = top_n

    def _fetch(self, catalog: Catalog, inputs: dict) -> FetchResult:
        weights = list(self.spec.ranking)
        scored = score_artifacts(catalog.artifacts, weights)
        limit = int(inputs.get("limit", self.top_n)) if "limit" in inputs else self.top_n
        items = scored.orderBy("score", ascending=False).limit(limit)
        return FetchResult(items=items, meta={"top_n": limit})
