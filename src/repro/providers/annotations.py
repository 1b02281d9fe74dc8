"""Annotation-metadata providers: type, owner, creator, badges, tags.

All five return the ``categories`` representation: artifact rows plus a
``category`` column (the annotation value). Membership comes from the
enriched artifact frame directly (type/owner/creator) or an inner join with
the normalized side table (badges/tags) — an artifact with two badges
appears once per badge category, which is exactly what the categories view
renders.
"""
from __future__ import annotations

from pyspark.sql import functions as F

from repro.catalog.builder import Catalog
from repro.providers.base import FetchResult, MetadataProvider


class _ColumnCategoryProvider(MetadataProvider):
    """Categories drawn from a column of the enriched artifact frame."""

    category_column: str = ""
    filter_input: str = ""  # optional input name that filters the category

    def _fetch(self, catalog: Catalog, inputs: dict) -> FetchResult:
        df = catalog.artifacts.withColumn("category", F.col(self.category_column))
        value = inputs.get(self.filter_input) if self.filter_input else None
        if value is not None:
            df = df.where(F.lower(F.col("category")) == str(value).lower())
        return FetchResult(items=df, meta={"category_source": self.category_column})


class TypedProvider(_ColumnCategoryProvider):
    """Artifacts grouped by ``artifact_type``."""

    category_column = "artifact_type"


class OwnedByProvider(_ColumnCategoryProvider):
    """Artifacts grouped by owner display name; optional ``user`` filter."""

    category_column = "owner_name"
    filter_input = "user"


class CreatedByProvider(_ColumnCategoryProvider):
    """Artifacts grouped by creator display name; optional ``user`` filter."""

    category_column = "created_by_name"
    filter_input = "user"


class _SideTableCategoryProvider(MetadataProvider):
    """Categories drawn from a normalized side table (badges/tags)."""

    side_frame: str = ""
    category_column: str = ""

    def _fetch(self, catalog: Catalog, inputs: dict) -> FetchResult:
        side = getattr(catalog, self.side_frame).select(
            "artifact_id", F.col(self.category_column).alias("category")
        )
        df = catalog.artifacts.join(side, "artifact_id", "inner")
        return FetchResult(
            items=df,
            meta={"category_source": f"{self.side_frame}.{self.category_column}"},
        )


class BadgedProvider(_SideTableCategoryProvider):
    """Artifacts grouped by badge kind (endorsed / warning / deprecated)."""

    side_frame = "badges"
    category_column = "badge"


class TaggedProvider(_SideTableCategoryProvider):
    """Artifacts grouped by tag."""

    side_frame = "tags"
    category_column = "tag"
