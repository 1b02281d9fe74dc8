"""Autocomplete for the query language (paper §5.3, §6.4).

"Humboldt uses metadata specifications to determine admissible field-value
pairs" and "provides autocomplete suggestions for admissible prefixes and
values as the user types". Field suggestions come from the spec's search
fields; value suggestions for a field come from the catalog frame/column
the spec binds it to (distinct values matching the typed prefix).
"""
from __future__ import annotations

import re
from dataclasses import dataclass

from pyspark.sql import functions as F

from repro.catalog.builder import Catalog
from repro.core.spec import HumboldtSpec
from repro.search.compiler import build_bindings

DEFAULT_LIMIT = 10


@dataclass(frozen=True)
class Suggestion:
    kind: str  # "field" | "value" | "provider"
    text: str  # what would be inserted
    detail: str = ""  # provider/description context shown alongside


class Autocomplete:
    """Suggests admissible fields, values and provider calls."""

    def __init__(self, catalog: Catalog, spec: HumboldtSpec):
        self.catalog = catalog
        self.spec = spec
        self.bindings = build_bindings(spec)

    # -- spec-derived vocabulary ----------------------------------------------
    def admissible_fields(self) -> list[str]:
        """Every field and alias the query language accepts (sorted)."""
        out = set()
        for p in self.spec.providers:
            for sf in p.search_fields:
                out.add(sf.name)
                out.update(sf.aliases)
        return sorted(out)

    def admissible_values(
        self, field: str, prefix: str = "", *, limit: int = DEFAULT_LIMIT
    ) -> list[str]:
        """Distinct catalog values for ``field`` starting with ``prefix``."""
        binding = self.bindings.get(field)
        if binding is None:
            raise KeyError(
                f"unknown field {field!r}; admissible: {sorted(self.bindings)}"
            )
        sf = binding.search_field
        if sf.source_frame == "provider":
            # Provider-call fields take a dataset name as input.
            frame = self.catalog.artifacts.where(
                F.col("dataset_name").isNotNull()
            ).select(F.col("dataset_name").alias("v"))
        else:
            frame = getattr(self.catalog, sf.source_frame).select(
                F.col(sf.source_column).alias("v")
            )
        if prefix:
            frame = frame.where(F.lower(F.col("v")).startswith(prefix.lower()))
        return [
            r["v"]
            for r in frame.where(F.col("v").isNotNull())
            .distinct()
            .orderBy("v")
            .limit(limit)
            .collect()
        ]

    # -- context-sensitive completion ------------------------------------------
    def suggest(self, text: str, *, limit: int = DEFAULT_LIMIT) -> list[Suggestion]:
        """Complete the trailing element of a partially typed query."""
        tail = text.rsplit("&", 1)[-1].rsplit("|", 1)[-1].lstrip("!( ")
        # `field: partial-value` -> value suggestions.
        m = re.match(r"\s*([a-zA-Z_][a-zA-Z_ ]*?)\s*:\s*([^:]*)$", tail)
        if m:
            field_txt = m.group(1).strip().lower()
            canonical = self._resolve_field(field_txt)
            if canonical:
                return [
                    Suggestion("value", v, detail=canonical)
                    for v in self.admissible_values(
                        canonical, m.group(2).strip().strip("'\""), limit=limit
                    )
                ]
        # `:prov` -> provider-call suggestions.
        pm = re.match(r"\s*:([a-zA-Z_]*)$", tail)
        if pm:
            pre = pm.group(1).lower()
            return [
                Suggestion("provider", f":{p.name}()", detail=p.description)
                for p in self.spec.providers
                if p.name.startswith(pre) and "search" in p.visibility
            ][:limit]
        # Otherwise: field-name suggestions matching the typed prefix.
        pre = tail.strip().lower()
        return [
            Suggestion("field", f"{f}:", detail=self.bindings[self._resolve_field(f)].provider_name)
            for f in self.admissible_fields()
            if f.startswith(pre)
        ][:limit]

    def _resolve_field(self, alias: str) -> str | None:
        alias = alias.lower()
        for p in self.spec.providers:
            for sf in p.search_fields:
                if alias == sf.name or alias in (a.lower() for a in sf.aliases):
                    return sf.name
        return None
