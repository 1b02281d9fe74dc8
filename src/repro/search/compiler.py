"""Query compiler: AST -> Catalyst plans over the metadata catalog.

Each query element "returns a list of data artifacts" (paper §5.3); the
compiler keeps two physical forms and picks per term:

* **predicate** — a Catalyst ``Column`` over the enriched artifact frame,
  used for fields bound to artifact columns (``type:``, ``owned_by:``) and
  free text. Conjunctions of predicates stay one filter, so Catalyst can
  fold and push the whole conjunction into the Parquet scan.
* **id-set** — a one-column ``artifact_id`` DataFrame, used for fields
  bound to side tables (``badged:``, ``tag:`` -> semijoin) and provider
  calls (``:recent_documents()``, ``joinable_with:`` -> the provider's
  fetched artifact set).

Logical operators follow set algebra: AND intersects (inner join on ids /
predicate conjunction), OR unions (distinct), NOT complements against the
full artifact id set (anti join). The binding of field name -> frame/column
comes from the spec (see :func:`build_bindings`) — the compiler contains no
metadata-specific code.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import reduce

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.catalog.builder import Catalog
from repro.core.registry import ProviderRegistry
from repro.core.spec import HumboldtSpec, SearchField
from repro.ranking.scorer import score_artifacts
from repro.search.lexer import Lexer, QuerySyntaxError
from repro.search.parser import (
    And,
    FieldTerm,
    Node,
    Not,
    Or,
    Parser,
    ProviderTerm,
    TextTerm,
)


class UnknownFieldError(QuerySyntaxError):
    """A query names a field the spec does not declare."""


@dataclass(frozen=True)
class FieldBinding:
    provider_name: str
    search_field: SearchField


def build_bindings(spec: HumboldtSpec) -> dict[str, FieldBinding]:
    """Canonical field name -> binding, from every provider's search_fields."""
    out: dict[str, FieldBinding] = {}
    for p in spec.providers:
        for sf in p.search_fields:
            out[sf.name] = FieldBinding(p.name, sf)
    return out


def build_lexer(spec: HumboldtSpec) -> Lexer:
    """Lexer whose vocabulary is compiled from the spec (paper §5.3)."""
    aliases: dict[str, str] = {}
    for p in spec.providers:
        for sf in p.search_fields:
            aliases[sf.name] = sf.name
            for a in sf.aliases:
                aliases[a] = sf.name
    return Lexer(aliases, set(spec.provider_names()))


@dataclass
class _Plan:
    """Exactly one of ``pred`` / ``ids`` is set."""

    pred: Column | None = None
    ids: DataFrame | None = None


class SearchEngine:
    """Spec-compiled search/filter over one catalog (paper §5.3, §6.4)."""

    def __init__(
        self, catalog: Catalog, spec: HumboldtSpec, registry: ProviderRegistry
    ):
        self.catalog = catalog
        self.spec = spec
        self.registry = registry
        self.bindings = build_bindings(spec)
        self.parser = Parser(build_lexer(spec))

    # -- public API ----------------------------------------------------------
    def parse(self, text: str) -> Node:
        return self.parser.parse(text)

    def match_ids(self, query: str | Node) -> DataFrame:
        """Distinct artifact ids matching the query."""
        node = self.parse(query) if isinstance(query, str) else query
        return self._to_ids(self._compile(node))

    def run(
        self,
        query: str | Node,
        *,
        scope_ids: DataFrame | None = None,
        limit: int | None = None,
    ) -> DataFrame:
        """Matching artifacts, ranked by the spec's global weights.

        ``scope_ids`` turns search into a *filter* over a view's artifact
        set (paper §5.3: "the difference between search and filters is the
        set of data artifacts it is performed on").
        """
        ids = self.match_ids(query)
        if scope_ids is not None:
            ids = ids.join(
                scope_ids.select("artifact_id").distinct(), "artifact_id", "inner"
            )
        hits = self.catalog.artifacts.join(ids, "artifact_id", "inner")
        ranked = score_artifacts(hits, self.spec.global_ranking).orderBy(
            F.col("score").desc(), F.col("artifact_id")
        )
        return ranked.limit(limit) if limit else ranked

    # -- compilation -----------------------------------------------------------
    def _compile(self, node: Node) -> _Plan:
        if isinstance(node, FieldTerm):
            return self._field(node)
        if isinstance(node, TextTerm):
            return _Plan(pred=self._text_pred(node.value))
        if isinstance(node, ProviderTerm):
            return _Plan(ids=self._provider_ids(node.name, node.args))
        if isinstance(node, Not):
            inner = self._to_ids(self._compile(node.child))
            return _Plan(
                ids=self.catalog.artifact_ids().join(inner, "artifact_id", "left_anti")
            )
        if isinstance(node, And):
            plans = [self._compile(c) for c in node.children]
            preds = [p.pred for p in plans if p.pred is not None]
            idsets = [p.ids for p in plans if p.ids is not None]
            pred = reduce(lambda a, b: a & b, preds) if preds else None
            if not idsets:
                return _Plan(pred=pred)
            ids = reduce(
                lambda a, b: a.join(b.distinct(), "artifact_id", "inner"),
                [i.distinct() for i in idsets],
            )
            if pred is not None:
                ids = ids.join(
                    self.catalog.artifacts.where(pred).select("artifact_id"),
                    "artifact_id",
                    "inner",
                )
            return _Plan(ids=ids)
        if isinstance(node, Or):
            idsets = [self._to_ids(self._compile(c)) for c in node.children]
            return _Plan(ids=reduce(lambda a, b: a.unionByName(b), idsets).distinct())
        raise TypeError(f"unknown AST node {node!r}")

    def _to_ids(self, plan: _Plan) -> DataFrame:
        if plan.ids is not None:
            return plan.ids.select("artifact_id").distinct()
        return (
            self.catalog.artifacts.where(plan.pred).select("artifact_id").distinct()
        )

    # -- terms -----------------------------------------------------------------
    def _field(self, term: FieldTerm) -> _Plan:
        binding = self.bindings.get(term.field)
        if binding is None:
            raise UnknownFieldError(
                f"unknown field {term.field!r}; spec declares "
                f"{sorted(self.bindings)}"
            )
        sf = binding.search_field
        value = term.value
        if sf.source_frame == "artifacts":
            return _Plan(
                pred=F.lower(F.col(sf.source_column)) == value.lower()
            )
        if sf.source_frame in ("badges", "tags"):
            frame = getattr(self.catalog, sf.source_frame)
            ids = (
                frame.where(F.lower(F.col(sf.source_column)) == value.lower())
                .select("artifact_id")
                .distinct()
            )
            return _Plan(ids=ids)
        if sf.source_frame == "provider":
            provider = self.registry.get(sf.source_column)
            req = provider.spec.required_inputs()
            inputs = {req[0].name: value} if req else {}
            items = provider.fetch(self.catalog, inputs).items
            if "dataset_name" in items.columns:
                # "joinable with X" should not return X itself.
                items = items.where(
                    F.col("dataset_name").isNull()
                    | (F.lower(F.col("dataset_name")) != value.lower())
                )
            return _Plan(ids=items.select("artifact_id").distinct())
        raise UnknownFieldError(
            f"field {term.field!r}: unsupported source_frame "
            f"{sf.source_frame!r}"
        )

    def _text_pred(self, value: str) -> Column:
        v = value.lower()
        return F.lower(F.col("name")).contains(v) | F.lower(
            F.col("description")
        ).contains(v)

    def _provider_ids(self, name: str, args: tuple[str, ...]) -> DataFrame:
        provider = self.registry.get(name)
        declared = list(provider.spec.inputs)
        if len(args) > len(declared):
            raise QuerySyntaxError(
                f":{name} takes at most {len(declared)} args, got {len(args)}"
            )
        inputs = {declared[i].name: a for i, a in enumerate(args)}
        return provider.fetch(self.catalog, inputs).items.select(
            "artifact_id"
        ).distinct()
