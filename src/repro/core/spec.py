"""The Humboldt specification (paper §4): a declarative, JSON-serializable
description of metadata providers from which the whole discovery UI — views,
exploration, the search query language, and ranking — is generated.

Fundamental elements (paper §4.1–§4.4), all modeled here:

* **Metadata providers**: category + name + description, the representation
  of the returned data (``list``/``tiles``/``hierarchy``/``graph``/
  ``categories``/``embedding``), required/optional input values, an endpoint
  identifier, and visibility in UI surfaces (``overview``, ``exploration``,
  ``search``).
* **Search fields** per provider: the query-language fields compiled from
  the spec (e.g. ``badged:`` and ``badged_by:`` both come from the badge
  provider), each declaring which catalog frame/column answers it — this is
  what makes "query parameters are compiled from the specification" true.
* **Ranking** (§4.2, Listing 1): per-provider ``(field, weight)`` lists with
  a global fallback; changing weights is a spec edit, never a code edit.
* **Custom content** (§4.3, Listing 2): team home pages referring to
  provider names; dangling references are validation errors, unknown custom
  keys are ignored by the UI (as the paper prescribes).

Everything round-trips through JSON (``to_json``/``from_json``) so the
expressivity experiment (E1) can count "lines of specification".
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field

REPRESENTATIONS = ("list", "tiles", "hierarchy", "graph", "categories", "embedding")
SURFACES = ("overview", "exploration", "search")
INPUT_TYPES = ("user_name", "table", "artifact_id", "team_name", "text")


class SpecError(ValueError):
    """Raised when a Humboldt specification fails validation."""


@dataclass(frozen=True)
class RankingWeight:
    field: str
    weight: float

    def to_dict(self) -> dict:
        return {"field": self.field, "weight": self.weight}


@dataclass(frozen=True)
class InputSpec:
    """An input value a provider needs before it can fetch (paper §4.1)."""

    name: str
    type: str
    required: bool = False

    def to_dict(self) -> dict:
        return {"name": self.name, "type": self.type, "required": self.required}


@dataclass(frozen=True)
class SearchField:
    """A query-language field synthesized from a provider's metadata.

    ``source_frame``/``source_column`` tell the compiler which catalog frame
    answers the field: ``artifacts`` columns compile to plain predicates,
    side tables (``badges``, ``tags``) compile to semijoins.
    """

    name: str
    aliases: tuple[str, ...] = ()
    source_frame: str = "artifacts"
    source_column: str = ""

    def to_dict(self) -> dict:
        return {
            "name": self.name,
            "aliases": list(self.aliases),
            "source_frame": self.source_frame,
            "source_column": self.source_column,
        }


@dataclass(frozen=True)
class ProviderSpec:
    """One metadata provider (paper §4.1, Figures 2–3)."""

    name: str
    category: str
    description: str
    representation: str
    endpoint: str
    inputs: tuple[InputSpec, ...] = ()
    visibility: tuple[str, ...] = SURFACES
    search_fields: tuple[SearchField, ...] = ()
    ranking: tuple[RankingWeight, ...] = ()

    def required_inputs(self) -> list[InputSpec]:
        return [i for i in self.inputs if i.required]

    def to_dict(self) -> dict:
        return {
            "name": self.name,
            "category": self.category,
            "description": self.description,
            "representation": self.representation,
            "endpoint": self.endpoint,
            "inputs": [i.to_dict() for i in self.inputs],
            "visibility": list(self.visibility),
            "search_fields": [s.to_dict() for s in self.search_fields],
            "ranking": [r.to_dict() for r in self.ranking],
        }


@dataclass(frozen=True)
class TeamHomePage:
    """Custom content: provider lineup for a team's home page (§4.3)."""

    team: str
    providers: tuple[str, ...]

    def to_dict(self) -> dict:
        return {"team": self.team, "providers": list(self.providers)}


@dataclass
class HumboldtSpec:
    """The full specification document."""

    providers: list[ProviderSpec]
    global_ranking: list[RankingWeight] = field(default_factory=list)
    team_home_pages: list[TeamHomePage] = field(default_factory=list)
    custom: dict = field(default_factory=dict)
    version: int = 1

    # -- access -------------------------------------------------------------
    def provider(self, name: str) -> ProviderSpec:
        for p in self.providers:
            if p.name == name:
                return p
        raise KeyError(f"unknown metadata provider: {name!r}")

    def provider_names(self) -> list[str]:
        return [p.name for p in self.providers]

    def visible(self, surface: str) -> list[ProviderSpec]:
        """Providers visible in a UI surface, in spec order."""
        if surface not in SURFACES:
            raise SpecError(f"unknown surface {surface!r}; expected one of {SURFACES}")
        return [p for p in self.providers if surface in p.visibility]

    def home_page(self, team: str) -> TeamHomePage | None:
        for hp in self.team_home_pages:
            if hp.team == team:
                return hp
        return None

    # -- validation ---------------------------------------------------------
    def validate(self) -> None:
        names = [p.name for p in self.providers]
        if len(names) != len(set(names)):
            dupes = sorted({n for n in names if names.count(n) > 1})
            raise SpecError(f"duplicate provider names: {dupes}")
        seen_fields: dict[str, str] = {}
        for p in self.providers:
            if p.representation not in REPRESENTATIONS:
                raise SpecError(
                    f"provider {p.name!r}: unknown representation "
                    f"{p.representation!r}; expected one of {REPRESENTATIONS}"
                )
            for s in p.visibility:
                if s not in SURFACES:
                    raise SpecError(
                        f"provider {p.name!r}: unknown surface {s!r}"
                    )
            for i in p.inputs:
                if i.type not in INPUT_TYPES:
                    raise SpecError(
                        f"provider {p.name!r}: unknown input type {i.type!r}"
                    )
            for r in list(p.ranking):
                if not isinstance(r.weight, (int, float)):
                    raise SpecError(
                        f"provider {p.name!r}: ranking weight for "
                        f"{r.field!r} is not numeric"
                    )
            for sf in p.search_fields:
                for key in (sf.name, *sf.aliases):
                    if key in seen_fields and seen_fields[key] != p.name:
                        raise SpecError(
                            f"search field {key!r} defined by both "
                            f"{seen_fields[key]!r} and {p.name!r}"
                        )
                    seen_fields[key] = p.name
        known = set(names)
        for hp in self.team_home_pages:
            for ref in hp.providers:
                if ref not in known:
                    raise SpecError(
                        f"team home page {hp.team!r} refers to unknown "
                        f"provider {ref!r}"
                    )

    # -- serialization --------------------------------------------------------
    def to_dict(self) -> dict:
        return {
            "version": self.version,
            "providers": [p.to_dict() for p in self.providers],
            "global_ranking": [r.to_dict() for r in self.global_ranking],
            "custom": {
                "team_home_pages": [hp.to_dict() for hp in self.team_home_pages],
                **self.custom,
            },
        }

    def to_json(self, *, indent: int = 2) -> str:
        return json.dumps(self.to_dict(), indent=indent)

    def line_count(self) -> int:
        """Lines of pretty-printed spec — the E1 'a few lines' metric."""
        return len(self.to_json().splitlines())

    @staticmethod
    def from_dict(d: dict) -> "HumboldtSpec":
        providers = [
            ProviderSpec(
                name=p["name"],
                category=p["category"],
                description=p.get("description", ""),
                representation=p["representation"],
                endpoint=p.get("endpoint", f"catalog://{p['name']}"),
                inputs=tuple(
                    InputSpec(i["name"], i["type"], bool(i.get("required", False)))
                    for i in p.get("inputs", [])
                ),
                visibility=tuple(p.get("visibility", list(SURFACES))),
                search_fields=tuple(
                    SearchField(
                        s["name"],
                        tuple(s.get("aliases", [])),
                        s.get("source_frame", "artifacts"),
                        s.get("source_column", ""),
                    )
                    for s in p.get("search_fields", [])
                ),
                ranking=tuple(
                    RankingWeight(r["field"], float(r["weight"]))
                    for r in p.get("ranking", [])
                ),
            )
            for p in d.get("providers", [])
        ]
        custom = dict(d.get("custom", {}))
        team_pages = [
            TeamHomePage(h["team"], tuple(h["providers"]))
            for h in custom.pop("team_home_pages", [])
        ]
        spec = HumboldtSpec(
            providers=providers,
            global_ranking=[
                RankingWeight(r["field"], float(r["weight"]))
                for r in d.get("global_ranking", [])
            ],
            team_home_pages=team_pages,
            custom=custom,
            version=int(d.get("version", 1)),
        )
        spec.validate()
        return spec

    @staticmethod
    def from_json(text: str) -> "HumboldtSpec":
        return HumboldtSpec.from_dict(json.loads(text))
