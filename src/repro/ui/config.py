"""Customization (paper §4.4, Figure 4, and study Task 4).

Three customization levels, mirroring the paper:

* **developers** add/remove providers (that lives on the registry);
* **team admins** configure which providers make up a team's home page —
  custom content stored *in the spec* so it can refer to provider names and
  round-trips through JSON (§4.3);
* **individual users** hide and reorder the providers they see.

``effective_providers`` resolves all three layers into the provider lineup
a surface shows for a given user/team.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.spec import HumboldtSpec, SpecError, TeamHomePage


@dataclass
class UserPrefs:
    """Per-user presentation preferences (hide set + explicit order)."""

    hidden: set[str] = field(default_factory=set)
    order: list[str] = field(default_factory=list)


class ConfigStore:
    """Mutates customization state; all team state lives in the spec."""

    def __init__(self, spec: HumboldtSpec):
        self.spec = spec
        self._user_prefs: dict[str, UserPrefs] = {}

    # -- team admin (Task 4) ---------------------------------------------------
    def set_team_home_page(self, team: str, providers: list[str]) -> TeamHomePage:
        """Configure a team's home page; validates provider references."""
        known = set(self.spec.provider_names())
        unknown = [p for p in providers if p not in known]
        if unknown:
            raise SpecError(
                f"team {team!r}: unknown providers {unknown}; "
                f"available: {sorted(known)}"
            )
        page = TeamHomePage(team, tuple(providers))
        self.spec.team_home_pages = [
            hp for hp in self.spec.team_home_pages if hp.team != team
        ] + [page]
        self.spec.validate()
        return page

    def team_home_page(self, team: str) -> TeamHomePage | None:
        return self.spec.home_page(team)

    # -- individual users ------------------------------------------------------
    def prefs(self, user: str) -> UserPrefs:
        return self._user_prefs.setdefault(user, UserPrefs())

    def hide_provider(self, user: str, provider: str) -> None:
        if provider not in self.spec.provider_names():
            raise SpecError(f"unknown provider {provider!r}")
        self.prefs(user).hidden.add(provider)

    def unhide_provider(self, user: str, provider: str) -> None:
        self.prefs(user).hidden.discard(provider)

    def reorder(self, user: str, order: list[str]) -> None:
        known = set(self.spec.provider_names())
        unknown = [p for p in order if p not in known]
        if unknown:
            raise SpecError(f"unknown providers in order: {unknown}")
        self.prefs(user).order = list(order)

    # -- resolution ------------------------------------------------------------
    def effective_providers(
        self,
        surface: str,
        *,
        user: str | None = None,
        team: str | None = None,
    ) -> list[str]:
        """Provider lineup for a surface after team + user customization.

        Team home pages apply to the ``overview`` surface only (that is
        what they configure); user hides/reorders apply everywhere.
        """
        names = [p.name for p in self.spec.visible(surface)]
        if team is not None and surface == "overview":
            page = self.spec.home_page(team)
            if page is not None:
                names = [n for n in page.providers if n in names]
        if user is not None:
            prefs = self._user_prefs.get(user)
            if prefs:
                names = [n for n in names if n not in prefs.hidden]
                if prefs.order:
                    pos = {n: i for i, n in enumerate(prefs.order)}
                    names = sorted(
                        names, key=lambda n: (pos.get(n, len(pos)), names.index(n))
                    )
        return names
