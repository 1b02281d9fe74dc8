"""Lexer for the Humboldt query language (paper §5.3, Figure 5).

The token vocabulary is **compiled from the specification**: field names
and their aliases come from each provider's ``search_fields``, provider-call
names from the provider list. Nothing here hardcodes a metadata field — the
abstract's query ``type: table owned_by: 'Alex' badged: endorsed
badged_by: 'Mike' & 'sales'`` lexes only because the default spec declares
those fields.

Token kinds:

* ``FIELD`` — ``<alias> : <value>`` with multi-word aliases (``owned by:``)
  matched longest-first and case-insensitively; value is a quoted string or
  a bare word.
* ``PROVIDER`` — prefix-call syntax ``:name(arg, ...)`` (e.g.
  ``:recent_documents()``), the paper's second search interface.
* ``TEXT`` — free-text keyword (bare word or quoted string).
* ``AND`` / ``OR`` / ``NOT`` / ``LPAREN`` / ``RPAREN`` — the operators
  ``&``, ``|``, ``!``, ``(``, ``)``.
"""
from __future__ import annotations

import re
from dataclasses import dataclass


class QuerySyntaxError(ValueError):
    """Raised on malformed query text, with the offending position."""


@dataclass(frozen=True)
class Token:
    kind: str  # FIELD | PROVIDER | TEXT | AND | OR | NOT | LPAREN | RPAREN
    text: str
    pos: int
    field: str | None = None  # canonical field name (FIELD)
    value: str | None = None  # field value / text value / provider name
    args: tuple[str, ...] = ()  # provider-call args


_OPS = {"&": "AND", "|": "OR", "!": "NOT", "(": "LPAREN", ")": "RPAREN"}
_WORD_RE = re.compile(r"[^\s&|!():]+")
_IDENT_RE = re.compile(r"[a-zA-Z_][a-zA-Z0-9_]*")
_QUOTE_RE = re.compile(r"""'([^']*)'|"([^"]*)\"""")


def _alias_regex(alias: str) -> re.Pattern:
    parts = [re.escape(w) for w in alias.split()]
    return re.compile(r"\s+".join(parts) + r"\s*:", re.IGNORECASE)


class Lexer:
    """Tokenizer parameterized by the spec-derived vocabulary."""

    def __init__(self, field_aliases: dict[str, str], provider_names: set[str]):
        """``field_aliases`` maps every alias (and canonical name) to the
        canonical field name; ``provider_names`` enables ``:name(...)``.
        """
        self.field_aliases = dict(field_aliases)
        self.provider_names = set(provider_names)
        # Longest alias first so "badged by:" wins over "badged:".
        self._alias_patterns = [
            (_alias_regex(a), canonical)
            for a, canonical in sorted(
                self.field_aliases.items(), key=lambda kv: -len(kv[0])
            )
        ]

    def tokenize(self, text: str) -> list[Token]:
        out: list[Token] = []
        i, n = 0, len(text)
        while i < n:
            c = text[i]
            if c.isspace():
                i += 1
                continue
            if c in _OPS:
                out.append(Token(_OPS[c], c, i))
                i += 1
                continue
            if c == ":":
                tok, i = self._provider_call(text, i)
                out.append(tok)
                continue
            m_field = self._match_field(text, i)
            if m_field is not None:
                tok, i = m_field
                out.append(tok)
                continue
            if c in "'\"":
                m = _QUOTE_RE.match(text, i)
                if not m:
                    raise QuerySyntaxError(f"unterminated quote at {i}: {text[i:]!r}")
                val = m.group(1) if m.group(1) is not None else m.group(2)
                out.append(Token("TEXT", m.group(0), i, value=val))
                i = m.end()
                continue
            m = _WORD_RE.match(text, i)
            if m:
                out.append(Token("TEXT", m.group(0), i, value=m.group(0)))
                i = m.end()
                continue
            raise QuerySyntaxError(f"unexpected character {c!r} at {i}")
        return out

    # -- helpers -------------------------------------------------------------
    def _match_field(self, text: str, i: int) -> tuple[Token, int] | None:
        for pat, canonical in self._alias_patterns:
            m = pat.match(text, i)
            if m:
                value, j = self._field_value(text, m.end())
                return (
                    Token(
                        "FIELD",
                        text[i:j],
                        i,
                        field=canonical,
                        value=value,
                    ),
                    j,
                )
        return None

    def _field_value(self, text: str, i: int) -> tuple[str, int]:
        while i < len(text) and text[i].isspace():
            i += 1
        if i < len(text) and text[i] in "'\"":
            m = _QUOTE_RE.match(text, i)
            if not m:
                raise QuerySyntaxError(f"unterminated quote at {i}")
            return (m.group(1) if m.group(1) is not None else m.group(2)), m.end()
        m = _WORD_RE.match(text, i)
        if not m:
            raise QuerySyntaxError(f"field at {i} has no value")
        return m.group(0), m.end()

    def _provider_call(self, text: str, i: int) -> tuple[Token, int]:
        m = _IDENT_RE.match(text, i + 1)
        if not m:
            raise QuerySyntaxError(f"':' at {i} not followed by a provider name")
        name = m.group(0)
        if name not in self.provider_names:
            raise QuerySyntaxError(
                f"unknown provider {name!r} at {i}; spec declares "
                f"{sorted(self.provider_names)}"
            )
        j = m.end()
        args: tuple[str, ...] = ()
        if j < len(text) and text[j] == "(":
            close = text.find(")", j)
            if close < 0:
                raise QuerySyntaxError(f"unclosed provider call at {i}")
            raw = text[j + 1 : close].strip()
            if raw:
                args = tuple(
                    a.strip().strip("'\"") for a in raw.split(",") if a.strip()
                )
            j = close + 1
        return Token("PROVIDER", text[i:j], i, value=name, args=args), j
