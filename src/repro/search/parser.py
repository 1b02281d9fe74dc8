"""Parser for the Humboldt query language: tokens -> AST.

Grammar (paper §5.3: two logical connectors, bracketed queries, negation;
adjacent terms combine with an implicit AND, as in the abstract's example
query where ``type: table owned_by: 'Alex'`` carries no explicit ``&``)::

    query   := orExpr
    orExpr  := andExpr ( '|' andExpr )*
    andExpr := unary ( '&'? unary )*
    unary   := '!' unary | '(' orExpr ')' | FIELD | PROVIDER | TEXT
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.search.lexer import Lexer, QuerySyntaxError, Token


@dataclass(frozen=True)
class Node:
    pass


@dataclass(frozen=True)
class FieldTerm(Node):
    field: str
    value: str


@dataclass(frozen=True)
class ProviderTerm(Node):
    name: str
    args: tuple[str, ...] = ()


@dataclass(frozen=True)
class TextTerm(Node):
    value: str


@dataclass(frozen=True)
class Not(Node):
    child: Node


@dataclass(frozen=True)
class And(Node):
    children: tuple[Node, ...]


@dataclass(frozen=True)
class Or(Node):
    children: tuple[Node, ...]


_STARTERS = {"NOT", "LPAREN", "FIELD", "PROVIDER", "TEXT"}


class Parser:
    """Recursive-descent parser over a spec-derived :class:`Lexer`."""

    def __init__(self, lexer: Lexer):
        self.lexer = lexer

    def parse(self, text: str) -> Node:
        tokens = self.lexer.tokenize(text)
        if not tokens:
            raise QuerySyntaxError("empty query")
        node, rest = self._or(tokens)
        if rest:
            raise QuerySyntaxError(
                f"unexpected {rest[0].kind} {rest[0].text!r} at {rest[0].pos}"
            )
        return node

    # -- grammar --------------------------------------------------------------
    def _or(self, toks: list[Token]) -> tuple[Node, list[Token]]:
        left, toks = self._and(toks)
        children = [left]
        while toks and toks[0].kind == "OR":
            nxt, toks = self._and(toks[1:])
            children.append(nxt)
        return (children[0] if len(children) == 1 else Or(tuple(children))), toks

    def _and(self, toks: list[Token]) -> tuple[Node, list[Token]]:
        left, toks = self._unary(toks)
        children = [left]
        while toks:
            if toks[0].kind == "AND":
                nxt, toks = self._unary(toks[1:])
                children.append(nxt)
            elif toks[0].kind in _STARTERS:  # implicit AND by adjacency
                nxt, toks = self._unary(toks)
                children.append(nxt)
            else:
                break
        return (children[0] if len(children) == 1 else And(tuple(children))), toks

    def _unary(self, toks: list[Token]) -> tuple[Node, list[Token]]:
        if not toks:
            raise QuerySyntaxError("query ends where a term was expected")
        t = toks[0]
        if t.kind == "NOT":
            child, rest = self._unary(toks[1:])
            return Not(child), rest
        if t.kind == "LPAREN":
            node, rest = self._or(toks[1:])
            if not rest or rest[0].kind != "RPAREN":
                raise QuerySyntaxError(f"unclosed '(' at {t.pos}")
            return node, rest[1:]
        if t.kind == "FIELD":
            return FieldTerm(t.field, t.value), toks[1:]
        if t.kind == "PROVIDER":
            return ProviderTerm(t.value, t.args), toks[1:]
        if t.kind == "TEXT":
            return TextTerm(t.value), toks[1:]
        raise QuerySyntaxError(f"unexpected {t.kind} {t.text!r} at {t.pos}")
