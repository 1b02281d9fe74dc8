"""Property-based tests (hypothesis) for the query language front-end.

Pure Python — no Spark. Two invariant families:

* total robustness: the lexer/parser never crash with anything other than
  :class:`QuerySyntaxError` on arbitrary input text;
* structural round-trip: rendering a random AST back to query text and
  re-parsing yields the same AST (associativity-normalized).
"""
from __future__ import annotations

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.default_spec import default_spec
from repro.search.compiler import build_lexer
from repro.search.lexer import QuerySyntaxError
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

PARSER = Parser(build_lexer(default_spec()))

FIELDS = ["type", "owned_by", "badged", "badged_by", "tag", "created_by"]
WORDS = ["sales", "marketing", "alpha", "beta", "gamma"]


# -- robustness ----------------------------------------------------------------
@given(st.text(max_size=60))
@settings(max_examples=300, deadline=None)
def test_lexer_total_on_arbitrary_text(text):
    try:
        PARSER.lexer.tokenize(text)
    except QuerySyntaxError:
        pass  # the only acceptable failure mode


@given(st.text(alphabet="abct yired:&|!()'\" _", max_size=40))
@settings(max_examples=300, deadline=None)
def test_parser_total_on_query_like_text(text):
    try:
        PARSER.parse(text)
    except QuerySyntaxError:
        pass


# -- AST round-trip ------------------------------------------------------------
def atoms():
    field = st.builds(
        FieldTerm, st.sampled_from(FIELDS), st.sampled_from(WORDS)
    )
    text = st.builds(TextTerm, st.sampled_from(WORDS))
    provider = st.just(ProviderTerm("recent_documents", ()))
    return st.one_of(field, text, provider)


def ast_nodes(depth: int = 3):
    if depth == 0:
        return atoms()
    sub = ast_nodes(depth - 1)
    return st.one_of(
        atoms(),
        st.builds(Not, sub),
        st.builds(lambda a, b: And((a, b)), sub, sub),
        st.builds(lambda a, b: Or((a, b)), sub, sub),
    )


def render(node: Node) -> str:
    """Render an AST back to query text (fully parenthesized)."""
    if isinstance(node, FieldTerm):
        return f"{node.field}: '{node.value}'"
    if isinstance(node, TextTerm):
        return f"'{node.value}'"
    if isinstance(node, ProviderTerm):
        args = ", ".join(node.args)
        return f":{node.name}({args})"
    if isinstance(node, Not):
        return f"!({render(node.child)})"
    if isinstance(node, And):
        return "(" + " & ".join(render(c) for c in node.children) + ")"
    if isinstance(node, Or):
        return "(" + " | ".join(render(c) for c in node.children) + ")"
    raise TypeError(node)


def normalize(node: Node) -> Node:
    """Flatten nested same-operator chains (parser associativity)."""
    if isinstance(node, Not):
        return Not(normalize(node.child))
    if isinstance(node, (And, Or)):
        cls = type(node)
        flat: list[Node] = []
        for c in node.children:
            c = normalize(c)
            if isinstance(c, cls):
                flat.extend(c.children)
            else:
                flat.append(c)
        return cls(tuple(flat))
    return node


@given(ast_nodes())
@settings(max_examples=300, deadline=None)
def test_render_parse_roundtrip(node):
    assert normalize(PARSER.parse(render(node))) == normalize(node)


@given(ast_nodes())
@settings(max_examples=200, deadline=None)
def test_double_negation_parses(node):
    text = f"!!({render(node)})"
    parsed = PARSER.parse(text)
    assert normalize(parsed) == Not(Not(normalize(node)))


@pytest.mark.parametrize("junk", ["&&", "||", "()", "(()", "a &", "| b", ":"])
def test_known_malformed_inputs_raise(junk):
    with pytest.raises(QuerySyntaxError):
        PARSER.parse(junk)
