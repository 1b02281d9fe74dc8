"""Tests for the query parser (pure Python)."""
import pytest

from repro.core.default_spec import default_spec
from repro.search.compiler import build_lexer
from repro.search.lexer import QuerySyntaxError
from repro.search.parser import (
    And,
    FieldTerm,
    Not,
    Or,
    Parser,
    ProviderTerm,
    TextTerm,
)


@pytest.fixture(scope="module")
def p():
    return Parser(build_lexer(default_spec()))


class TestAtoms:
    def test_field_term(self, p):
        assert p.parse("type: table") == FieldTerm("type", "table")

    def test_text_term(self, p):
        assert p.parse("sales") == TextTerm("sales")

    def test_provider_term(self, p):
        assert p.parse(":recent_documents()") == ProviderTerm("recent_documents")

    def test_provider_term_with_args(self, p):
        assert p.parse(":joinable(orders)") == ProviderTerm("joinable", ("orders",))


class TestCombinators:
    def test_explicit_and(self, p):
        node = p.parse("sales & type: table")
        assert node == And((TextTerm("sales"), FieldTerm("type", "table")))

    def test_implicit_and_by_adjacency(self, p):
        node = p.parse("type: table owned_by: 'Alex'")
        assert node == And(
            (FieldTerm("type", "table"), FieldTerm("owned_by", "Alex"))
        )

    def test_or(self, p):
        node = p.parse("sales | marketing")
        assert node == Or((TextTerm("sales"), TextTerm("marketing")))

    def test_negation(self, p):
        assert p.parse("!sales") == Not(TextTerm("sales"))

    def test_double_negation(self, p):
        assert p.parse("!!sales") == Not(Not(TextTerm("sales")))

    def test_precedence_and_binds_tighter_than_or(self, p):
        node = p.parse("a & b | c")
        assert isinstance(node, Or)
        assert node.children[0] == And((TextTerm("a"), TextTerm("b")))
        assert node.children[1] == TextTerm("c")

    def test_brackets_override_precedence(self, p):
        node = p.parse("a & (b | c)")
        assert isinstance(node, And)
        assert node.children[1] == Or((TextTerm("b"), TextTerm("c")))

    def test_nested_brackets(self, p):
        node = p.parse("((a))")
        assert node == TextTerm("a")

    def test_negated_group(self, p):
        node = p.parse("!(a | b)")
        assert node == Not(Or((TextTerm("a"), TextTerm("b"))))

    def test_flagship_query_shape(self, p):
        node = p.parse(
            "type: table owned_by: 'Alex' badged: endorsed "
            "badged_by: 'Mike' & 'sales'"
        )
        assert isinstance(node, And)
        assert len(node.children) == 5
        assert node.children[-1] == TextTerm("sales")


class TestErrors:
    def test_empty_query(self, p):
        with pytest.raises(QuerySyntaxError, match="empty"):
            p.parse("   ")

    def test_unclosed_paren(self, p):
        with pytest.raises(QuerySyntaxError, match="unclosed"):
            p.parse("(a & b")

    def test_dangling_operator(self, p):
        with pytest.raises(QuerySyntaxError):
            p.parse("a &")

    def test_leading_binary_operator(self, p):
        with pytest.raises(QuerySyntaxError):
            p.parse("& a")

    def test_stray_rparen(self, p):
        with pytest.raises(QuerySyntaxError, match="RPAREN"):
            p.parse("a )")

    def test_lone_not(self, p):
        with pytest.raises(QuerySyntaxError):
            p.parse("!")
