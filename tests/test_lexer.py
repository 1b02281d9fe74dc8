"""Tests for the spec-driven query lexer (pure Python)."""
import pytest

from repro.core.default_spec import default_spec
from repro.search.compiler import build_lexer
from repro.search.lexer import Lexer, QuerySyntaxError


@pytest.fixture(scope="module")
def lx():
    return build_lexer(default_spec())


class TestFieldTokens:
    def test_simple_field(self, lx):
        (t,) = lx.tokenize("type: table")
        assert t.kind == "FIELD" and t.field == "type" and t.value == "table"

    def test_quoted_value(self, lx):
        (t,) = lx.tokenize("owned_by: 'Alex'")
        assert t.field == "owned_by" and t.value == "Alex"

    def test_double_quoted_value(self, lx):
        (t,) = lx.tokenize('owned_by: "John Doe"')
        assert t.value == "John Doe"

    def test_multiword_alias(self, lx):
        (t,) = lx.tokenize("owned by: 'Alex'")
        assert t.field == "owned_by"

    def test_longest_alias_wins(self, lx):
        # "badged by:" must not lex as field "badged" with value "by:..."
        (t,) = lx.tokenize("badged by: 'Mike'")
        assert t.field == "badged_by" and t.value == "Mike"

    def test_alias_case_insensitive(self, lx):
        (t,) = lx.tokenize("Owned By: 'Alex'")
        assert t.field == "owned_by"

    def test_space_before_colon_allowed(self, lx):
        (t,) = lx.tokenize("type : table")
        assert t.field == "type" and t.value == "table"

    def test_field_without_value_raises(self, lx):
        with pytest.raises(QuerySyntaxError, match="no value"):
            lx.tokenize("type: &")


class TestOperatorsAndText:
    def test_operators(self, lx):
        kinds = [t.kind for t in lx.tokenize("a & b | !c (d)")]
        assert kinds == [
            "TEXT", "AND", "TEXT", "OR", "NOT", "TEXT", "LPAREN", "TEXT", "RPAREN",
        ]

    def test_bare_word(self, lx):
        (t,) = lx.tokenize("sales")
        assert t.kind == "TEXT" and t.value == "sales"

    def test_quoted_text(self, lx):
        (t,) = lx.tokenize("'sales numbers'")
        assert t.kind == "TEXT" and t.value == "sales numbers"

    def test_unterminated_quote_raises(self, lx):
        with pytest.raises(QuerySyntaxError, match="unterminated"):
            lx.tokenize("'oops")

    def test_empty_input_gives_no_tokens(self, lx):
        assert lx.tokenize("   ") == []


class TestProviderCalls:
    def test_no_args(self, lx):
        (t,) = lx.tokenize(":recent_documents()")
        assert t.kind == "PROVIDER" and t.value == "recent_documents"
        assert t.args == ()

    def test_with_arg(self, lx):
        (t,) = lx.tokenize(":joinable(orders)")
        assert t.value == "joinable" and t.args == ("orders",)

    def test_quoted_args_stripped(self, lx):
        (t,) = lx.tokenize(":joinable('orders')")
        assert t.args == ("orders",)

    def test_bare_call_without_parens(self, lx):
        (t,) = lx.tokenize(":most_viewed")
        assert t.kind == "PROVIDER" and t.args == ()

    def test_unknown_provider_raises(self, lx):
        with pytest.raises(QuerySyntaxError, match="unknown provider"):
            lx.tokenize(":no_such_provider()")

    def test_unclosed_call_raises(self, lx):
        with pytest.raises(QuerySyntaxError, match="unclosed"):
            lx.tokenize(":joinable(orders")

    def test_prefix_language_example(self, lx):
        # Paper §5.3: ":recent_documents() & bit"
        kinds = [t.kind for t in lx.tokenize(":recent_documents() & bit")]
        assert kinds == ["PROVIDER", "AND", "TEXT"]


class TestFlagshipQuery:
    def test_abstract_query_lexes(self, lx):
        toks = lx.tokenize(
            "type: table owned_by: 'Alex' badged: endorsed "
            "badged_by: 'Mike' & 'sales'"
        )
        assert [t.kind for t in toks] == ["FIELD"] * 4 + ["AND", "TEXT"]
        assert [t.field for t in toks[:4]] == [
            "type", "owned_by", "badged", "badged_by",
        ]
        assert [t.value for t in toks[:4]] == ["table", "Alex", "endorsed", "Mike"]

    def test_spaced_variant_from_abstract(self, lx):
        # The abstract also writes it with spaces: "owned by:", "badged by:".
        toks = lx.tokenize(
            "type: table owned by: 'Alex' badged: endorsed "
            "badged by: 'Mike' & 'sales'"
        )
        assert [t.field for t in toks[:4]] == [
            "type", "owned_by", "badged", "badged_by",
        ]


class TestVocabularyIsSpecDriven:
    def test_field_outside_spec_is_not_a_field(self):
        lx = Lexer({"type": "type"}, set())
        toks = lx.tokenize("type: table")
        assert toks[0].kind == "FIELD"
        # Same text, vocabulary without "type": lexes as text then fails on ':'
        lx2 = Lexer({}, set())
        with pytest.raises(QuerySyntaxError):
            lx2.tokenize("type: table")

    def test_provider_vocabulary_is_spec_driven(self):
        lx = Lexer({}, {"my_provider"})
        (t,) = lx.tokenize(":my_provider()")
        assert t.value == "my_provider"
