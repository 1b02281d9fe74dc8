"""Tests for the query compiler — every result is oracle-checked."""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.search.compiler import UnknownFieldError


@pytest.fixture(scope="module")
def eng(humboldt):
    return humboldt.search_engine


def ids_of(df):
    return {r["artifact_id"] for r in df.collect()}


class TestColumnFieldTerms:
    def test_type_vs_oracle(self, eng, corpus):
        got = eng.match_ids("type: workbook")
        assert_equivalent(
            got,
            "SELECT artifact_id FROM artifacts WHERE artifact_type = 'workbook'",
            artifacts=corpus.artifacts,
        )

    def test_owned_by_vs_oracle(self, eng, corpus):
        got = eng.match_ids("owned_by: 'Alex'")
        assert_equivalent(
            got,
            "SELECT artifact_id FROM artifacts WHERE owner_id = 1",
            artifacts=corpus.artifacts,
        )

    def test_created_by_vs_oracle(self, eng, corpus):
        got = eng.match_ids("created by: 'John Doe'")
        assert_equivalent(
            got,
            "SELECT artifact_id FROM artifacts WHERE created_by_id = 3",
            artifacts=corpus.artifacts,
        )

    def test_value_matching_case_insensitive(self, eng):
        assert ids_of(eng.match_ids("type: WORKBOOK")) == ids_of(
            eng.match_ids("type: workbook")
        )


class TestSideTableFieldTerms:
    def test_badged_vs_oracle(self, eng, corpus):
        got = eng.match_ids("badged: endorsed")
        assert_equivalent(
            got,
            "SELECT DISTINCT artifact_id FROM badges WHERE badge = 'endorsed'",
            badges=corpus.badges,
        )

    def test_badged_by_vs_oracle(self, eng, corpus):
        got = eng.match_ids("badged by: 'Mike'")
        assert_equivalent(
            got,
            "SELECT DISTINCT artifact_id FROM badges WHERE badged_by_id = 2",
            badges=corpus.badges,
        )

    def test_tag_vs_oracle(self, eng, corpus):
        got = eng.match_ids("tag: sales")
        assert_equivalent(
            got,
            "SELECT DISTINCT artifact_id FROM tags WHERE tag = 'sales'",
            tags=corpus.tags,
        )


class TestTextTerms:
    def test_free_text_vs_oracle(self, eng, corpus):
        got = eng.match_ids("sales")
        assert_equivalent(
            got,
            """
            SELECT artifact_id FROM artifacts
            WHERE lower(name) LIKE '%sales%'
               OR lower(description) LIKE '%sales%'
            """,
            artifacts=corpus.artifacts,
        )

    def test_quoted_text(self, eng, corpus):
        got = eng.match_ids("'sales numbers'")
        assert_equivalent(
            got,
            """
            SELECT artifact_id FROM artifacts
            WHERE lower(name) LIKE '%sales numbers%'
               OR lower(description) LIKE '%sales numbers%'
            """,
            artifacts=corpus.artifacts,
        )


class TestOperators:
    def test_and_vs_oracle(self, eng, corpus):
        got = eng.match_ids("type: table & badged: endorsed")
        assert_equivalent(
            got,
            """
            SELECT DISTINCT a.artifact_id
            FROM artifacts a JOIN badges b USING (artifact_id)
            WHERE a.artifact_type = 'table' AND b.badge = 'endorsed'
            """,
            artifacts=corpus.artifacts,
            badges=corpus.badges,
        )

    def test_implicit_and_equals_explicit(self, eng):
        a = ids_of(eng.match_ids("type: table badged: endorsed"))
        b = ids_of(eng.match_ids("type: table & badged: endorsed"))
        assert a == b

    def test_or_vs_oracle(self, eng, corpus):
        got = eng.match_ids("type: dashboard | badged: deprecated")
        assert_equivalent(
            got,
            """
            SELECT artifact_id FROM artifacts WHERE artifact_type = 'dashboard'
            UNION
            SELECT artifact_id FROM badges WHERE badge = 'deprecated'
            """,
            artifacts=corpus.artifacts,
            badges=corpus.badges,
        )

    def test_not_vs_oracle(self, eng, corpus):
        got = eng.match_ids("!type: table")
        assert_equivalent(
            got,
            "SELECT artifact_id FROM artifacts WHERE artifact_type <> 'table'",
            artifacts=corpus.artifacts,
        )

    def test_not_of_side_table_term(self, eng, corpus):
        got = eng.match_ids("! badged: endorsed")
        assert_equivalent(
            got,
            """
            SELECT artifact_id FROM artifacts
            WHERE artifact_id NOT IN
              (SELECT artifact_id FROM badges WHERE badge = 'endorsed')
            """,
            artifacts=corpus.artifacts,
            badges=corpus.badges,
        )

    def test_brackets_vs_oracle(self, eng, corpus):
        got = eng.match_ids("type: table & (sales | marketing)")
        assert_equivalent(
            got,
            """
            SELECT artifact_id FROM artifacts
            WHERE artifact_type = 'table' AND (
              lower(name) LIKE '%sales%' OR lower(description) LIKE '%sales%'
              OR lower(name) LIKE '%marketing%'
              OR lower(description) LIKE '%marketing%')
            """,
            artifacts=corpus.artifacts,
        )

    def test_de_morgan_consistency(self, eng):
        a = ids_of(eng.match_ids("!(type: table | type: workbook)"))
        b = ids_of(eng.match_ids("!type: table & !type: workbook"))
        assert a == b


class TestFlagshipQuery:
    QUERY = (
        "type: table owned_by: 'Alex' badged: endorsed "
        "badged_by: 'Mike' & 'sales'"
    )

    def test_flagship_vs_oracle(self, eng, corpus):
        got = eng.match_ids(self.QUERY)
        assert_equivalent(
            got,
            """
            SELECT DISTINCT a.artifact_id
            FROM artifacts a
            JOIN badges e ON e.artifact_id = a.artifact_id
                 AND e.badge = 'endorsed'
            JOIN badges m ON m.artifact_id = a.artifact_id
                 AND m.badged_by_id = 2
            WHERE a.artifact_type = 'table' AND a.owner_id = 1
              AND (lower(a.name) LIKE '%sales%'
                   OR lower(a.description) LIKE '%sales%')
            """,
            artifacts=corpus.artifacts,
            badges=corpus.badges,
        )

    def test_flagship_equals_planted_ground_truth(self, eng, corpus):
        assert ids_of(eng.match_ids(self.QUERY)) == set(corpus.flagship_ids)

    def test_task3_query_equals_ground_truth(self, eng, corpus):
        got = ids_of(eng.match_ids("type: workbook created_by: 'John Doe'"))
        assert got == set(corpus.john_doe_workbook_ids)


class TestProviderTerms:
    def test_provider_call_returns_its_items(self, eng, humboldt, catalog):
        got = ids_of(eng.match_ids(":most_viewed(10)"))
        top10 = {
            r["artifact_id"]
            for r in humboldt.registry.get("most_viewed")
            .fetch(catalog, {"limit": 10})
            .items.collect()
        }
        assert got == top10

    def test_prefix_language_composition(self, eng, catalog):
        """Paper §5.3: ':recent_documents() & bit'-style composition."""
        both = ids_of(eng.match_ids(":recent_documents() & sales"))
        recent = ids_of(eng.match_ids(":recent_documents()"))
        sales = ids_of(eng.match_ids("sales"))
        assert both == recent & sales

    def test_joinable_with_excludes_input_table(self, eng, corpus):
        got = eng.match_ids("joinable_with: orders")
        names = {
            r["dataset_name"]
            for r in eng.catalog.artifacts.join(got, "artifact_id").collect()
        }
        assert "orders" not in names
        assert "lineitem" in names and "customer" in names


class TestScopeAndRanking:
    def test_scoped_search_filters_view(self, eng, humboldt):
        views = {v.provider: v for v in humboldt.overview_views()}
        scope = views["most_viewed"].item_ids()
        scoped = ids_of(eng.run("sales", scope_ids=scope))
        unscoped = ids_of(eng.run("sales"))
        in_scope = {r["artifact_id"] for r in scope.collect()}
        assert scoped == unscoped & in_scope

    def test_results_ranked_by_global_weights(self, eng):
        rows = eng.run("type: table").select("score").collect()
        scores = [r["score"] for r in rows]
        assert scores == sorted(scores, reverse=True)

    def test_limit(self, eng):
        assert eng.run("type: table", limit=5).count() == 5


class TestErrors:
    def test_unknown_field_raises(self, eng):
        # "color" is not declared by any provider -> lexes as text, then the
        # colon fails; a declared-but-unbound field raises UnknownFieldError.
        from repro.search.parser import FieldTerm

        with pytest.raises(UnknownFieldError):
            eng.match_ids(FieldTerm("no_such_field", "x"))

    def test_too_many_provider_args(self, eng):
        with pytest.raises(Exception, match="at most"):
            eng.match_ids(":typed(a, b, c)")
