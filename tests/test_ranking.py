"""Tests for spec-driven ranking (oracle-checked scoring math)."""
import pytest
from pyspark.sql import functions as F

from repro.core.spec import RankingWeight
from repro.oracle import assert_equivalent
from repro.ranking.scorer import (
    RankingError,
    combine_scores,
    effective_weights,
    rank,
    score_artifacts,
)


class TestScoring:
    def test_single_field_minmax_vs_oracle(self, catalog, corpus):
        got = score_artifacts(
            catalog.artifacts, [RankingWeight("view_count", 2.0)]
        ).select("artifact_id", F.round("score", 6).alias("score"))
        assert_equivalent(
            got,
            """
            SELECT artifact_id,
                   round(2.0 * (view_count - mn) / (mx - mn), 6) AS score
            FROM artifacts,
                 (SELECT min(view_count)::double AS mn,
                         max(view_count)::double AS mx FROM artifacts)
            """,
            artifacts=corpus.artifacts,
        )

    def test_two_field_sum_vs_oracle(self, catalog, corpus):
        got = score_artifacts(
            catalog.artifacts,
            [RankingWeight("view_count", 1.5), RankingWeight("favorite_count", 4.3)],
        ).select("artifact_id", F.round("score", 6).alias("score"))
        assert_equivalent(
            got,
            """
            SELECT artifact_id,
              round(1.5 * (view_count - v.mn) / (v.mx - v.mn)
                  + 4.3 * (favorite_count - f.mn) / (f.mx - f.mn), 6) AS score
            FROM artifacts,
              (SELECT min(view_count)::double mn, max(view_count)::double mx
                 FROM artifacts) v,
              (SELECT min(favorite_count)::double mn, max(favorite_count)::double mx
                 FROM artifacts) f
            """,
            artifacts=corpus.artifacts,
        )

    def test_negative_weight_reverses_order(self, catalog):
        up = rank(catalog.artifacts, [RankingWeight("view_count", 1.0)])
        down = rank(catalog.artifacts, [RankingWeight("view_count", -1.0)])
        top_up = up.first()["artifact_id"]
        top_down = down.first()["artifact_id"]
        assert top_up != top_down
        vmax = catalog.artifacts.agg(F.max("view_count")).first()[0]
        assert up.first()["view_count"] == vmax

    def test_scores_normalized_to_weight_range(self, catalog):
        scored = score_artifacts(catalog.artifacts, [RankingWeight("view_count", 4.0)])
        row = scored.agg(F.min("score"), F.max("score")).first()
        assert row[0] == pytest.approx(0.0)
        assert row[1] == pytest.approx(4.0)

    def test_empty_weights_score_zero(self, catalog):
        scored = score_artifacts(catalog.artifacts, [])
        assert scored.where(F.col("score") != 0.0).count() == 0

    def test_unknown_field_raises(self, catalog):
        with pytest.raises(RankingError, match="nonexistent"):
            score_artifacts(catalog.artifacts, [RankingWeight("nonexistent", 1.0)])

    def test_constant_field_contributes_nothing(self, catalog):
        const = catalog.artifacts.withColumn("c", F.lit(7))
        scored = score_artifacts(const, [RankingWeight("c", 100.0)])
        assert scored.where(F.col("score") != 0.0).count() == 0

    def test_rank_is_deterministic_tiebreak(self, catalog):
        a = [r["artifact_id"] for r in rank(catalog.artifacts, []).limit(10).collect()]
        b = [r["artifact_id"] for r in rank(catalog.artifacts, []).limit(10).collect()]
        assert a == b == sorted(a)


class TestFallback:
    def test_provider_weights_win(self):
        pw = [RankingWeight("a", 1.0)]
        gw = [RankingWeight("b", 2.0)]
        assert effective_weights(pw, gw) == pw

    def test_global_fallback_used_when_empty(self):
        gw = [RankingWeight("b", 2.0)]
        assert effective_weights([], gw) == gw
        assert effective_weights((), gw) == gw


class TestCombination:
    def test_combine_sums_per_artifact_vs_oracle(self, catalog, corpus):
        s1 = score_artifacts(catalog.artifacts, [RankingWeight("view_count", 1.0)])
        s2 = score_artifacts(
            catalog.artifacts, [RankingWeight("favorite_count", 1.0)]
        )
        got = combine_scores([s1, s2]).select(
            "artifact_id", F.round("score", 6).alias("score")
        )
        assert_equivalent(
            got,
            """
            SELECT artifact_id,
              round((view_count - v.mn) / (v.mx - v.mn)
                  + (favorite_count - f.mn) / (f.mx - f.mn), 6) AS score
            FROM artifacts,
              (SELECT min(view_count)::double mn, max(view_count)::double mx
                 FROM artifacts) v,
              (SELECT min(favorite_count)::double mn, max(favorite_count)::double mx
                 FROM artifacts) f
            """,
            artifacts=corpus.artifacts,
        )

    def test_combine_empty_raises(self):
        with pytest.raises(ValueError):
            combine_scores([])

    def test_combine_single_is_identity(self, catalog):
        s = score_artifacts(catalog.artifacts, [RankingWeight("view_count", 1.0)])
        combined = combine_scores([s])
        assert combined.count() == s.count()
