"""Spec-driven ranking (paper §4.2, Listing 1).

``score = sum_f weight_f * minmax_norm(field_f)`` — metadata field values,
min-max normalized over the frame being ranked, multiplied by the spec's
weights. Normalization makes scores comparable *across* providers so that
"whenever multiple metadata providers are combined ... the ranking results
need to be combined" works: :func:`combine_scores` sums per-artifact scores
from any number of providers.

Negative weights express "smaller is better" (e.g. ``recency_days`` with
weight −1 ranks recently-modified artifacts first). Per-provider weights
override the global list; the global list is the fallback (paper §4.2).
"""
from __future__ import annotations

from functools import reduce

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.spec import RankingWeight


class RankingError(ValueError):
    """A ranking weight refers to a field the frame does not have."""


def effective_weights(
    provider_weights: list[RankingWeight] | tuple,
    global_weights: list[RankingWeight] | tuple,
) -> list[RankingWeight]:
    """Per-provider weights if present, else the global fallback (§4.2)."""
    return list(provider_weights) if provider_weights else list(global_weights)


def score_artifacts(
    df: DataFrame, weights: list[RankingWeight] | tuple
) -> DataFrame:
    """Add a ``score`` column. Deterministic; ties unbroken (caller orders).

    Min/max per field are computed in one aggregation pass and folded into
    the scoring expression as literals (broadcast joins are disabled in the
    session, so a scalar subquery/crossjoin would shuffle needlessly).
    """
    weights = list(weights)
    if not weights:
        return df.withColumn("score", F.lit(0.0))
    missing = [w.field for w in weights if w.field not in df.columns]
    if missing:
        raise RankingError(
            f"ranking fields {missing} not in frame columns {df.columns}"
        )
    aggs = []
    for w in weights:
        aggs.append(F.min(F.col(w.field).cast("double")).alias(f"min__{w.field}"))
        aggs.append(F.max(F.col(w.field).cast("double")).alias(f"max__{w.field}"))
    stats = df.agg(*aggs).collect()[0].asDict()
    terms = []
    for w in weights:
        lo, hi = stats[f"min__{w.field}"], stats[f"max__{w.field}"]
        if lo is None or hi is None or hi == lo:
            continue  # constant or all-null field contributes nothing
        norm = (F.col(w.field).cast("double") - F.lit(lo)) / F.lit(hi - lo)
        terms.append(F.coalesce(norm, F.lit(0.0)) * F.lit(float(w.weight)))
    score = reduce(lambda a, b: a + b, terms) if terms else F.lit(0.0)
    return df.withColumn("score", score)


def rank(df: DataFrame, weights: list[RankingWeight] | tuple) -> DataFrame:
    """Score and order (descending score, artifact_id as the tiebreak)."""
    return score_artifacts(df, weights).orderBy(
        F.col("score").desc(), F.col("artifact_id")
    )


def combine_scores(scored: list[DataFrame]) -> DataFrame:
    """Sum scores per artifact across provider results (§4.2).

    Input frames must carry ``artifact_id`` and ``score``; output is
    ``(artifact_id, score)`` with one row per artifact.
    """
    if not scored:
        raise ValueError("combine_scores needs at least one scored frame")
    slim = [s.select("artifact_id", "score") for s in scored]
    allrows = reduce(lambda a, b: a.unionByName(b), slim)
    return allrows.groupBy("artifact_id").agg(F.sum("score").alias("score"))
