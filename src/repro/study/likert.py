"""Post-study questionnaire reconstruction (paper §7.2 + Figure 8).

The paper reports 5-point Likert statistics for 6 participants over 12
statements in 4 categories: six statement-level (mean, std) pairs plus the
overall (3.97, 0.85). The raw ratings were not published, so we
*reconstruct* them:

1. For each reported statement, brute-force the 6-rating multisets (there
   are only C(10,4)=210) whose mean and **population** std round to the
   reported values. (Population std is the right model: e.g. ratings
   [3,4,4,5,5,5] give pop-std 0.745 -> 0.75 as reported, while sample std
   would give 0.82.)
2. For the six unreported statements, solve for multisets whose grand
   total over all 72 ratings matches the reported overall mean/std — the
   rounding windows pin the total sum and sum-of-squares to unique
   integers, and a small DP over (sum, sumsq) finds a deterministic
   lexicographically-least solution.

The reconstruction existing at all verifies the paper's statistics are
internally consistent; aggregating the reconstructed ratings in Spark (and
checking the aggregation against DuckDB) reproduces every reported number,
which is experiment E3.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import lru_cache
from itertools import combinations_with_replacement, product

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

N_PARTICIPANTS = 6
SCALE = (1, 2, 3, 4, 5)

#: Figure 8's four statement categories.
CATEGORIES = ("Search", "Entry points", "Exploration", "Customization")

#: statement -> (category, reported mean, reported std); None = unreported.
STATEMENTS: dict[str, tuple[str, float | None, float | None]] = {
    "metadata_search": ("Search", 4.33, 0.75),
    "query_composition": ("Search", None, None),
    "autocomplete": ("Search", None, None),
    "finding_data_views": ("Entry points", 3.33, 0.75),
    "layout_design": ("Entry points", 3.50, 0.96),
    "view_variety": ("Entry points", None, None),
    "previews": ("Exploration", 4.33, 1.11),
    "related_artifacts": ("Exploration", None, None),
    "exploration_paths": ("Exploration", None, None),
    "customization": ("Customization", 4.17, 0.69),
    "extension": ("Customization", 4.17, 0.69),
    "config_discoverability": ("Customization", None, None),
}

OVERALL = (3.97, 0.85)


class ReconstructionError(RuntimeError):
    """No rating assignment is consistent with the reported statistics."""


def _pop_std(ratings: tuple[int, ...]) -> float:
    m = sum(ratings) / len(ratings)
    return (sum((r - m) ** 2 for r in ratings) / len(ratings)) ** 0.5


def _matches(ratings: tuple[int, ...], mean: float, std: float) -> bool:
    m = sum(ratings) / len(ratings)
    return round(m, 2) == mean and round(_pop_std(ratings), 2) == std


@lru_cache(maxsize=None)
def _all_multisets() -> tuple[tuple[int, ...], ...]:
    return tuple(combinations_with_replacement(SCALE, N_PARTICIPANTS))


def candidates_for(mean: float, std: float) -> list[tuple[int, ...]]:
    """All 6-rating multisets matching a reported (mean, std) pair."""
    return [ms for ms in _all_multisets() if _matches(ms, mean, std)]


def _overall_targets() -> tuple[int, int]:
    """The unique integer (sum, sumsq) over all 72 ratings implied by the
    reported overall mean/std rounding windows."""
    n = N_PARTICIPANTS * len(STATEMENTS)
    mean, std = OVERALL
    s_candidates = [
        s for s in range(n, 5 * n + 1) if round(s / n, 2) == mean
    ]
    if len(s_candidates) != 1:
        raise ReconstructionError(
            f"overall mean {mean} does not pin a unique sum: {s_candidates}"
        )
    total = s_candidates[0]
    mean_sq = (total / n) ** 2
    sq_candidates = [
        q
        for q in range(n, 25 * n + 1)
        if q / n >= mean_sq and round((q / n - mean_sq) ** 0.5, 2) == std
    ]
    if len(sq_candidates) != 1:
        raise ReconstructionError(
            f"overall std {std} does not pin a unique sumsq: {sq_candidates}"
        )
    return total, sq_candidates[0]


def _solve_latent(
    n_latent: int, need_sum: int, need_sq: int
) -> list[tuple[int, ...]] | None:
    """DP: pick ``n_latent`` multisets with given total sum and sum-of-squares.

    Returns the lexicographically least solution (deterministic) or None.
    """
    opts = sorted(
        {(sum(ms), sum(r * r for r in ms), ms) for ms in _all_multisets()}
    )
    reachable: list[set[tuple[int, int]]] = [set() for _ in range(n_latent + 1)]
    reachable[0].add((0, 0))
    for i in range(1, n_latent + 1):
        for s, q in reachable[i - 1]:
            for os_, oq, _ in opts:
                ns, nq = s + os_, q + oq
                if ns <= need_sum and nq <= need_sq:
                    reachable[i].add((ns, nq))
    if (need_sum, need_sq) not in reachable[n_latent]:
        return None
    # Greedy reconstruction, lexicographically least multiset first.
    out: list[tuple[int, ...]] = []
    s, q = need_sum, need_sq
    for i in range(n_latent, 0, -1):
        for os_, oq, ms in opts:
            if (s - os_, q - oq) in reachable[i - 1]:
                out.append(ms)
                s, q = s - os_, q - oq
                break
        else:  # pragma: no cover - reachable set guarantees a step exists
            return None
    return out


def reconstruct_ratings() -> pd.DataFrame:
    """(participant, statement, category, rating) — 72 rows, deterministic."""
    reported = [
        (name, cat, m, s)
        for name, (cat, m, s) in STATEMENTS.items()
        if m is not None
    ]
    latent = [name for name, (_, m, _) in STATEMENTS.items() if m is None]
    per_stmt_cands = {
        name: candidates_for(m, s) for name, _, m, s in reported
    }
    for name, cands in per_stmt_cands.items():
        if not cands:
            raise ReconstructionError(
                f"statement {name!r}: no 6-rating multiset matches its "
                "reported mean/std — paper statistics would be inconsistent"
            )
    total, total_sq = _overall_targets()
    # Usually the first candidate per statement works; iterate combinations
    # deterministically until the latent DP solves.
    names = [name for name, *_ in reported]
    for chosen in product(*(per_stmt_cands[n] for n in names)):
        got_sum = sum(sum(ms) for ms in chosen)
        got_sq = sum(sum(r * r for r in ms) for ms in chosen)
        latent_sets = _solve_latent(
            len(latent), total - got_sum, total_sq - got_sq
        )
        if latent_sets is not None:
            assignment = dict(zip(names, chosen)) | dict(zip(latent, latent_sets))
            break
    else:
        raise ReconstructionError(
            "no combination of per-statement candidates is consistent with "
            "the reported overall statistics"
        )
    rows = []
    for name, (cat, _, _) in STATEMENTS.items():
        for i, rating in enumerate(sorted(assignment[name])):
            rows.append((f"P{i + 1}", name, cat, int(rating)))
    return pd.DataFrame(
        rows, columns=["participant", "statement", "category", "rating"]
    )


# -- Spark aggregation (the measured side of E3) ------------------------------
def ratings_df(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(reconstruct_ratings())


def statement_stats(ratings: DataFrame) -> DataFrame:
    """Per-statement mean and population std, rounded as the paper rounds."""
    return (
        ratings.groupBy("statement", "category")
        .agg(
            F.round(F.avg("rating"), 2).alias("mean"),
            F.round(F.stddev_pop("rating"), 2).alias("std"),
        )
        .orderBy("statement")
    )


def category_stats(ratings: DataFrame) -> DataFrame:
    """Per-category mean/std over all of that category's ratings (Fig. 8)."""
    return (
        ratings.groupBy("category")
        .agg(
            F.round(F.avg("rating"), 2).alias("mean"),
            F.round(F.stddev_pop("rating"), 2).alias("std"),
        )
        .orderBy("category")
    )


def overall_stats(ratings: DataFrame) -> DataFrame:
    return ratings.agg(
        F.round(F.avg("rating"), 2).alias("mean"),
        F.round(F.stddev_pop("rating"), 2).alias("std"),
    )


def paper_vs_measured(spark: SparkSession) -> list[dict]:
    """E3's table: every reported statistic next to the reconstructed one."""
    ratings = ratings_df(spark)
    stmt = {r["statement"]: r for r in statement_stats(ratings).collect()}
    overall = overall_stats(ratings).collect()[0]
    rows = []
    for name, (cat, m, s) in STATEMENTS.items():
        if m is None:
            continue
        rows.append(
            {
                "scope": name,
                "category": cat,
                "paper_mean": m,
                "paper_std": s,
                "measured_mean": float(stmt[name]["mean"]),
                "measured_std": float(stmt[name]["std"]),
            }
        )
    rows.append(
        {
            "scope": "overall",
            "category": "all",
            "paper_mean": OVERALL[0],
            "paper_std": OVERALL[1],
            "measured_mean": float(overall["mean"]),
            "measured_std": float(overall["std"]),
        }
    )
    return rows
