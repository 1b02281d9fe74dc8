"""Experiment harnesses E1–E5 (see DESIGN.md §3 for the table index).

Each function returns the rows of one results table; ``jobs/`` entrypoints
print them and EXPERIMENTS.md records paper-vs-measured. The functions are
plain libraries over a SparkSession/facade so tests and benchmarks reuse
them.
"""
from __future__ import annotations

import time

import duckdb
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.catalog import profiles as profiling
from repro.core.framework import Humboldt
from repro.lake.corpus import Corpus
from repro.study.agents import completion_table, run_study
from repro.study.likert import paper_vs_measured


# -- E1: expressivity ---------------------------------------------------------
def e1_expressivity(h: Humboldt) -> list[dict]:
    """Spec size vs. generated discovery surface (paper §1/§6 claims)."""
    s = h.surface_stats()
    paper = {
        "spec_lines": "a few lines (per provider)",
        "n_providers": "large set (Fig. 2 shows 8+)",
        "n_categories": "grouped by type (§4.1)",
        "n_view_types": 6,
        "n_overview_views": "one per visible provider",
        "n_exploration_providers": "metadata-dependent",
        "n_search_fields": "compiled from spec",
        "n_search_aliases": "compiled from spec",
        "n_search_interfaces": 2,
    }
    return [
        {"metric": k, "paper": paper[k], "measured": v}
        for k, v in vars(s).items()
    ]


# -- E2: task completion ------------------------------------------------------
#: §7.2 narrative, tabulated.
E2_PAPER = {
    1: {"n_completed": 6, "n_assisted": 0, "n_search_first": 3, "n_views_first": 3},
    2: {"n_completed": 6, "n_assisted": 3},
    3: {"n_completed": 6, "n_assisted": 3},
    4: {"n_completed": 6, "n_assisted": 2},
}


def e2_completion(h: Humboldt, corpus: Corpus) -> list[dict]:
    """Run the simulated study; paper vs measured per task."""
    measured = {row["task"]: row for row in completion_table(run_study(h, corpus))}
    rows = []
    for task in (1, 2, 3, 4):
        for key, paper_val in E2_PAPER[task].items():
            rows.append(
                {
                    "task": task,
                    "metric": key,
                    "paper": paper_val,
                    "measured": measured[task][key],
                }
            )
    return rows


# -- E3: questionnaire --------------------------------------------------------
def e3_questionnaire(spark: SparkSession) -> list[dict]:
    """Reported Likert statistics vs Spark-aggregated reconstruction."""
    return paper_vs_measured(spark)


# -- E4: search correctness + latency ----------------------------------------
def _search_suite() -> list[tuple[str, str, str]]:
    """(class, Humboldt query, equivalent DuckDB SQL over corpus frames)."""
    text = (
        "SELECT artifact_id FROM artifacts WHERE lower(name) LIKE '%{0}%' "
        "OR lower(description) LIKE '%{0}%'"
    )
    return [
        (
            "column-predicate",
            "type: table",
            "SELECT artifact_id FROM artifacts WHERE artifact_type='table'",
        ),
        (
            "column-predicate",
            "owned_by: 'Alex'",
            "SELECT artifact_id FROM artifacts WHERE owner_id=1",
        ),
        (
            "side-table",
            "badged: endorsed",
            "SELECT DISTINCT artifact_id FROM badges WHERE badge='endorsed'",
        ),
        (
            "side-table",
            "tag: sales",
            "SELECT DISTINCT artifact_id FROM tags WHERE tag='sales'",
        ),
        ("free-text", "sales", text.format("sales")),
        (
            "conjunction",
            "type: table & badged: endorsed",
            """SELECT DISTINCT a.artifact_id FROM artifacts a
               JOIN badges b USING (artifact_id)
               WHERE a.artifact_type='table' AND b.badge='endorsed'""",
        ),
        (
            "disjunction",
            "type: dashboard | badged: deprecated",
            """SELECT artifact_id FROM artifacts WHERE artifact_type='dashboard'
               UNION
               SELECT artifact_id FROM badges WHERE badge='deprecated'""",
        ),
        (
            "negation",
            "!type: table",
            "SELECT artifact_id FROM artifacts WHERE artifact_type<>'table'",
        ),
        (
            "bracketed",
            "type: table & (sales | marketing)",
            """SELECT artifact_id FROM artifacts WHERE artifact_type='table'
               AND (lower(name) LIKE '%sales%' OR lower(description) LIKE '%sales%'
                    OR lower(name) LIKE '%marketing%'
                    OR lower(description) LIKE '%marketing%')""",
        ),
        (
            "flagship",
            "type: table owned_by: 'Alex' badged: endorsed badged_by: 'Mike' & 'sales'",
            """SELECT DISTINCT a.artifact_id FROM artifacts a
               JOIN badges e ON e.artifact_id=a.artifact_id AND e.badge='endorsed'
               JOIN badges m ON m.artifact_id=a.artifact_id AND m.badged_by_id=2
               WHERE a.artifact_type='table' AND a.owner_id=1
                 AND (lower(a.name) LIKE '%sales%'
                      OR lower(a.description) LIKE '%sales%')""",
        ),
        (
            "task3",
            "type: workbook created_by: 'John Doe'",
            """SELECT artifact_id FROM artifacts
               WHERE artifact_type='workbook' AND created_by_id=3""",
        ),
    ]


def e4_search_suite(h: Humboldt, corpus: Corpus) -> list[dict]:
    """Every query class: result-set equality vs DuckDB + latency."""
    con = duckdb.connect()
    con.register("artifacts", corpus.artifacts)
    con.register("badges", corpus.badges)
    con.register("tags", corpus.tags)
    rows = []
    try:
        for cls, query, sql in _search_suite():
            t0 = time.perf_counter()
            got = {r["artifact_id"] for r in h.search_engine.match_ids(query).collect()}
            latency = time.perf_counter() - t0
            expected = {r[0] for r in con.execute(sql).fetchall()}
            rows.append(
                {
                    "class": cls,
                    "query": query,
                    "n_results": len(got),
                    "oracle_match": got == expected,
                    "latency_s": round(latency, 3),
                }
            )
    finally:
        con.close()
    return rows


# -- E5: joinability quality --------------------------------------------------
def e5_joinability(
    spark: SparkSession,
    lake_root: str,
    *,
    thresholds: tuple[float, ...] = (0.3, 0.5, 0.7, 0.9),
    k: int = profiling.DEFAULT_K,
    truth_threshold: float = 0.9,
    datasets: list[str] | None = None,
) -> list[dict]:
    """Precision/recall of MinHash joinability vs exact containment.

    Ground truth: exact containment >= ``truth_threshold`` over all
    compatible cross-dataset column pairs (computed with the one-shot
    self-join in :func:`repro.catalog.profiles.exact_containment`).
    """
    from repro.lake.writer import PLANTED_JOIN_EDGES

    t0 = time.perf_counter()
    prof = profiling.profile_columns(spark, lake_root, datasets=datasets, k=k).cache()
    prof.count()
    profile_s = time.perf_counter() - t0
    t0 = time.perf_counter()
    exact = profiling.exact_containment(spark, lake_root, datasets=datasets).cache()
    truth = {
        (r["src_dataset"], r["src_column"], r["dst_dataset"], r["dst_column"])
        for r in exact.where(F.col("containment") >= truth_threshold).collect()
    }
    exact_s = time.perf_counter() - t0
    # The *semantic* subset of the truth: planted PK-FK edges (the edges a
    # joinability UI actually needs). The remainder of `truth` is mostly
    # coincidental dense-integer-range containment.
    names = set(datasets) if datasets else None
    planted = {
        (sd, sc, dd, dc)
        for (sd, sc), (dd, dc) in PLANTED_JOIN_EDGES
        if names is None or (sd in names and dd in names)
    }
    rows = []
    for th in thresholds:
        t0 = time.perf_counter()
        est = {
            (r["src_dataset"], r["src_column"], r["dst_dataset"], r["dst_column"])
            for r in profiling.estimate_joinability(prof, threshold=th, k=k).collect()
        }
        est_s = time.perf_counter() - t0
        tp = len(est & truth)
        precision = tp / len(est) if est else 1.0
        recall = tp / len(truth) if truth else 1.0
        f1 = (
            2 * precision * recall / (precision + recall)
            if precision + recall
            else 0.0
        )
        planted_recall = (
            len(est & planted) / len(planted) if planted else 1.0
        )
        rows.append(
            {
                "threshold": th,
                "n_true_edges": len(truth),
                "n_est_edges": len(est),
                "precision": round(precision, 3),
                "recall": round(recall, 3),
                "planted_fk_recall": round(planted_recall, 3),
                "f1": round(f1, 3),
                "estimate_s": round(est_s, 2),
                "profile_s": round(profile_s, 2),
                "exact_s": round(exact_s, 2),
            }
        )
    return rows
