"""Synthetic enterprise artifact corpus for the Humboldt reproduction.

The paper evaluates Humboldt inside Sigma Workbook over Sigma's production
metadata (owners, teams, badges/endorsements, usage counts, lineage). That
corpus is proprietary, so we generate a deterministic synthetic equivalent
sized by ``sf``:

* **users / teams** — includes the named principals from the paper's queries
  and tasks: ``Alex`` (owner in the flagship query), ``Mike`` (endorser),
  ``John Doe`` (Task 3 workbook creator), and ``A Team`` (Task 4).
* **artifacts** — tables, visualizations, workbooks, dashboards with owner,
  creator, team, timestamps, and usage counts (scalar columns only, so every
  frame is directly oracle-comparable).
* **badges / tags** — normalized side tables (artifact_id, badge, badged_by).
* **lineage** — parent/child edges forming table -> visualization -> workbook
  -> dashboard chains (the hierarchy provider's input).

Planted facts guarantee the paper's tasks and the abstract's flagship query
("type: table owned_by: 'Alex' badged: endorsed badged_by: 'Mike' & 'sales'")
have non-empty, known answers at any SF:

* a table artifact named ``AIRLINES`` carrying an ``endorsed`` badge granted
  by Mike (Task 1);
* three sales tables owned by Alex, endorsed by Mike (flagship query);
* four workbooks and two non-workbooks created by John Doe (Task 3 and its
  "missed the type condition" distractor).

All generation is pure pandas/numpy, deterministic in ``(sf, seed)``; use
``Corpus.to_spark`` for DataFrame-side processing.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

# Fixed "now" so recency metadata is deterministic across runs.
NOW = pd.Timestamp("2024-06-01")

ARTIFACT_TYPES = ["table", "visualization", "workbook", "dashboard"]
BADGE_KINDS = ["endorsed", "warning", "deprecated"]

#: Physical datasets materialized by :mod:`repro.lake.writer`; the first
#: table artifacts are bound to these so catalog scans and the corpus agree.
PHYSICAL_DATASETS = [
    "lineitem",
    "orders",
    "customer",
    "part",
    "airlines",
    "airports",
    "flights",
    "orders_na",
    "customer_gold",
]

_PLANTED_USERS = [(1, "Alex"), (2, "Mike"), (3, "John Doe")]
_SUBJECTS = [
    "sales", "marketing", "revenue", "churn", "inventory", "shipping",
    "finance", "growth", "traffic", "support", "attribution", "pipeline",
]
_TYPE_SUFFIX = {
    "table": ["base", "daily", "staging", "clean", "agg"],
    "visualization": ["chart", "trend", "breakdown", "heatmap"],
    "workbook": ["analysis", "report", "deep_dive", "review"],
    "dashboard": ["dashboard", "overview", "kpis"],
}


@dataclass
class Corpus:
    """All corpus frames (pandas) plus the planted ground truth."""

    users: pd.DataFrame
    teams: pd.DataFrame
    artifacts: pd.DataFrame
    badges: pd.DataFrame
    tags: pd.DataFrame
    lineage: pd.DataFrame
    #: artifact ids answering the flagship query, for test assertions
    flagship_ids: list[int] = field(default_factory=list)
    #: artifact id of the planted AIRLINES table (Task 1 target)
    airlines_id: int = -1
    #: artifact ids of John Doe's workbooks (Task 3 answer)
    john_doe_workbook_ids: list[int] = field(default_factory=list)

    def to_spark(self, spark: SparkSession) -> dict[str, DataFrame]:
        """Materialize every corpus frame as a Spark DataFrame."""
        return {
            name: spark.createDataFrame(getattr(self, name))
            for name in ("users", "teams", "artifacts", "badges", "tags", "lineage")
        }


def n_artifacts_for_sf(sf: float) -> int:
    """Corpus size at scale factor ``sf`` (>= the planted artifacts)."""
    return max(80, int(20_000 * sf))


def build_corpus(*, sf: float = 0.01, seed: int = 7) -> Corpus:
    """Generate the full corpus at scale factor ``sf`` (deterministic)."""
    g = np.random.default_rng(seed)
    n_users = max(12, int(1_200 * sf))
    n_teams = max(3, n_users // 6)
    n_art = n_artifacts_for_sf(sf)

    users = pd.DataFrame(
        {
            "user_id": np.arange(1, n_users + 1),
            "user_name": [
                dict(_PLANTED_USERS).get(i, f"user_{i}") for i in range(1, n_users + 1)
            ],
            "team_id": (np.arange(n_users) % n_teams) + 1,
        }
    )
    teams = pd.DataFrame(
        {
            "team_id": np.arange(1, n_teams + 1),
            "team_name": ["A Team"] + [f"Team {i}" for i in range(2, n_teams + 1)],
        }
    )

    # --- artifacts ---------------------------------------------------------
    ids = np.arange(1, n_art + 1)
    types = g.choice(ARTIFACT_TYPES, n_art, p=[0.4, 0.25, 0.2, 0.15])
    # Bind the first table artifacts to the physical lake datasets.
    table_pos = np.flatnonzero(types == "table")
    for j, _ in enumerate(PHYSICAL_DATASETS):
        types[table_pos[j]] = "table"
    names, dataset_names = [], []
    for i, t in zip(ids, types):
        names.append(
            f"{g.choice(_SUBJECTS)}_{g.choice(_TYPE_SUFFIX[t])}_{i}"
        )
        dataset_names.append(None)
    for j, ds in enumerate(PHYSICAL_DATASETS):
        pos = table_pos[j]
        names[pos] = ds.upper()
        dataset_names[pos] = ds

    owner = g.integers(1, n_users + 1, n_art)
    creator = np.where(g.random(n_art) < 0.8, owner, g.integers(1, n_users + 1, n_art))
    created = NOW - pd.to_timedelta(g.integers(1, 720, n_art), unit="D")
    modified = (
        created + pd.to_timedelta(g.integers(0, 120, n_art), unit="D")
    ).map(lambda t: min(t, NOW))
    ranks = np.arange(1, n_art + 1).astype("float64")
    zipf = 1.0 / ranks**1.1
    views = (g.permutation(zipf) / zipf.max() * 5_000).astype("int64")
    favorites = (views * g.random(n_art) * 0.02).astype("int64")

    artifacts = pd.DataFrame(
        {
            "artifact_id": ids,
            "name": names,
            "artifact_type": types,
            "dataset_name": pd.array(dataset_names, dtype="string"),
            "owner_id": owner,
            "created_by_id": creator,
            "team_id": g.integers(1, n_teams + 1, n_art),
            "created_at": created,
            "modified_at": modified,
            "view_count": views,
            "favorite_count": favorites,
            "description": [
                f"{t} about {n.split('_')[0]} (id {i})"
                for i, n, t in zip(ids, names, types)
            ],
        }
    )

    # --- planted facts -----------------------------------------------------
    airlines_id = int(
        artifacts.loc[artifacts["dataset_name"] == "airlines", "artifact_id"].iloc[0]
    )
    # Flagship: three *tables* owned by Alex(1), named about sales. Use
    # un-bound table artifacts (skip the physical-dataset rows).
    free_tables = [
        int(artifacts["artifact_id"].iloc[p])
        for p in table_pos[len(PHYSICAL_DATASETS) :]
    ]
    flagship_ids = free_tables[:3]
    for k, aid in enumerate(flagship_ids):
        row = artifacts["artifact_id"] == aid
        artifacts.loc[row, "owner_id"] = 1
        artifacts.loc[row, "name"] = f"sales_{['pipeline', 'forecast', 'regions'][k]}"
        artifacts.loc[row, "description"] = "table about sales numbers"
    # John Doe(3): four workbooks + two visualizations created by him.
    non_flagship = artifacts[~artifacts["artifact_id"].isin(flagship_ids)]
    wb_ids = non_flagship.loc[
        non_flagship["artifact_type"] == "workbook", "artifact_id"
    ].iloc[:4].tolist()
    viz_ids = non_flagship.loc[
        non_flagship["artifact_type"] == "visualization", "artifact_id"
    ].iloc[:2].tolist()
    for aid in wb_ids + viz_ids:
        artifacts.loc[artifacts["artifact_id"] == aid, "created_by_id"] = 3
    # Ground truth is *computed* from the final corpus, not assumed from the
    # planting: randomly generated artifacts can legitimately match too
    # (e.g. a workbook whose randomly drawn creator happens to be John Doe).
    john_doe_workbooks = artifacts.loc[
        (artifacts["artifact_type"] == "workbook")
        & (artifacts["created_by_id"] == 3),
        "artifact_id",
    ].tolist()

    # --- badges ------------------------------------------------------------
    badge_rows: list[tuple[int, str, int]] = []
    # Planted: AIRLINES endorsed by Mike(2); flagship tables endorsed by Mike.
    for aid in [airlines_id, *flagship_ids]:
        badge_rows.append((aid, "endorsed", 2))
    planted_badged = {airlines_id, *flagship_ids}
    for aid in ids:
        if aid in planted_badged:
            continue
        r = g.random()
        if r < 0.10:
            badge_rows.append((int(aid), g.choice(BADGE_KINDS), int(g.integers(1, n_users + 1))))
    badges = pd.DataFrame(
        badge_rows, columns=["artifact_id", "badge", "badged_by_id"]
    )
    badges["badged_at"] = NOW - pd.to_timedelta(
        g.integers(1, 360, len(badges)), unit="D"
    )
    # Flagship-query ground truth, computed from the final corpus: tables
    # owned by Alex(1), endorsed with the badge granted by Mike(2), whose
    # name or description mentions "sales".
    endorsed_by_mike = set(
        badges.loc[
            (badges["badge"] == "endorsed") & (badges["badged_by_id"] == 2),
            "artifact_id",
        ]
    )
    flagship_truth = artifacts.loc[
        (artifacts["artifact_type"] == "table")
        & (artifacts["owner_id"] == 1)
        & (
            artifacts["name"].str.lower().str.contains("sales")
            | artifacts["description"].str.lower().str.contains("sales")
        )
        & artifacts["artifact_id"].isin(endorsed_by_mike),
        "artifact_id",
    ].tolist()

    # --- tags --------------------------------------------------------------
    tag_rows = []
    for aid, name in zip(ids, names):
        tag_rows.append((int(aid), name.split("_")[0].lower()))
        if g.random() < 0.3:
            tag_rows.append((int(aid), str(g.choice(_SUBJECTS))))
    tags = pd.DataFrame(tag_rows, columns=["artifact_id", "tag"]).drop_duplicates()

    # --- lineage: table -> visualization -> workbook -> dashboard ----------
    by_type = {t: artifacts.loc[artifacts["artifact_type"] == t, "artifact_id"].to_numpy() for t in ARTIFACT_TYPES}
    edges: list[tuple[int, int]] = []
    for child_t, parent_t in [
        ("visualization", "table"),
        ("workbook", "visualization"),
        ("dashboard", "workbook"),
    ]:
        parents, children = by_type[parent_t], by_type[child_t]
        if len(parents) == 0 or len(children) == 0:
            continue
        for c in children:
            for p in g.choice(parents, size=min(len(parents), int(g.integers(1, 3))), replace=False):
                edges.append((int(p), int(c)))
    lineage = pd.DataFrame(sorted(set(edges)), columns=["parent_id", "child_id"])

    return Corpus(
        users=users,
        teams=teams,
        artifacts=artifacts,
        badges=badges,
        tags=tags,
        lineage=lineage,
        flagship_ids=sorted(int(x) for x in flagship_truth),
        airlines_id=airlines_id,
        john_doe_workbook_ids=sorted(int(x) for x in john_doe_workbooks),
    )
