"""Metadata catalog assembly: DataFrame scans over the lake -> one catalog.

The catalog is the backend every Humboldt metadata provider queries. It is
built entirely with DataFrame scans:

* corpus frames (users/teams/artifacts/badges/tags/lineage) are read back
  from the lake's Parquet metadata directory;
* physical dataset metadata comes through the ``humboldt_metadata`` Python
  DataSource (schemas, row counts, sizes — no data pages read);
* the *enriched artifact* frame joins owner/creator/team names and derives
  recency, so search predicates compile to plain Catalyst filters over a
  single cached frame whenever possible.

Column profiles (MinHash) are optional — they require a data scan pass, so
callers opt in via ``with_profiles=True``.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.catalog import profiles as profiling
from repro.catalog.datasource import read_lake_metadata
from repro.lake import writer
from repro.lake.corpus import NOW


@dataclass
class Catalog:
    """All catalog frames (Spark DataFrames), enrichment applied."""

    spark: SparkSession
    lake_root: str
    users: DataFrame
    teams: DataFrame
    artifacts: DataFrame  # enriched: owner/creator/team names, recency_days
    badges: DataFrame  # (artifact_id, badge, badged_by_id, badged_by, badged_at)
    tags: DataFrame
    lineage: DataFrame
    dataset_meta: DataFrame  # from the humboldt_metadata DataSource
    column_profiles: DataFrame | None = None

    def artifact_ids(self) -> DataFrame:
        """All artifact ids (one column, ``artifact_id``)."""
        return self.artifacts.select("artifact_id")

    def dataset_level_meta(self) -> DataFrame:
        """Dataset-level rollup of the per-column metadata frame."""
        return self.dataset_meta.groupBy("dataset", "path").agg(
            F.first("n_files").alias("n_files"),
            F.first("n_rows").alias("n_rows"),
            F.first("size_bytes").alias("size_bytes"),
            F.count("*").alias("n_cols"),
        )


def _enrich_artifacts(
    artifacts: DataFrame, users: DataFrame, teams: DataFrame
) -> DataFrame:
    """Join display names and derive recency; keeps one row per artifact."""
    owners = users.select(
        F.col("user_id").alias("owner_id"), F.col("user_name").alias("owner_name")
    )
    creators = users.select(
        F.col("user_id").alias("created_by_id"),
        F.col("user_name").alias("created_by_name"),
    )
    team_names = teams.select("team_id", "team_name")
    return (
        artifacts.join(owners, "owner_id", "left")
        .join(creators, "created_by_id", "left")
        .join(team_names, "team_id", "left")
        .withColumn(
            "recency_days",
            F.datediff(F.lit(NOW.date()), F.col("modified_at").cast("date")),
        )
    )


def build_catalog(
    spark: SparkSession,
    lake_root: str,
    *,
    with_profiles: bool = False,
    minhash_k: int = profiling.DEFAULT_K,
    cache: bool = True,
) -> Catalog:
    """Scan the lake and assemble the catalog.

    ``cache=True`` persists the enriched artifact frame (every search/view
    touches it); profiles add one scan per physical dataset.
    """
    users = writer.read_metadata(spark, lake_root, "users")
    teams = writer.read_metadata(spark, lake_root, "teams")
    artifacts = _enrich_artifacts(
        writer.read_metadata(spark, lake_root, "artifacts"), users, teams
    )
    badges = writer.read_metadata(spark, lake_root, "badges").join(
        users.select(
            F.col("user_id").alias("badged_by_id"),
            F.col("user_name").alias("badged_by"),
        ),
        "badged_by_id",
        "left",
    )
    tags = writer.read_metadata(spark, lake_root, "tags")
    lineage = writer.read_metadata(spark, lake_root, "lineage")
    dataset_meta = read_lake_metadata(spark, lake_root)
    if cache:
        artifacts = artifacts.cache()
        badges = badges.cache()
        tags = tags.cache()
        lineage = lineage.cache()
        dataset_meta = dataset_meta.cache()
    column_profiles = None
    if with_profiles:
        column_profiles = profiling.profile_columns(spark, lake_root, k=minhash_k)
        if cache:
            column_profiles = column_profiles.cache()
    return Catalog(
        spark=spark,
        lake_root=lake_root,
        users=users,
        teams=teams,
        artifacts=artifacts,
        badges=badges,
        tags=tags,
        lineage=lineage,
        dataset_meta=dataset_meta,
        column_profiles=column_profiles,
    )
