"""Lineage provider: the ``hierarchy`` representation (paper §6.2).

Surfaces the one-to-many "used by" relationships planted in the corpus
(table -> visualization -> workbook -> dashboard). Depths are computed by
iterative frontier joins over the edge frame — "traversing hierarchies of
arbitrary depths" (paper) — with a cycle-guard depth cap.

With a ``root`` input, the hierarchy is the descendant tree of that
artifact; without it, the forest starts from all roots (artifacts with no
incoming edge).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.catalog.builder import Catalog
from repro.providers.base import FetchResult, MetadataProvider

MAX_DEPTH = 16


def descendant_edges(
    lineage: DataFrame, frontier_ids: DataFrame, *, max_depth: int = MAX_DEPTH
) -> DataFrame:
    """BFS from ``frontier_ids`` (one ``artifact_id`` column); returns
    ``(parent_id, child_id, depth)`` with depth 1 at the frontier's children.
    """
    frontier = frontier_ids.select(F.col("artifact_id").alias("parent_id")).distinct()
    levels: list[DataFrame] = []
    for depth in range(1, max_depth + 1):
        step = (
            lineage.join(frontier, "parent_id", "inner")
            .select("parent_id", "child_id")
            .distinct()
            .withColumn("depth", F.lit(depth))
        )
        step = step.cache()
        if step.isEmpty():
            step.unpersist()
            break
        levels.append(step)
        frontier = step.select(F.col("child_id").alias("parent_id")).distinct()
    if not levels:
        return lineage.select("parent_id", "child_id").withColumn(
            "depth", F.lit(1)
        ).limit(0)
    out = levels[0]
    for lv in levels[1:]:
        out = out.unionByName(lv)
    # A node reachable along two paths keeps its shortest depth.
    return out.groupBy("parent_id", "child_id").agg(F.min("depth").alias("depth"))


class LineageProvider(MetadataProvider):
    """Hierarchy of downstream artifacts from a root (or from all roots)."""

    def _fetch(self, catalog: Catalog, inputs: dict) -> FetchResult:
        if "root" in inputs and inputs["root"] is not None:
            frontier = catalog.spark.createDataFrame(
                [(int(inputs["root"]),)], "artifact_id bigint"
            )
        else:
            # Roots: artifacts never appearing as a child.
            frontier = (
                catalog.lineage.select(F.col("parent_id").alias("artifact_id"))
                .distinct()
                .join(
                    catalog.lineage.select(
                        F.col("child_id").alias("artifact_id")
                    ).distinct(),
                    "artifact_id",
                    "left_anti",
                )
            )
        edges = descendant_edges(catalog.lineage, frontier)
        node_ids = (
            frontier.select("artifact_id")
            .unionByName(edges.select(F.col("child_id").alias("artifact_id")))
            .unionByName(edges.select(F.col("parent_id").alias("artifact_id")))
            .distinct()
        )
        items = catalog.artifacts.join(node_ids, "artifact_id", "inner")
        return FetchResult(items=items, edges=edges)
