"""Joinability provider: the ``graph`` representation (paper Figures 2–3).

"This metadata provider requires a table as input and returns a graph
representation of joinability for the input table." The backing computation
is the MinHash column-profile pipeline (:mod:`repro.catalog.profiles`); this
provider turns the estimated column-level containment edges incident to the
input table into an artifact-level graph: nodes are the table artifacts
bound to physical datasets, edge weight is the best containment estimate
between any column pair of the two datasets.
"""
from __future__ import annotations

from pyspark.sql import functions as F

from repro.catalog.builder import Catalog
from repro.catalog.profiles import DEFAULT_K, estimate_joinability
from repro.providers.base import FetchResult, MetadataProvider, ProviderInputError

DEFAULT_THRESHOLD = 0.5


class JoinableProvider(MetadataProvider):
    """Graph of tables joinable with the required ``table`` input."""

    def __init__(self, spec, *, threshold: float = DEFAULT_THRESHOLD, k: int = DEFAULT_K):
        super().__init__(spec)
        self.threshold = threshold
        self.k = k

    def _fetch(self, catalog: Catalog, inputs: dict) -> FetchResult:
        if catalog.column_profiles is None:
            raise ProviderInputError(
                "joinable provider needs column profiles; build the catalog "
                "with with_profiles=True"
            )
        table = str(inputs["table"])
        est = estimate_joinability(
            catalog.column_profiles, threshold=self.threshold, k=self.k
        )
        incident = est.where(
            (F.col("src_dataset") == table) | (F.col("dst_dataset") == table)
        )
        # Best containment between any column pair of each dataset pair.
        ds_edges = incident.groupBy("src_dataset", "dst_dataset").agg(
            F.max("containment_est").alias("weight")
        )
        # Map dataset names to the table artifacts bound to them.
        art = catalog.artifacts.where(F.col("dataset_name").isNotNull()).select(
            "artifact_id", "dataset_name"
        )
        edges = (
            ds_edges.join(
                art.select(
                    F.col("dataset_name").alias("src_dataset"),
                    F.col("artifact_id").alias("src_id"),
                ),
                "src_dataset",
            )
            .join(
                art.select(
                    F.col("dataset_name").alias("dst_dataset"),
                    F.col("artifact_id").alias("dst_id"),
                ),
                "dst_dataset",
            )
            .select("src_id", "dst_id", "weight")
        )
        node_ids = (
            edges.select(F.col("src_id").alias("artifact_id"))
            .unionByName(edges.select(F.col("dst_id").alias("artifact_id")))
            .distinct()
        )
        items = catalog.artifacts.join(node_ids, "artifact_id", "inner")
        return FetchResult(
            items=items, edges=edges, meta={"table": table, "threshold": self.threshold}
        )
