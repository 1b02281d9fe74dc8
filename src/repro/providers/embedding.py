"""Embedding provider: the ``embedding`` representation (paper §6.2).

"The embedding view ... expects the x and y coordinates to be included in
the data artifacts metadata." We compute those coordinates from the corpus
itself: TF-IDF vectors over name/description terms (tokenization, term
frequencies and document frequencies are all Spark aggregations), then a
2-D PCA of the — by then small — artifact x term matrix on the driver.
Deterministic: SVD sign is fixed so repeated builds give identical layouts.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.catalog.builder import Catalog
from repro.providers.base import FetchResult, MetadataProvider

MIN_TOKEN_LEN = 3


def _tfidf_triplets(artifacts: DataFrame) -> DataFrame:
    """(artifact_id, token, tfidf) from name+description, all in Spark."""
    tokens = (
        artifacts.select(
            "artifact_id",
            F.explode(
                F.split(
                    F.lower(F.concat_ws(" ", F.col("name"), F.col("description"))),
                    "[^a-z]+",
                )
            ).alias("token"),
        )
        .where(F.length("token") >= MIN_TOKEN_LEN)
    )
    tf = tokens.groupBy("artifact_id", "token").agg(F.count("*").alias("tf"))
    n_docs = artifacts.count()
    df_t = tf.groupBy("token").agg(F.countDistinct("artifact_id").alias("df"))
    return (
        tf.join(df_t, "token")
        .select(
            "artifact_id",
            "token",
            (F.col("tf") * F.log(F.lit(float(n_docs)) / F.col("df"))).alias("tfidf"),
        )
    )


def compute_embedding(artifacts: DataFrame) -> list[tuple[int, float, float]]:
    """2-D PCA coordinates per artifact (deterministic)."""
    trip = _tfidf_triplets(artifacts).collect()
    if not trip:
        return []
    ids = sorted({r["artifact_id"] for r in trip})
    toks = sorted({r["token"] for r in trip})
    id_ix = {a: i for i, a in enumerate(ids)}
    tok_ix = {t: i for i, t in enumerate(toks)}
    m = np.zeros((len(ids), len(toks)))
    for r in trip:
        m[id_ix[r["artifact_id"]], tok_ix[r["token"]]] = r["tfidf"]
    m -= m.mean(axis=0, keepdims=True)
    # Top-2 principal components via SVD; fix the sign convention so that
    # the largest-magnitude loading of each component is positive.
    u, s, vt = np.linalg.svd(m, full_matrices=False)
    coords = u[:, :2] * s[:2]
    for j in range(min(2, coords.shape[1])):
        lead = vt[j, np.argmax(np.abs(vt[j]))]
        if lead < 0:
            coords[:, j] *= -1
    if coords.shape[1] < 2:  # degenerate vocab: pad y with zeros
        coords = np.pad(coords, ((0, 0), (0, 2 - coords.shape[1])))
    return [
        (int(a), float(coords[i, 0]), float(coords[i, 1]))
        for a, i in id_ix.items()
    ]


class EmbeddingProvider(MetadataProvider):
    """Artifacts with 2-D positional metadata (x, y)."""

    def _fetch(self, catalog: Catalog, inputs: dict) -> FetchResult:
        rows = compute_embedding(catalog.artifacts)
        coords = catalog.spark.createDataFrame(
            rows, "artifact_id bigint, x double, y double"
        )
        items = catalog.artifacts.join(coords, "artifact_id", "inner")
        return FetchResult(items=items)
