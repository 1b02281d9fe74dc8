"""Materialize the synthetic data lake on the local filesystem.

Layout written under a root directory::

    <root>/datasets/<name>/   one Parquet dataset per physical table
    <root>/metadata/<frame>/  corpus frames (users, teams, artifacts, ...)

Physical datasets are the TPC-H-lite tables from :mod:`repro.synth_data`,
the airline schema (planted for the paper's Task 1), and two *sliced*
datasets (``orders_na``, ``customer_gold``) whose key columns are strict
subsets of their source tables — planted high-containment edges for the
joinability provider's ground truth.

The writer is the only component that touches the filesystem layout; the
catalog side reads it back either with plain DataFrame scans or through the
``humboldt_metadata`` Python DataSource (:mod:`repro.catalog.datasource`).
"""
from __future__ import annotations

import os

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro import synth_data
from repro.lake.corpus import Corpus, build_corpus

#: Planted PK-FK edges between physical datasets — a known-true subset of
#: the joinability ground truth, used for sanity checks in tests.
PLANTED_JOIN_EDGES = [
    (("lineitem", "l_orderkey"), ("orders", "o_orderkey")),
    (("lineitem", "l_partkey"), ("part", "p_partkey")),
    (("orders", "o_custkey"), ("customer", "c_custkey")),
    (("flights", "airline_id"), ("airlines", "airline_id")),
    (("flights", "origin"), ("airports", "airport_code")),
    (("flights", "dest"), ("airports", "airport_code")),
    (("orders_na", "o_orderkey"), ("orders", "o_orderkey")),
    (("orders_na", "o_custkey"), ("customer", "c_custkey")),
    (("customer_gold", "c_custkey"), ("customer", "c_custkey")),
]

CORPUS_FRAMES = ("users", "teams", "artifacts", "badges", "tags", "lineage")


def physical_datasets(
    spark: SparkSession, *, sf: float = 0.01, seed: int = 0
) -> dict[str, DataFrame]:
    """Build every physical dataset as a DataFrame (nothing written yet)."""
    li = synth_data.lineitem(spark, sf=sf, seed=seed)
    orders = synth_data.orders(spark, sf=sf, seed=seed + 1)
    customer = synth_data.customer(spark, sf=sf, seed=seed + 2)
    part = synth_data.part(spark, sf=sf, seed=seed + 5)
    out = {
        "lineitem": li,
        "orders": orders,
        "customer": customer,
        "part": part,
        "airlines": synth_data.airlines(spark),
        "airports": synth_data.airports(spark),
        "flights": synth_data.flights(spark, sf=sf),
        # Slices: key columns are subsets of the source keys (containment 1.0).
        "orders_na": orders.where(F.col("o_orderkey") % 7 == 0),
        "customer_gold": customer.where(F.col("c_acctbal") > 5000),
    }
    return out


def dataset_path(root: str, name: str) -> str:
    return os.path.join(root, "datasets", name)


def metadata_path(root: str, frame: str) -> str:
    return os.path.join(root, "metadata", frame)


def write_lake(
    spark: SparkSession, root: str, *, sf: float = 0.01, seed: int = 0
) -> Corpus:
    """Write datasets + corpus metadata under ``root``; returns the corpus.

    Idempotent (``overwrite`` mode); deterministic in ``(sf, seed)``.
    """
    for name, df in physical_datasets(spark, sf=sf, seed=seed).items():
        df.write.mode("overwrite").parquet(dataset_path(root, name))
    corpus = build_corpus(sf=sf, seed=seed + 7)
    for frame, df in corpus.to_spark(spark).items():
        df.write.mode("overwrite").parquet(metadata_path(root, frame))
    return corpus


def read_dataset(spark: SparkSession, root: str, name: str) -> DataFrame:
    """Read one physical dataset back from the lake."""
    return spark.read.parquet(dataset_path(root, name))


def read_metadata(spark: SparkSession, root: str, frame: str) -> DataFrame:
    """Read one corpus metadata frame back from the lake."""
    return spark.read.parquet(metadata_path(root, frame))


def list_datasets(root: str) -> list[str]:
    """Dataset names present in the lake (sorted, filesystem-derived)."""
    base = os.path.join(root, "datasets")
    if not os.path.isdir(base):
        return []
    return sorted(
        d for d in os.listdir(base) if os.path.isdir(os.path.join(base, d))
    )
