"""Shared helpers for the ``jobs/`` spark-submit entrypoints.

Jobs create their own session (they run standalone under spark-submit);
tests use the ``spark`` fixture instead — job *logic* lives in library
functions that take a SparkSession, per the repo's layering rule.
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_session(app: str) -> SparkSession:
    """Session with the same per-session configs the test fixture uses."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def ensure_lake(spark: SparkSession, root: str, *, sf: float, seed: int = 0):
    """Write the lake at ``root`` if absent; returns the corpus either way.

    The corpus generator is deterministic, so rebuilding the corpus object
    for an existing lake gives exactly the frames that were written.
    """
    from repro.lake.corpus import build_corpus, n_artifacts_for_sf
    from repro.lake.writer import list_datasets, read_metadata, write_lake

    if list_datasets(root):
        corpus = build_corpus(sf=sf, seed=seed + 7)
        on_disk = read_metadata(spark, root, "artifacts").count()
        if on_disk != n_artifacts_for_sf(sf):
            raise ValueError(
                f"lake at {root} holds {on_disk} artifacts but SF={sf} implies "
                f"{n_artifacts_for_sf(sf)} — it was written at a different "
                "scale factor; pass a fresh --lake directory"
            )
        return corpus
    return write_lake(spark, root, sf=sf, seed=seed)


def print_table(title: str, rows: list[dict]) -> None:
    """Render a list of dicts as an aligned text table."""
    print(f"\n== {title} ==")
    if not rows:
        print("(empty)")
        return
    cols = list(rows[0].keys())
    widths = {
        c: max(len(str(c)), *(len(str(r.get(c, ""))) for r in rows)) for c in cols
    }
    print("  ".join(str(c).ljust(widths[c]) for c in cols))
    print("  ".join("-" * widths[c] for c in cols))
    for r in rows:
        print("  ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols))
