"""``humboldt_metadata`` — a custom Python DataSource for metadata extraction.

The paper's metadata providers sit behind endpoints that expose *metadata
about datasets* rather than the data itself. We reproduce that extraction
path with PySpark 4's Python DataSource API (the user-facing successor to
DataSourceV2 for Python): registering :class:`HumboldtMetadataDataSource`
lets the catalog builder run

    spark.read.format("humboldt_metadata").load(lake_root)

and get back one row per ``(dataset, column)`` with physical metadata
(row counts, byte sizes, file counts, column names/types) read from Parquet
footers via pyarrow — without scanning any data pages. Partition planning is
one :class:`~pyspark.sql.datasource.InputPartition` per dataset directory, so
extraction parallelizes across executors like any other scan.
"""
from __future__ import annotations

import os
from typing import Iterator

from pyspark.sql import SparkSession
from pyspark.sql.datasource import DataSource, DataSourceReader, InputPartition
from pyspark.sql.types import (
    IntegerType,
    LongType,
    StringType,
    StructField,
    StructType,
)

#: Output schema: one row per (dataset, column).
METADATA_SCHEMA = StructType(
    [
        StructField("dataset", StringType(), False),
        StructField("path", StringType(), False),
        StructField("n_files", IntegerType(), False),
        StructField("n_rows", LongType(), False),
        StructField("size_bytes", LongType(), False),
        StructField("column_name", StringType(), False),
        StructField("column_type", StringType(), False),
        StructField("column_index", IntegerType(), False),
    ]
)


class _DatasetPartition(InputPartition):
    """One partition per dataset directory under ``<root>/datasets``."""

    def __init__(self, name: str, path: str):
        self.name = name
        self.path = path


class HumboldtMetadataReader(DataSourceReader):
    """Reads Parquet footers of each dataset and yields metadata rows."""

    def __init__(self, options: dict):
        path = options.get("path")
        if not path:
            raise ValueError("humboldt_metadata requires .load(<lake_root>)")
        self.root = path

    def partitions(self) -> list[InputPartition]:
        base = os.path.join(self.root, "datasets")
        if not os.path.isdir(base):
            raise FileNotFoundError(f"not a Humboldt lake (no datasets/): {self.root}")
        return [
            _DatasetPartition(d, os.path.join(base, d))
            for d in sorted(os.listdir(base))
            if os.path.isdir(os.path.join(base, d))
        ]

    def read(self, partition: _DatasetPartition) -> Iterator[tuple]:
        # Imported inside read() so the executor-side pickle stays light.
        import pyarrow.parquet as pq

        files = sorted(
            os.path.join(partition.path, f)
            for f in os.listdir(partition.path)
            if f.endswith(".parquet")
        )
        n_rows = 0
        size_bytes = 0
        schema = None
        for f in files:
            md = pq.read_metadata(f)
            n_rows += md.num_rows
            size_bytes += os.path.getsize(f)
            if schema is None:
                schema = pq.read_schema(f)
        if schema is None:
            return
        for i, fld in enumerate(schema):
            yield (
                partition.name,
                partition.path,
                len(files),
                n_rows,
                size_bytes,
                fld.name,
                str(fld.type),
                i,
            )


class HumboldtMetadataDataSource(DataSource):
    """DataSource entry point; register with :func:`register_datasource`."""

    @classmethod
    def name(cls) -> str:
        return "humboldt_metadata"

    def schema(self) -> StructType:
        return METADATA_SCHEMA

    def reader(self, schema: StructType) -> DataSourceReader:
        return HumboldtMetadataReader(self.options)


def register_datasource(spark: SparkSession) -> None:
    """Idempotently register ``humboldt_metadata`` with this session."""
    spark.dataSource.register(HumboldtMetadataDataSource)


def read_lake_metadata(spark: SparkSession, lake_root: str):
    """Convenience: register + read the metadata frame for ``lake_root``."""
    register_datasource(spark)
    return spark.read.format("humboldt_metadata").load(lake_root)
