"""Tests for the ``humboldt_metadata`` Python DataSource."""
import pytest
from pyspark.sql import functions as F

from repro.catalog.datasource import (
    METADATA_SCHEMA,
    read_lake_metadata,
    register_datasource,
)
from repro.lake import writer
from repro.lake.corpus import PHYSICAL_DATASETS


@pytest.fixture(scope="module")
def meta(spark, lake_root):
    return read_lake_metadata(spark, lake_root).cache()


class TestRegistration:
    def test_register_idempotent(self, spark):
        register_datasource(spark)
        register_datasource(spark)

    def test_format_usable_directly(self, spark, lake_root):
        register_datasource(spark)
        df = spark.read.format("humboldt_metadata").load(lake_root)
        assert df.schema == METADATA_SCHEMA


class TestExtraction:
    def test_one_partition_per_dataset(self, meta):
        got = {r["dataset"] for r in meta.select("dataset").distinct().collect()}
        assert got == set(PHYSICAL_DATASETS)

    def test_row_counts_match_actual_data(self, spark, lake_root, meta):
        for name in ("airlines", "orders", "customer_gold"):
            reported = (
                meta.where(F.col("dataset") == name)
                .select("n_rows")
                .first()["n_rows"]
            )
            actual = writer.read_dataset(spark, lake_root, name).count()
            assert reported == actual, name

    def test_columns_match_actual_schema(self, spark, lake_root, meta):
        for name in ("flights", "part"):
            reported = [
                r["column_name"]
                for r in meta.where(F.col("dataset") == name)
                .orderBy("column_index")
                .collect()
            ]
            actual = writer.read_dataset(spark, lake_root, name).columns
            assert reported == actual, name

    def test_size_bytes_positive(self, meta):
        assert meta.where(F.col("size_bytes") <= 0).count() == 0

    def test_file_counts_positive(self, meta):
        assert meta.where(F.col("n_files") <= 0).count() == 0

    def test_column_types_are_arrow_names(self, meta):
        types = {r["column_type"] for r in meta.select("column_type").distinct().collect()}
        assert types <= {
            "int64", "double", "string", "large_string",
            "timestamp[ns]", "timestamp[us]", "date32[day]",
        }

    def test_metadata_is_queryable_with_sql(self, spark, meta):
        meta.createOrReplaceTempView("lake_meta")
        biggest = spark.sql(
            """
            SELECT dataset FROM lake_meta
            GROUP BY dataset ORDER BY first(n_rows) DESC LIMIT 1
            """
        ).first()["dataset"]
        assert biggest == "lineitem"


class TestErrors:
    def test_missing_path_option(self, spark):
        register_datasource(spark)
        # Reader construction is lazy; the error surfaces at action time.
        with pytest.raises(Exception, match="lake_root"):
            spark.read.format("humboldt_metadata").load().collect()

    def test_non_lake_directory(self, spark, tmp_path):
        register_datasource(spark)
        df = spark.read.format("humboldt_metadata").load(str(tmp_path))
        with pytest.raises(Exception, match="datasets"):
            df.collect()
