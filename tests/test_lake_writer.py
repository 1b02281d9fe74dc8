"""Tests for lake materialization and read-back."""
import os

import pytest
from pyspark.sql import functions as F

from repro.lake import writer
from repro.lake.corpus import PHYSICAL_DATASETS
from repro.oracle import assert_equivalent


class TestLayout:
    def test_all_datasets_written(self, lake_root):
        assert writer.list_datasets(lake_root) == sorted(PHYSICAL_DATASETS)

    def test_metadata_frames_written(self, lake_root):
        for frame in writer.CORPUS_FRAMES:
            assert os.path.isdir(writer.metadata_path(lake_root, frame))

    def test_list_datasets_empty_for_non_lake(self, tmp_path):
        assert writer.list_datasets(str(tmp_path)) == []


class TestRoundTrip:
    def test_corpus_roundtrip_counts(self, spark, lake_root, corpus):
        for frame in writer.CORPUS_FRAMES:
            df = writer.read_metadata(spark, lake_root, frame)
            assert df.count() == len(getattr(corpus, frame))

    def test_artifact_roundtrip_content(self, spark, lake_root, corpus):
        got = (
            writer.read_metadata(spark, lake_root, "artifacts")
            .orderBy("artifact_id")
            .toPandas()
        )
        assert list(got["name"]) == list(
            corpus.artifacts.sort_values("artifact_id")["name"]
        )

    @pytest.mark.parametrize("name", ["airlines", "orders", "customer_gold"])
    def test_dataset_readback(self, spark, lake_root, name):
        assert writer.read_dataset(spark, lake_root, name).count() > 0


class TestSlices:
    def test_orders_na_is_strict_subset(self, spark, lake_root):
        orders = writer.read_dataset(spark, lake_root, "orders")
        na = writer.read_dataset(spark, lake_root, "orders_na")
        assert 0 < na.count() < orders.count()
        # Every slice key exists in the source (containment 1.0).
        missing = na.join(orders, "o_orderkey", "left_anti").count()
        assert missing == 0

    def test_orders_na_predicate(self, spark, lake_root):
        na = writer.read_dataset(spark, lake_root, "orders_na")
        assert na.where(F.col("o_orderkey") % 7 != 0).count() == 0

    def test_customer_gold_predicate(self, spark, lake_root):
        gold = writer.read_dataset(spark, lake_root, "customer_gold")
        assert gold.where(F.col("c_acctbal") <= 5000).count() == 0

    def test_slice_join_oracle(self, spark, lake_root):
        """A join through the planted FK answers correctly vs DuckDB."""
        orders = writer.read_dataset(spark, lake_root, "orders")
        customer = writer.read_dataset(spark, lake_root, "customer_gold")
        got = (
            orders.join(customer, orders.o_custkey == customer.c_custkey)
            .groupBy("c_mktsegment")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            """
            SELECT c_mktsegment, count(*) AS n
            FROM orders JOIN customer_gold ON o_custkey = c_custkey
            GROUP BY c_mktsegment
            """,
            orders=orders,
            customer_gold=customer,
        )


class TestAirlineJoinEdges:
    def test_flights_airline_fk_resolves(self, spark, lake_root):
        fl = writer.read_dataset(spark, lake_root, "flights")
        al = writer.read_dataset(spark, lake_root, "airlines")
        assert fl.join(al, "airline_id", "left_anti").count() == 0

    def test_flights_airport_fk_resolves(self, spark, lake_root):
        fl = writer.read_dataset(spark, lake_root, "flights")
        ap = writer.read_dataset(spark, lake_root, "airports")
        orphans = fl.join(
            ap, fl.origin == ap.airport_code, "left_anti"
        ).count()
        assert orphans == 0

    def test_planted_edges_reference_real_columns(self, spark, lake_root):
        for (ds_a, col_a), (ds_b, col_b) in writer.PLANTED_JOIN_EDGES:
            a = writer.read_dataset(spark, lake_root, ds_a)
            b = writer.read_dataset(spark, lake_root, ds_b)
            assert col_a in a.columns, (ds_a, col_a)
            assert col_b in b.columns, (ds_b, col_b)
