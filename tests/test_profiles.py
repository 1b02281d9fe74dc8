"""Tests for MinHash column profiling and joinability estimation."""
import pytest
from pyspark.sql import functions as F

from repro.catalog import profiles
from repro.lake import writer
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def prof(catalog):
    return catalog.column_profiles


@pytest.fixture(scope="module")
def exact(spark, lake_root):
    """Exact containment over the small-dataset subset (fast)."""
    return profiles.exact_containment(
        spark,
        lake_root,
        datasets=["airlines", "airports", "flights", "customer", "customer_gold", "orders_na"],
    ).cache()


class TestProfiles:
    def test_signature_length(self, prof):
        bad = prof.where(F.size("minhash") != profiles.DEFAULT_K).count()
        assert bad == 0

    def test_every_joinable_column_profiled(self, spark, lake_root, prof):
        fl = writer.read_dataset(spark, lake_root, "flights")
        profiled = {
            r["column"]
            for r in prof.where(F.col("dataset") == "flights").collect()
        }
        assert {"flight_id", "airline_id", "origin", "dest"} <= profiled
        assert profiled <= set(fl.columns)

    def test_distinct_counts_close_to_truth(self, spark, lake_root, prof):
        truth = (
            writer.read_dataset(spark, lake_root, "airlines")
            .select(F.countDistinct("airline_id"))
            .first()[0]
        )
        est = (
            prof.where(
                (F.col("dataset") == "airlines") & (F.col("column") == "airline_id")
            )
            .first()["n_distinct"]
        )
        assert abs(est - truth) / truth < 0.15

    def test_profiles_deterministic(self, spark, lake_root):
        a = profiles.profile_columns(spark, lake_root, datasets=["airlines"]).collect()
        b = profiles.profile_columns(spark, lake_root, datasets=["airlines"]).collect()
        assert sorted(map(str, a)) == sorted(map(str, b))

    def test_identical_columns_have_identical_signatures(self, prof):
        """customer_gold.c_custkey subset of customer.c_custkey shares most
        minhash slots; a full copy would share all. Compare a column to
        itself across two profile runs via dataset orders/orders_na keys."""
        a = prof.where(
            (F.col("dataset") == "customer") & (F.col("column") == "c_custkey")
        ).first()["minhash"]
        b = prof.where(
            (F.col("dataset") == "customer_gold") & (F.col("column") == "c_custkey")
        ).first()["minhash"]
        overlap = sum(1 for x, y in zip(a, b) if x == y) / len(a)
        # |gold|/|customer| ~ 0.4 -> Jaccard ~ 0.4 expected, far above noise.
        assert overlap > 0.15


class TestEstimatedJoinability:
    def test_planted_subset_edge_found(self, prof):
        est = profiles.estimate_joinability(prof, threshold=0.5)
        rows = est.where(
            (F.col("src_dataset") == "orders_na")
            & (F.col("src_column") == "o_orderkey")
            & (F.col("dst_dataset") == "orders")
            & (F.col("dst_column") == "o_orderkey")
        ).collect()
        assert rows, "orders_na.o_orderkey ⊆ orders.o_orderkey must be estimated"
        assert rows[0]["containment_est"] > 0.8

    def test_planted_fk_edge_found(self, prof):
        est = profiles.estimate_joinability(prof, threshold=0.5)
        rows = est.where(
            (F.col("src_dataset") == "flights")
            & (F.col("src_column") == "airline_id")
            & (F.col("dst_dataset") == "airlines")
        ).collect()
        assert any(r["dst_column"] == "airline_id" for r in rows)

    def test_no_same_dataset_edges(self, prof):
        est = profiles.estimate_joinability(prof, threshold=0.0)
        assert est.where(F.col("src_dataset") == F.col("dst_dataset")).count() == 0

    def test_type_compatibility_respected(self, prof):
        est = profiles.estimate_joinability(prof, threshold=0.0)
        joined = est.join(
            prof.select(
                F.col("dataset").alias("src_dataset"),
                F.col("column").alias("src_column"),
                F.col("dtype").alias("src_dtype"),
            ),
            ["src_dataset", "src_column"],
        ).join(
            prof.select(
                F.col("dataset").alias("dst_dataset"),
                F.col("column").alias("dst_column"),
                F.col("dtype").alias("dst_dtype"),
            ),
            ["dst_dataset", "dst_column"],
        )
        assert joined.where(F.col("src_dtype") != F.col("dst_dtype")).count() == 0

    def test_threshold_monotone(self, prof):
        lo = profiles.estimate_joinability(prof, threshold=0.3).count()
        hi = profiles.estimate_joinability(prof, threshold=0.9).count()
        assert hi <= lo


class TestExactContainment:
    def test_subset_has_containment_one(self, exact):
        row = exact.where(
            (F.col("src_dataset") == "customer_gold")
            & (F.col("src_column") == "c_custkey")
            & (F.col("dst_dataset") == "customer")
            & (F.col("dst_column") == "c_custkey")
        ).first()
        assert row is not None and row["containment"] == pytest.approx(1.0)

    def test_fk_containment_high(self, exact):
        row = exact.where(
            (F.col("src_dataset") == "flights")
            & (F.col("src_column") == "origin")
            & (F.col("dst_dataset") == "airports")
            & (F.col("dst_column") == "airport_code")
        ).first()
        assert row is not None and row["containment"] == pytest.approx(1.0)

    def test_exact_containment_vs_oracle(self, spark, lake_root, exact):
        """Spot-check the all-pairs self-join against a direct DuckDB query."""
        fl = writer.read_dataset(spark, lake_root, "flights")
        al = writer.read_dataset(spark, lake_root, "airlines")
        got = exact.where(
            (F.col("src_dataset") == "flights")
            & (F.col("src_column") == "airline_id")
            & (F.col("dst_dataset") == "airlines")
            & (F.col("dst_column") == "airline_id")
        ).select(F.round("containment", 6).alias("containment"))
        assert_equivalent(
            got,
            """
            SELECT round(
              (SELECT count(DISTINCT f.airline_id) FROM flights f
                WHERE f.airline_id IN (SELECT airline_id FROM airlines))
              * 1.0 /
              (SELECT count(DISTINCT airline_id) FROM flights), 6
            ) AS containment
            """,
            flights=fl,
            airlines=al,
        )

    def test_estimates_track_exact_on_planted_edges(self, exact, prof):
        """MinHash containment within 0.15 of exact on the planted PK-FK
        edges (accuracy on arbitrary coincidental integer overlaps is noisy
        by design — that is measured, not asserted, in experiment E5)."""
        small = {"airlines", "airports", "flights", "customer", "customer_gold", "orders_na"}
        est = profiles.estimate_joinability(prof, threshold=0.0)
        for (src_ds, src_col), (dst_ds, dst_col) in writer.PLANTED_JOIN_EDGES:
            if src_ds not in small or dst_ds not in small:
                continue
            sel = (
                (F.col("src_dataset") == src_ds)
                & (F.col("src_column") == src_col)
                & (F.col("dst_dataset") == dst_ds)
                & (F.col("dst_column") == dst_col)
            )
            e = est.where(sel).first()
            x = exact.where(sel).first()
            assert e is not None and x is not None, (src_ds, src_col, dst_ds, dst_col)
            assert abs(e["containment_est"] - x["containment"]) <= 0.15
