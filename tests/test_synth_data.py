"""Tests for the synthetic dataset generators (provided + extensions)."""
import pandas as pd
import pytest

from repro import synth_data


class TestTpchLite:
    def test_lineitem_rows_scale_with_sf(self, spark):
        assert synth_data.lineitem(spark, sf=0.001).count() == 6_000
        assert synth_data.lineitem(spark, sf=0.002).count() == 12_000

    def test_orders_keys_are_dense(self, spark):
        o = synth_data.orders(spark, sf=0.001).toPandas()
        assert sorted(o["o_orderkey"]) == list(range(1, len(o) + 1))

    def test_lineitem_deterministic_in_seed(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_lineitem_differs_across_seeds(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=1).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=2).toPandas()
        assert not a.equals(b)

    def test_lineitem_fk_range_within_orders(self, spark):
        li = synth_data.lineitem(spark, sf=0.001).toPandas()
        n_orders = synth_data.orders(spark, sf=0.001).count()
        assert li["l_orderkey"].between(1, n_orders).all()

    def test_customer_segments(self, spark):
        c = synth_data.customer(spark, sf=0.001).toPandas()
        assert set(c["c_mktsegment"]) <= {
            "BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE",
        }

    def test_part_keys_dense(self, spark):
        p = synth_data.part(spark, sf=0.001).toPandas()
        assert sorted(p["p_partkey"]) == list(range(1, len(p) + 1))


class TestKeyGenerators:
    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=1000).toPandas()
        top = df["k"].value_counts(normalize=True).iloc[0]
        assert top > 0.05  # rank-1 key dominates under alpha=1.1

    def test_uniform_no_extreme_skew(self, spark):
        df = synth_data.uniform_keys(spark, n=20_000, n_keys=1000).toPandas()
        top = df["k"].value_counts(normalize=True).iloc[0]
        assert top < 0.01

    def test_key_ranges(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert df["k"].between(1, 50).all()


class TestAirlineSchema:
    def test_airlines_shape(self):
        a = synth_data.airlines_pdf()
        assert len(a) == 40
        assert list(a["airline_id"]) == list(range(1, 41))

    def test_airports_codes_unique(self):
        ap = synth_data.airports_pdf()
        assert ap["airport_code"].is_unique

    def test_flights_fks_resolve(self):
        f = synth_data.flights_pdf(sf=0.01)
        airlines = set(synth_data.airlines_pdf()["airline_id"])
        airports = set(synth_data.airports_pdf()["airport_code"])
        assert set(f["airline_id"]) <= airlines
        assert set(f["origin"]) <= airports
        assert set(f["dest"]) <= airports

    def test_flights_scale(self):
        assert len(synth_data.flights_pdf(sf=0.01)) == 4000
        assert len(synth_data.flights_pdf(sf=0.02)) == 8000

    def test_flights_deterministic(self):
        a = synth_data.flights_pdf(sf=0.005)
        b = synth_data.flights_pdf(sf=0.005)
        pd.testing.assert_frame_equal(a, b)

    @pytest.mark.parametrize("fn", ["airlines", "airports", "flights"])
    def test_spark_wrappers_match_pandas(self, spark, fn):
        spark_df = getattr(synth_data, fn)(spark)
        pdf = getattr(synth_data, f"{fn}_pdf")()
        assert spark_df.count() == len(pdf)
        assert spark_df.columns == list(pdf.columns)
