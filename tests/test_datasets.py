"""Tests for the synthetic stand-ins of the paper's four data sets."""
import numpy as np
import pandas as pd
import pytest

from repro import datasets as ds


class TestSpecs:
    def test_table1_shapes(self):
        """Table I: #Dims and #Targets per dataset (flights lists one
        target — delay — but the evaluation also uses cancellation; our
        generator carries both, see DESIGN.md)."""
        assert len(ds.ACS_SPEC.dims) == 3 and len(ds.ACS_SPEC.targets) == 6
        assert len(ds.STACKOVERFLOW_SPEC.dims) == 7
        assert len(ds.STACKOVERFLOW_SPEC.targets) == 6
        assert len(ds.FLIGHTS_SPEC.dims) == 6
        assert len(ds.PRIMARIES_SPEC.dims) == 5
        assert len(ds.PRIMARIES_SPEC.targets) == 1

    def test_registry_complete(self):
        assert set(ds.SPECS) == {"acs", "stackoverflow", "flights", "primaries"}


@pytest.mark.parametrize("name", list(ds.SPECS))
class TestGenerators:
    def test_columns_match_spec(self, name):
        spec = ds.SPECS[name]
        df = ds.load_pandas(name, sf=0.001)
        assert set(spec.dims) <= set(df.columns)
        assert set(spec.targets) <= set(df.columns)

    def test_deterministic(self, name):
        a = ds.load_pandas(name, sf=0.001)
        b = ds.load_pandas(name, sf=0.001)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_data(self, name):
        a = ds.load_pandas(name, sf=0.001, seed=100)
        b = ds.load_pandas(name, sf=0.001, seed=101)
        assert not a.equals(b)

    def test_scale_factor(self, name):
        small = len(ds.load_pandas(name, sf=0.001))
        big = len(ds.load_pandas(name, sf=0.002))
        assert big >= small * 1.5

    def test_targets_numeric_finite(self, name):
        df = ds.load_pandas(name, sf=0.001)
        for t in ds.SPECS[name].targets:
            assert np.isfinite(df[t]).all()

    def test_dims_are_low_cardinality(self, name):
        df = ds.load_pandas(name, sf=0.005)
        for d in ds.SPECS[name].dims:
            assert df[d].nunique() <= 60  # voice-friendly categorical dims


class TestStructure:
    def test_flights_season_consistent_with_month(self):
        df = ds.flights_pandas(sf=0.002)
        winter = df[df["month"].isin(["Dec", "Jan", "Feb"])]
        assert (winter["season"] == "Winter").all()

    def test_flights_winter_delays_higher(self):
        df = ds.flights_pandas(sf=0.01)
        assert (
            df[df.season == "Winter"].delay_minutes.mean()
            > df[df.season == "Fall"].delay_minutes.mean() + 5
        )

    def test_flights_cancelled_is_probability_target(self):
        df = ds.flights_pandas(sf=0.01)
        assert set(df["cancelled"].unique()) <= {0.0, 1.0}
        assert 0.01 < df["cancelled"].mean() < 0.3

    def test_flights_feb_cancellations_elevated(self):
        # the paper's Example 5 speech: "a significant increase in February"
        df = ds.flights_pandas(sf=0.02)
        assert df[df.month == "Feb"].cancelled.mean() > df.cancelled.mean()

    def test_acs_prevalence_rises_with_age(self):
        df = ds.acs_pandas(sf=0.01)
        elder = df[df.age_group == "elder"].visual_impairment.mean()
        children = df[df.age_group == "children"].visual_impairment.mean()
        assert elder > children + 10

    def test_acs_nonnegative_prevalence(self):
        df = ds.acs_pandas(sf=0.005)
        for t in ds.ACS_SPEC.targets:
            assert (df[t] >= 0).all()

    def test_stackoverflow_scores_bounded(self):
        df = ds.stackoverflow_pandas(sf=0.001)
        for t in ds.STACKOVERFLOW_SPEC.targets:
            assert df[t].between(0, 10).all()

    def test_primaries_support_bounded(self):
        df = ds.primaries_pandas(sf=0.01)
        assert df.support_pct.between(0, 100).all()

    def test_spark_roundtrip(self, spark):
        sdf = ds.load_spark(spark, "acs", sf=0.001)
        assert sdf.count() == len(ds.load_pandas("acs", sf=0.001))
        assert "visual_impairment" in sdf.columns
