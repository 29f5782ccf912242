"""Dataset generators and missingness injectors."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import airquality, flight, inject_missing, retailer


@pytest.fixture(scope="module")
def fl():
    return flight.generate(sf=0.002, seed=0)


@pytest.fixture(scope="module")
def rt():
    return retailer.generate(sf=0.02, seed=1)


@pytest.fixture(scope="module")
def aq():
    return airquality.generate(sf=0.01, seed=2)


class TestFlight:
    def test_tables(self, fl):
        assert set(fl.tables) == {"flights", "routes", "airlines"}
        assert len(fl.tables["flights"]) == 10_000

    def test_deterministic(self, fl):
        again = flight.generate(sf=0.002, seed=0)
        pd.testing.assert_frame_equal(fl.tables["flights"], again.tables["flights"])

    def test_seed_changes_data(self, fl):
        other = flight.generate(sf=0.002, seed=9)
        assert not fl.tables["flights"]["distance"].equals(other.tables["flights"]["distance"])

    def test_joined_covers_schema(self, fl):
        j = fl.joined()
        assert set(fl.schema.names) <= set(j.columns)
        assert len(j) == len(fl.tables["flights"])  # FK integrity, no fanout

    def test_fact_holds_most_attributes(self, fl):
        """Flight property: the fact carries most analysis attributes."""
        assert len(flight.FACT_ATTRS) / fl.schema.m > 0.6

    def test_correlations_present(self, fl):
        j = fl.joined()
        assert j["airtime"].corr(j["distance"]) > 0.9
        assert j["elapsed_time"].corr(j["airtime"]) > 0.9
        assert j["arr_delay"].corr(j["dep_delay"]) > 0.7

    def test_diverted_is_int_binary_with_signal(self, fl):
        j = fl.joined()
        assert set(j["diverted"].unique()) <= {0, 1}
        assert 0.005 < j["diverted"].mean() < 0.4
        assert j.groupby("diverted")["airtime"].mean().is_monotonic_increasing

    def test_incomplete_in_schema(self, fl):
        assert set(fl.incomplete) <= set(fl.schema.names)
        assert fl.target not in fl.incomplete


class TestRetailer:
    def test_tables(self, rt):
        assert set(rt.tables) == {"inventory", "location", "census", "item", "weather"}

    def test_narrow_fact_wide_dims(self, rt):
        """Retailer property: 1 analysis attribute in the fact, dims tiny."""
        assert retailer.FACT_ATTRS == ["inventoryunits"]
        n = len(rt.tables["inventory"])
        for dim in ("location", "census", "item", "weather"):
            assert len(rt.tables[dim]) < 0.2 * n

    def test_snowflake_join_no_fanout(self, rt):
        j = rt.joined()
        assert len(j) == len(rt.tables["inventory"])
        assert set(rt.schema.names) <= set(j.columns)

    def test_inventory_correlated_with_dims(self, rt):
        j = rt.joined()
        assert j["inventoryunits"].corr(j["population"]) > 0.3
        assert j["inventoryunits"].corr(j["maxtemp"]) > 0.1

    def test_categoricals_int_encoded(self, rt):
        j = rt.joined()
        for c in rt.schema.categorical:
            assert pd.api.types.is_integer_dtype(j[c]), c

    def test_deterministic(self, rt):
        again = retailer.generate(sf=0.02, seed=1)
        pd.testing.assert_frame_equal(rt.joined(), again.joined())


class TestAirQuality:
    def test_single_table(self, aq):
        assert list(aq.tables) == ["airquality"]
        assert aq.joined().shape[1] == 11

    def test_aqi_predictable_from_pollutants(self, aq):
        j = aq.joined()
        x = np.column_stack([np.ones(len(j))] + [j[c] for c in airquality.POLLUTANTS])
        theta, *_ = np.linalg.lstsq(x, j["aqi"], rcond=None)
        r2 = 1 - ((x @ theta - j["aqi"]) ** 2).sum() / ((j["aqi"] - j["aqi"].mean()) ** 2).sum()
        assert r2 > 0.95

    def test_all_continuous(self, aq):
        assert not aq.schema.categorical


class TestInjectMissing:
    def test_mcar_rate(self, aq):
        pdf = aq.joined()
        out, mask = inject_missing(pdf, ["pm25", "o3"], 0.2, "MCAR", seed=0)
        for c in ("pm25", "o3"):
            assert abs(mask[c].mean() - 0.2) < 0.02
            assert out[c].isna().equals(mask[c])

    def test_mcar_zero_rate(self, aq):
        out, mask = inject_missing(aq.joined(), ["pm25"], 0.0, "MCAR", seed=0)
        assert mask["pm25"].sum() == 0 and not out["pm25"].isna().any()

    def test_ground_truth_unchanged(self, aq):
        pdf = aq.joined()
        before = pdf.copy()
        inject_missing(pdf, ["pm25"], 0.3, "MCAR", seed=0)
        pd.testing.assert_frame_equal(pdf, before)

    def test_mar_depends_on_driver(self, aq):
        pdf = aq.joined()
        out, mask = inject_missing(pdf, ["pm25"], 0.2, "MAR", depends_on="aqi", seed=0)
        hi = mask["pm25"][pdf["aqi"] > pdf["aqi"].median()].mean()
        lo = mask["pm25"][pdf["aqi"] <= pdf["aqi"].median()].mean()
        assert hi > 2 * lo
        assert abs(mask["pm25"].mean() - 0.2) < 0.02

    def test_mar_requires_driver(self, aq):
        with pytest.raises(ValueError, match="depends_on"):
            inject_missing(aq.joined(), ["pm25"], 0.2, "MAR")

    def test_mar_driver_must_stay_observed(self, aq):
        with pytest.raises(ValueError, match="observed"):
            inject_missing(aq.joined(), ["pm25"], 0.2, "MAR", depends_on="pm25")

    def test_mnar_depends_on_own_values(self, aq):
        pdf = aq.joined()
        out, mask = inject_missing(pdf, ["pm25"], 0.3, "MNAR", seed=0)
        hi = mask["pm25"][pdf["pm25"] > pdf["pm25"].median()].mean()
        lo = mask["pm25"][pdf["pm25"] <= pdf["pm25"].median()].mean()
        assert hi > 2 * lo

    def test_mnar_categorical_column(self, fl):
        pdf = fl.joined()
        out, mask = inject_missing(pdf, ["diverted"], 0.2, "MNAR", seed=0)
        assert abs(mask["diverted"].mean() - 0.2) < 0.05
        assert out["diverted"].isna().sum() == mask["diverted"].sum()

    def test_integer_column_gets_na(self, fl):
        pdf = fl.joined()
        out, _ = inject_missing(pdf, ["diverted"], 0.2, "MCAR", seed=3)
        assert out["diverted"].isna().any()

    def test_high_rate(self, aq):
        _, mask = inject_missing(aq.joined(), ["pm25"], 0.8, "MCAR", seed=1)
        assert abs(mask["pm25"].mean() - 0.8) < 0.02

    def test_invalid_args(self, aq):
        with pytest.raises(ValueError):
            inject_missing(aq.joined(), ["pm25"], 1.5, "MCAR")
        with pytest.raises(ValueError):
            inject_missing(aq.joined(), ["pm25"], 0.2, "WRONG")

    def test_deterministic_in_seed(self, aq):
        pdf = aq.joined()
        _, m1 = inject_missing(pdf, ["pm25"], 0.2, "MCAR", seed=5)
        _, m2 = inject_missing(pdf, ["pm25"], 0.2, "MCAR", seed=5)
        pd.testing.assert_frame_equal(m1, m2)
