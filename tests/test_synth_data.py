"""Flights generator: determinism, schema, planted evaluation structure."""
import numpy as np
import pandas as pd

from repro.synth_data import AIRPORTS, CARRIERS, flights_pdf


class TestDeterminism:
    def test_same_seed_same_data(self):
        a = flights_pdf(sf=0.003, seed=9)
        b = flights_pdf(sf=0.003, seed=9)
        pd.testing.assert_frame_equal(a, b)

    def test_different_seed_different_data(self):
        a = flights_pdf(sf=0.003, seed=1)
        b = flights_pdf(sf=0.003, seed=2)
        assert not a["dep_delay"].equals(b["dep_delay"])

    def test_scale_factor_controls_rows(self):
        assert len(flights_pdf(sf=0.002)) == 2600
        assert len(flights_pdf(sf=0.004)) == 5200


class TestSchema:
    def test_24_columns(self, fl_pdf):
        assert fl_pdf.shape[1] == 24

    def test_mixed_types_like_paper(self, fl_pdf):
        # Numerical, categorical/text, date, and undefined values (§7).
        assert pd.api.types.is_float_dtype(fl_pdf["dep_delay"])
        assert fl_pdf["carrier"].dtype == object
        assert pd.api.types.is_datetime64_any_dtype(fl_pdf["flight_date"])
        assert fl_pdf["dep_delay"].isna().any()

    def test_airports_consistent_with_table(self, fl_pdf):
        codes = {a[0] for a in AIRPORTS}
        assert set(fl_pdf["origin"].unique()) <= codes
        assert set(fl_pdf["dest"].unique()) <= codes

    def test_no_self_loops(self, fl_pdf):
        assert (fl_pdf["origin"] != fl_pdf["dest"]).all()

    def test_cancelled_flights_have_no_departure(self, fl_pdf):
        cancelled = fl_pdf[fl_pdf["cancelled"] == 1]
        assert cancelled["dep_time"].isna().all()
        assert cancelled["dep_delay"].isna().all()


class TestPlantedStructure:
    def test_carrier_shares_roughly_match_weights(self, fl_pdf):
        shares = fl_pdf["carrier"].value_counts(normalize=True)
        assert shares.index[0] == "WN"  # the heaviest carrier

    def test_defunct_carriers_stop_flying(self, fl_pdf):
        last = fl_pdf.groupby("carrier")["flight_date"].max()
        span = fl_pdf["flight_date"].max() - fl_pdf["flight_date"].min()
        for code, *_, active in CARRIERS:
            if active < 0.9 and code in last.index:
                frac = (last[code] - fl_pdf["flight_date"].min()) / span
                assert frac < active + 0.05, code

    def test_delays_grow_through_the_day(self, fl_pdf):
        hours = fl_pdf["crs_dep_time"] // 100
        early = fl_pdf.loc[hours.between(5, 8), "dep_delay"].mean()
        late = fl_pdf.loc[hours.between(17, 20), "dep_delay"].mean()
        assert late > early + 5

    def test_weather_cities_have_worse_weather_delay(self, fl_pdf):
        by_city = fl_pdf.groupby("origin_city")["weather_delay"].mean()
        assert by_city["Chicago"] > by_city["Phoenix"]

    def test_hawaii_routes_are_long(self, fl_pdf):
        hi = (fl_pdf["origin_state"] == "HI") ^ (fl_pdf["dest_state"] == "HI")
        assert fl_pdf.loc[hi, "distance"].mean() > fl_pdf.loc[~hi, "distance"].mean() + 1500

    def test_regional_carriers_avoid_hawaii(self, fl_pdf):
        regional = fl_pdf[fl_pdf["carrier"].isin(["EV", "MQ", "OO"])]
        assert not (
            (regional["origin_state"] == "HI") | (regional["dest_state"] == "HI")
        ).any()

    def test_arrival_tracks_departure_delay(self, fl_pdf):
        sub = fl_pdf.dropna(subset=["dep_delay", "arr_delay"])
        assert np.corrcoef(sub["dep_delay"], sub["arr_delay"])[0, 1] > 0.5

    def test_cells_scale(self):
        # "Cells" in our reproduction: rows x 24 columns.
        pdf = flights_pdf(sf=0.01)
        assert pdf.size == len(pdf) * 24
