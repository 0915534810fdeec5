"""Tests for the synthetic mobility generators and sampling protocol."""
import numpy as np
import pandas as pd
import pytest

from repro.core import proximity
from repro.mobility import generator


class TestCabTraces:
    @pytest.fixture(scope="class")
    def traces(self):
        return generator.cab_traces(n_entities=10, duration_min=120, seed=1)

    def test_schema(self, traces):
        assert list(traces.columns) == generator.RECORD_COLUMNS

    def test_deterministic(self, traces):
        again = generator.cab_traces(n_entities=10, duration_min=120, seed=1)
        pd.testing.assert_frame_equal(traces, again)

    def test_seed_changes_data(self, traces):
        other = generator.cab_traces(n_entities=10, duration_min=120, seed=2)
        assert not traces["lat"].equals(other["lat"])

    def test_entity_count_and_pings(self, traces):
        assert traces["entity"].nunique() == 10
        assert (traces.groupby("entity").size() == 60).all()  # 120 min / 2 min

    def test_inside_city_box(self, traces):
        box_half_deg = (50.0 / 2 + 1) * 1000 / 111_319.49
        assert (np.abs(traces["lat"] - 37.75) < box_half_deg * 1.2).all()

    def test_speed_below_alpha(self, traces):
        # consecutive pings must never exceed the runaway speed (2 km/min),
        # else an entity would alibi against itself
        for _, g in traces.groupby("entity"):
            g = g.sort_values("ts")
            dt = np.diff(g["ts"]) / 60.0  # minutes
            dy = np.diff(g["lat"]) * 111.32
            dx = np.diff(g["lon"]) * 111.32 * np.cos(np.radians(37.75))
            speed = np.hypot(dy, dx) / dt
            assert (speed < 2.0).all()


class TestSmCheckins:
    @pytest.fixture(scope="class")
    def checkins(self):
        return generator.sm_checkins(n_entities=50, duration_days=10, seed=3)

    def test_schema_and_entities(self, checkins):
        assert list(checkins.columns) == generator.RECORD_COLUMNS
        assert checkins["entity"].nunique() == 50

    def test_deterministic(self, checkins):
        again = generator.sm_checkins(n_entities=50, duration_days=10, seed=3)
        pd.testing.assert_frame_equal(checkins, again)

    def test_sparse(self, checkins):
        assert checkins.groupby("entity").size().mean() < 100

    def test_ts_within_horizon(self, checkins):
        assert checkins["ts"].between(0, 10 * 86_400).all()

    def test_entities_have_favourite_venues(self, checkins):
        # zipfian personal venue choice ⇒ the top location should hold a
        # disproportionate share of a user's check-ins
        shares = []
        for _, g in checkins.groupby("entity"):
            if len(g) >= 10:
                top = g.groupby(["lat", "lon"]).size().max()
                shares.append(top / len(g))
        assert np.mean(shares) > 0.2


class TestSamplePair:
    @pytest.fixture(scope="class")
    def traces(self):
        return generator.cab_traces(n_entities=40, duration_min=240, seed=5)

    def test_intersection_ratio(self, traces):
        pair = generator.sample_pair(
            traces, intersection_ratio=0.5, inclusion_prob=1.0, seed=0
        )
        ue = set(pair.e_records["entity"])
        ui = set(pair.i_records["entity"] - generator.I_SIDE_OFFSET)
        n_each = int(40 / 1.5)
        assert len(ue) == len(ui) == n_each
        assert len(ue & ui) == round(0.5 * n_each)
        assert len(pair.truth) == round(0.5 * n_each)

    @pytest.mark.parametrize("rho", [0.0, 0.3, 0.7, 1.0])
    def test_ratio_sweep(self, traces, rho):
        pair = generator.sample_pair(
            traces, intersection_ratio=rho, inclusion_prob=1.0, seed=1
        )
        n_each = int(40 / (2 - rho))
        ue = set(pair.e_records["entity"])
        ui = set(pair.i_records["entity"] - generator.I_SIDE_OFFSET)
        assert len(ue & ui) == round(rho * n_each)

    def test_inclusion_prob_thins_records(self, traces):
        dense = generator.sample_pair(traces, inclusion_prob=0.9, seed=2)
        sparse = generator.sample_pair(traces, inclusion_prob=0.3, seed=2)
        assert len(sparse.e_records) < len(dense.e_records)
        ratio = len(sparse.e_records) / len(dense.e_records)
        assert 0.15 < ratio < 0.55

    def test_sides_asynchronous(self, traces):
        # independent downsampling must produce different record sets
        pair = generator.sample_pair(traces, inclusion_prob=0.5, seed=3)
        common_e = pair.e_records[pair.e_records["entity"].isin(pair.truth["u"])]
        common_i = pair.i_records[
            (pair.i_records["entity"] - generator.I_SIDE_OFFSET).isin(pair.truth["u"])
        ]
        ts_e = set(zip(common_e["entity"], common_e["ts"]))
        ts_i = set(
            zip(common_i["entity"] - generator.I_SIDE_OFFSET, common_i["ts"])
        )
        assert ts_e != ts_i

    def test_min_records_enforced(self, traces):
        pair = generator.sample_pair(traces, inclusion_prob=0.2, min_records=5, seed=4)
        assert (pair.e_records.groupby("entity").size() > 5).all()
        assert (pair.i_records.groupby("entity").size() > 5).all()

    def test_truth_entities_present_on_both_sides(self, traces):
        pair = generator.sample_pair(traces, seed=5)
        assert set(pair.truth["u"]).issubset(set(pair.e_records["entity"]))
        assert set(pair.truth["v"]).issubset(set(pair.i_records["entity"]))

    def test_id_spaces_disjoint(self, traces):
        pair = generator.sample_pair(traces, seed=6)
        assert set(pair.e_records["entity"]).isdisjoint(set(pair.i_records["entity"]))

    @pytest.mark.parametrize("bad", [-0.1, 1.5])
    def test_bad_ratio_rejected(self, traces, bad):
        with pytest.raises(ValueError):
            generator.sample_pair(traces, intersection_ratio=bad)

    @pytest.mark.parametrize("bad", [0.0, -1.0, 1.5])
    def test_bad_inclusion_rejected(self, traces, bad):
        with pytest.raises(ValueError):
            generator.sample_pair(traces, inclusion_prob=bad)


class TestNamedScales:
    def test_cab_pair_test_scale(self):
        pair = generator.cab_pair(scale="test", seed=0)
        assert len(pair.truth) >= 5
        assert len(pair.e_records) > 500

    def test_sm_pair_test_scale(self):
        pair = generator.sm_pair(scale="test", seed=0)
        assert len(pair.truth) >= 20
        # sparse regime: around a dozen records per entity
        assert pair.e_records.groupby("entity").size().mean() < 40

    def test_to_spark_schema(self, spark):
        pair = generator.cab_pair(scale="test", seed=0)
        df, _ = pair.to_spark(spark)
        assert dict(df.dtypes) == {
            "entity": "bigint",
            "ts": "bigint",
            "lat": "double",
            "lon": "double",
        }
