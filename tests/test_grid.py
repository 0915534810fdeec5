"""Unit tests for the hierarchical grid substrate (S2 substitute)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from pyspark.sql import functions as F

from repro.grid import cells


class TestCellSize:
    def test_halves_every_level(self):
        for level in range(0, cells.MAX_LEVEL):
            assert cells.cell_size_m(level) == pytest.approx(
                2 * cells.cell_size_m(level + 1)
            )

    def test_level12_matches_s2_scale(self):
        # S2 level-12 mean edge is ~2.2 km; our schedule gives ~2.45 km
        assert 2000 <= cells.cell_size_m(12) <= 3000

    def test_level16_sub_200m(self):
        assert cells.cell_size_m(16) < 200

    @pytest.mark.parametrize("level", [-1, 25, 100])
    def test_rejects_bad_level(self, level):
        with pytest.raises(ValueError):
            cells.cell_size_m(level)

    def test_deg_conversion(self):
        assert cells.cell_size_deg(12) == pytest.approx(
            cells.cell_size_m(12) / cells.M_PER_DEG
        )


class TestEncodeDecode:
    @pytest.mark.parametrize("level", [4, 8, 12, 16, 20, 24])
    def test_roundtrip_center(self, level):
        lat = np.array([0.0, 37.75, -45.2, 89.0, -89.0])
        lon = np.array([0.0, -122.45, 170.9, -179.9, 179.9])
        c = cells.encode(lat, lon, level)
        clat, clon = cells.cell_center(c, level)
        half = cells.cell_size_deg(level) / 2
        assert np.all(np.abs(clat - lat) <= half + 1e-9)
        assert np.all(np.abs(clon - lon) <= half + 1e-9)

    @pytest.mark.parametrize("level", [0, 12, 24])
    def test_decode_inverts_pack(self, level):
        lat = np.linspace(-80, 80, 50)
        lon = np.linspace(-170, 170, 50)
        c = cells.encode(lat, lon, level)
        row, col = cells.decode(c)
        assert np.all((row << 32) | col == c)
        assert np.all(row >= 0) and np.all(col >= 0)

    def test_same_point_same_cell(self):
        a = cells.encode(np.array([10.0]), np.array([20.0]), 12)
        b = cells.encode(np.array([10.0]), np.array([20.0]), 12)
        assert a[0] == b[0]

    def test_distinct_far_points_distinct_cells(self):
        c = cells.encode(np.array([10.0, 11.0]), np.array([20.0, 21.0]), 12)
        assert c[0] != c[1]

    @given(
        lat=st.floats(min_value=-85, max_value=85),
        lon=st.floats(min_value=-179, max_value=179),
        level=st.integers(min_value=0, max_value=24),
    )
    @settings(max_examples=60, deadline=None)
    def test_containment_property(self, lat, lon, level):
        c = cells.encode(np.array([lat]), np.array([lon]), level)
        clat, clon = cells.cell_center(c, level)
        half = cells.cell_size_deg(level) / 2
        assert abs(clat[0] - lat) <= half + 1e-9
        assert abs(clon[0] - lon) <= half + 1e-9


class TestSparkEncode:
    def test_encode_col_matches_numpy(self, spark):
        import pandas as pd

        g = np.random.default_rng(7)
        pdf = pd.DataFrame(
            {"lat": g.uniform(-80, 80, 500), "lon": g.uniform(-179, 179, 500)}
        )
        for level in (8, 12, 16):
            got = (
                spark.createDataFrame(pdf)
                .select(cells.encode_col(F.col("lat"), F.col("lon"), level).alias("c"))
                .toPandas()["c"]
                .to_numpy()
            )
            want = cells.encode(pdf["lat"].to_numpy(), pdf["lon"].to_numpy(), level)
            assert np.array_equal(got, want)


class TestMinDistance:
    def test_same_cell_zero(self):
        c = cells.encode(np.array([37.0]), np.array([-122.0]), 12)
        assert cells.min_distance_m(c, c, 12)[0] == 0.0

    def test_adjacent_cells_zero(self):
        step = cells.cell_size_deg(12)
        c1 = cells.encode(np.array([37.0]), np.array([-122.0]), 12)
        c2 = cells.encode(np.array([37.0]), np.array([-122.0 + step]), 12)
        assert c1[0] != c2[0]
        assert cells.min_distance_m(c1, c2, 12)[0] == 0.0

    def test_symmetry(self):
        g = np.random.default_rng(3)
        lat = g.uniform(-60, 60, 100)
        lon = g.uniform(-170, 170, 100)
        a = cells.encode(lat, lon, 10)
        b = cells.encode(lat[::-1], lon[::-1], 10)
        assert np.allclose(
            cells.min_distance_m(a, b, 10), cells.min_distance_m(b, a, 10)
        )

    def test_underestimates_point_distance(self):
        # min inter-cell distance can never exceed the distance between
        # two points inside the cells (planar, equator for simplicity)
        lat = np.array([0.0, 0.0])
        lon = np.array([0.0, 1.0])
        c = cells.encode(lat, lon, 12)
        d_cells = cells.min_distance_m(c[:1], c[1:], 12)[0]
        d_points = 1.0 * cells.M_PER_DEG
        assert d_cells <= d_points
        assert d_cells >= d_points - 3 * cells.cell_size_m(12)

    def test_grows_with_gap(self):
        step = cells.cell_size_deg(14)
        base = cells.encode(np.array([10.0]), np.array([10.0]), 14)
        dists = [
            cells.min_distance_m(
                base, cells.encode(np.array([10.0]), np.array([10.0 + k * step]), 14), 14
            )[0]
            for k in range(2, 8)
        ]
        assert all(d2 > d1 for d1, d2 in zip(dists, dists[1:]))

    def test_lat_compression(self):
        # same column gap covers fewer metres at high latitude
        step = cells.cell_size_deg(12)
        lo = cells.min_distance_m(
            cells.encode(np.array([0.0]), np.array([0.0]), 12),
            cells.encode(np.array([0.0]), np.array([5 * step]), 12),
            12,
        )[0]
        hi = cells.min_distance_m(
            cells.encode(np.array([70.0]), np.array([0.0]), 12),
            cells.encode(np.array([70.0]), np.array([5 * step]), 12),
            12,
        )[0]
        assert hi < lo

    def test_broadcasting(self):
        a = cells.encode(np.array([10.0, 11.0, 12.0]), np.array([10.0, 10.0, 10.0]), 12)
        b = cells.encode(np.array([10.0]), np.array([10.0]), 12)
        d = cells.min_distance_m(a[:, None], b[None, :], 12)
        assert d.shape == (3, 1)
        assert d[0, 0] == 0.0
        assert d[1, 0] > 0 and d[2, 0] > d[1, 0]
