"""Tests for kneedle elbow detection and spatial-level auto-tuning."""
import numpy as np
import pytest

from repro.core import tuning


class TestKneedle:
    def test_planted_elbow_convex_decreasing(self):
        # 1/x-style curve: steep drop then flat — elbow near the bend
        x = np.arange(1, 11, dtype=float)
        y = 1.0 / x
        elbow = tuning.kneedle(x, y, direction="decreasing", curve="convex")
        assert 2 <= elbow <= 4

    def test_planted_elbow_concave_increasing(self):
        x = np.arange(1, 11, dtype=float)
        y = np.log(x)
        elbow = tuning.kneedle(x, y, direction="increasing", curve="concave")
        assert 2 <= elbow <= 4

    def test_linear_curve_no_crash(self):
        x = np.arange(10, dtype=float)
        elbow = tuning.kneedle(x, x.copy(), direction="increasing", curve="concave")
        assert 0 <= elbow <= 9

    def test_flat_curve_returns_first(self):
        x = np.arange(5, dtype=float)
        assert tuning.kneedle(x, np.ones(5), direction="decreasing") == 0.0

    def test_unsorted_input_handled(self):
        x = np.array([5.0, 1.0, 3.0, 2.0, 4.0, 6.0, 7.0, 8.0])
        y = 1.0 / x
        elbow = tuning.kneedle(x, y, direction="decreasing", curve="convex")
        assert 1 <= elbow <= 4

    def test_too_few_points(self):
        with pytest.raises(ValueError):
            tuning.kneedle(np.array([1.0, 2.0]), np.array([1.0, 2.0]))

    def test_bad_direction(self):
        with pytest.raises(ValueError):
            tuning.kneedle(np.arange(3.0), np.arange(3.0), direction="sideways")


class TestSelfSimilarityRatio:
    def test_ratio_decreases_with_level(self, cab_records):
        # the Sec 3.3 observation: finer detail makes an entity more
        # distinguishable, so pair/self similarity drops with level
        rec_e, _ = cab_records
        r_coarse = tuning.self_similarity_ratio(
            rec_e, level=6, window_sec=900, n_probe=4, n_others=6, seed=0
        )
        r_fine = tuning.self_similarity_ratio(
            rec_e, level=14, window_sec=900, n_probe=4, n_others=6, seed=0
        )
        assert r_fine < r_coarse

    def test_ratio_below_one_at_fine_level(self, cab_records):
        rec_e, _ = cab_records
        r = tuning.self_similarity_ratio(
            rec_e, level=14, window_sec=900, n_probe=4, n_others=6, seed=0
        )
        assert r < 1.0


class TestSelectSpatialLevel:
    def test_selects_reasonable_level(self, cab_records):
        rec_e, rec_i = cab_records
        level, curve_e, curve_i = tuning.select_spatial_level(
            rec_e,
            rec_i,
            levels=[6, 8, 10, 12, 14, 16],
            window_sec=900,
            seed=0,
        )
        assert level in (8, 10, 12, 14, 16)
        assert set(curve_e) == {6, 8, 10, 12, 14, 16}
        # curves should be broadly decreasing from coarse to fine
        assert curve_e[16] < curve_e[6]
        assert curve_i[16] < curve_i[6]
