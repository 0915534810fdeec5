"""Closed-form tests of Eq. 1's proximity function."""
import numpy as np
import pytest

from repro.core import proximity


class TestRunaway:
    def test_paper_default(self):
        # 15-minute window at 2 km/min = 30 km
        assert proximity.runaway_distance_m(900) == pytest.approx(30_000.0)

    def test_scales_with_window(self):
        assert proximity.runaway_distance_m(1800) == pytest.approx(
            2 * proximity.runaway_distance_m(900)
        )

    @pytest.mark.parametrize("window,alpha", [(0, 1.0), (-5, 1.0), (10, 0.0)])
    def test_rejects_nonpositive(self, window, alpha):
        with pytest.raises(ValueError):
            proximity.runaway_distance_m(window, alpha)


class TestProximity:
    R = 30_000.0

    def test_zero_distance_gives_one(self):
        assert proximity.proximity(np.array([0.0]), self.R)[0] == pytest.approx(1.0)

    def test_runaway_distance_gives_zero(self):
        assert proximity.proximity(np.array([self.R]), self.R)[0] == pytest.approx(0.0)

    def test_half_runaway(self):
        # log2(2 - 0.5) = log2(1.5)
        assert proximity.proximity(np.array([self.R / 2]), self.R)[0] == pytest.approx(
            np.log2(1.5)
        )

    def test_beyond_runaway_negative(self):
        assert proximity.proximity(np.array([1.5 * self.R]), self.R)[0] < 0

    def test_double_runaway_capped(self):
        v = proximity.proximity(np.array([2 * self.R]), self.R)[0]
        assert v == pytest.approx(np.log2(proximity.ALIBI_FLOOR_ARG))
        assert np.isfinite(v)

    def test_beyond_double_runaway_same_cap(self):
        v2 = proximity.proximity(np.array([10 * self.R]), self.R)[0]
        v1 = proximity.proximity(np.array([2 * self.R]), self.R)[0]
        assert v1 == v2

    def test_monotone_decreasing(self):
        d = np.linspace(0, 2.5 * self.R, 100)
        p = proximity.proximity(d, self.R)
        assert np.all(np.diff(p) <= 1e-12)

    def test_vectorized_shape(self):
        d = np.zeros((4, 5))
        assert proximity.proximity(d, self.R).shape == (4, 5)


class TestAlibi:
    def test_threshold_exact(self):
        R = 1000.0
        d = np.array([999.0, 1000.0, 1000.1])
        assert list(proximity.is_alibi(d, R)) == [False, False, True]

    def test_alibi_iff_negative_proximity(self):
        R = 5000.0
        d = np.linspace(0, 3 * R, 200)
        p = proximity.proximity(d, R)
        a = proximity.is_alibi(d, R)
        # negative proximity exactly characterizes alibi pairs
        assert np.array_equal(p < 0, a)
