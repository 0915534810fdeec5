"""Tests for linkage quality metrics."""
import pandas as pd
import pytest

from repro.core import metrics


def _df(rows, cols=("u", "v")):
    return pd.DataFrame(rows, columns=list(cols))


class TestEvaluateLinks:
    def test_perfect(self):
        t = _df([(0, 10), (1, 11)])
        prf = metrics.evaluate_links(t, t)
        assert prf.precision == prf.recall == prf.f1 == 1.0

    def test_empty_links(self):
        prf = metrics.evaluate_links(_df([]), _df([(0, 10)]))
        assert prf.precision == 0.0 and prf.recall == 0.0 and prf.f1 == 0.0

    def test_half_right(self):
        links = _df([(0, 10), (1, 99)])
        truth = _df([(0, 10), (1, 11)])
        prf = metrics.evaluate_links(links, truth)
        assert prf.precision == 0.5
        assert prf.recall == 0.5
        assert prf.f1 == 0.5

    def test_precision_recall_asymmetry(self):
        links = _df([(0, 10)])
        truth = _df([(0, 10), (1, 11), (2, 12), (3, 13)])
        prf = metrics.evaluate_links(links, truth)
        assert prf.precision == 1.0
        assert prf.recall == 0.25

    def test_counts(self):
        links = _df([(0, 10), (5, 55)])
        truth = _df([(0, 10)])
        prf = metrics.evaluate_links(links, truth)
        assert (prf.n_linked, prf.n_true, prf.n_correct) == (2, 1, 1)


class TestHitPrecision:
    def test_rank_zero_scores_one(self):
        scores = _df(
            [(0, 10, 9.0), (0, 11, 1.0)], cols=("u", "v", "score")
        )
        truth = _df([(0, 10)])
        assert metrics.hit_precision_at_k(scores, truth, 40) == 1.0

    def test_rank_formula(self):
        # true link ranked 2nd (rank=1) at k=4 ⇒ 1 − 1/4
        scores = _df(
            [(0, 11, 9.0), (0, 10, 5.0), (0, 12, 1.0)], cols=("u", "v", "score")
        )
        truth = _df([(0, 10)])
        assert metrics.hit_precision_at_k(scores, truth, 4) == pytest.approx(0.75)

    def test_missing_pair_scores_zero(self):
        scores = _df([(0, 11, 9.0)], cols=("u", "v", "score"))
        truth = _df([(0, 10)])
        assert metrics.hit_precision_at_k(scores, truth, 40) == 0.0

    def test_averaged_over_entities(self):
        scores = _df(
            [(0, 10, 9.0), (1, 99, 9.0)], cols=("u", "v", "score")
        )
        truth = _df([(0, 10), (1, 11)])
        assert metrics.hit_precision_at_k(scores, truth, 40) == pytest.approx(0.5)

    def test_empty_truth(self):
        scores = _df([(0, 10, 1.0)], cols=("u", "v", "score"))
        assert metrics.hit_precision_at_k(scores, _df([]), 40) == 0.0

    def test_deep_rank_clamped(self):
        rows = [(0, v, 100.0 - v) for v in range(1, 60)] + [(0, 100, 0.5)]
        scores = _df(rows, cols=("u", "v", "score"))
        truth = _df([(0, 100)])
        assert metrics.hit_precision_at_k(scores, truth, 40) == 0.0
