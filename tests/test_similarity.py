"""Tests for the pairwise similarity scorer (Eq. 2 / Alg. 1)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import histories, similarity
from repro.core.proximity import proximity as prox
from repro.grid import cells

LEVEL = 12
WINDOW_SEC = 900
RUNAWAY = 30_000.0  # 15 min × 2 km/min


def _cell(lat, lon):
    return int(cells.encode(np.array([lat]), np.array([lon]), LEVEL)[0])


# well-separated cells around the origin
CELL_A = _cell(0.0, 0.0)
CELL_B = _cell(0.0, 0.05)  # ~5.5 km east: close (within runaway)
CELL_FAR = _cell(0.0, 0.8)  # ~89 km east: alibi (beyond 2R)
D_AB = cells.min_distance_m(np.array([CELL_A]), np.array([CELL_B]), LEVEL)[0]
D_AF = cells.min_distance_m(np.array([CELL_A]), np.array([CELL_FAR]), LEVEL)[0]


def _bins(spark, rows):
    """rows: (entity, window, cell) triples → bins DataFrame."""
    pdf = pd.DataFrame(rows, columns=["entity", "window", "cell"])
    pdf["n_rec"] = 1
    return spark.createDataFrame(pdf.astype({"entity": "int64", "window": "int64", "cell": "int64"}))


def _cand(spark, pairs):
    return spark.createDataFrame(pd.DataFrame(pairs, columns=["u", "v"]).astype("int64"))


def _score(spark, e_rows, i_rows, pairs, **kw):
    kw.setdefault("use_idf", False)
    kw.setdefault("use_norm", False)
    out = similarity.pair_scores(
        _bins(spark, e_rows),
        _bins(spark, i_rows),
        _cand(spark, pairs),
        level=LEVEL,
        window_sec=WINDOW_SEC,
        **kw,
    ).toPandas()
    return out.set_index(["u", "v"]).sort_index()


class TestGreedySelect:
    def _mask(self, win, eid, iid, d, furthest=False):
        return similarity.greedy_select_mask(
            np.asarray(win, np.int64),
            np.asarray(eid, np.int64),
            np.asarray(iid, np.int64),
            np.asarray(d, float),
            furthest=furthest,
        )

    def test_two_by_two_nearest(self):
        # matrix [[1,5],[4,2]]: greedy picks (0,0)=1 then (1,1)=2
        win = [0, 0, 0, 0]
        eid = [0, 0, 1, 1]
        iid = [0, 1, 0, 1]
        d = [1.0, 5.0, 4.0, 2.0]
        assert list(self._mask(win, eid, iid, d)) == [True, False, False, True]

    def test_two_by_two_furthest(self):
        win = [0, 0, 0, 0]
        eid = [0, 0, 1, 1]
        iid = [0, 1, 0, 1]
        d = [1.0, 5.0, 4.0, 2.0]
        assert list(self._mask(win, eid, iid, d, furthest=True)) == [
            False,
            True,
            True,
            False,
        ]

    def test_greedy_not_optimal_assignment(self):
        # [[1,2],[1.5,100]]: greedy picks (0,0)=1 then (1,1)=100;
        # optimal assignment would be 2 + 1.5 — documents greedy order
        win = [0] * 4
        eid = [0, 0, 1, 1]
        iid = [0, 1, 0, 1]
        d = [1.0, 2.0, 1.5, 100.0]
        assert list(self._mask(win, eid, iid, d)) == [True, False, False, True]

    def test_smaller_side_exhausted(self):
        # 1 e-bin × 3 i-bins: exactly one pair selected (the nearest)
        win = [0, 0, 0]
        eid = [0, 0, 0]
        iid = [0, 1, 2]
        d = [3.0, 1.0, 2.0]
        assert list(self._mask(win, eid, iid, d)) == [False, True, False]

    def test_windows_independent(self):
        # two windows each with a single pair: both selected
        win = [0, 1]
        eid = [0, 1]
        iid = [0, 1]
        d = [5.0, 7.0]
        assert list(self._mask(win, eid, iid, d)) == [True, True]

    def test_matches_sequential_reference(self):
        # vectorized rounds must equal a literal sequential greedy
        g = np.random.default_rng(0)
        for trial in range(10):
            n_w = g.integers(1, 4)
            rows = []
            for w in range(n_w):
                ne, ni = g.integers(1, 5, 2)
                for e in range(ne):
                    for i in range(ni):
                        rows.append((w, w * 10 + e, w * 10 + i, float(g.random())))
            win, eid, iid, d = map(np.array, zip(*rows))
            got = self._mask(win, eid, iid, d)
            # reference: per window, repeatedly take global min pair
            want = np.zeros(len(rows), bool)
            for w in set(win):
                idx = np.where(win == w)[0]
                used_e, used_i = set(), set()
                for j in idx[np.argsort(d[idx], kind="stable")]:
                    if eid[j] not in used_e and iid[j] not in used_i:
                        want[j] = True
                        used_e.add(eid[j])
                        used_i.add(iid[j])
            assert np.array_equal(got, want), f"trial {trial}"

    def test_empty(self):
        assert self._mask([], [], [], []).size == 0


class TestPairScores:
    def test_exact_match_scores_one(self, spark):
        out = _score(
            spark, [(0, 0, CELL_A), (1, 5, CELL_B)], [(10, 0, CELL_A)], [(0, 10)]
        )
        assert out.loc[(0, 10), "score"] == pytest.approx(1.0)
        assert out.loc[(0, 10), "n_pairs"] == 1
        assert out.loc[(0, 10), "n_alibi"] == 0

    def test_nearby_cell_partial_credit(self, spark):
        out = _score(
            spark, [(0, 0, CELL_A), (1, 5, CELL_B)], [(10, 0, CELL_B)], [(0, 10)]
        )
        expected = prox(np.array([D_AB]), RUNAWAY)[0]
        assert 0 < expected < 1
        assert out.loc[(0, 10), "score"] == pytest.approx(expected)

    def test_alibi_negative_score(self, spark):
        out = _score(
            spark, [(0, 0, CELL_A), (1, 5, CELL_B)], [(10, 0, CELL_FAR)], [(0, 10)]
        )
        assert out.loc[(0, 10), "score"] < 0
        assert out.loc[(0, 10), "n_alibi"] == 1

    def test_no_shared_window_no_row(self, spark):
        out = _score(spark, [(0, 0, CELL_A)], [(10, 7, CELL_A)], [(0, 10)])
        assert len(out) == 0

    def test_temporal_asynchrony_not_penalized(self, spark):
        # v active in window 1 where u is absent: score unchanged vs
        # the single matching window alone
        base = _score(spark, [(0, 0, CELL_A), (1, 9, CELL_B)], [(10, 0, CELL_A)], [(0, 10)])
        extra = _score(
            spark,
            [(0, 0, CELL_A), (1, 9, CELL_B)],
            [(10, 0, CELL_A), (10, 1, CELL_FAR)],
            [(0, 10)],
        )
        assert extra.loc[(0, 10), "score"] == pytest.approx(
            base.loc[(0, 10), "score"]
        )

    def test_mfn_catches_hidden_alibi(self, spark):
        # paper's MFN example: v has a near bin AND a far (alibi) bin in
        # the same window; MNN alone scores positive, MFN adds penalty
        e_rows = [(0, 0, CELL_A), (1, 5, CELL_B)]
        i_rows = [(10, 0, CELL_A), (10, 0, CELL_FAR)]
        with_mfn = _score(spark, e_rows, i_rows, [(0, 10)], use_mfn=True)
        without = _score(spark, e_rows, i_rows, [(0, 10)], use_mfn=False)
        assert without.loc[(0, 10), "score"] == pytest.approx(1.0)
        assert with_mfn.loc[(0, 10), "score"] < without.loc[(0, 10), "score"]
        assert with_mfn.loc[(0, 10), "n_alibi"] == 1

    def test_mfn_no_double_count_single_pair(self, spark):
        # one alibi pair only: MNN already includes it; MFN must not add
        # it again
        e_rows = [(0, 0, CELL_A), (1, 5, CELL_B)]
        i_rows = [(10, 0, CELL_FAR)]
        w = _score(spark, e_rows, i_rows, [(0, 10)], use_mfn=True)
        wo = _score(spark, e_rows, i_rows, [(0, 10)], use_mfn=False)
        assert w.loc[(0, 10), "score"] == pytest.approx(wo.loc[(0, 10), "score"])

    def test_all_pairs_overcounts(self, spark):
        # 2 e-bins × 1 i-bin in one window: MNN keeps 1 pair, all-pairs 2
        e_rows = [(0, 0, CELL_A), (0, 0, CELL_B), (1, 5, CELL_B)]
        i_rows = [(10, 0, CELL_A)]
        mnn = _score(spark, e_rows, i_rows, [(0, 10)])
        allp = _score(spark, e_rows, i_rows, [(0, 10)], pairing="all", use_mfn=False)
        assert mnn.loc[(0, 10), "n_pairs"] == 1
        assert allp.loc[(0, 10), "n_pairs"] == 2
        assert allp.loc[(0, 10), "score"] == pytest.approx(
            1.0 + prox(np.array([D_AB]), RUNAWAY)[0]
        )

    def test_n_comp_is_cross_product(self, spark):
        e_rows = [(0, 0, CELL_A), (0, 0, CELL_B), (1, 5, CELL_B)]
        i_rows = [(10, 0, CELL_A), (10, 0, CELL_FAR)]
        out = _score(spark, e_rows, i_rows, [(0, 10)])
        assert out.loc[(0, 10), "n_comp"] == 4  # 2 e-bins × 2 i-bins in w0

    def test_idf_min_weighting(self, spark):
        # u0/u1 both visit CELL_A in w0 (idf_e = log(2/2) = 0) while v's
        # CELL_A bin is unique on its side (idf_i = log(2/2)=... v side
        # also needs 2 entities). With min(), the shared bin contributes 0.
        e_rows = [(0, 0, CELL_A), (1, 0, CELL_A)]
        i_rows = [(10, 0, CELL_A), (11, 5, CELL_B)]
        out = _score(spark, e_rows, i_rows, [(0, 10)], use_idf=True)
        assert out.loc[(0, 10), "score"] == pytest.approx(0.0)

    def test_idf_rewards_unique_bins(self, spark):
        # unique bins on both sides: idf = log(2) each ⇒ score = log 2
        e_rows = [(0, 0, CELL_A), (1, 5, CELL_B)]
        i_rows = [(10, 0, CELL_A), (11, 5, CELL_B)]
        out = _score(spark, e_rows, i_rows, [(0, 10)], use_idf=True)
        assert out.loc[(0, 10), "score"] == pytest.approx(np.log(2.0))

    def test_norm_divides_by_L(self, spark):
        # u has 3 bins, u' has 1: with b=1, L_u = 3/2, L_u' = 1/2
        e_rows = [(0, 0, CELL_A), (0, 1, CELL_A), (0, 2, CELL_A), (1, 0, CELL_B)]
        i_rows = [(10, 0, CELL_A), (11, 5, CELL_B)]
        out = _score(spark, e_rows, i_rows, [(0, 10)], use_norm=True, b=1.0)
        bins_e = _bins(spark, e_rows)
        L = histories.norm_factors(bins_e, b=1.0).toPandas().set_index("entity")["L"]
        raw = 1.0  # single matching bin pair, exact cell match
        # i side: both entities have 1 bin ⇒ L_v = 1
        assert out.loc[(0, 10), "score"] == pytest.approx(raw / (L[0] * 1.0))

    def test_self_similarity_is_max(self, spark, cab_records):
        # an entity is at least as similar to itself as to anyone else
        rec_e, _ = cab_records
        bins = histories.build_bins(rec_e, level=LEVEL, window_sec=WINDOW_SEC).cache()
        ents = sorted(r[0] for r in bins.select("entity").distinct().collect())[:4]
        pairs = [(u, v) for u in ents for v in ents]
        out = similarity.pair_scores(
            bins, bins, _cand(spark, pairs), level=LEVEL, window_sec=WINDOW_SEC
        ).toPandas()
        piv = out.set_index(["u", "v"])["score"]
        for u in ents:
            for v in ents:
                if v != u and (u, v) in piv.index:
                    assert piv[(u, u)] >= piv[(u, v)]
