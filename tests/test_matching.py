"""Tests for greedy maximum-weight bipartite matching."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import matching


def _edges(rows):
    return pd.DataFrame(rows, columns=["u", "v", "score"])


class TestGreedyMatch:
    def test_simple_conflict(self):
        # both want v=0; higher score wins, loser takes nothing
        m = matching.greedy_match(_edges([(0, 0, 5.0), (1, 0, 3.0)]))
        assert len(m) == 1
        assert (m.iloc[0]["u"], m.iloc[0]["v"]) == (0, 0)

    def test_second_best_falls_through(self):
        m = matching.greedy_match(
            _edges([(0, 0, 5.0), (1, 0, 3.0), (1, 1, 1.0)])
        )
        got = set(zip(m["u"], m["v"]))
        assert got == {(0, 0), (1, 1)}

    def test_greedy_vs_optimal(self):
        # greedy takes (0,0)=10 then nothing else; optimal would be 9+9
        m = matching.greedy_match(
            _edges([(0, 0, 10.0), (0, 1, 9.0), (1, 0, 9.0)])
        )
        assert set(zip(m["u"], m["v"])) == {(0, 0)}

    def test_empty_input(self):
        m = matching.greedy_match(_edges([]))
        assert len(m) == 0

    def test_deterministic_tie_break(self):
        a = matching.greedy_match(_edges([(1, 1, 2.0), (0, 0, 2.0)]))
        b = matching.greedy_match(_edges([(0, 0, 2.0), (1, 1, 2.0)]))
        pd.testing.assert_frame_equal(
            a.reset_index(drop=True), b.reset_index(drop=True)
        )

    def test_extra_columns_pass_through(self):
        e = _edges([(0, 0, 1.0)])
        e["tag"] = ["x"]
        m = matching.greedy_match(e)
        assert m["tag"].iloc[0] == "x"

    def test_scores_descending(self):
        m = matching.greedy_match(
            _edges([(0, 1, 1.0), (1, 0, 3.0), (2, 2, 2.0)])
        )
        assert list(m["score"]) == sorted(m["score"], reverse=True)

    @given(
        st.lists(
            st.tuples(
                st.integers(0, 8),
                st.integers(0, 8),
                st.floats(0.1, 100, allow_nan=False),
            ),
            max_size=40,
        )
    )
    @settings(max_examples=60, deadline=None)
    def test_one_to_one_invariant(self, rows):
        m = matching.greedy_match(_edges(rows))
        assert m["u"].is_unique
        assert m["v"].is_unique
        if rows:
            # the globally best edge (by score, ties by u,v) is always kept
            best = max(rows, key=lambda r: (r[2], -r[0], -r[1]))
            top = m.iloc[0]
            assert top["score"] == pytest.approx(
                max(r[2] for r in rows)
            )
            assert best is not None and len(m) >= 1

    @given(
        st.lists(
            st.tuples(st.integers(0, 5), st.integers(0, 5), st.floats(0.1, 10)),
            min_size=1,
            max_size=30,
        )
    )
    @settings(max_examples=40, deadline=None)
    def test_maximality(self, rows):
        # no unmatched edge could be added without conflict
        e = _edges(rows)
        m = matching.greedy_match(e)
        used_u, used_v = set(m["u"]), set(m["v"])
        leftovers = e[~e["u"].isin(used_u) & ~e["v"].isin(used_v)]
        assert leftovers.empty


class TestNumpyInterop:
    def test_int64_ids(self):
        m = matching.greedy_match(
            _edges([(np.int64(2**40), np.int64(7), 1.0)])
        )
        assert m.iloc[0]["u"] == 2**40
