"""Greedy maximum-weight bipartite matching (paper Sec 3.2).

The paper adopts "a simple greedy heuristic, which links the pair with
the highest similarity at each step". The input is one scored edge per
candidate pair that survived similarity scoring (score > 0); the
output is a one-to-one matching. This runs on the driver: after
matching there is at most one edge per entity of the smaller side, and
even the *input* edge list is |candidates| rows — the pair-scale
object the paper itself handles in memory on a single node.
"""
from __future__ import annotations

import pandas as pd


def greedy_match(edges: pd.DataFrame) -> pd.DataFrame:
    """One-to-one matching maximizing weight greedily.

    ``edges`` columns: ``u, v, score`` (extra columns pass through).
    Edges are scanned in decreasing score; a pair is linked iff neither
    endpoint is already linked. Ties break deterministically on (u, v).
    """
    if edges.empty:
        return edges.iloc[0:0]
    ordered = edges.sort_values(
        ["score", "u", "v"], ascending=[False, True, True], kind="stable"
    )
    used_u: set = set()
    used_v: set = set()
    keep = []
    for row in ordered.itertuples(index=True):
        if row.u in used_u or row.v in used_v:
            continue
        used_u.add(row.u)
        used_v.add(row.v)
        keep.append(row.Index)
    return ordered.loc[keep].reset_index(drop=True)
