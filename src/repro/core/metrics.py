"""Linkage quality metrics used across the evaluation (paper Sec 5).

Precision / recall / F1 against exact ground truth, and the
Hit-Precision@k of Sec 5.5: for each ground-truth entity, the rank of
its true counterpart in the similarity-sorted candidate list scores
``1 − min(rank/k, 1)`` (the paper writes ``1 − max(rank/k, 1)``, an
evident typo — as written it would always be ≤ 0), averaged over
entities.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd


@dataclass(frozen=True)
class Prf:
    precision: float
    recall: float
    f1: float
    n_linked: int
    n_true: int
    n_correct: int


def evaluate_links(links: pd.DataFrame, truth: pd.DataFrame) -> Prf:
    """Precision/recall/F1 of a linkage (columns ``u, v``) vs truth."""
    linked = set(zip(links["u"], links["v"])) if len(links) else set()
    true = set(zip(truth["u"], truth["v"]))
    correct = len(linked & true)
    p = correct / len(linked) if linked else 0.0
    r = correct / len(true) if true else 0.0
    f1 = 2 * p * r / (p + r) if p + r > 0 else 0.0
    return Prf(p, r, f1, len(linked), len(true), correct)


def hit_precision_at_k(scores: pd.DataFrame, truth: pd.DataFrame, k: int) -> float:
    """Average Hit-Precision@k over ground-truth entities.

    ``scores`` columns: ``u, v, score`` (all scored candidate pairs).
    Rank 0 = the top-scored v for a given u. Entities whose true
    counterpart is absent from the scored list get rank ≥ k (score 0).
    """
    if truth.empty:
        return 0.0
    ranked = scores.sort_values(
        ["u", "score", "v"], ascending=[True, False, True], kind="stable"
    ).copy()
    ranked["rank"] = ranked.groupby("u").cumcount()
    true_pairs = truth.merge(ranked[["u", "v", "rank"]], on=["u", "v"], how="left")
    rank = true_pairs["rank"].fillna(float(k)).to_numpy()
    hp = 1.0 - (rank / k).clip(max=1.0)
    return float(hp.mean())
