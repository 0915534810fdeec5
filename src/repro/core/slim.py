"""End-to-end SLIM pipeline (paper Alg. 1 + Secs 3.2 and 4).

``run_slim`` wires the stages together:

1. records → mobility-history bins (``repro.core.histories``),
2. LSH candidate filtering (``repro.core.lsh``) or brute-force all
   pairs,
3. distributed pairwise similarity scoring
   (``repro.core.similarity``),
4. driver-side greedy maximum-weight bipartite matching
   (``repro.core.matching``),
5. GMM stop-threshold selection and final filtering
   (``repro.core.gmm``).

The result carries the paper's own instrumentation: number of
candidate pairs, pairwise bin comparisons performed (the scalability
metric of Secs 5.3/5.5), alibi entity pairs, and wall-clock runtime.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field, replace

import pandas as pd
from pyspark.sql import DataFrame

from repro.core import gmm, histories, matching, proximity, similarity
from repro.core.lsh import LshConfig, LshPlan, lsh_candidates


@dataclass(frozen=True)
class SlimConfig:
    """All knobs of one SLIM run (paper defaults, Sec 5.1)."""

    level: int = 12
    window_min: float = 15.0
    alpha_m_per_sec: float = proximity.DEFAULT_ALPHA_M_PER_SEC
    b: float = 0.5
    pairing: similarity.Pairing = "mnn"
    use_mfn: bool = True
    use_idf: bool = True
    use_norm: bool = True
    use_lsh: bool = True
    lsh: LshConfig = field(default_factory=LshConfig)

    @property
    def window_sec(self) -> int:
        return int(round(self.window_min * 60))

    def without_lsh(self) -> "SlimConfig":
        return replace(self, use_lsh=False)


@dataclass
class SlimResult:
    """Outcome + instrumentation of one SLIM run."""

    links: pd.DataFrame  # final linkage (u, v, score)
    matched: pd.DataFrame  # full matching before thresholding
    scores: pd.DataFrame  # all scored candidate pairs
    threshold: gmm.StopThreshold | None
    n_candidates: int
    n_comparisons: int
    n_alibi_pairs: int
    runtime_sec: float
    lsh_plan: LshPlan | None


def run_slim(records_e: DataFrame, records_i: DataFrame, cfg: SlimConfig) -> SlimResult:
    """Link two location datasets; see module docstring for stages."""
    t0 = time.monotonic()
    bins_e = histories.build_bins(records_e, level=cfg.level, window_sec=cfg.window_sec)
    bins_i = histories.build_bins(records_i, level=cfg.level, window_sec=cfg.window_sec)

    lsh_plan: LshPlan | None = None
    if cfg.use_lsh:
        candidates, lsh_plan = lsh_candidates(
            records_e, records_i, window_sec=cfg.window_sec, cfg=cfg.lsh
        )
    else:
        candidates = similarity.all_pairs(bins_e, bins_i)
    candidates = candidates.cache()
    n_candidates = candidates.count()

    scored = similarity.pair_scores(
        bins_e,
        bins_i,
        candidates,
        level=cfg.level,
        window_sec=cfg.window_sec,
        alpha_m_per_sec=cfg.alpha_m_per_sec,
        b=cfg.b,
        pairing=cfg.pairing,
        use_mfn=cfg.use_mfn,
        use_idf=cfg.use_idf,
        use_norm=cfg.use_norm,
    ).toPandas()
    candidates.unpersist()

    n_comparisons = int(scored["n_comp"].sum()) if len(scored) else 0
    n_alibi_pairs = int((scored["n_alibi"] > 0).sum()) if len(scored) else 0

    # positive-score edges form the bipartite graph (Sec 3.1 end)
    edges = scored[scored["score"] > 0][["u", "v", "score"]]
    matched = matching.greedy_match(edges)

    threshold: gmm.StopThreshold | None = None
    links = matched
    if len(matched) >= 4:
        threshold = gmm.select_stop_threshold(matched["score"].to_numpy())
        links = matched[matched["score"] > threshold.threshold].reset_index(drop=True)
    runtime = time.monotonic() - t0
    return SlimResult(
        links=links,
        matched=matched,
        scores=scored,
        threshold=threshold,
        n_candidates=n_candidates,
        n_comparisons=n_comparisons,
        n_alibi_pairs=n_alibi_pairs,
        runtime_sec=runtime,
        lsh_plan=lsh_plan,
    )
