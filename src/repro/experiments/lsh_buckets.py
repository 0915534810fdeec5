"""E6 — speed-up vs number of hash buckets (paper Fig. 9).

One series per LSH similarity threshold t. F1 is unaffected by the
bucket count (identical bands always collide regardless of bucket
count), so this harness computes the speed-up from comparison counts
alone — no similarity scoring needed — exactly the paper's metric:
comparisons without LSH / comparisons with LSH. Signature level 16,
temporal step 48 (the paper's setting; at "test" scale a smaller step
keeps the signature non-degenerate).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import histories
from repro.core.lsh import LshConfig, lsh_candidates
from repro.experiments import common

DEFAULT_GRID = {
    "test": {"bucket_counts": [2**6, 2**12], "thresholds": [0.6], "step": 4},
    "bench": {
        "bucket_counts": [2**6, 2**9, 2**12, 2**15, 2**18],
        "thresholds": [0.4, 0.6, 0.8],
        "step": 24,
    },
}


def run(
    spark: SparkSession,
    *,
    dataset: str = "cab",
    scale: str = "test",
    bucket_counts: list[int] | None = None,
    thresholds: list[float] | None = None,
    sig_level: int = 16,
    step: int | None = None,
    window_min: float = 15.0,
    level: int = 12,
    seed: int = 0,
) -> pd.DataFrame:
    grid = DEFAULT_GRID.get(scale, DEFAULT_GRID["bench"])
    bucket_counts = bucket_counts or grid["bucket_counts"]
    thresholds = thresholds or grid["thresholds"]
    step = step or grid["step"]
    pair = common.make_pair(dataset, scale, seed=seed)
    rec_e, rec_i = common.spark_pair(spark, pair)
    window_sec = int(window_min * 60)
    bins_e = histories.build_bins(rec_e, level=level, window_sec=window_sec).cache()
    bins_i = histories.build_bins(rec_i, level=level, window_sec=window_sec).cache()
    comp_bf = histories.comparison_count_all_pairs(bins_e, bins_i)

    rows = []
    for t in thresholds:
        for nb in bucket_counts:
            cfg = LshConfig(level=sig_level, step=step, threshold=t, n_buckets=nb)
            cand, plan = lsh_candidates(rec_e, rec_i, window_sec=window_sec, cfg=cfg)
            cand = cand.cache()
            n_cand = cand.count()
            comp = histories.comparison_count_candidates(bins_e, bins_i, cand)
            cand.unpersist()
            rows.append(
                {
                    "dataset": dataset,
                    "threshold": t,
                    "n_buckets": nb,
                    "n_bands": plan.n_bands,
                    "candidates": n_cand,
                    "comparisons": comp,
                    "comparisons_bf": comp_bf,
                    "speedup": round(comp_bf / comp, 1) if comp else float("inf"),
                }
            )
    return pd.DataFrame(rows)
