"""E3 — GMM fit and stop-threshold quality vs spatial detail
(paper Fig. 6: window width 90 min, spatial detail 4–16).

For each spatial level, runs brute-force SLIM, reports the fitted GMM
components over the matched-edge weights, the detected stop threshold,
the separation between the components (how distinguishable true and
false positives are), and the resulting precision/recall — the paper's
observation being that separation and threshold quality improve with
spatial detail.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import metrics
from repro.core.slim import SlimConfig, run_slim
from repro.experiments import common

DEFAULT_LEVELS = {"test": [8, 12], "bench": [4, 8, 12, 16]}


def run(
    spark: SparkSession,
    *,
    dataset: str = "cab",
    scale: str = "test",
    levels: list[int] | None = None,
    window_min: float = 90.0,
    seed: int = 0,
) -> pd.DataFrame:
    levels = levels or DEFAULT_LEVELS[scale]
    pair = common.make_pair(dataset, scale, seed=seed)
    rec_e, rec_i = common.spark_pair(spark, pair)
    truth_pairs = set(zip(pair.truth["u"], pair.truth["v"]))
    rows = []
    for level in levels:
        res = run_slim(rec_e, rec_i, SlimConfig(level=level, window_min=window_min, use_lsh=False))
        prf = metrics.evaluate_links(res.links, pair.truth)
        row = {
            "dataset": dataset,
            "level": level,
            "window_min": window_min,
            "precision": round(prf.precision, 4),
            "recall": round(prf.recall, 4),
            "f1": round(prf.f1, 4),
        }
        if res.threshold is not None:
            g = res.threshold.gmm
            sep = (g.mu[1] - g.mu[0]) / (g.sigma[0] + g.sigma[1])
            matched = res.matched
            is_tp = [
                (u, v) in truth_pairs for u, v in zip(matched["u"], matched["v"])
            ]
            tp_scores = matched["score"][pd.Series(is_tp, index=matched.index)]
            fp_scores = matched["score"][~pd.Series(is_tp, index=matched.index)]
            row.update(
                threshold=round(res.threshold.threshold, 3),
                mu_fp=round(float(g.mu[0]), 3),
                mu_tp=round(float(g.mu[1]), 3),
                sigma_fp=round(float(g.sigma[0]), 3),
                sigma_tp=round(float(g.sigma[1]), 3),
                separation=round(float(sep), 3),
                mean_tp_score=round(float(tp_scores.mean()), 3) if len(tp_scores) else float("nan"),
                mean_fp_score=round(float(fp_scores.mean()), 3) if len(fp_scores) else float("nan"),
            )
        rows.append(row)
    return pd.DataFrame(rows)
