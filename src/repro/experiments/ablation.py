"""E7 — ablation study (paper Fig. 10).

F1 of SLIM against four modified variants, (a) as a function of the
spatial level at 15-minute windows and (b) as a function of the window
width at level 12:

* ``mnn``       — MFN alibi pass removed,
* ``all_pairs`` — all within-window bin pairs instead of MNN,
* ``no_idf``    — idf uniqueness award removed,
* ``no_norm``   — BM25 length normalization removed.

Also reports the mean similarity of matched false-positive pairs,
which the paper uses to show MFN's effect (2227 → 1501 at level 12 /
5-minute windows).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core import metrics
from repro.core.slim import SlimConfig, run_slim
from repro.experiments import common

VARIANTS: dict[str, dict] = {
    "slim": {},
    "mnn": {"use_mfn": False},
    "all_pairs": {"pairing": "all", "use_mfn": False},
    "no_idf": {"use_idf": False},
    "no_norm": {"use_norm": False},
}

DEFAULT_GRID = {
    "test": {"levels": [12], "windows_min": [90.0], "fixed_level": 12, "fixed_window": 15.0},
    "bench": {
        "levels": [8, 12, 24],
        "windows_min": [15.0, 360.0, 720.0],
        "fixed_level": 12,
        "fixed_window": 15.0,
    },
}


def run(
    spark: SparkSession,
    *,
    dataset: str = "cab",
    scale: str = "test",
    levels: list[int] | None = None,
    windows_min: list[float] | None = None,
    variants: list[str] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    grid = DEFAULT_GRID[scale]
    levels = levels or grid["levels"]
    windows_min = windows_min or grid["windows_min"]
    variants = variants or list(VARIANTS)
    pair = common.make_pair(dataset, scale, seed=seed)
    rec_e, rec_i = common.spark_pair(spark, pair)
    truth_pairs = set(zip(pair.truth["u"], pair.truth["v"]))

    sweeps = [("level", lv, grid["fixed_window"]) for lv in levels] + [
        ("window", grid["fixed_level"], w) for w in windows_min
    ]
    rows = []
    for sweep, level, window in sweeps:
        for name in variants:
            cfg = SlimConfig(
                level=level, window_min=window, use_lsh=False, **VARIANTS[name]
            )
            res = run_slim(rec_e, rec_i, cfg)
            prf = metrics.evaluate_links(res.links, pair.truth)
            matched = res.matched
            fp_mask = [
                (u, v) not in truth_pairs for u, v in zip(matched["u"], matched["v"])
            ]
            fp_scores = matched["score"][pd.Series(fp_mask, index=matched.index)]
            rows.append(
                {
                    "dataset": dataset,
                    "sweep": sweep,
                    "level": level,
                    "window_min": window,
                    "variant": name,
                    "f1": round(prf.f1, 4),
                    "precision": round(prf.precision, 4),
                    "recall": round(prf.recall, 4),
                    "mean_fp_score": round(float(fp_scores.mean()), 2)
                    if len(fp_scores)
                    else float("nan"),
                }
            )
    return pd.DataFrame(rows)
