"""E4 — sensitivity to workload parameters (paper Fig. 7).

F1-Score and running time as a function of the record inclusion
probability, one series per entity intersection ratio, for the
Cab-like and SM-like datasets.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.slim import SlimConfig
from repro.experiments import common

DEFAULT_GRID = {
    "test": {"inclusion_probs": [0.25, 0.75], "intersection_ratios": [0.5]},
    "bench": {
        "inclusion_probs": [0.1, 0.5, 0.9],
        "intersection_ratios": [0.3, 0.5, 0.7],
    },
}


def run(
    spark: SparkSession,
    *,
    dataset: str = "cab",
    scale: str = "test",
    inclusion_probs: list[float] | None = None,
    intersection_ratios: list[float] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    grid = DEFAULT_GRID[scale]
    inclusion_probs = inclusion_probs or grid["inclusion_probs"]
    intersection_ratios = intersection_ratios or grid["intersection_ratios"]
    rows = []
    for rho in intersection_ratios:
        for p in inclusion_probs:
            pair = common.make_pair(
                dataset, scale, intersection_ratio=rho, inclusion_prob=p, seed=seed
            )
            rec_e, rec_i = common.spark_pair(spark, pair)
            avg_records = (
                pair.e_records.groupby("entity").size().mean()
                + pair.i_records.groupby("entity").size().mean()
            ) / 2.0
            rows.append(
                common.run_slim_row(
                    rec_e,
                    rec_i,
                    pair,
                    SlimConfig(use_lsh=False),
                    dataset=dataset,
                    intersection_ratio=rho,
                    inclusion_prob=p,
                    avg_records=round(avg_records, 1),
                )
            )
            rec_e.unpersist()
            rec_i.unpersist()
    return pd.DataFrame(rows)
