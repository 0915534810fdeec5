"""Shared plumbing for the evaluation harnesses (DESIGN.md §4).

Each harness is a pure function ``(spark, scale, ...) -> pandas
DataFrame`` whose rows are one printed table line; ``jobs/`` wraps them
for spark-submit and ``benchmarks/`` times them. ``scale`` is "test"
(seconds, used by pytest) or "bench" (the EXPERIMENTS.md numbers).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import metrics
from repro.core.slim import SlimConfig, SlimResult, run_slim
from repro.mobility import generator


def make_pair(
    dataset: str,
    scale: str,
    *,
    intersection_ratio: float = 0.5,
    inclusion_prob: float = 0.5,
    seed: int = 0,
    **overrides,
) -> generator.LinkagePair:
    """Build a Cab-like or SM-like linkage instance."""
    maker = {"cab": generator.cab_pair, "sm": generator.sm_pair}[dataset]
    return maker(
        scale=scale,
        intersection_ratio=intersection_ratio,
        inclusion_prob=inclusion_prob,
        seed=seed,
        **overrides,
    )


def spark_pair(
    spark: SparkSession, pair: generator.LinkagePair
) -> tuple[DataFrame, DataFrame]:
    """Lift both sides to cached Spark DataFrames."""
    rec_e, rec_i = pair.to_spark(spark)
    return rec_e.cache(), rec_i.cache()


def slim_row(
    res: SlimResult, pair: generator.LinkagePair, **tags
) -> dict:
    """One result row: tags + quality + instrumentation of a SLIM run."""
    prf = metrics.evaluate_links(res.links, pair.truth)
    return {
        **tags,
        "precision": round(prf.precision, 4),
        "recall": round(prf.recall, 4),
        "f1": round(prf.f1, 4),
        "n_linked": prf.n_linked,
        "n_true": prf.n_true,
        "alibi_pairs": res.n_alibi_pairs,
        "comparisons": res.n_comparisons,
        "candidates": res.n_candidates,
        "runtime_sec": round(res.runtime_sec, 2),
    }


def run_slim_row(
    rec_e: DataFrame,
    rec_i: DataFrame,
    pair: generator.LinkagePair,
    cfg: SlimConfig,
    **tags,
) -> dict:
    return slim_row(run_slim(rec_e, rec_i, cfg), pair, **tags)


def print_table(df: pd.DataFrame, title: str) -> pd.DataFrame:
    """Print a harness result the way the jobs do; returns ``df``."""
    print(f"\n=== {title} ===")
    print(df.to_string(index=False))
    return df
