"""ST-Link baseline (Basık et al., TMC 2018 — paper Sec 5.5).

ST-Link performs a sliding-window comparison over record pairs and
links two entities iff they have at least ``k`` co-occurring records in
at least ``l`` diverse locations and (at most a small tolerance of)
no alibi record pairs. If an entity has qualifying counterparts on
more than one entity of the other dataset, all of its pairs are deemed
ambiguous and dropped. ``k`` and ``l`` are chosen from the data as the
elbow of the co-occurrence-count distributions (no labels needed).

Reimplementation notes (the original is closed-source Java):

* a *co-occurrence* is a shared (temporal window × grid cell) bin;
* *location diversity* counts distinct cells among co-occurrences;
* *alibis* are same-window bin pairs farther apart than the runaway
  distance, counted only for co-occurring candidate pairs (others can
  never link);
* the ranking score for Hit-Precision is ``k_uv · l_uv`` (co-occurrence
  volume × diversity), a monotone proxy for ST-Link's evidence order;
* the comparison-cost metric counts all within-window cross record
  pairs — ST-Link has no candidate pruning, which is exactly why the
  paper's Fig. 11d shows it doing ~3 orders of magnitude more
  comparisons than SLIM+LSH.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import histories, proximity, tuning
from repro.grid import cells


@dataclass(frozen=True)
class StLinkConfig:
    level: int = 12
    window_min: float = 15.0
    alpha_m_per_sec: float = proximity.DEFAULT_ALPHA_M_PER_SEC
    alibi_tolerance: int = 3  # paper Sec 5.5 sets the alibi threshold count to 3
    k_min: int | None = None  # override elbow-detected k*
    l_min: int | None = None  # override elbow-detected l*

    @property
    def window_sec(self) -> int:
        return int(round(self.window_min * 60))


@dataclass
class StLinkResult:
    links: pd.DataFrame  # (u, v, score)
    scores: pd.DataFrame  # all co-occurring pairs (u, v, score, k, l, alibis)
    k_star: int
    l_star: int
    n_comparisons: int
    runtime_sec: float


def _center_cols(cell_col: str, level: int, prefix: str):
    """Catalyst expressions for cell-centre planar metre coordinates."""
    step = cells.cell_size_deg(level)
    row = F.shiftright(F.col(cell_col), 32)
    col = F.col(cell_col).bitwiseAND(F.lit((1 << 32) - 1))
    lat = (row + F.lit(0.5)) * F.lit(step) - F.lit(90.0)
    lon = (col + F.lit(0.5)) * F.lit(step) - F.lit(180.0)
    y = lat * F.lit(cells.M_PER_DEG)
    x = lon * F.lit(cells.M_PER_DEG) * F.cos(F.radians(lat))
    return y.alias(f"{prefix}_y"), x.alias(f"{prefix}_x")


def _elbow_threshold(values: np.ndarray, fallback: int) -> int:
    """Pick a count threshold at the elbow of the sorted-desc curve."""
    values = np.sort(values)[::-1].astype(float)
    if values.size < 3 or values.max() == values.min():
        return fallback
    x = np.arange(values.size, dtype=float)
    elbow_x = tuning.kneedle(x, values, direction="decreasing", curve="convex")
    return int(max(fallback, values[int(elbow_x)]))


def run_stlink(
    records_e: DataFrame, records_i: DataFrame, cfg: StLinkConfig
) -> StLinkResult:
    """Run ST-Link and return links, scores and instrumentation."""
    t0 = time.monotonic()
    runaway = proximity.runaway_distance_m(cfg.window_sec, cfg.alpha_m_per_sec)
    bins_e = histories.build_bins(
        records_e, level=cfg.level, window_sec=cfg.window_sec
    )
    bins_i = histories.build_bins(
        records_i, level=cfg.level, window_sec=cfg.window_sec
    )

    # comparison cost: all within-window record pairs (no pruning)
    we = records_e.groupBy(
        F.floor(F.col("ts") / cfg.window_sec).alias("window")
    ).agg(F.count(F.lit(1)).alias("ne"))
    wi = records_i.groupBy(
        F.floor(F.col("ts") / cfg.window_sec).alias("window")
    ).agg(F.count(F.lit(1)).alias("ni"))
    n_comp_row = (
        we.join(wi, "window").agg(F.sum(F.col("ne") * F.col("ni")).alias("t")).collect()[0]
    )
    n_comparisons = int(n_comp_row["t"] or 0)

    # co-occurrences: shared (window, cell) bins
    co = (
        bins_e.select(F.col("entity").alias("u"), "window", "cell")
        .join(
            bins_i.select(F.col("entity").alias("v"), "window", "cell"),
            ["window", "cell"],
        )
        .groupBy("u", "v")
        .agg(
            F.count(F.lit(1)).alias("k"),
            F.countDistinct("cell").alias("l"),
        )
    )

    # alibi record pairs among co-occurring candidates
    eb = bins_e.select(
        F.col("entity").alias("u"), "window", *_center_cols("cell", cfg.level, "e")
    )
    ib = bins_i.select(
        F.col("entity").alias("v"), "window", *_center_cols("cell", cfg.level, "i")
    )
    cand = co.select("u", "v")
    dist = (
        cand.join(eb, "u")
        .join(ib, ["v", "window"])
        .withColumn(
            "d",
            F.sqrt(
                (F.col("e_y") - F.col("i_y")) ** 2 + (F.col("e_x") - F.col("i_x")) ** 2
            ),
        )
    )
    alibis = dist.groupBy("u", "v").agg(
        F.sum(F.when(F.col("d") > runaway, 1).otherwise(0)).alias("alibis")
    )
    scores = (
        co.join(alibis, ["u", "v"], "left")
        .fillna({"alibis": 0})
        .withColumn("score", (F.col("k") * F.col("l")).cast("double"))
        .toPandas()
    )

    k_star = cfg.k_min if cfg.k_min is not None else _elbow_threshold(
        scores["k"].to_numpy(), fallback=2
    )
    l_star = cfg.l_min if cfg.l_min is not None else _elbow_threshold(
        scores["l"].to_numpy(), fallback=2
    )

    qual = scores[
        (scores["k"] >= k_star)
        & (scores["l"] >= l_star)
        & (scores["alibis"] <= cfg.alibi_tolerance)
    ]
    # ambiguity: drop every pair touching an entity with >1 qualifying pair
    u_counts = qual["u"].value_counts()
    v_counts = qual["v"].value_counts()
    links = qual[
        qual["u"].map(u_counts).eq(1) & qual["v"].map(v_counts).eq(1)
    ][["u", "v", "score"]].reset_index(drop=True)

    return StLinkResult(
        links=links,
        scores=scores,
        k_star=int(k_star),
        l_star=int(l_star),
        n_comparisons=n_comparisons,
        runtime_sec=time.monotonic() - t0,
    )
