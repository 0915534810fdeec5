"""Synthetic mobility datasets with exact ground truth (DESIGN.md §2).

The paper evaluates on two real corpora we cannot ship:

* **Cab** — GPS pings of ~530 San Francisco taxis over 24 days
  (dense continuous traces, ~10,700 records/entity).
* **SM** — Twitter × Foursquare check-ins (~30 k users, ~12
  records/user, venue-popularity skew, world-wide spread).

We simulate the *generating process* of each and then apply the paper's
own sampling protocol (Sec 5.1): draw two entity sets with a controlled
**intersection ratio**, keep each record per side with an independent
**inclusion probability**, and drop entities with ≤ ``min_records``
records. Because both sides sample the same underlying trace, ground
truth is exact, and the two sides are temporally asynchronous exactly
as two real services would be.

All generators are deterministic in ``seed``. They return pandas frames
(record counts are small at laptop scale); ``to_spark`` lifts them into
DataFrames with the canonical schema ``(entity: long, ts: long seconds,
lat: double, lon: double)``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

#: I-side entity ids are offset so the two sides can never collide.
I_SIDE_OFFSET = 1_000_000_000

RECORD_COLUMNS = ["entity", "ts", "lat", "lon"]


def to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift a records frame into Spark with the canonical schema."""
    pdf = pdf[RECORD_COLUMNS].astype(
        {"entity": "int64", "ts": "int64", "lat": "float64", "lon": "float64"}
    )
    return spark.createDataFrame(pdf)


# --------------------------------------------------------------------------
# Cab-like: dense continuous taxi traces (random-waypoint-ish walk)
# --------------------------------------------------------------------------

def cab_traces(
    *,
    n_entities: int = 24,
    duration_min: int = 360,
    ping_interval_min: float = 2.0,
    box_km: float = 50.0,
    speed_km_min: float = 0.7,
    center_lat: float = 37.75,
    center_lon: float = -122.45,
    seed: int = 0,
) -> pd.DataFrame:
    """Simulate taxi GPS traces inside a ``box_km`` square city.

    Each taxi performs a velocity-persistent random walk (AR(1)
    velocity, reflecting boundaries) interleaved with *dwell* episodes
    — idling at a taxi stand, as SF cabs do — and reports its position
    every ``ping_interval_min`` minutes. Dwells are what give each taxi
    stable *dominating grid cells* (Sec 4); without them the LSH
    signatures of the real Cab data could not be reproduced. Speeds
    stay well under the paper's α = 2 km/min runaway speed, so
    same-entity records never look like alibis, while distant taxis in
    narrow windows do.
    """
    g = np.random.default_rng(seed)
    n_steps = max(1, int(round(duration_min / ping_interval_min)))
    half = box_km / 2.0
    n_stands = 3
    stands = g.uniform(-half, half, size=(n_entities, n_stands, 2))
    target = g.integers(0, n_stands, n_entities)
    pos = stands[np.arange(n_entities), g.integers(0, n_stands, n_entities)].copy()
    vel = np.zeros((n_entities, 2))
    dwell_left = np.zeros(n_entities, dtype=np.int64)
    rows_idx = np.arange(n_entities)
    out = np.empty((n_steps, n_entities, 2))
    for s in range(n_steps):
        moving = dwell_left <= 0
        tgt = stands[rows_idx, target]
        delta = tgt - pos
        dist = np.linalg.norm(delta, axis=1)
        # arrival at the target stand: park (mean ~25 min) and pick the
        # next stand to head to afterwards
        arrived = moving & (dist < 1.0)
        dwell_left = np.where(arrived, g.geometric(0.08, n_entities), dwell_left - 1)
        target = np.where(arrived, g.integers(0, n_stands, n_entities), target)
        moving &= ~arrived
        # steer toward the target with persistent noisy velocity
        steer = delta / np.maximum(dist, 1e-9)[:, None] * speed_km_min
        vel = 0.7 * vel + 0.3 * steer + g.normal(
            0.0, 0.3 * speed_km_min, size=(n_entities, 2)
        )
        # cap speed at 1.5 km/min (< α = 2 km/min)
        speed = np.linalg.norm(vel, axis=1, keepdims=True)
        vel = np.where(speed > 1.5, vel * (1.5 / speed), vel)
        pos = np.where(moving[:, None], pos + vel * ping_interval_min, pos)
        # reflect at the city boundary
        over = np.abs(pos) > half
        pos = np.where(over, np.sign(pos) * (2 * half) - pos, pos)
        vel = np.where(over, -vel, vel)
        out[s] = pos
    m_per_deg = 111_319.49
    ts = (np.arange(n_steps) * ping_interval_min * 60.0).astype(np.int64)
    ent = np.repeat(np.arange(n_entities, dtype=np.int64), n_steps)
    km = out.transpose(1, 0, 2).reshape(-1, 2)  # entity-major
    return pd.DataFrame(
        {
            "entity": ent,
            "ts": np.tile(ts, n_entities),
            "lat": center_lat + km[:, 0] * 1000.0 / m_per_deg,
            "lon": center_lon
            + km[:, 1] * 1000.0 / (m_per_deg * np.cos(np.radians(center_lat))),
        }
    )


# --------------------------------------------------------------------------
# SM-like: sparse zipfian-venue check-ins across dispersed cities
# --------------------------------------------------------------------------

def sm_checkins(
    *,
    n_entities: int = 300,
    n_cities: int = 12,
    venues_per_city: int = 60,
    region_km: float = 3000.0,
    city_km: float = 15.0,
    duration_days: int = 26,
    records_per_entity_mean: float = 24.0,
    home_bias: float = 0.85,
    zipf_alpha: float = 1.2,
    seed: int = 0,
) -> pd.DataFrame:
    """Simulate social-media check-ins with venue-popularity skew.

    Cities are scattered over a ``region_km`` square; each city holds
    ``venues_per_city`` venues. A user lives in one city and checks in
    at a *personal* zipfian ranking of the home city's venues
    (probability ``home_bias``) or at a random global venue otherwise.
    Check-in times are uniform over the horizon, so per-entity data is
    sparse — the regime where idf and LSH matter in the paper.
    """
    g = np.random.default_rng(seed)
    m_per_deg = 111_319.49
    city_xy = g.uniform(-region_km / 2, region_km / 2, size=(n_cities, 2))
    venue_city = np.repeat(np.arange(n_cities), venues_per_city)
    venue_xy = city_xy[venue_city] + g.uniform(
        -city_km / 2, city_km / 2, size=(n_cities * venues_per_city, 2)
    )
    n_venues = n_cities * venues_per_city

    home = g.integers(0, n_cities, n_entities)
    # personal zipf over home-city venues: each user gets an own
    # permutation so favourites differ across users
    ranks = np.arange(1, venues_per_city + 1, dtype=np.float64)
    zipf_p = (1.0 / ranks**zipf_alpha)
    zipf_p /= zipf_p.sum()

    counts = g.poisson(records_per_entity_mean, n_entities)
    counts = np.maximum(counts, 1)
    rows_ent, rows_venue = [], []
    for u in range(n_entities):
        n = counts[u]
        perm = np.random.default_rng(seed * 7919 + u).permutation(venues_per_city)
        local = home[u] * venues_per_city + perm[g.choice(venues_per_city, n, p=zipf_p)]
        use_global = g.random(n) >= home_bias
        glob = g.integers(0, n_venues, n)
        rows_ent.append(np.full(n, u, dtype=np.int64))
        rows_venue.append(np.where(use_global, glob, local))
    ent = np.concatenate(rows_ent)
    ven = np.concatenate(rows_venue)
    ts = g.integers(0, duration_days * 86_400, ent.size)
    xy = venue_xy[ven]
    return pd.DataFrame(
        {
            "entity": ent,
            "ts": ts.astype(np.int64),
            "lat": xy[:, 0] * 1000.0 / m_per_deg,
            "lon": xy[:, 1] * 1000.0 / m_per_deg,
        }
    ).sort_values(["entity", "ts"], kind="stable", ignore_index=True)


# --------------------------------------------------------------------------
# The paper's sampling protocol (Sec 5.1)
# --------------------------------------------------------------------------

@dataclass(frozen=True)
class LinkagePair:
    """Two sampled location datasets plus exact ground truth.

    ``truth`` holds one row (u, v) per entity present (with enough
    records) on both sides; ``e_records`` / ``i_records`` use disjoint
    id spaces (I side offset by :data:`I_SIDE_OFFSET`).
    """

    e_records: pd.DataFrame
    i_records: pd.DataFrame
    truth: pd.DataFrame  # columns: u, v

    def to_spark(self, spark: SparkSession) -> tuple[DataFrame, DataFrame]:
        return to_spark(spark, self.e_records), to_spark(spark, self.i_records)


def sample_pair(
    records: pd.DataFrame,
    *,
    intersection_ratio: float = 0.5,
    inclusion_prob: float = 0.5,
    min_records: int = 5,
    seed: int = 0,
) -> LinkagePair:
    """Split one true corpus into two overlapping location datasets.

    Both sides get ``n_each = floor(N / (2 − ρ))`` entities where N is
    the number of true entities, sharing ``round(ρ · n_each)`` of them
    (ρ = ``intersection_ratio`` — the paper's ratio of common entities
    to the size of the smaller dataset). Each record survives on each
    side independently with probability ``inclusion_prob``; entities
    left with ≤ ``min_records`` records are dropped from that side (and
    from the truth if dropped from either).
    """
    if not 0.0 <= intersection_ratio <= 1.0:
        raise ValueError("intersection_ratio must be in [0, 1]")
    if not 0.0 < inclusion_prob <= 1.0:
        raise ValueError("inclusion_prob must be in (0, 1]")
    g = np.random.default_rng(seed)
    entities = np.sort(records["entity"].unique())
    n = entities.size
    n_each = int(n / (2.0 - intersection_ratio))
    if n_each < 1:
        raise ValueError(f"too few entities ({n}) for sampling")
    n_common = int(round(intersection_ratio * n_each))
    perm = g.permutation(entities)
    common = perm[:n_common]
    e_only = perm[n_common : n_each]
    i_only = perm[n_each : 2 * n_each - n_common]
    e_ids = set(np.concatenate([common, e_only]).tolist())
    i_ids = set(np.concatenate([common, i_only]).tolist())

    def _side(ids: set[int], rng: np.random.Generator, offset: int) -> pd.DataFrame:
        side = records[records["entity"].isin(ids)].copy()
        keep = rng.random(len(side)) < inclusion_prob
        side = side[keep]
        sizes = side.groupby("entity")["ts"].transform("size")
        side = side[sizes > min_records].copy()
        side["entity"] = side["entity"] + offset
        return side.reset_index(drop=True)[RECORD_COLUMNS]

    e_rec = _side(e_ids, np.random.default_rng(seed + 101), 0)
    i_rec = _side(i_ids, np.random.default_rng(seed + 202), I_SIDE_OFFSET)
    e_kept = set(e_rec["entity"].unique().tolist())
    i_kept = set((i_rec["entity"] - I_SIDE_OFFSET).unique().tolist())
    truth_ids = sorted(set(common.tolist()) & e_kept & i_kept)
    truth = pd.DataFrame(
        {
            "u": np.asarray(truth_ids, dtype=np.int64),
            "v": np.asarray(truth_ids, dtype=np.int64) + I_SIDE_OFFSET,
        }
    )
    return LinkagePair(e_records=e_rec, i_records=i_rec, truth=truth)


def cab_pair(
    *,
    scale: str = "test",
    intersection_ratio: float = 0.5,
    inclusion_prob: float = 0.5,
    min_records: int = 5,
    seed: int = 0,
    **overrides,
) -> LinkagePair:
    """Cab-like linkage instance at a named scale (see DESIGN.md §5)."""
    params = dict(
        test=dict(n_entities=24, duration_min=360, ping_interval_min=2.0),
        bench=dict(n_entities=60, duration_min=1440, ping_interval_min=2.0),
    )[scale]
    params.update(overrides)
    traces = cab_traces(seed=seed, **params)
    return sample_pair(
        traces,
        intersection_ratio=intersection_ratio,
        inclusion_prob=inclusion_prob,
        min_records=min_records,
        seed=seed,
    )


def sm_pair(
    *,
    scale: str = "test",
    intersection_ratio: float = 0.5,
    inclusion_prob: float = 0.5,
    min_records: int = 5,
    seed: int = 0,
    **overrides,
) -> LinkagePair:
    """SM-like linkage instance at a named scale (see DESIGN.md §5)."""
    params = dict(
        test=dict(n_entities=300, n_cities=8, duration_days=26),
        # "bench" is sized so brute-force similarity sweeps stay tractable;
        # "large" exists for LSH-only experiments (E6) whose brute-force
        # cost is a closed-form count, where more entities show the
        # entity-count-driven speed-up the paper reports for SM
        bench=dict(n_entities=600, n_cities=12, duration_days=26),
        large=dict(n_entities=2000, n_cities=12, duration_days=26),
    )[scale]
    params.update(overrides)
    checkins = sm_checkins(seed=seed, **params)
    return sample_pair(
        checkins,
        intersection_ratio=intersection_ratio,
        inclusion_prob=inclusion_prob,
        min_records=min_records,
        seed=seed,
    )
