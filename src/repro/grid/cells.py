"""Hierarchical spatial grid — the S2 substitute (see DESIGN.md §2).

The paper partitions space with Google S2 cells at a configurable
*level*; SLIM only needs three grid capabilities:

1. map a (lat, lon) point to the id of the level-ℓ cell containing it,
2. a per-level cell size schedule (finer level ⇒ smaller cell), and
3. the minimum geographical distance between two cells (for the
   proximity / alibi computation of Eq. 1).

We provide those over an equirectangular lat/lon grid. Level ℓ cells
are squares of ``cell_size_m(ℓ) = EARTH_CIRCUMFERENCE / (4 · 2^ℓ)``
metres of latitude on a side, which matches the S2 mean-edge schedule
closely (level 12 ≈ 2.45 km vs S2's ≈ 2.2 km). Cell ids pack the
integer (row, col) of the cell into one int64, so they can live in
Spark columns and be grouped/joined natively.

Longitude compression (cells narrower in metres at high latitude) is
handled in the *distance* function via a cos(lat) factor, exactly as a
real spherical grid would behave; the id mapping itself stays a pure
Catalyst expression (floor/divide), so binning never leaves the JVM.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F

EARTH_CIRCUMFERENCE_M = 40_075_017.0
#: metres per degree of latitude (and of longitude at the equator)
M_PER_DEG = 111_319.49
_COL_BITS = 32  # cell id = row << 32 | col

MAX_LEVEL = 24  # finer than ~0.6 m cells is pointless for mobility data


def cell_size_m(level: int) -> float:
    """Edge length (metres of latitude) of a level-``level`` cell."""
    if not 0 <= level <= MAX_LEVEL:
        raise ValueError(f"level must be in [0, {MAX_LEVEL}], got {level}")
    return EARTH_CIRCUMFERENCE_M / (4.0 * (2.0**level))


def cell_size_deg(level: int) -> float:
    """Edge length of a level-``level`` cell in degrees (lat and lon)."""
    return cell_size_m(level) / M_PER_DEG


def encode(lat: np.ndarray, lon: np.ndarray, level: int) -> np.ndarray:
    """Vectorized (lat, lon) → int64 cell id at ``level``."""
    step = cell_size_deg(level)
    row = np.floor((np.asarray(lat, dtype=np.float64) + 90.0) / step).astype(np.int64)
    col = np.floor((np.asarray(lon, dtype=np.float64) + 180.0) / step).astype(np.int64)
    return (row << _COL_BITS) | col


def encode_col(lat: Column, lon: Column, level: int) -> Column:
    """Catalyst expression computing the level-``level`` cell id.

    Mirrors :func:`encode` exactly (same floor arithmetic) so numpy and
    Spark agree bit-for-bit on cell assignment.
    """
    step = float(cell_size_deg(level))
    row = F.floor((lat + F.lit(90.0)) / F.lit(step)).cast("long")
    col = F.floor((lon + F.lit(180.0)) / F.lit(step)).cast("long")
    return F.shiftleft(row, _COL_BITS) + col


def decode(cell: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """int64 cell id → (row, col) integer arrays."""
    cell = np.asarray(cell, dtype=np.int64)
    return cell >> _COL_BITS, cell & ((1 << _COL_BITS) - 1)


def cell_center(cell: np.ndarray, level: int) -> tuple[np.ndarray, np.ndarray]:
    """Cell id → (lat, lon) of the cell centre."""
    step = cell_size_deg(level)
    row, col = decode(cell)
    return (row + 0.5) * step - 90.0, (col + 0.5) * step - 180.0


def min_distance_m(c1: np.ndarray, c2: np.ndarray, level: int) -> np.ndarray:
    """Minimum geographical distance in metres between two cells.

    This is the ``d`` of Eq. 1: the closest approach between the two
    cell rectangles (0 for identical or edge/corner-adjacent cells),
    computed in a planar approximation with longitude compressed by
    cos(mean latitude). Adequate for city-scale separations, which is
    where the runaway-distance comparison happens.
    """
    step_deg = cell_size_deg(level)
    r1, x1 = decode(c1)
    r2, x2 = decode(c2)
    # Gap between cell intervals, in whole cells (adjacent ⇒ 0).
    drow = np.maximum(0, np.abs(r1 - r2) - 1).astype(np.float64)
    dcol = np.maximum(0, np.abs(x1 - x2) - 1).astype(np.float64)
    mean_lat = ((r1 + r2 + 1.0) / 2.0) * step_deg - 90.0
    dy = drow * step_deg * M_PER_DEG
    dx = dcol * step_deg * M_PER_DEG * np.cos(np.radians(mean_lat))
    return np.hypot(dy, dx)
