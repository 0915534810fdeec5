"""LSH over mobility histories via dominating grid cells (paper Sec 4).

Each mobility history is summarized into a *signature*: for a sequence
of non-overlapping query windows (``step`` leaf windows each) the
*dominating grid cell* — the cell holding the most of the entity's
records in that query window, at a configurable signature spatial
level — is appended. Query windows with no records contribute a
placeholder, which is omitted from hashing (here: simply no row).

The signature of length ``s`` is then split into ``b`` bands of ``r``
rows; ``b`` is derived from the target similarity threshold ``t`` via
``b = exp(W(−s·ln t))`` (Lambert W), so that signatures with
dominating-cell agreement above ``t`` land in the same bucket at least
once with high probability. Bands are hashed into ``n_buckets``
buckets; entities from the two datasets sharing a (band, bucket) become
candidate pairs. A *finite* bucket count means unrelated bands can
collide — exactly the effect the paper's Figure 9 sweeps.

In the paper the dominating-cell query is served by the inner nodes of
the history tree; here it is the same records relation aggregated at
(signature level × query window) — see DESIGN.md §3.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core import histories


def lambert_w(x: float, *, tol: float = 1e-12, max_iter: int = 100) -> float:
    """Principal-branch Lambert W for x ≥ 0 (Newton iteration)."""
    if x < 0:
        raise ValueError("only x >= 0 is needed here (t < 1 ⇒ −s·ln t > 0)")
    if x == 0:
        return 0.0
    w = math.log1p(x)  # good starting point for x >= 0
    for _ in range(max_iter):
        ew = math.exp(w)
        delta = (w * ew - x) / (ew * (w + 1.0))
        w -= delta
        if abs(delta) < tol * (1.0 + abs(w)):
            break
    return w


def n_bands(signature_len: int, threshold: float) -> int:
    """Number of bands b = exp(W(−s·ln t)), clamped to [1, s]."""
    if not 0 < threshold < 1:
        raise ValueError("threshold must be in (0, 1)")
    if signature_len < 1:
        raise ValueError("signature_len must be >= 1")
    b = round(math.exp(lambert_w(-signature_len * math.log(threshold))))
    return int(min(max(b, 1), signature_len))


@dataclass(frozen=True)
class LshConfig:
    """Parameters of the dominating-cell LSH (paper Sec 4).

    ``step`` is the query window size in *leaf windows*; the signature
    spatial ``level`` is independent of the similarity level.
    """

    level: int = 16
    step: int = 48
    threshold: float = 0.6
    n_buckets: int = 4096


def signatures(records: DataFrame, *, level: int, window_sec: int, step: int) -> DataFrame:
    """Dominating-cell signature entries ``(entity, qw, cell)``.

    One row per (entity, query window) that has records; the dominating
    cell is the argmax-record-count cell (ties broken on cell id so the
    result is deterministic).
    """
    if step < 1:
        raise ValueError("step must be >= 1")
    qbins = histories.build_bins(records, level=level, window_sec=window_sec * step)
    w = Window.partitionBy("entity", "window").orderBy(
        F.col("n_rec").desc(), F.col("cell").asc()
    )
    return (
        qbins.withColumn("rn", F.row_number().over(w))
        .where(F.col("rn") == 1)
        .select("entity", F.col("window").alias("qw"), "cell")
    )


def band_buckets(
    sigs: DataFrame, *, qw_min: int, r: int, n_buckets: int
) -> DataFrame:
    """Hash each entity's bands to buckets: ``(entity, band, bucket)``.

    A band's content is the ordered list of (position, dominating cell)
    of its non-placeholder positions; bands that are all placeholders
    produce no row. Hashing includes the in-band position so that the
    same cell at different query windows hashes differently, exactly as
    the paper's positional signatures do.
    """
    sig = sigs.select(
        "entity",
        (F.col("qw") - F.lit(int(qw_min))).alias("pos"),
        "cell",
    ).withColumn("band", (F.col("pos") / F.lit(int(r))).cast("long"))
    return (
        sig.groupBy("entity", "band")
        .agg(F.sort_array(F.collect_list(F.struct("pos", "cell"))).alias("content"))
        .select(
            "entity",
            "band",
            F.pmod(F.xxhash64(F.col("content")), F.lit(int(n_buckets))).alias("bucket"),
        )
    )


@dataclass(frozen=True)
class LshPlan:
    """Derived banding parameters for one linkage instance."""

    signature_len: int
    n_bands: int
    rows_per_band: int
    qw_min: int


def plan(records_e: DataFrame, records_i: DataFrame, *, window_sec: int, cfg: LshConfig) -> LshPlan:
    """Derive signature length and banding from the data's time span."""
    q_sec = window_sec * cfg.step
    bounds = (
        records_e.select("ts")
        .unionAll(records_i.select("ts"))
        .agg(
            F.floor(F.min("ts") / q_sec).alias("lo"),
            F.floor(F.max("ts") / q_sec).alias("hi"),
        )
        .collect()[0]
    )
    qw_min, qw_max = int(bounds["lo"]), int(bounds["hi"])
    s = qw_max - qw_min + 1
    b = n_bands(s, cfg.threshold)
    r = math.ceil(s / b)
    return LshPlan(signature_len=s, n_bands=b, rows_per_band=r, qw_min=qw_min)


def lsh_candidates(
    records_e: DataFrame,
    records_i: DataFrame,
    *,
    window_sec: int,
    cfg: LshConfig,
) -> tuple[DataFrame, LshPlan]:
    """Candidate entity pairs ``(u, v)`` sharing a (band, bucket).

    This is the paper's filtering step: only these pairs proceed to
    similarity scoring. Returns the distinct candidate relation plus
    the banding plan (for reporting).
    """
    p = plan(records_e, records_i, window_sec=window_sec, cfg=cfg)
    sig_e = signatures(records_e, level=cfg.level, window_sec=window_sec, step=cfg.step)
    sig_i = signatures(records_i, level=cfg.level, window_sec=window_sec, step=cfg.step)
    be = band_buckets(sig_e, qw_min=p.qw_min, r=p.rows_per_band, n_buckets=cfg.n_buckets)
    bi = band_buckets(sig_i, qw_min=p.qw_min, r=p.rows_per_band, n_buckets=cfg.n_buckets)
    cand = (
        be.select(F.col("entity").alias("u"), "band", "bucket")
        .join(bi.select(F.col("entity").alias("v"), "band", "bucket"), ["band", "bucket"])
        .select("u", "v")
        .distinct()
    )
    return cand, p


# --------------------------------------------------------------------------
# Alternative pruner: pyspark.ml MinHashLSH over bin sets (repro hint)
# --------------------------------------------------------------------------

def minhash_candidates(
    bins_e: DataFrame,
    bins_i: DataFrame,
    *,
    jaccard_distance: float = 0.8,
    num_hash_tables: int = 8,
    dim: int = 1 << 18,
    seed: int = 42,
) -> DataFrame:
    """Candidate pairs via the stock ``MinHashLSH`` transformer.

    Entities become binary sparse vectors over hashed (window, cell)
    bins; ``approxSimilarityJoin`` under Jaccard distance prunes pairs.
    Provided as a cross-check for the paper's own dominating-cell LSH
    (which remains the primary path, matching the paper).
    """
    from pyspark.ml.feature import MinHashLSH
    from pyspark.ml.linalg import SparseVector, VectorUDT

    @F.udf(returnType=VectorUDT())
    def to_vec(idxs):
        return SparseVector(dim, sorted(set(idxs)), [1.0] * len(set(idxs)))

    ve = (
        bins_e.select(
            F.col("entity").alias("u"),
            F.pmod(F.xxhash64("window", "cell"), F.lit(dim)).alias("idx"),
        )
        .groupBy("u")
        .agg(F.collect_set("idx").alias("idxs"))
        .select("u", to_vec("idxs").alias("features"))
    )
    vi = (
        bins_i.select(
            F.col("entity").alias("v"),
            F.pmod(F.xxhash64("window", "cell"), F.lit(dim)).alias("idx"),
        )
        .groupBy("v")
        .agg(F.collect_set("idx").alias("idxs"))
        .select("v", to_vec("idxs").alias("features"))
    )
    mh = MinHashLSH(
        inputCol="features", outputCol="hashes", numHashTables=num_hash_tables, seed=seed
    )
    model = mh.fit(ve.select(F.col("features")).unionAll(vi.select("features")))
    joined = model.approxSimilarityJoin(ve, vi, jaccard_distance, distCol="jd")
    return joined.select(
        F.col("datasetA.u").alias("u"), F.col("datasetB.v").alias("v")
    ).distinct()
