"""Tests for mobility-history construction — DuckDB oracle checks for
every query-shaped aggregation."""
import math

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import oracle
from repro.core import histories
from repro.grid import cells


@pytest.fixture(scope="module")
def tiny_records(spark):
    """Hand-sized records frame with known binning."""
    g = np.random.default_rng(11)
    n = 400
    pdf = pd.DataFrame(
        {
            "entity": g.integers(0, 8, n),
            "ts": g.integers(0, 6 * 3600, n),
            "lat": 37.7 + g.random(n) * 0.2,
            "lon": -122.5 + g.random(n) * 0.2,
        }
    ).astype({"entity": "int64", "ts": "int64"})
    return spark.createDataFrame(pdf).cache(), pdf


class TestBuildBins:
    def test_oracle_counts(self, tiny_records):
        df, pdf = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        step = cells.cell_size_deg(12)
        pdf2 = pdf.copy()
        pdf2["window"] = pdf2["ts"] // 900
        pdf2["cell"] = cells.encode(pdf2["lat"].to_numpy(), pdf2["lon"].to_numpy(), 12)
        oracle.assert_equivalent(
            bins,
            'SELECT entity, "window", cell, count(*) AS n_rec '
            'FROM rec GROUP BY entity, "window", cell',
            rec=pdf2[["entity", "window", "cell"]],
        )
        assert step > 0  # silence unused warning

    def test_distinct_bins(self, tiny_records):
        df, _ = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        assert (
            bins.groupBy("entity", "window", "cell").count().where("count > 1").count()
            == 0
        )

    def test_total_records_preserved(self, tiny_records):
        df, pdf = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        assert bins.agg(F.sum("n_rec")).collect()[0][0] == len(pdf)

    def test_finer_level_no_fewer_bins(self, tiny_records):
        df, _ = tiny_records
        coarse = histories.build_bins(df, level=8, window_sec=900).count()
        fine = histories.build_bins(df, level=16, window_sec=900).count()
        assert fine >= coarse

    def test_wider_window_no_more_bins(self, tiny_records):
        df, _ = tiny_records
        narrow = histories.build_bins(df, level=12, window_sec=300).count()
        wide = histories.build_bins(df, level=12, window_sec=3600).count()
        assert wide <= narrow


class TestHistorySizes:
    def test_oracle(self, tiny_records):
        df, pdf = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        pdf2 = pdf.copy()
        pdf2["window"] = pdf2["ts"] // 900
        pdf2["cell"] = cells.encode(pdf2["lat"].to_numpy(), pdf2["lon"].to_numpy(), 12)
        oracle.assert_equivalent(
            histories.history_sizes(bins),
            'SELECT entity, count(*) AS n_bins FROM '
            '(SELECT DISTINCT entity, "window", cell FROM rec) GROUP BY entity',
            rec=pdf2[["entity", "window", "cell"]],
        )


class TestNormFactors:
    def test_b_zero_is_identity(self, tiny_records):
        df, _ = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        L = histories.norm_factors(bins, b=0.0).toPandas()
        assert np.allclose(L["L"], 1.0)

    def test_b_one_is_relative_size(self, tiny_records):
        df, _ = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        sizes = histories.history_sizes(bins).toPandas()
        L = histories.norm_factors(bins, b=1.0).toPandas().merge(sizes, on="entity")
        avg = sizes["n_bins"].mean()
        assert np.allclose(L["L"], L["n_bins"] / avg)

    def test_mean_is_one_at_any_b(self, tiny_records):
        # E[L] = (1-b) + b·E[|H|]/avg = 1
        df, _ = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        for b in (0.25, 0.5, 0.75):
            L = histories.norm_factors(bins, b=b).toPandas()
            assert L["L"].mean() == pytest.approx(1.0)

    @pytest.mark.parametrize("bad", [-0.1, 1.1])
    def test_rejects_bad_b(self, tiny_records, bad):
        df, _ = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        with pytest.raises(ValueError):
            histories.norm_factors(bins, b=bad)


class TestIdf:
    def test_oracle(self, tiny_records):
        df, pdf = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        n_u = pdf["entity"].nunique()
        pdf2 = pdf.copy()
        pdf2["window"] = pdf2["ts"] // 900
        pdf2["cell"] = cells.encode(pdf2["lat"].to_numpy(), pdf2["lon"].to_numpy(), 12)
        oracle.assert_equivalent(
            histories.idf(bins, n_entities=n_u),
            f'SELECT "window", cell, ln({n_u} / count(DISTINCT entity)) AS idf '
            'FROM rec GROUP BY "window", cell',
            rec=pdf2[["entity", "window", "cell"]],
        )

    def test_unique_bin_gets_max_idf(self, tiny_records):
        df, pdf = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        n_u = pdf["entity"].nunique()
        vals = histories.idf(bins).toPandas()["idf"]
        assert vals.max() <= math.log(n_u) + 1e-9
        assert vals.min() >= 0.0

    def test_everyone_bin_zero_idf(self, spark):
        # all entities in the same bin ⇒ idf = log(1) = 0
        pdf = pd.DataFrame(
            {"entity": [0, 1, 2], "ts": [0, 1, 2], "lat": [0.0] * 3, "lon": [0.0] * 3}
        )
        bins = histories.build_bins(spark.createDataFrame(pdf), level=12, window_sec=900)
        vals = histories.idf(bins).toPandas()
        assert len(vals) == 1 and vals["idf"].iloc[0] == pytest.approx(0.0)


class TestComparisonCounts:
    def test_all_pairs_closed_form(self, tiny_records, spark):
        df, pdf = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900).cache()
        total = histories.comparison_count_all_pairs(bins, bins)
        # closed form equals per-window (Σ bins)²
        bp = bins.groupBy("window").count().toPandas()
        assert total == int((bp["count"] ** 2).sum())

    def test_candidate_count_matches_all_pairs_when_cross(self, tiny_records, spark):
        df, _ = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900).cache()
        ents = [r[0] for r in bins.select("entity").distinct().collect()]
        cand = spark.createDataFrame(
            [(u, v) for u in ents for v in ents], "u long, v long"
        )
        assert histories.comparison_count_candidates(
            bins, bins, cand
        ) == histories.comparison_count_all_pairs(bins, bins)

    def test_candidate_subset_fewer(self, tiny_records, spark):
        df, _ = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900).cache()
        ents = sorted(r[0] for r in bins.select("entity").distinct().collect())
        cand = spark.createDataFrame([(ents[0], ents[1])], "u long, v long")
        sub = histories.comparison_count_candidates(bins, bins, cand)
        assert 0 < sub < histories.comparison_count_all_pairs(bins, bins)

    def test_oracle_window_bin_counts(self, tiny_records):
        df, pdf = tiny_records
        bins = histories.build_bins(df, level=12, window_sec=900)
        pdf2 = pdf.copy()
        pdf2["window"] = pdf2["ts"] // 900
        pdf2["cell"] = cells.encode(pdf2["lat"].to_numpy(), pdf2["lon"].to_numpy(), 12)
        oracle.assert_equivalent(
            histories.window_bin_counts(bins),
            'SELECT entity, "window", count(*) AS n_bins_w FROM '
            '(SELECT DISTINCT entity, "window", cell FROM rec) GROUP BY entity, "window"',
            rec=pdf2[["entity", "window", "cell"]],
        )
