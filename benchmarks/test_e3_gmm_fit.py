"""E3 (paper Fig. 6): GMM stop-threshold fit vs spatial detail."""
from repro.experiments import gmm_fit


def test_e3_gmm_fit(benchmark, spark, save_table):
    table = benchmark.pedantic(
        lambda: gmm_fit.run(spark, scale="bench"), rounds=1, iterations=1
    )
    save_table(table, "e3_gmm_fit", "E3 — GMM fit and stop threshold vs spatial detail (Fig. 6)")
    # level 4 is a legitimate degenerate row: the whole city fits one
    # ~600 km cell, idf ≡ 0, no positive edges → no fit (NaN columns)
    fitted = table.dropna(subset=["mu_tp", "mu_fp"])
    assert len(fitted) >= 3
    assert (fitted["mu_tp"] >= fitted["mu_fp"]).all()
