"""E1 (paper Fig. 4): Cab accuracy vs spatio-temporal level."""
from repro.experiments import spatiotemporal


def test_e1_spatiotemporal_cab(benchmark, spark, save_table):
    table = benchmark.pedantic(
        lambda: spatiotemporal.run(spark, dataset="cab", scale="bench"),
        rounds=1,
        iterations=1,
    )
    save_table(table, "e1_spatiotemporal_cab", "E1 — Cab: accuracy vs spatio-temporal level (Fig. 4)")
    assert table["f1"].max() > 0.9
