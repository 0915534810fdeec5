"""E8 (paper Fig. 11): SLIM vs ST-Link vs GM."""
from repro.experiments import comparison


def test_e8_comparison(benchmark, spark, save_table):
    table = benchmark.pedantic(
        lambda: comparison.run(spark, scale="bench"), rounds=1, iterations=1
    )
    save_table(table, "e8_comparison", "E8 — comparison with ST-Link and GM (Fig. 11)")
    dens = table[table["part"] == "density"]
    assert {"slim", "slim_lsh", "stlink", "gm"} <= set(dens["algo"])
