"""E5 (paper Fig. 8): LSH relative F1 and speed-up vs signature params."""
import pandas as pd

from repro.experiments import lsh_level


def test_e5_lsh_level(benchmark, spark, save_table):
    def run_both():
        cab = lsh_level.run(spark, dataset="cab", scale="bench")
        sm = lsh_level.run(spark, dataset="sm", scale="bench")
        return pd.concat([cab, sm], ignore_index=True)

    table = benchmark.pedantic(run_both, rounds=1, iterations=1)
    save_table(table, "e5_lsh_level", "E5 — LSH accuracy and speed-up vs signature level/step (Fig. 8)")
    assert (table["speedup"] >= 1).any()
