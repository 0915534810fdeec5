"""E4 (paper Fig. 7): F1/runtime vs inclusion probability and intersection."""
import pandas as pd

from repro.experiments import workload


def test_e4_workload(benchmark, spark, save_table):
    def run_both():
        cab = workload.run(spark, dataset="cab", scale="bench")
        sm = workload.run(spark, dataset="sm", scale="bench")
        return pd.concat([cab, sm], ignore_index=True)

    table = benchmark.pedantic(run_both, rounds=1, iterations=1)
    save_table(table, "e4_workload", "E4 — workload sensitivity (Fig. 7)")
    assert table["f1"].between(0, 1).all()
