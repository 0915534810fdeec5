"""E7 (paper Fig. 10): ablation of MFN / pairing / idf / normalization."""
from repro.experiments import ablation


def test_e7_ablation(benchmark, spark, save_table):
    table = benchmark.pedantic(
        lambda: ablation.run(spark, scale="bench"), rounds=1, iterations=1
    )
    save_table(table, "e7_ablation", "E7 — ablation study (Fig. 10)")
    assert set(table["variant"]) == set(ablation.VARIANTS)
