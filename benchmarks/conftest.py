"""Benchmark-local fixtures.

Each benchmark runs its harness once (``pedantic`` rounds=1 — these are
minutes-long experiment sweeps, not microbenchmarks), prints the table
it reproduces, and drops a CSV under ``benchmarks/results/`` which
EXPERIMENTS.md quotes.
"""
import pathlib

import pytest

RESULTS_DIR = pathlib.Path(__file__).parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> pathlib.Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR


@pytest.fixture(scope="session")
def save_table(results_dir):
    from repro.experiments.common import print_table

    def _save(df, name: str, title: str):
        print_table(df, title)
        df.to_csv(results_dir / f"{name}.csv", index=False)
        return df

    return _save
