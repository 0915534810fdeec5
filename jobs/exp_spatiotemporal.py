#!/usr/bin/env python
"""E1/E2 (paper Figs. 4-5): accuracy vs spatio-temporal level.

    spark-submit jobs/exp_spatiotemporal.py --dataset cab --scale bench
"""
from repro.experiments import spatiotemporal
from repro.experiments.cli import run_job

if __name__ == "__main__":
    run_job("E1/E2 spatio-temporal level", spatiotemporal.run)
