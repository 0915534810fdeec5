#!/usr/bin/env python
"""E4 (paper Fig. 7): F1/runtime vs inclusion probability x intersection.

    spark-submit jobs/exp_workload.py --dataset sm --scale bench
"""
from repro.experiments import workload
from repro.experiments.cli import run_job

if __name__ == "__main__":
    run_job("E4 workload sensitivity", workload.run)
