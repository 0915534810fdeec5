#!/usr/bin/env python
"""E8 (paper Fig. 11): SLIM vs ST-Link vs GM.

    spark-submit jobs/exp_comparison.py --scale bench
"""
from repro.experiments import comparison
from repro.experiments.cli import run_job

if __name__ == "__main__":
    run_job("E8 comparison with existing work", comparison.run)
