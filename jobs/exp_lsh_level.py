#!/usr/bin/env python
"""E5 (paper Fig. 8): LSH relative F1 + speed-up vs signature params.

    spark-submit jobs/exp_lsh_level.py --dataset cab --scale bench
"""
from repro.experiments import lsh_level
from repro.experiments.cli import run_job

if __name__ == "__main__":
    run_job("E5 LSH signature sweep", lsh_level.run)
