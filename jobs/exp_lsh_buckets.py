#!/usr/bin/env python
"""E6 (paper Fig. 9): speed-up vs number of hash buckets.

    spark-submit jobs/exp_lsh_buckets.py --dataset sm --scale bench
"""
from repro.experiments import lsh_buckets
from repro.experiments.cli import run_job

if __name__ == "__main__":
    run_job("E6 LSH bucket sweep", lsh_buckets.run)
