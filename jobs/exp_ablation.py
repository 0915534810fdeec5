#!/usr/bin/env python
"""E7 (paper Fig. 10): ablation of MFN / pairing / idf / normalization.

    spark-submit jobs/exp_ablation.py --scale bench
"""
from repro.experiments import ablation
from repro.experiments.cli import run_job

if __name__ == "__main__":
    run_job("E7 ablation", ablation.run)
