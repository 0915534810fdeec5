#!/usr/bin/env python
"""E3 (paper Fig. 6): GMM fit and stop threshold vs spatial detail.

    spark-submit jobs/exp_gmm_fit.py --scale bench
"""
from repro.experiments import gmm_fit
from repro.experiments.cli import run_job

if __name__ == "__main__":
    run_job("E3 GMM stop threshold", gmm_fit.run)
