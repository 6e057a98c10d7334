"""Experiment harnesses reproducing the paper's evaluation tables/figures.

Each ``run_*`` function takes the SparkSession plus scale knobs and returns a
plain dict of rows; ``jobs/`` wraps them for spark-submit and ``benchmarks/``
wraps them in pytest-benchmark.  Results are also dumped as JSON next to the
benchmarks so EXPERIMENTS.md can be assembled from real runs.
"""
from repro.experiments.common import save_results

__all__ = ["save_results"]
