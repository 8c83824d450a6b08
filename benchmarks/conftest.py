"""Benchmark-scope fixtures and the shared sweep cache.

Tables III and IV are two views of one sweep; the cache lets
``bench_table3`` run it once and ``bench_table4`` reuse the aggregated
results (re-running 132 stream runs to re-print the same grid would
double the benchmark wall-clock for no information).
"""
import os

import pytest

#: (key -> aggregated pandas DataFrame), filled by the first bench that runs
SWEEP_CACHE: dict = {}

SEEDS = int(os.environ.get("REPRO_BENCH_SEEDS", "3"))
SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))
RESULTS_DIR = os.path.join(os.path.dirname(__file__), "results")


@pytest.fixture(scope="session")
def results_dir():
    os.makedirs(RESULTS_DIR, exist_ok=True)
    return RESULTS_DIR
