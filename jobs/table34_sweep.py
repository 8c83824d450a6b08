"""Shared sweep behind Tables III and IV (same runs yield both).

Runs the 11-dataset × {ER, S-MI, U-MI, FiCSUM} × seeds grid through the
Spark sweep and returns the aggregated (dataset, method) metrics.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.sparkjobs.sweep import aggregate, run_sweep
from repro.tables import table34_configs


def run(spark: SparkSession, seeds: int = 3, length_scale: float = 1.0) -> pd.DataFrame:
    results = run_sweep(
        spark, table34_configs(range(seeds)), length_scale=length_scale
    )
    results.cache()
    errors = results.where("error is not null").select("dataset", "method", "seed", "error")
    err_rows = errors.collect()
    if err_rows:
        for r in err_rows:
            print(f"[table34] FAILED {r.dataset}/{r.method}/seed={r.seed}: {r.error}")
    return aggregate(results).toPandas()
