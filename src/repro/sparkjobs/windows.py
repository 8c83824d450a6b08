"""Windowed fingerprint computation on Spark (DESIGN.md Spark layer 2).

Turns a stream (one row per observation: seq, features, y, l) into a
DataFrame of per-window meta-information vectors via
``groupBy(window_id).applyInPandas`` — the distributed-dataflow
expression of "compute meta-information feature vectors per window"
from the repro brief. The moment-based columns are cross-checked
against DuckDB SQL by the oracle tests.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.streams.datasets import StreamDataset


def stream_to_df(spark: SparkSession, ds: StreamDataset) -> DataFrame:
    """One row per observation: seq, x0..x{d-1}, y, concept_id."""
    pdf = pd.DataFrame(ds.X, columns=[f"x{i}" for i in range(ds.n_features)])
    pdf.insert(0, "seq", np.arange(len(ds), dtype=np.int64))
    pdf["y"] = ds.y.astype(np.int64)
    pdf["concept_id"] = ds.concept_ids.astype(np.int64)
    return spark.createDataFrame(pdf)


def assign_windows(df: DataFrame, window_size: int) -> DataFrame:
    """Tumbling windows by sequence number (Spark SQL, no shuffle yet)."""
    return df.withColumn(
        "window_id", (F.col("seq") / F.lit(window_size)).cast("long")
    )


def window_fingerprints(
    df: DataFrame,
    feature_cols: list[str],
    functions: list[str] | None = None,
    *,
    window_size: int,
) -> DataFrame:
    """Per-window meta-information vectors.

    Output: one row per (window_id, source) with one column per
    meta-information function — long-form so the schema is independent
    of d. Windows are processed in parallel across the cluster.
    """
    from repro.core.meta_features import SEQUENCE_FUNCTIONS

    names = functions or list(SEQUENCE_FUNCTIONS)
    schema = "window_id long, source string, n long, " + ", ".join(
        f"`{f}` double" for f in names
    )

    def _fp(pdf: pd.DataFrame) -> pd.DataFrame:
        from repro.core.meta_features import compute_feature_matrix

        pdf = pdf.sort_values("seq")
        M = pdf[feature_cols].to_numpy(dtype=float)
        mat = compute_feature_matrix(M, names)
        out = pd.DataFrame(mat, columns=names)
        out.insert(0, "window_id", int(pdf["window_id"].iloc[0]))
        out.insert(1, "source", feature_cols)
        out.insert(2, "n", len(pdf))
        return out

    windowed = assign_windows(df, window_size) if "window_id" not in df.columns else df
    return windowed.groupBy("window_id").applyInPandas(_fp, schema)
