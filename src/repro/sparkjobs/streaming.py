"""Structured Streaming drift detection (DESIGN.md Spark layer 3).

A stateful operator keyed by stream id carries a pickled
:class:`repro.core.monitor.DriftMonitor` across micro-batches, feeds
each batch's observations in sequence order, and emits
(stream_id, seq, similarity, drift) rows — the Structured Streaming
expression of Algorithm 1's detection path ("fingerprints per window +
custom stateful operator" per the repro brief).

Implementation note: Spark 4.1's ``transformWithStateInPandas`` is the
newer stateful API, but its state-server protocol requires a protobuf
runtime (>= 6.33) that cannot be installed in this offline environment
(`ImportError: google.protobuf`), so the operator is built on the
Arrow-based ``applyInPandasWithState`` instead — same stateful
semantics (per-key state persisted across micro-batches), no protobuf
dependency.

Feature columns are packed into a single array column upstream so the
operator's input schema is independent of d.
"""
from __future__ import annotations

import pickle
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.streaming.state import GroupState, GroupStateTimeout

OUTPUT_SCHEMA = "stream_id string, seq long, similarity double, drift boolean"
STATE_SCHEMA = "blob binary"


def make_drift_fn(n_features: int, **monitor_kwargs):
    """Build the per-key stateful function for ``applyInPandasWithState``.

    The returned closure deserializes the per-key DriftMonitor, replays
    the batch's rows in ``seq`` order (ignoring already-seen sequence
    numbers on replay), and stores the updated monitor back.
    """

    def fn(
        key: tuple, pdfs: Iterator[pd.DataFrame], state: GroupState
    ) -> Iterator[pd.DataFrame]:
        from repro.core.monitor import DriftMonitor

        if state.exists:
            monitor = pickle.loads(state.get[0])
        else:
            monitor = DriftMonitor(n_features, **monitor_kwargs)
        out_rows = []
        for pdf in pdfs:
            pdf = pdf.sort_values("seq")
            for _, row in pdf.iterrows():
                seq = int(row["seq"])
                if seq < monitor.i:  # replay/out-of-order guard
                    continue
                sim, drift = monitor.add(
                    list(row["features"]), int(row["y"]), int(row["l"])
                )
                out_rows.append((key[0], seq, sim, drift))
        state.update((pickle.dumps(monitor),))
        if out_rows:
            yield pd.DataFrame(
                out_rows, columns=["stream_id", "seq", "similarity", "drift"]
            )

    return fn


def detect_drift_stream(
    obs_stream: DataFrame, n_features: int, **monitor_kwargs
) -> DataFrame:
    """Wire the stateful drift operator onto a streaming DataFrame with
    columns (stream_id string, seq long, features array<double>, y long,
    l long)."""
    return obs_stream.groupBy("stream_id").applyInPandasWithState(
        make_drift_fn(n_features, **monitor_kwargs),
        outputStructType=OUTPUT_SCHEMA,
        stateStructType=STATE_SCHEMA,
        outputMode="append",
        timeoutConf=GroupStateTimeout.NoTimeout,
    )
