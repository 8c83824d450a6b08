"""Structured Streaming stateful drift-detection tests.

Exercises the custom stateful operator (applyInPandasWithState) across
multiple micro-batches with checkpointing — the Spark layer 3 of
DESIGN.md.
"""
import os
import time

import numpy as np
import pandas as pd
import pytest

from repro.sparkjobs.streaming import detect_drift_stream
from repro.streams.datasets import build_dataset

SCHEMA = "stream_id string, seq long, features array<double>, y long, l long"


def _obs_pdf(ds, n, stream_id="s0"):
    return pd.DataFrame(
        {
            "stream_id": stream_id,
            "seq": np.arange(n, dtype=np.int64),
            "features": list(ds.X[:n].tolist()),
            "y": ds.y[:n].astype(np.int64),
            "l": ds.y[:n].astype(np.int64),
        }
    )


@pytest.fixture(scope="module")
def drift_result(spark, tmp_path_factory):
    """Run the stateful operator over two micro-batches once; several
    tests assert on the collected output."""
    d = tmp_path_factory.mktemp("stream")
    src = d / "in"
    os.makedirs(src)
    ds = build_dataset("Synth_D", 0, length_scale=0.6)
    n = min(len(ds), 900)
    pdf = _obs_pdf(ds, n)
    pdf[pdf.seq < 450].to_parquet(src / "a.parquet")
    time.sleep(0.05)
    pdf[pdf.seq >= 450].to_parquet(src / "b.parquet")
    stream = (
        spark.readStream.schema(SCHEMA)
        .option("maxFilesPerTrigger", "1")
        .parquet(str(src))
    )
    out = detect_drift_stream(stream, ds.n_features)
    q = (
        out.writeStream.format("memory")
        .queryName("drift_test")
        .option("checkpointLocation", str(d / "ckpt"))
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination(300)
    res = spark.sql("select * from drift_test order by seq").toPandas()
    boundaries = [i for i in range(1, n) if ds.concept_ids[i] != ds.concept_ids[i - 1]]
    return res, boundaries, n


def test_emits_one_row_per_observation(drift_result):
    res, _, n = drift_result
    assert len(res) == n
    assert list(res.seq) == list(range(n))


def test_state_survives_micro_batches(drift_result):
    """Similarity is already trained (non-NaN) right after the batch
    boundary at seq 450 — only possible if state crossed batches."""
    res, _, _ = drift_result
    just_after = res[(res.seq >= 450) & (res.seq < 460)].similarity
    assert just_after.notna().any()


def test_detects_drift_after_a_boundary(drift_result):
    res, boundaries, _ = drift_result
    drift_seqs = res[res.drift].seq.tolist()
    assert drift_seqs, "no drift detected at all"
    first = drift_seqs[0]
    assert any(b <= first <= b + 150 for b in boundaries), (
        f"first drift at {first}, boundaries {boundaries}"
    )


def test_no_drift_during_warmup(drift_result):
    res, boundaries, _ = drift_result
    assert not res[res.seq < boundaries[0]].drift.any()


def test_similarity_values_bounded(drift_result):
    res, _, _ = drift_result
    sims = res.similarity.dropna()
    assert len(sims) > 50
    assert sims.between(-1.0 - 1e-9, 1.0 + 1e-9).all()


def test_two_keys_independent_state(spark, tmp_path):
    """Two stream ids in one source get independent monitors."""
    src = tmp_path / "in2"
    os.makedirs(src)
    ds = build_dataset("Synth_D", 1, length_scale=0.3)
    n = min(len(ds), 300)
    a = _obs_pdf(ds, n, "a")
    b = _obs_pdf(ds, n, "b")
    pd.concat([a, b]).to_parquet(src / "x.parquet")
    stream = spark.readStream.schema(SCHEMA).parquet(str(src))
    out = detect_drift_stream(stream, ds.n_features)
    q = (
        out.writeStream.format("memory")
        .queryName("drift_two")
        .option("checkpointLocation", str(tmp_path / "ck2"))
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination(300)
    res = spark.sql("select * from drift_two").toPandas()
    assert set(res.stream_id) == {"a", "b"}
    assert (res.groupby("stream_id").size() == n).all()
