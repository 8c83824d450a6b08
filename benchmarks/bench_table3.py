"""Benchmark: Table III — discrimination ability sweep (ER / S-MI /
U-MI / FiCSUM over 11 datasets), distributed via the Spark sweep.

Runs the shared Table III+IV sweep once (cached for bench_table4) and
prints discrimination ours-vs-paper.
"""
import sys

import pytest

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")

from benchmarks.conftest import SCALE, SEEDS, SWEEP_CACHE  # noqa: E402

from repro.tables import PAPER_T3, T34_VARIANTS, format_table  # noqa: E402


@pytest.mark.benchmark(group="table3")
def test_bench_table3_discrimination(benchmark, spark, results_dir):
    from table34_sweep import run

    def sweep():
        agg = run(spark, seeds=SEEDS, length_scale=SCALE)
        SWEEP_CACHE["table34"] = agg
        return agg

    agg = benchmark.pedantic(sweep, rounds=1, iterations=1)
    md = format_table(
        agg, "disc_mean", PAPER_T3, T34_VARIANTS,
        "Table III — discrimination ability "
        "(ours: separation z-score; paper: its own normalization — compare ordering)",
    )
    print("\n" + md)
    agg.to_csv(f"{results_dir}/table34.csv", index=False)
    with open(f"{results_dir}/table3.md", "w") as f:
        f.write(md)
    assert len(agg) == 11 * 4
