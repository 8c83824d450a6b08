"""Benchmark: Table V — per-meta-information-function sweep over the
Synth_{D,A,F,...} induced-drift datasets."""
import sys

import pytest

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")

from benchmarks.conftest import SCALE, SEEDS  # noqa: E402


@pytest.mark.benchmark(group="table5")
def test_bench_table5_meta_functions(benchmark, spark, results_dir):
    from table5_meta_functions import render, run

    agg = benchmark.pedantic(
        lambda: run(spark, seeds=SEEDS, length_scale=SCALE), rounds=1, iterations=1
    )
    md = render(agg)
    print("\n" + md)
    agg.to_csv(f"{results_dir}/table5.csv", index=False)
    with open(f"{results_dir}/table5.md", "w") as f:
        f.write(md)
    assert len(agg) == 7 * 11
