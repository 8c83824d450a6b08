"""Benchmark: Table VI — framework comparison (HTCD, RCD, ER, DWM, ARF,
FiCSUM) with kappa, C-F1 and relative runtime."""
import sys

import pytest

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")

from benchmarks.conftest import SCALE, SEEDS  # noqa: E402


@pytest.mark.benchmark(group="table6")
def test_bench_table6_frameworks(benchmark, spark, results_dir):
    from table6_frameworks import render, run

    agg = benchmark.pedantic(
        lambda: run(spark, seeds=SEEDS, length_scale=SCALE), rounds=1, iterations=1
    )
    md = render(agg)
    print("\n" + md)
    agg.to_csv(f"{results_dir}/table6.csv", index=False)
    with open(f"{results_dir}/table6.md", "w") as f:
        f.write(md)
    assert len(agg) == 9 * 6
