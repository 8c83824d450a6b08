"""Benchmark: Table IV — kappa + C-F1 of the fingerprint variants.

Reuses bench_table3's sweep when available (same runs produce both
tables); otherwise runs the sweep itself.
"""
import sys

import pytest

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")

from benchmarks.conftest import SCALE, SEEDS, SWEEP_CACHE  # noqa: E402

from repro.tables import (  # noqa: E402
    PAPER_T4_CF1,
    PAPER_T4_KAPPA,
    T34_VARIANTS,
    format_table,
)


@pytest.mark.benchmark(group="table4")
def test_bench_table4_performance(benchmark, spark, results_dir):
    from table34_sweep import run

    def get_agg():
        if "table34" in SWEEP_CACHE:  # computed by bench_table3 this session
            return SWEEP_CACHE["table34"]
        return run(spark, seeds=SEEDS, length_scale=SCALE)

    agg = benchmark.pedantic(get_agg, rounds=1, iterations=1)
    md_k = format_table(agg, "kappa_mean", PAPER_T4_KAPPA, T34_VARIANTS,
                        "Table IV — kappa statistic")
    md_c = format_table(agg, "c_f1_mean", PAPER_T4_CF1, T34_VARIANTS,
                        "Table IV — C-F1")
    print("\n" + md_k + "\n" + md_c)
    with open(f"{results_dir}/table4.md", "w") as f:
        f.write(md_k + "\n" + md_c)
    assert len(agg) == 11 * 4
