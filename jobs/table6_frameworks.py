"""Table VI — framework comparison: HTCD, RCD, ER, DWM, ARF, FiCSUM."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])

import pandas as pd  # noqa: E402
from pyspark.sql import SparkSession  # noqa: E402

from _common import build_session, cli  # noqa: E402

from repro.sparkjobs.sweep import aggregate, run_sweep  # noqa: E402
from repro.tables import (  # noqa: E402
    PAPER_T6_CF1,
    PAPER_T6_KAPPA,
    PAPER_T6_RUNTIME,
    T6_DATASETS,
    T6_FRAMEWORKS,
    table6_configs,
)


def run(spark: SparkSession, seeds: int = 3, length_scale: float = 1.0) -> pd.DataFrame:
    results = run_sweep(spark, table6_configs(range(seeds)), length_scale=length_scale)
    results.cache()
    for r in results.where("error is not null").collect():
        print(f"[table6] FAILED {r.dataset}/{r.method}/seed={r.seed}: {r.error}")
    return aggregate(results).toPandas()


def render(agg: pd.DataFrame) -> str:
    out = []
    for metric, paper, note in [
        ("kappa_mean", PAPER_T6_KAPPA, "kappa"),
        ("c_f1_mean", PAPER_T6_CF1, "C-F1"),
        ("runtime_mean_s", PAPER_T6_RUNTIME,
         "runtime seconds — ours on scaled streams, compare ordering only"),
    ]:
        out.append(f"### Table VI — {note} (ours / paper)")
        out.append("| framework | " + " | ".join(T6_DATASETS) + " |")
        out.append("|" + "---|" * (1 + len(T6_DATASETS)))
        for fw in T6_FRAMEWORKS:
            cells = []
            for j, d in enumerate(T6_DATASETS):
                row = agg[(agg.dataset == d) & (agg.method == fw)]
                ours = f"{row.iloc[0][metric]:.2f}" if len(row) else "—"
                cells.append(f"{ours} / {paper[fw][j]}")
            out.append(f"| {fw} | " + " | ".join(cells) + " |")
        out.append("")
    return "\n".join(out)


def main() -> None:
    args = cli()
    spark = build_session("table6")
    agg = run(spark, seeds=args.seeds, length_scale=args.scale)
    print(render(agg))
    spark.stop()


if __name__ == "__main__":
    main()
