"""Table V — per-meta-information-function performance under induced
drift in distribution (D) / autocorrelation (A) / frequency (F)."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])

import pandas as pd  # noqa: E402
from pyspark.sql import SparkSession  # noqa: E402

from _common import build_session, cli  # noqa: E402

from repro.sparkjobs.sweep import aggregate, run_sweep  # noqa: E402
from repro.tables import (  # noqa: E402
    PAPER_T5_CF1,
    PAPER_T5_DISC,
    PAPER_T5_KAPPA,
    T5_DATASETS,
    table5_configs,
)


def run(spark: SparkSession, seeds: int = 3, length_scale: float = 1.0) -> pd.DataFrame:
    results = run_sweep(spark, table5_configs(range(seeds)), length_scale=length_scale)
    results.cache()
    for r in results.where("error is not null").collect():
        print(f"[table5] FAILED {r.dataset}/{r.method}/seed={r.seed}: {r.error}")
    return aggregate(results).toPandas()


def render(agg: pd.DataFrame) -> str:
    """Table V layout: rows = function groups, columns = Synth_* datasets."""
    out = []
    label = {"FiCSUM": "FiCSUM"}
    for metric, paper in [("kappa_mean", PAPER_T5_KAPPA),
                          ("c_f1_mean", PAPER_T5_CF1),
                          ("disc_mean", PAPER_T5_DISC)]:
        out.append(f"### Table V — {metric} (ours / paper)")
        out.append("| function | " + " | ".join(T5_DATASETS) + " |")
        out.append("|" + "---|" * (1 + len(T5_DATASETS)))
        for group, pvals in paper.items():
            method = label.get(group, f"mi:{group}")
            cells = []
            for j, d in enumerate(T5_DATASETS):
                row = agg[(agg.dataset == d) & (agg.method == method)]
                ours = f"{row.iloc[0][metric]:.2f}" if len(row) else "—"
                p = pvals[j]
                cells.append(f"{ours} / {p if p is not None else '—'}")
            out.append(f"| {group} | " + " | ".join(cells) + " |")
        out.append("")
    return "\n".join(out)


def main() -> None:
    args = cli()
    spark = build_session("table5")
    agg = run(spark, seeds=args.seeds, length_scale=args.scale)
    print(render(agg))
    spark.stop()


if __name__ == "__main__":
    main()
