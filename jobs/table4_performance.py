"""Table IV — kappa and C-F1 of ER / S-MI / U-MI / FiCSUM."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])

from _common import build_session, cli  # noqa: E402
from table34_sweep import run  # noqa: E402

from repro.tables import (  # noqa: E402
    PAPER_T4_CF1,
    PAPER_T4_KAPPA,
    T34_VARIANTS,
    format_table,
)


def main() -> None:
    args = cli()
    spark = build_session("table4")
    agg = run(spark, seeds=args.seeds, length_scale=args.scale)
    print(format_table(agg, "kappa_mean", PAPER_T4_KAPPA, T34_VARIANTS,
                       "Table IV — kappa statistic"))
    print(format_table(agg, "c_f1_mean", PAPER_T4_CF1, T34_VARIANTS,
                       "Table IV — C-F1"))
    spark.stop()


if __name__ == "__main__":
    main()
