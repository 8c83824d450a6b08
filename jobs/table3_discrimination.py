"""Table III — discrimination ability of ER / S-MI / U-MI / FiCSUM."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])

from _common import build_session, cli  # noqa: E402
from table34_sweep import run  # noqa: E402

from repro.tables import PAPER_T3, T34_VARIANTS, format_table  # noqa: E402


def main() -> None:
    args = cli()
    spark = build_session("table3")
    agg = run(spark, seeds=args.seeds, length_scale=args.scale)
    print(format_table(agg, "disc_mean", PAPER_T3, T34_VARIANTS,
                       "Table III — discrimination ability (z-score; paper uses its own normalization, compare ordering only)"))
    spark.stop()


if __name__ == "__main__":
    main()
