"""Table harnesses: configs, paper reference numbers and printers.

Each ``tableN_configs`` returns the sweep configs for that table; each
``print_tableN`` renders our measured numbers next to the paper's (the
``PAPER_*`` constants transcribe the published tables) so EXPERIMENTS.md
can be produced by the jobs in ``jobs/``.
"""
from __future__ import annotations

import pandas as pd

# ----------------------------------------------------------------- paper data
#: Table III — discrimination ability, mean (std).
PAPER_T3 = {
    #             ER        S-MI      U-MI      FiCSUM
    "AQSex":    (140.16, 173.15, 51.11, 190.26),
    "AQTemp":   (8.83, 128.64, 71.15, 184.91),
    "STAGGER":  (963.32, 339.10, 13.09, 138.55),
    "RTREE":    (6404.99, 87.73, 38.25, 289.15),
    "RBF":      (10.29, 160.97, 22.75, 224.33),
    "Arabic":   (28.94, 106.24, 180.47, 265.38),
    "CMC":      (1.12, 23.26, 20.25, 60.64),
    "HPLANE-U": (18.31, 110.35, 74.01, 215.56),
    "QG":       (18.43, 90.53, 25.78, 25.31),
    "RTREE-U":  (8.81, 179.24, 129.96, 222.17),
    "UCI-Wine": (0.42, 45.50, 55.22, 131.93),
}

#: Table IV — kappa and C-F1 per variant.
PAPER_T4_KAPPA = {
    "AQSex":    (0.93, 0.90, 0.71, 0.94),
    "AQTemp":   (0.58, 0.50, 0.36, 0.47),
    "STAGGER":  (0.98, 0.97, 0.41, 0.97),
    "RBF":      (0.75, 0.72, 0.68, 0.73),
    "RTREE":    (0.93, 0.79, 0.34, 0.94),
    "Arabic":   (0.86, 0.77, 0.85, 0.86),
    "CMC":      (0.21, 0.22, 0.25, 0.27),
    "HPLANE-U": (0.43, 0.42, 0.44, 0.44),
    "QG":       (0.66, 0.59, 0.73, 0.72),
    "RTREE-U":  (0.73, 0.68, 0.81, 0.80),
    "UCI-Wine": (0.20, 0.18, 0.23, 0.23),
}
PAPER_T4_CF1 = {
    "AQSex":    (0.51, 0.41, 0.65, 0.75),
    "AQTemp":   (0.65, 0.49, 0.63, 0.72),
    "STAGGER":  (0.98, 0.94, 0.48, 0.91),
    "RBF":      (0.82, 0.67, 0.53, 0.73),
    "RTREE":    (0.76, 0.50, 0.30, 0.74),
    "Arabic":   (0.57, 0.38, 0.85, 0.85),
    "CMC":      (0.56, 0.61, 0.80, 0.76),
    "HPLANE-U": (0.31, 0.28, 0.95, 0.75),
    "QG":       (0.36, 0.32, 0.52, 0.52),
    "RTREE-U":  (0.53, 0.47, 0.95, 0.91),
    "UCI-Wine": (0.54, 0.51, 0.73, 0.92),
}

#: Table V — per meta-information function group, kappa / C-F1 / discrimination.
T5_DATASETS = ["Synth_A", "Synth_AF", "Synth_D", "Synth_DA", "Synth_DAF",
               "Synth_DF", "Synth_F"]
T5_GROUPS = ["shapley", "mean", "std", "skew", "kurtosis", "autocorrelation",
             "partial_autocorrelation", "mutual_info", "turning_point_rate",
             "imf_entropy"]
PAPER_T5_KAPPA = {  # rows: function group (paper order), cols: T5_DATASETS
    "shapley":                 (0.64, 0.53, 0.84, 0.88, 0.85, 0.79, 0.52),
    "mean":                    (0.96, 0.84, 0.97, 0.97, 0.97, 0.97, 0.79),
    "std":                     (0.86, 0.44, 0.98, 0.98, 0.97, 0.97, 0.46),
    "skew":                    (0.51, 0.40, 0.92, 0.94, 0.91, 0.88, 0.52),
    "kurtosis":                (0.59, 0.45, 0.94, 0.95, 0.94, 0.90, 0.41),
    "autocorrelation":         (0.72, 0.51, 0.91, 0.93, 0.94, 0.92, 0.44),
    "partial_autocorrelation": (0.75, 0.62, 0.91, 0.95, 0.94, 0.89, 0.41),
    "mutual_info":             (0.60, 0.44, 0.80, 0.89, 0.93, 0.87, 0.68),
    "turning_point_rate":      (0.85, 0.83, 0.96, 0.96, 0.95, 0.94, 0.66),
    "imf_entropy":             (0.90, 0.49, 0.95, 0.95, 0.95, 0.92, 0.46),
    "FiCSUM":                  (0.97, 0.90, 0.98, 0.98, 0.98, 0.98, 0.74),
}
PAPER_T5_CF1 = {
    "shapley":                 (0.40, 0.27, 0.48, 0.55, 0.43, 0.38, 0.25),
    "mean":                    (0.92, 0.61, 0.89, 0.90, 0.87, 0.87, 0.37),
    "std":                     (0.79, 0.31, 0.94, 0.97, 0.90, 0.92, 0.36),
    "skew":                    (0.33, 0.29, 0.42, 0.47, 0.40, 0.35, 0.33),
    "kurtosis":                (0.35, 0.30, 0.37, 0.39, 0.39, 0.38, 0.29),
    "autocorrelation":         (0.64, 0.37, 0.34, 0.47, 0.60, 0.61, 0.29),
    "partial_autocorrelation": (0.63, 0.50, 0.38, 0.51, 0.49, 0.53, 0.27),
    "mutual_info":             (0.43, 0.38, 0.27, 0.29, 0.51, 0.49, 0.54),
    "turning_point_rate":      (0.75, 0.78, 0.70, 0.66, 0.60, 0.72, 0.60),
    "imf_entropy":             (0.79, 0.35, 0.74, 0.67, 0.60, 0.65, 0.43),
    "FiCSUM":                  (0.96, 0.69, 0.92, 0.93, 0.91, 0.93, 0.44),
}
PAPER_T5_DISC = {
    "shapley":                 (35.44, 157.46, 500.0, 500.0, 198.66, 500.0, 29.99),
    "mean":                    (86.20, 34.80, 274.82, 283.69, 190.84, 165.98, 39.22),
    "std":                     (55.67, 12.26, 86.28, 99.77, 25.20, 29.06, 3.94),
    "skew":                    (3.86, 2.41, 9.48, 6.43, 11.07, 6.81, 2.62),
    "kurtosis":                (2.40, 1.81, 6.20, 6.46, 5.46, 7.08, 3.19),
    "autocorrelation":         (24.28, 10.60, 11.00, 20.92, 15.32, 20.21, 34.33),
    "partial_autocorrelation": (22.83, 12.76, 14.09, 16.46, 15.83, 15.73, 22.79),
    "mutual_info":             (None, None, None, None, None, None, 50.00),
    "turning_point_rate":      (13.74, 12.37, 26.86, 21.58, 23.25, 28.51, 4.91),
    "imf_entropy":             (51.06, 19.39, 55.23, 58.89, 51.12, 53.15, 5.72),
    "FiCSUM":                  (279.74, 124.25, 416.29, 342.47, 340.94, 315.24, 78.71),
}

#: Table VI — framework comparison.
T6_DATASETS = ["AQSex", "CMC", "UCI-Wine", "RBF", "RTREE-U", "Arabic",
               "HPLANE-U", "QG", "STAGGER"]
T6_FRAMEWORKS = ["HTCD", "RCD", "ER", "DWM", "ARF", "FiCSUM"]
PAPER_T6_KAPPA = {  # rows: framework, cols: T6_DATASETS
    "HTCD":   (0.94, 0.23, 0.21, 0.62, 0.57, 0.86, 0.42, 0.84, 0.95),
    "RCD":    (0.69, 0.17, 0.06, 0.52, 0.51, 0.74, 0.06, 0.54, 0.82),
    "ER":     (0.93, 0.20, 0.20, 0.79, 0.72, 0.81, 0.41, 0.59, 0.99),
    "DWM":    (0.88, 0.19, 0.18, 0.56, 0.49, 0.85, 0.42, 0.66, 0.91),
    "ARF":    (0.94, 0.40, 0.34, 0.82, 0.71, 0.91, 0.48, 0.97, 0.99),
    "FiCSUM": (0.95, 0.30, 0.26, 0.81, 0.83, 0.90, 0.42, 0.84, 0.98),
}
PAPER_T6_CF1 = {
    "HTCD":   (0.12, 0.45, 0.13, 0.11, 0.11, 0.12, 0.18, 0.12, 0.11),
    "RCD":    (0.19, 0.45, 0.47, 0.29, 0.25, 0.27, 0.27, 0.28, 0.20),
    "ER":     (0.55, 0.62, 0.52, 0.84, 0.53, 0.45, 0.34, 0.34, 0.98),
    "DWM":    (0.29, 0.67, 0.63, 0.29, 0.29, 0.29, 0.29, 0.29, 0.50),
    "ARF":    (0.29, 0.67, 0.63, 0.29, 0.29, 0.29, 0.29, 0.29, 0.50),
    "FiCSUM": (0.80, 0.80, 0.71, 0.88, 0.94, 0.83, 0.78, 0.64, 0.96),
}
PAPER_T6_RUNTIME = {  # seconds on the authors' testbed — ordering only
    "HTCD":   (581.31, 21.07, 147.34, 700.51, 449.62, 151.12, 508.45, 133.71, 321.01),
    "RCD":    (41393.30, 402.13, 1323.12, 9225.21, 11493.21, 2328.68, 8220.22, 2581.04, 10198.77),
    "ER":     (605.04, 17.40, 123.93, 2651.41, 485.77, 175.25, 477.18, 112.62, 270.69),
    "DWM":    (518.90, 13.64, 140.28, 961.08, 274.04, 86.61, 336.43, 82.01, 133.46),
    "ARF":    (1582.78, 90.58, 812.35, 4163.04, 1700.22, 451.60, 2208.43, 257.88, 957.12),
    "FiCSUM": (8171.87, 137.70, 1061.45, 5640.01, 6642.76, 1567.25, 11928.28, 3581.32, 1198.45),
}

T34_DATASETS = list(PAPER_T3)
T34_VARIANTS = ["ER", "S-MI", "U-MI", "FiCSUM"]


# ------------------------------------------------------------------- configs
def table34_configs(seeds: range = range(3)) -> list[dict]:
    """One sweep serves Tables III (discrimination) and IV (kappa/C-F1)."""
    return [
        {"dataset": d, "method": m, "seed": s}
        for d in T34_DATASETS
        for m in T34_VARIANTS
        for s in seeds
    ]


def table5_configs(seeds: range = range(3)) -> list[dict]:
    cfgs = []
    for d in T5_DATASETS:
        for g in T5_GROUPS:
            cfgs += [{"dataset": d, "method": f"mi:{g}", "seed": s} for s in seeds]
        cfgs += [{"dataset": d, "method": "FiCSUM", "seed": s} for s in seeds]
    return cfgs


def table6_configs(seeds: range = range(3)) -> list[dict]:
    return [
        {"dataset": d, "method": m, "seed": s}
        for d in T6_DATASETS
        for m in T6_FRAMEWORKS
        for s in seeds
    ]


# ------------------------------------------------------------------ printers
def _pivot(agg: pd.DataFrame, value: str) -> pd.DataFrame:
    return agg.pivot(index="dataset", columns="method", values=value)


def format_table(agg: pd.DataFrame, value: str, paper: dict, methods: list[str],
                 title: str) -> str:
    """Render measured-vs-paper rows as markdown."""
    piv = _pivot(agg, value)
    lines = [f"### {title}", "",
             "| dataset | " + " | ".join(f"{m} (ours) | {m} (paper)" for m in methods) + " |",
             "|" + "---|" * (1 + 2 * len(methods))]
    for ds, pvals in paper.items():
        if ds not in piv.index:
            continue
        cells = []
        for j, m in enumerate(methods):
            ours = piv.loc[ds].get(m)
            p = pvals[j] if j < len(pvals) else None
            cells.append(f"{ours:.2f}" if ours is not None and pd.notna(ours) else "—")
            cells.append(f"{p:.2f}" if p is not None else "—")
        lines.append(f"| {ds} | " + " | ".join(cells) + " |")
    return "\n".join(lines) + "\n"
