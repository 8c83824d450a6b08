"""Tests for table harness configs and paper-constant integrity."""
import pandas as pd
import pytest

from repro import tables as T
from repro.streams.datasets import SPECS


def test_table34_config_grid():
    cfgs = T.table34_configs(range(2))
    assert len(cfgs) == 11 * 4 * 2
    assert {c["dataset"] for c in cfgs} == set(T.PAPER_T3)
    assert {c["method"] for c in cfgs} == set(T.T34_VARIANTS)


def test_table5_config_grid():
    cfgs = T.table5_configs(range(2))
    assert len(cfgs) == 7 * 11 * 2
    methods = {c["method"] for c in cfgs}
    assert "FiCSUM" in methods and "mi:mean" in methods


def test_table6_config_grid():
    cfgs = T.table6_configs(range(1))
    assert len(cfgs) == 9 * 6
    assert {c["method"] for c in cfgs} == set(T.T6_FRAMEWORKS)


def test_all_config_datasets_exist():
    for cfgs in (T.table34_configs(range(1)), T.table5_configs(range(1)),
                 T.table6_configs(range(1))):
        for c in cfgs:
            assert c["dataset"] in SPECS, c["dataset"]


@pytest.mark.parametrize(
    "paper,n_cols",
    [
        (T.PAPER_T3, 4),
        (T.PAPER_T4_KAPPA, 4),
        (T.PAPER_T4_CF1, 4),
    ],
)
def test_paper_table_row_widths(paper, n_cols):
    assert len(paper) == 11
    for ds, vals in paper.items():
        assert len(vals) == n_cols, ds


@pytest.mark.parametrize(
    "paper", [T.PAPER_T5_KAPPA, T.PAPER_T5_CF1, T.PAPER_T5_DISC]
)
def test_paper_table5_shapes(paper):
    assert set(paper) == set(T.T5_GROUPS) | {"FiCSUM"}
    for vals in paper.values():
        assert len(vals) == len(T.T5_DATASETS)


@pytest.mark.parametrize(
    "paper", [T.PAPER_T6_KAPPA, T.PAPER_T6_CF1, T.PAPER_T6_RUNTIME]
)
def test_paper_table6_shapes(paper):
    assert set(paper) == set(T.T6_FRAMEWORKS)
    for vals in paper.values():
        assert len(vals) == len(T.T6_DATASETS)


def test_paper_values_spotcheck():
    """Guard against transcription drift of key published numbers."""
    assert T.PAPER_T3["RTREE"][0] == 6404.99     # ER on RTREE
    assert T.PAPER_T4_KAPPA["STAGGER"][0] == 0.98
    assert T.PAPER_T4_CF1["UCI-Wine"][3] == 0.92
    assert T.PAPER_T6_CF1["FiCSUM"][4] == 0.94   # RTREE-U
    assert T.PAPER_T6_KAPPA["ARF"][7] == 0.97    # QG


def test_format_table_renders_markdown():
    agg = pd.DataFrame(
        [
            {"dataset": "STAGGER", "method": "ER", "kappa_mean": 0.5},
            {"dataset": "STAGGER", "method": "S-MI", "kappa_mean": 0.4},
            {"dataset": "STAGGER", "method": "U-MI", "kappa_mean": 0.3},
            {"dataset": "STAGGER", "method": "FiCSUM", "kappa_mean": 0.6},
        ]
    )
    md = T.format_table(agg, "kappa_mean", T.PAPER_T4_KAPPA, T.T34_VARIANTS, "t")
    assert "| STAGGER |" in md
    assert "0.60" in md and "0.98" in md  # ours and paper side by side
