"""Smoke tests for the per-table job entrypoints (scaled-down configs)."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).resolve().parent.parent / "jobs"))

import table3_benchmark_auc  # noqa: E402
import table4_datasets  # noqa: E402
import table5_execution_time  # noqa: E402
import table6_stability  # noqa: E402
import table7_business_datasets  # noqa: E402
import table8_business_auc  # noqa: E402
import _common  # noqa: E402
from _common import to_markdown  # noqa: E402


@pytest.fixture(autouse=True)
def results_in_tmp(tmp_path, monkeypatch):
    """Redirect job output so scaled smoke runs never clobber results/."""
    monkeypatch.setattr(_common, "RESULTS_DIR", tmp_path)
    yield tmp_path


def test_to_markdown_renders_pipe_table():
    import pandas as pd

    md = to_markdown(pd.DataFrame({"a": [1, 22], "b": ["x", "y"]}))
    lines = md.splitlines()
    assert lines[0].startswith("| a")
    assert set(lines[1]) <= {"|", "-"}
    assert len(lines) == 4


def test_table4_job(results_in_tmp):
    rows = table4_datasets.main()
    assert len(rows) == 12
    assert (results_in_tmp / "table4.md").exists()


def test_table7_job(results_in_tmp):
    rows = table7_business_datasets.main()
    assert len(rows) == 3
    assert (results_in_tmp / "table7.md").exists()


def test_table3_job_scaled(results_in_tmp):
    table = table3_benchmark_auc.main(
        repeats=1, datasets={"banknote"}, clfs=("LR",)
    )
    assert len(table) == 1
    for m in ("ORIG", "SAFE", "TFC"):
        assert m in table.columns
    assert (results_in_tmp / "table3.md").exists()


def test_table5_job_scaled():
    table = table5_execution_time.main(datasets={"banknote", "phoneme"})
    assert len(table) == 2
    assert {"FCT", "TFC", "RAND", "IMP", "SAFE"} <= set(table.columns)


def test_table6_job_scaled():
    table = table6_stability.main(T=2, datasets={"banknote"})
    assert len(table) == 1
    for m in ("FCT", "RAND", "IMP", "SAFE"):
        assert 0 <= table[m].iloc[0] <= 0.70


@pytest.mark.slow
def test_table8_job_scaled(spark):
    table = table8_business_auc.main(spark=spark, scale=0.05, datasets={"Data1"})
    assert len(table) == 3  # LR, RF, XGB rows
    assert {"ORIG", "RAND", "IMP", "SAFE"} <= set(table.columns)
    assert table[["ORIG", "SAFE"]].notna().all().all()
