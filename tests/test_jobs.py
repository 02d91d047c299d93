"""Smoke tests for the table-reproduction job harnesses (tiny scale)."""
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"
sys.path.insert(0, str(JOBS))

import common  # noqa: E402  (jobs/common.py)
import fig8_scaling  # noqa: E402
import table2_datasets  # noqa: E402
import table3_shared_memory  # noqa: E402
import table4_query_modes  # noqa: E402


@pytest.fixture(autouse=True)
def _sandbox_results(tmp_path, monkeypatch):
    """Jobs must not clobber the real results/ when exercised by tests."""
    monkeypatch.setattr(common, "RESULTS_DIR", tmp_path)
    yield


def test_table2_job(spark):
    df = table2_datasets.run(spark, scale=0.05)
    assert df.count() == 12
    assert set(df.columns) >= {"dataset", "paper_n", "ours_n", "ranking"}


def test_table3_job_subset(spark):
    df = table3_shared_memory.run(
        spark, scale=0.06, deadline_s=60, names=["SKIT", "CAL"]
    )
    rows = {r["dataset"]: r for r in df.collect()}
    assert set(rows) == {"SKIT", "CAL"}
    for r in rows.values():
        # SparaPLL never produces fewer labels than the CHL
        assert float(r["spara_als"]) >= float(r["chl_als"])


def test_table4_job_subset(spark):
    df = table4_query_modes.run(spark, scale=0.06, names=["SKIT"], n_queries=500)
    row = df.collect()[0]
    assert row["dataset"] == "SKIT"
    assert float(row["QFDL_mem_MB"]) < float(row["QLSN_mem_MB"])


def test_fig8_job_subset(spark):
    df = fig8_scaling.run(spark, names=("SKIT",), q_sweep=(1, 2), scale=0.06)
    rows = df.collect()
    assert len(rows) == 2 * 4  # q values × algorithms
    plant = [r for r in rows if r["algo"] == "PLaNT"]
    assert all(float(r["comm_MB"]) == 0.0 for r in plant)
