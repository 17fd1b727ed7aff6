"""Smoke tests for the spark-submit entrypoints (arg wiring + output)."""
import runpy
import sys
from pathlib import Path

import pandas as pd
import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def _run_job(monkeypatch, script: str, argv: list[str]):
    monkeypatch.setattr(sys, "argv", [script] + argv)
    monkeypatch.syspath_prepend(str(JOBS))
    runpy.run_path(str(JOBS / script), run_name="__main__")


def test_table4_job_writes_csv(monkeypatch, tmp_path, capsys):
    out = tmp_path / "t4.csv"
    _run_job(monkeypatch, "table4.py", ["--scale", "0.01", "--out", str(out)])
    df = pd.read_csv(out)
    assert len(df) == 8
    assert "paper n" in df.columns and "ours n" in df.columns
    assert "EmailCore" in capsys.readouterr().out


def test_table3_job_runs(monkeypatch, tmp_path, spark, capsys):
    # spark fixture keeps the session alive; get_spark reuses it
    out = tmp_path / "t3.csv"
    _run_job(monkeypatch, "table3.py", ["--theta", "200", "--out", str(out)])
    df = pd.read_csv(out)
    assert set(df["Algorithm"]) == {"Greedy", "OutNeighbors", "GreedyReplace"}
    assert df["E (b=2)"].min() == pytest.approx(1.0)


def test_table7_job_tiny_grid(monkeypatch, tmp_path, spark):
    out = tmp_path / "t7.csv"
    _run_job(
        monkeypatch,
        "table7.py",
        [
            "--datasets", "EmailCore",
            "--models", "WC",
            "--budgets", "5",
            "--theta", "100",
            "--r-eval", "300",
            "--out", str(out),
        ],
    )
    df = pd.read_csv(out)
    assert list(df.columns) == ["Dataset", "Model", "b", "RA", "OD", "AG", "GR"]
    assert len(df) == 1


def test_table5_job_tiny(monkeypatch, tmp_path, spark):
    out = tmp_path / "t5.csv"
    _run_job(
        monkeypatch,
        "table5.py",
        [
            "--n-subgraphs", "1",
            "--n-target", "10",
            "--n-seeds", "2",
            "--budgets", "1",
            "--theta", "80",
            "--out", str(out),
        ],
    )
    df = pd.read_csv(out)
    assert list(df["b"]) == [1]
    assert "Exact time (s)" in df.columns


def test_efficiency_job_tiny(monkeypatch, tmp_path, spark):
    out = tmp_path / "eff.csv"
    _run_job(
        monkeypatch,
        "efficiency.py",
        [
            "--b", "1",
            "--theta", "80",
            "--r-bg", "5",
            "--scale", "0.2",
            "--out", str(out),
        ],
    )
    df = pd.read_csv(out)
    assert list(df["Algorithm"]) == ["BG", "AG", "GR"]
