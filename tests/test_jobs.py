"""Smoke tests for the jobs/ entrypoints.

Pure-Python jobs run end-to-end at tiny scale; Spark jobs are
import-checked only (their ``main`` stops the session, which would kill
the shared test fixture — the experiment functions they wrap are
exercised with the fixture in test_experiments.py).
"""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"

ALL_JOBS = [
    "table2_stats",
    "fig3_accuracy",
    "fig4_throughput",
    "fig5_accuracy_insert_only",
    "fig6_deletions",
    "fig7_scalability",
    "fig8_speedup_batch",
    "fig9_speedup_threads",
    "fig10_load_balance",
]


def load_job(name):
    spec = importlib.util.spec_from_file_location(f"job_{name}", JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


@pytest.mark.parametrize("name", ALL_JOBS)
def test_job_importable(name):
    mod = load_job(name)
    assert callable(mod.main)


def run_main(name, argv, monkeypatch, capsys):
    mod = load_job(name)
    monkeypatch.setattr(sys, "argv", [f"{name}.py"] + argv)
    mod.main()
    return capsys.readouterr().out


def test_table2_job_duckdb(monkeypatch, capsys):
    out = run_main(
        "table2_stats", ["--scale", "0.04", "--engine", "duckdb"], monkeypatch, capsys
    )
    assert "Table II" in out
    for name in ("movielens_lite", "orkut_lite"):
        assert name in out


def test_fig3_job_tiny(monkeypatch, capsys):
    out = run_main(
        "fig3_accuracy", ["--scale", "0.05", "--runs", "1"], monkeypatch, capsys
    )
    assert "Fig. 3" in out
    assert "abacus" in out and "fleet" in out and "cas" in out
    assert "improvement" in out


def test_fig5_job_tiny(monkeypatch, capsys):
    out = run_main(
        "fig5_accuracy_insert_only", ["--scale", "0.05", "--runs", "1"],
        monkeypatch, capsys,
    )
    assert "Fig. 5" in out


def test_fig6_job_tiny(monkeypatch, capsys):
    out = run_main(
        "fig6_deletions", ["--scale", "0.05", "--runs", "1", "--k", "500"],
        monkeypatch, capsys,
    )
    assert "Fig. 6" in out
    assert "alpha" in out


def test_fig7_job_tiny(monkeypatch, capsys):
    out = run_main("fig7_scalability", ["--scale", "0.05"], monkeypatch, capsys)
    assert "Fig. 7" in out
    assert "linearity" in out


def test_fig10_job_serial_tiny(monkeypatch, capsys):
    out = run_main(
        "fig10_load_balance", ["--scale", "0.05", "--serial"], monkeypatch, capsys
    )
    assert "Fig. 10" in out
    assert "Sec. VI-G" in out
