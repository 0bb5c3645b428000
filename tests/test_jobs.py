"""Job entrypoints run end-to-end (tiny scale, local engine paths).

The Spark-engine paths of the jobs are covered by the dedicated Spark tests
(same library calls); invoking them here would spawn/stop extra JVMs.
"""
from __future__ import annotations

import subprocess
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def _run(job: str, *args: str) -> str:
    proc = subprocess.run(
        [sys.executable, str(JOBS / job), *args],
        capture_output=True,
        text=True,
        timeout=420,
    )
    assert proc.returncode == 0, f"{job} failed:\n{proc.stdout}\n{proc.stderr}"
    return proc.stdout


def test_table2_local(tmp_path):
    out = tmp_path / "t2.md"
    text = _run(
        "table2_graph_stats.py",
        "--engine", "local", "--scale", "unit",
        "--graphs", "ca-CondMat,inf-road-usa",
        "--out", str(out),
    )
    assert "Table 2" in out.read_text()
    assert "inf-road-usa" in text


def test_table3_ablation(tmp_path):
    out = tmp_path / "t3.md"
    _run(
        "table3_ablation.py",
        "--scale", "unit", "--repeats", "1",
        "--graphs", "ca-CondMat,wiki-Talk",
        "--out", str(out),
    )
    text = out.read_text()
    assert "Variant1" in text and "ca-CondMat" in text


def test_fig7_speedups(tmp_path):
    out = tmp_path / "f7.md"
    _run(
        "fig7_speedups.py",
        "--scale", "unit", "--repeats", "1",
        "--graphs", "inf-road-usa",
        "--out", str(out),
    )
    text = out.read_text()
    assert "RMCEdegen" in text and "paper max speedup" in text


def test_fig8_local(tmp_path):
    out = tmp_path / "f8.md"
    _run(
        "fig8_reduction_ratio.py",
        "--engine", "local", "--scale", "unit",
        "--graphs", "inf-road-usa,sc-delaunay_n23",
        "--out", str(out),
    )
    text = out.read_text()
    assert "100.0%" in text  # road analog fully deleted


def test_fig9_recursive_calls(tmp_path):
    out = tmp_path / "f9.md"
    _run(
        "fig9_recursive_calls.py",
        "--scale", "unit",
        "--graphs", "ca-CondMat",
        "--out", str(out),
    )
    assert "BKdegen calls" in out.read_text()


def test_fig10_forbidden(tmp_path):
    out = tmp_path / "f10.md"
    _run(
        "fig10_forbidden_reduction.py",
        "--scale", "unit",
        "--graphs", "ca-CondMat",
        "--out", str(out),
    )
    assert "r_subproblem" in out.read_text()


def test_fig11_visits(tmp_path):
    out = tmp_path / "f11.md"
    _run(
        "fig11_vertex_visits.py",
        "--scale", "unit",
        "--graphs", "com-dblp",
        "--out", str(out),
    )
    text = out.read_text()
    assert "mean vertex visits" in text and "com-dblp" in text


@pytest.mark.parametrize(
    "job",
    [
        "table2_graph_stats.py",
        "table3_ablation.py",
        "fig7_speedups.py",
        "fig8_reduction_ratio.py",
        "fig9_recursive_calls.py",
        "fig10_forbidden_reduction.py",
        "fig11_vertex_visits.py",
        "spark_pipeline.py",
    ],
)
def test_job_help(job):
    _run(job, "--help")
