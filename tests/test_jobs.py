"""Smoke tests for the spark-submit job entrypoints (argument parsing
and the Spark-free jobs end to end)."""
import subprocess
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def _run(script: str, *args: str) -> subprocess.CompletedProcess:
    return subprocess.run(
        [sys.executable, str(JOBS / script), *args],
        capture_output=True,
        text=True,
        timeout=300,
        cwd=str(JOBS),
    )


class TestSparkFreeJobs:
    def test_table1_job(self):
        p = _run("table1_workload.py", "--scale", "test")
        assert p.returncode == 0, p.stderr[-2000:]
        assert "Table 1" in p.stdout
        assert "T10" in p.stdout

    def test_table2_job(self):
        p = _run("table2_datasets.py", "--scale", "test")
        assert p.returncode == 0, p.stderr[-2000:]
        for name in ("RelatedQS", "LP", "MSTuring", "SIFT", "YandexT2I"):
            assert name in p.stdout

    def test_bad_scale_rejected(self):
        p = _run("table1_workload.py", "--scale", "galactic")
        assert p.returncode != 0


class TestJobHelp:
    @pytest.mark.parametrize(
        "script",
        [
            "table1_workload.py",
            "table2_datasets.py",
            "table3_slowdown.py",
            "table4_index_time.py",
            "table5_robustness.py",
        ],
    )
    def test_help_exits_zero(self, script):
        p = _run(script, "--help")
        assert p.returncode == 0
        assert "--scale" in p.stdout
