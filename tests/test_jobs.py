"""Smoke tests for the spark-submit job entrypoints."""
import subprocess
import sys

import pytest


def _run(args):
    return subprocess.run(
        [sys.executable, *args], capture_output=True, text=True, timeout=120
    )


class TestTable2Job:
    """table2.py needs no Spark session — run it for real."""

    def test_prints_workload(self):
        r = _run(["jobs/table2.py"])
        assert r.returncode == 0
        assert "Q2.2" in r.stdout and "side by side" in r.stdout

    def test_extension_flag(self):
        r = _run(["jobs/table2.py", "--extension"])
        assert r.returncode == 0
        assert "EQ1" in r.stdout and "Q2.2" not in r.stdout


class TestJobModules:
    """Every job script must at least parse and expose a main()."""

    @pytest.mark.parametrize(
        "path",
        [
            "jobs/table1.py",
            "jobs/table2.py",
            "jobs/table3.py",
            "jobs/table4.py",
            "jobs/table5.py",
            "jobs/table7.py",
            "jobs/build_index.py",
            "jobs/run_query.py",
            "jobs/common.py",
        ],
    )
    def test_compiles(self, path):
        import py_compile

        py_compile.compile(path, doraise=True)

    def test_help_does_not_launch_spark(self):
        r = _run(["jobs/table3.py", "--help"])
        assert r.returncode == 0
        assert "--sf" in r.stdout and "--cost-scale" in r.stdout
