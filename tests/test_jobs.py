"""The spark-submit entrypoints stay importable/compilable.

Jobs own their SparkSession lifecycle (they call ``spark.stop()``), so
they are not *run* inside the shared-fixture test session — the full runs
are recorded in EXPERIMENTS.md. Here we compile them and check the wiring
that does not need Spark.
"""
import py_compile
from pathlib import Path

import pytest

JOBS = sorted((Path(__file__).resolve().parent.parent / "jobs")
              .glob("*.py"))


@pytest.mark.parametrize("path", JOBS, ids=lambda p: p.name)
def test_job_compiles(path):
    py_compile.compile(str(path), doraise=True)


def test_expected_jobs_exist():
    names = {p.name for p in JOBS}
    assert {"table2_stats.py", "table3_cover.py", "table4_two_cycles.py",
            "speedup.py", "_common.py"} <= names


def test_emit_writes_csv(tmp_path, monkeypatch):
    import importlib.util
    spec = importlib.util.spec_from_file_location(
        "_common", JOBS[0].parent / "_common.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    monkeypatch.setattr(mod, "RESULTS", tmp_path)
    import pandas as pd
    mod.emit(pd.DataFrame({"a": [1]}), "x")
    assert (tmp_path / "x.csv").read_text().startswith("a")
