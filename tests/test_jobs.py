"""Smoke tests for the jobs/ entrypoints (the per-table drivers)."""
from __future__ import annotations

import importlib.util
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def load_job(name: str):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    module = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(module)
    return module


def test_table1_prints_all_languages(capsys):
    load_job("table1_formation").main()
    out = capsys.readouterr().out
    for lang in ("sqlpp", "sql", "mongo", "cypher", "sparksql"):
        assert f"================ {lang} ================" in out
    assert out.count("af['lang'] == 'en'") == 5 * 4  # appears in ops 3–6


def test_table2_validates_all_attributes(capsys):
    load_job("table2_wisconsin").main(n=1_000)  # asserts internally
    out = capsys.readouterr().out
    assert "FAIL" not in out
    assert out.count(" OK") == 16


@pytest.mark.parametrize(
    "name", ["table3_expressions", "table4_single_node", "table5_multinode"]
)
def test_spark_jobs_importable(name):
    module = load_job(name)
    assert callable(module.main)
