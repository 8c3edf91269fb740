"""Smoke tests for the spark-submit job entrypoints: importability and the
table formatter. (Full runs are the benchmarks' job.)"""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def _load(name: str):
    sys.path.insert(0, str(JOBS))
    try:
        spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.pop(0)


ALL_JOBS = [
    "table2_signature_size",
    "table3_datasets",
    "fig5_bihmm_vs_hmm",
    "fig6_window_size",
    "fig7_lambda",
    "fig8_effectiveness",
    "fig9_updates",
    "fig10_efficiency",
    "fig11_update_cost",
]


@pytest.mark.parametrize("name", ALL_JOBS)
def test_job_importable_with_main(name):
    mod = _load(name)
    assert callable(mod.main)


def test_print_table_formats(capsys):
    common = _load("_common")
    common.print_table("T", [{"a": 1, "b": 0.5}, {"a": 22, "b": 1.0}])
    out = capsys.readouterr().out
    assert "== T ==" in out
    assert "0.5000" in out
    assert "22" in out


def test_print_table_empty(capsys):
    common = _load("_common")
    common.print_table("T", [])
    assert "(no rows)" in capsys.readouterr().out


def test_base_parser_defaults():
    common = _load("_common")
    args = common.base_parser("x").parse_args([])
    assert args.dataset == "ytube"
    assert args.sf == 0.1


def test_table3_job_runs_quickly(capsys):
    """table3 needs no Spark session — run it end-to-end at tiny sf."""
    mod = _load("table3_datasets")
    argv = sys.argv
    sys.argv = ["table3_datasets.py", "--sf", "0.01"]
    try:
        mod.main()
    finally:
        sys.argv = argv
    out = capsys.readouterr().out
    assert "Table III" in out
    assert "ytube" in out and "syn_mlens" in out
