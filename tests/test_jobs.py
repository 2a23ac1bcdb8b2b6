"""Smoke tests for the spark-submit job entrypoints at tiny scale."""
import importlib.util
import pathlib

import pytest

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"


def _load(name):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def test_table2_job(spark, capsys):
    _load("table2_memory").run(spark, sf=0.01)
    out = capsys.readouterr().out
    assert "Table 2 (ldbc_lite" in out and "Table 2 (imdb_lite" in out


def test_table4_job(spark, capsys):
    _load("table4_single_card").run(spark, sf=0.01)
    out = capsys.readouterr().out
    assert "V-Column vs CSR" in out


def test_table3_job(spark, capsys):
    _load("table3_prop_pages").run(spark, scale=0.01)
    out = capsys.readouterr().out
    assert "PAGE_P" in out and "COL_E" in out


def test_table5_job(spark, capsys):
    _load("table5_lbp").run(spark, scale=0.2, hops=(1, 2))
    out = capsys.readouterr().out
    assert "GF-CV" in out and "GF-CL" in out


def test_table6_ldbc_job(spark, capsys):
    _load("table6_ldbc").run(spark, sf=0.01, repeats=1)
    out = capsys.readouterr().out
    assert "LDBC IS" in out and "LDBC IC" in out


def test_table6_job_job(spark, capsys):
    _load("table6_job").run(spark, sf=0.01, repeats=1)
    out = capsys.readouterr().out
    assert "JOB" in out and "33a" in out


def test_table7_8_job(spark, capsys):
    _load("table7_8_sensitivity").run(spark, sf=0.01)
    out = capsys.readouterr().out
    assert "Table 7" in out and "Table 8" in out and "Fig 12" in out
