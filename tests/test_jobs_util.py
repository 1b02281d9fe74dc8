"""Tests for the jobs helper layer and job-script importability."""
import importlib.util
import pathlib

import pytest

from repro.jobs_util import ensure_lake, print_table

JOBS_DIR = pathlib.Path(__file__).resolve().parent.parent / "jobs"


class TestEnsureLake:
    def test_existing_lake_returns_matching_corpus(self, spark, lake_root, corpus):
        again = ensure_lake(spark, lake_root, sf=0.01)
        assert again.airlines_id == corpus.airlines_id
        assert again.flagship_ids == corpus.flagship_ids

    def test_sf_mismatch_rejected(self, spark, lake_root):
        with pytest.raises(ValueError, match="different[\\s\\S]*scale factor|scale factor"):
            ensure_lake(spark, lake_root, sf=0.05)

    def test_fresh_dir_writes_lake(self, spark, tmp_path):
        corpus = ensure_lake(spark, str(tmp_path / "mini"), sf=0.005)
        assert corpus.airlines_id > 0


class TestPrintTable:
    def test_renders_rows(self, capsys):
        print_table("t", [{"a": 1, "b": "xy"}, {"a": 22, "b": "z"}])
        out = capsys.readouterr().out
        assert "== t ==" in out
        assert "22" in out and "xy" in out

    def test_empty(self, capsys):
        print_table("t", [])
        assert "(empty)" in capsys.readouterr().out


class TestJobScripts:
    @pytest.mark.parametrize(
        "name",
        [
            "build_catalog", "run_search", "expressivity",
            "study_tables", "search_correctness", "joinability_eval",
        ],
    )
    def test_job_script_imports_and_has_main(self, name):
        spec = importlib.util.spec_from_file_location(
            f"job_{name}", JOBS_DIR / f"{name}.py"
        )
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        assert callable(mod.main)
