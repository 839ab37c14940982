"""Tests for the report helpers and smoke tests for the job entrypoints."""
import runpy
import sys

import pytest

from repro.experiments.report import format_table, human_bytes, reduction_pct


class TestReportHelpers:
    def test_format_table_alignment(self):
        out = format_table([{"a": 1, "bb": 2.5}, {"a": 10, "bb": 3.0}], title="T")
        lines = out.splitlines()
        assert lines[0] == "T"
        assert "a" in lines[1] and "bb" in lines[1]
        assert len(lines) == 5

    def test_format_table_empty(self):
        assert format_table([]) == "(no rows)"

    def test_format_numbers(self):
        out = format_table([{"x": 2.5e9, "y": 3.1e6, "z": 4.2e3, "w": 0.123}])
        assert "2.50G" in out and "3.10M" in out and "4.20K" in out and "0.123" in out

    def test_human_bytes(self):
        assert human_bytes(2.5e9) == "2.50GB"
        assert human_bytes(3e6) == "3.00MB"
        assert human_bytes(512) == "512B"

    def test_reduction_pct_matches_paper_math(self):
        # paper: 740.34 -> 307.87 is a 58.42 % reduction
        assert reduction_pct(740.34, 307.87) == pytest.approx(58.42, abs=0.05)


class TestJobEntrypoints:
    """Each jobs/*.py must run end-to-end as __main__ (the simulator jobs;
    the Spark job is covered by tests/test_queries.py + test_microbatch)."""

    @pytest.mark.parametrize("job", [
        "table1_setup", "table2_state_transfer", "prediction",
        "elastic_shuffle",
    ])
    def test_job_main_runs(self, job, capsys, monkeypatch):
        monkeypatch.setattr(sys, "argv", [f"jobs/{job}.py"])
        if job == "table1_setup":
            monkeypatch.setattr(sys, "argv", [f"jobs/{job}.py", "0.002"])
        runpy.run_path(f"jobs/{job}.py", run_name="__main__")
        out = capsys.readouterr().out
        assert out.strip()

    def test_table2_job_prints_both_tables(self, capsys, monkeypatch):
        monkeypatch.setattr(sys, "argv", ["jobs/table2_state_transfer.py"])
        runpy.run_path("jobs/table2_state_transfer.py", run_name="__main__")
        out = capsys.readouterr().out
        assert "2 -> 4" in out and "paper" in out
