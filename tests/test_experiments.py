"""Tests for the table harnesses and formatting utilities."""
from pathlib import Path

import pytest

from repro.core import DeepERConfig
from repro.experiments import (
    PAPER_T3,
    PAPER_T4,
    PAPER_T5,
    PAPER_T6,
    PAPER_T7,
    T4_ORDER,
    blocking_sweep_rows,
    format_table,
    multiprobe_rows,
    table3_rows,
    write_result,
)

FAST = DeepERConfig(folds=2, neg_ratio=4, d=32, epochs=8)


class TestPaperConstants:
    def test_all_six_datasets_covered(self):
        assert set(T4_ORDER) == set(PAPER_T3) == set(PAPER_T4) \
            == set(PAPER_T5) == set(PAPER_T6)
        assert set(PAPER_T7) <= set(PAPER_T3)

    def test_table4_values_match_paper_text(self):
        assert PAPER_T4["prod_ag"][1] == pytest.approx(96.03, abs=0.01)
        assert PAPER_T4["rest_fz"][:2] == (100.0, 100.0)

    def test_table3_scaling_direction(self):
        # our generators never exceed the paper's sizes
        for key, (pa, pb, pm, _) in PAPER_T3.items():
            from repro.er_data import SPECS
            assert SPECS[key]["n_a"] <= pa
            assert SPECS[key]["n_b"] <= pb
            assert SPECS[key]["n_matches"] <= pm


class TestTable3:
    def test_rows_structure(self):
        rows = table3_rows(scale=0.2)
        assert [r["dataset"] for r in rows] == T4_ORDER
        for r in rows:
            assert r["paper_attrs"] == r["ours_attrs"]


class TestBlockingSweeps:
    def test_sweep_rows_cover_grid(self):
        rows = blocking_sweep_rows(scale=0.15)
        assert len(rows) == 2 * 20
        assert all(0.0 <= r["pc"] <= 1.0 for r in rows)
        assert all(0.0 <= r["rr"] <= 1.0 for r in rows)

    def test_multiprobe_rows_cover_grid(self):
        rows = multiprobe_rows(scale=0.15)
        assert len(rows) == 4 * 3


class TestFormatting:
    def test_format_table_alignment(self):
        text = format_table([{"a": 1, "bb": "xy"}, {"a": 22, "bb": "z"}],
                            "T")
        lines = text.splitlines()
        assert lines[0] == "## T"
        assert "a" in lines[1] and "bb" in lines[1]
        assert len({len(l) for l in lines[1:4]}) <= 2  # aligned columns

    def test_format_empty(self):
        assert "(no rows)" in format_table([], "T")

    def test_write_result_creates_file(self, tmp_path, monkeypatch):
        p = write_result("unit_test_artifact", "hello\n")
        assert p.exists() and p.read_text() == "hello\n"
        assert p.parent.name == "results"
        p.unlink()


class TestJobsImportAndRun:
    def test_table3_job_main(self):
        import sys
        sys.path.insert(0, "jobs")
        import table3_stats
        out = table3_stats.main()
        assert "Table 3" in out and "rest_fz" in out
