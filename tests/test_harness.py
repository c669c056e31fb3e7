"""Tests for the experiment harness (timing, INF, table rendering)."""
import pytest

from repro.bench import (
    fmt_seconds,
    markdown_table,
    run_efficiency_cell,
    run_iterations_cell,
    table1_rows,
)
from repro.core.baseline import INF
from repro.graphgen import DATASETS


class TestFormatting:
    def test_fmt_seconds(self):
        assert fmt_seconds(1.234) == "1.23s"

    def test_fmt_inf(self):
        assert fmt_seconds(INF) == "INF"

    def test_markdown_table_shape(self):
        out = markdown_table(["a", "b"], [[1, 2], [3, 4]])
        lines = out.splitlines()
        assert lines[0] == "| a | b |"
        assert lines[1] == "|---|---|"
        assert len(lines) == 4


class TestTable1:
    def test_has_six_rows(self):
        rows = table1_rows(scale=0.02)
        assert len(rows) == 6
        assert {r[0] for r in rows} == set(DATASETS)

    def test_row_shape(self):
        key, name, nv, ne, gv, ge = table1_rows(scale=0.02)[0]
        assert gv <= nv and ge <= ne


class TestCells:
    """Cells at minuscule scale: the harness plumbing, not performance."""

    def test_base_cell_reports_inf_on_zero_budget(self, sparkf):
        secs, sweeps = run_efficiency_cell(
            sparkf, "SC", 2, "base", budget_s=0.0, scale=0.02
        )
        assert secs == INF and sweeps == 0

    def test_base_cell_finishes_small(self, sparkf):
        secs, _ = run_efficiency_cell(
            sparkf, "YT", 1, "base", budget_s=300.0, scale=0.05
        )
        assert secs < 300

    @pytest.mark.parametrize("algo", ["paral", "asyn"])
    def test_iterations_cell(self, sparkf, algo):
        sweeps = run_iterations_cell(sparkf, "YT", 2, algo, scale=0.03)
        assert sweeps >= 1
