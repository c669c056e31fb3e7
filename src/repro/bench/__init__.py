"""Experiment harness: timing with an INF budget, and the five
table-reproduction experiments (T1-T5) shared by ``jobs/`` and
``benchmarks/``."""
from .harness import (  # noqa: F401
    fmt_seconds,
    markdown_table,
    run_efficiency_cell,
    run_iterations_cell,
    run_serial_iterations_cell,
    run_speedup_cell,
    table1_rows,
    table2_trace,
)
