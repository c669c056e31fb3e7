"""T2 — Figure 3: traced Paral run on the toy graph.

The benchmark times the traced run; the assertion pins the figure's
headline fact (convergence after 4 sweeps at h=2).
"""
from repro.bench import table2_trace


def test_toy_convergence_trace(benchmark, spark):
    trace, sweeps = benchmark.pedantic(
        table2_trace, args=(spark,), kwargs={"h": 2}, rounds=1, iterations=1
    )
    assert sweeps == 4
    assert len(trace) == sweeps + 1
