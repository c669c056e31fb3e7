"""T5 — paper Figure 6: iteration (sweep) counts, Paral vs Asyn.

The assertion encodes the paper's claim: the asynchronous strategy never
needs more sweeps than the synchronous one (and cuts them "up to nearly
half" — the measured ratios are recorded in EXPERIMENTS.md).
"""
import pytest

from repro.bench import run_iterations_cell

CASES = [
    ("YT", 2), ("GA", 2),
]


@pytest.mark.parametrize(("dataset", "h"), CASES)
def test_iterations_paral_vs_asyn(benchmark, spark, dataset, h):
    def both():
        paral = run_iterations_cell(spark, dataset, h, "paral")
        asyn = run_iterations_cell(spark, dataset, h, "asyn")
        return paral, asyn

    paral, asyn = benchmark.pedantic(both, rounds=1, iterations=1)
    benchmark.extra_info["paral_sweeps"] = paral
    benchmark.extra_info["asyn_sweeps"] = asyn
    assert 1 <= asyn <= paral
