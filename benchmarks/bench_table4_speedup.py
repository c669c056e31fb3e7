"""T4 — paper Figure 5: Paral wall time versus parallelism.

Parallelism (partition count on 16 cores) plays the paper's thread-count
role; the parallelism-1 entry is the paper's **Single**. The speedup
ratios in EXPERIMENTS.md come from `jobs/table4_speedup.py` over the
full {1,2,4,8,16} sweep; this benchmark pins the endpoints and middle.
"""
import pytest

from repro.bench import run_speedup_cell

DATASETS = ["YT"]
PARALLELISM = [1, 4, 16]


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("parallelism", PARALLELISM)
def test_speedup(benchmark, spark, dataset, parallelism):
    secs, sweeps = benchmark.pedantic(
        run_speedup_cell,
        args=(spark, dataset, 2, parallelism),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["sweeps"] = sweeps
    assert secs > 0 and sweeps >= 1
