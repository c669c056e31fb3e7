"""T1 — dataset statistics (paper Table 1).

Benchmarks stand-in generation at bench scale and asserts the generated
sizes stay within the targets recorded in EXPERIMENTS.md.
"""
import pytest

from repro.graphgen import DATASETS, dataset_edges


@pytest.mark.parametrize("key", sorted(DATASETS))
def test_generate_dataset(benchmark, key):
    spec = DATASETS[key]
    edges = benchmark.pedantic(
        dataset_edges, args=(key,), rounds=1, iterations=1
    )
    assert 0 < len(edges) <= spec.m_paper * spec.bench_scale + 8
