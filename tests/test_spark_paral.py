"""End-to-end tests for Algorithm 2 and its variants (the contribution).

Every variant must produce exactly the peeling trussness (Theorem 2);
traces must be monotone (Theorem 1); Asyn must not need more sweeps than
Paral (§4.3); results are also pushed through the DuckDB oracle.
"""
import pandas as pd
import pytest

from repro.core.paral import parallel_decompose
from repro.oracle import assert_equivalent
from repro.pyref import all_h_supports, decompose_peeling, serial_hindex_decompose

from .graph_catalog import SMALL_GRAPHS, random_graph


def _as_dict(result_df):
    return {(r.src, r.dst): r.trussness for r in result_df.collect()}


@pytest.fixture(scope="module")
def toy_paral(sparkf):
    """One traced Paral run on the toy graph, shared by several tests."""
    return parallel_decompose(
        sparkf, SMALL_GRAPHS["toy"], 2, trace=True, parallelism=4
    )


class TestParalCorrectness:
    @pytest.mark.parametrize("name", ["toy", "bowtie", "petersen"])
    @pytest.mark.parametrize("h", [1, 2])
    def test_matches_peeling_catalog(self, sparkf, name, h):
        edges = SMALL_GRAPHS[name]
        res = parallel_decompose(sparkf, edges, h, parallelism=4)
        assert _as_dict(res.trussness) == decompose_peeling(edges, h)

    @pytest.mark.parametrize("seed", [0, 1])
    @pytest.mark.parametrize("h", [2, 3])
    def test_matches_peeling_random(self, sparkf, seed, h):
        edges = random_graph(seed)
        res = parallel_decompose(sparkf, edges, h, parallelism=4)
        assert _as_dict(res.trussness) == decompose_peeling(edges, h)

    def test_empty_graph(self, sparkf):
        res = parallel_decompose(sparkf, [], 2)
        assert res.trussness.count() == 0
        assert res.sweeps == 0

    def test_zero_support_edges_get_trussness_2(self, sparkf):
        res = parallel_decompose(sparkf, SMALL_GRAPHS["single_edge"], 2, parallelism=2)
        assert _as_dict(res.trussness) == {(3, 7): 2}

    def test_result_via_duckdb_oracle(self, sparkf, toy_paral):
        expected = decompose_peeling(SMALL_GRAPHS["toy"], 2)
        expected_pdf = pd.DataFrame(
            [(u, v, t) for (u, v), t in sorted(expected.items())],
            columns=["src", "dst", "trussness"],
        )
        assert_equivalent(
            toy_paral.trussness.select("src", "dst", "trussness"),
            "SELECT src, dst, trussness FROM expected",
            expected=expected_pdf,
        )


class TestVariants:
    @pytest.mark.parametrize("h", [1, 2])
    def test_asyn_matches_peeling(self, sparkf, h):
        edges = SMALL_GRAPHS["toy"]
        res = parallel_decompose(sparkf, edges, h, asynchronous=True, parallelism=4)
        assert _as_dict(res.trussness) == decompose_peeling(edges, h)

    @pytest.mark.parametrize("h", [1, 2])
    def test_paralplus_matches_peeling(self, sparkf, h):
        edges = SMALL_GRAPHS["toy"]
        res = parallel_decompose(
            sparkf, edges, h, asynchronous=True, pruning=True, parallelism=4
        )
        assert _as_dict(res.trussness) == decompose_peeling(edges, h)

    @pytest.mark.parametrize("seed", [2])
    def test_all_variants_agree_random(self, sparkf, seed):
        edges = random_graph(seed)
        expected = decompose_peeling(edges, 2)
        for kwargs in (
            {},
            {"asynchronous": True},
            {"asynchronous": True, "pruning": True},
            {"pruning": True},
        ):
            res = parallel_decompose(sparkf, edges, 2, parallelism=4, **kwargs)
            assert _as_dict(res.trussness) == expected, f"variant {kwargs}"

    def test_single_parallelism_one(self, sparkf):
        edges = SMALL_GRAPHS["bowtie"]
        res = parallel_decompose(sparkf, edges, 2, parallelism=1)
        assert _as_dict(res.trussness) == decompose_peeling(edges, 2)

    def test_parallelism_restores_conf(self, sparkf):
        before = sparkf.conf.get("spark.sql.shuffle.partitions")
        parallel_decompose(sparkf, SMALL_GRAPHS["triangle"], 1, parallelism=2)
        assert sparkf.conf.get("spark.sql.shuffle.partitions") == before


class TestSweepsAndTrace:
    def test_paral_sweeps_match_serial_reference(self, sparkf, toy_paral):
        _, ref_sweeps = serial_hindex_decompose(SMALL_GRAPHS["toy"], 2)
        assert toy_paral.sweeps == ref_sweeps == 4

    def test_asyn_needs_fewer_or_equal_sweeps(self, sparkf, toy_paral):
        asyn = parallel_decompose(
            sparkf, SMALL_GRAPHS["toy"], 2, asynchronous=True, parallelism=4
        )
        assert asyn.sweeps <= toy_paral.sweeps
        assert asyn.sweeps < toy_paral.sweeps  # strict on the toy (3 < 4)

    def test_trace_starts_at_h_support(self, toy_paral):
        sup = all_h_supports(SMALL_GRAPHS["toy"], 2)
        first = toy_paral.trace[0]
        got = {
            (r.src, r.dst): r.hval for r in first.itertuples(index=False)
        }
        assert got == sup

    def test_trace_is_monotone_nonincreasing(self, toy_paral):
        """Theorem 1: H^(n)sup(e) >= H^(n+1)sup(e) for every edge."""
        frames = toy_paral.trace
        assert len(frames) == toy_paral.sweeps + 1
        for a, b in zip(frames, frames[1:]):
            merged = a.merge(b, on=["src", "dst"], suffixes=("_a", "_b"))
            assert (merged.hval_b <= merged.hval_a).all()

    def test_trace_converges_to_trussness(self, toy_paral):
        expected = decompose_peeling(SMALL_GRAPHS["toy"], 2)
        last = toy_paral.trace[-1]
        got = {
            (r.src, r.dst): r.hval + 2 for r in last.itertuples(index=False)
        }
        assert got == expected

    def test_last_two_trace_frames_equal(self, toy_paral):
        a, b = toy_paral.trace[-2], toy_paral.trace[-1]
        assert a.equals(b)
