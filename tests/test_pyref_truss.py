"""Reference-layer truss tests: peeling vs the raw definition, and the
paper's H-index fixpoint theorems (1 and 2) checked empirically."""
import pytest

from repro.pyref import (
    all_h_supports,
    decompose_peeling,
    kh_truss_by_definition,
    serial_hindex_decompose,
)
from repro.pyref.graphs import canonical_edges

from .graph_catalog import SMALL_GRAPHS, random_graph


class TestHSupport:
    def test_triangle_h1(self):
        assert all_h_supports(SMALL_GRAPHS["triangle"], 1) == {
            (0, 1): 1, (0, 2): 1, (1, 2): 1
        }

    def test_k4_h1(self):
        sup = all_h_supports(SMALL_GRAPHS["k4"], 1)
        assert set(sup.values()) == {2}

    def test_cycle6_h2(self):
        # In C6 each edge's endpoints jointly reach 2 vertices within 2 hops.
        sup = all_h_supports(SMALL_GRAPHS["cycle6"], 2)
        assert set(sup.values()) == {2}

    def test_star_h2(self):
        # Leaves of a star are pairwise within 2 hops via the hub.
        sup = all_h_supports(SMALL_GRAPHS["star5"], 2)
        assert set(sup.values()) == {4}

    def test_single_edge_any_h(self):
        for h in (1, 2, 3):
            assert all_h_supports(SMALL_GRAPHS["single_edge"], h) == {(3, 7): 0}

    @pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
    @pytest.mark.parametrize("h", [1, 2])
    def test_support_monotone_in_h(self, name, h):
        e = SMALL_GRAPHS[name]
        s1, s2 = all_h_supports(e, h), all_h_supports(e, h + 1)
        assert all(s2[k] >= s1[k] for k in s1)


class TestKhTrussByDefinition:
    def test_k4_is_4_truss(self):
        assert kh_truss_by_definition(SMALL_GRAPHS["k4"], 4, 1) == set(
            canonical_edges(SMALL_GRAPHS["k4"])
        )

    def test_k4_is_not_5_truss(self):
        assert kh_truss_by_definition(SMALL_GRAPHS["k4"], 5, 1) == set()

    def test_wheel5_is_62_truss(self):
        # The 5-wheel is the toy's (6,2)-truss kernel (DESIGN.md sub. 6).
        w = SMALL_GRAPHS["wheel5"]
        assert kh_truss_by_definition(w, 6, 2) == set(canonical_edges(w))
        assert kh_truss_by_definition(w, 7, 2) == set()

    @pytest.mark.parametrize("h", [1, 2, 3])
    @pytest.mark.parametrize("k", [2, 3, 4, 5])
    def test_containment_lemma1(self, h, k):
        edges = SMALL_GRAPHS["toy"]
        assert kh_truss_by_definition(edges, k + 1, h) <= kh_truss_by_definition(
            edges, k, h
        )

    @pytest.mark.parametrize("seed", range(4))
    def test_truss_of_truss_is_fixed(self, seed):
        edges = random_graph(seed)
        t = kh_truss_by_definition(edges, 4, 2)
        assert kh_truss_by_definition(t, 4, 2) == t


class TestDecomposePeeling:
    @pytest.mark.parametrize("h", [1, 2, 3])
    def test_covers_all_edges(self, h):
        edges = canonical_edges(SMALL_GRAPHS["toy"])
        t = decompose_peeling(edges, h)
        assert sorted(t) == edges

    @pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
    @pytest.mark.parametrize("h", [1, 2])
    def test_consistent_with_definition(self, name, h):
        """t(e,h) = k  ⟺  e ∈ (k,h)-truss and e ∉ (k+1,h)-truss."""
        edges = SMALL_GRAPHS[name]
        t = decompose_peeling(edges, h)
        if not t:
            return
        for k in range(2, max(t.values()) + 2):
            in_truss = kh_truss_by_definition(edges, k, h)
            assert in_truss == {e for e, te in t.items() if te >= k}

    def test_k5_h1(self):
        t = decompose_peeling(SMALL_GRAPHS["k5"], 1)
        assert set(t.values()) == {5}

    def test_single_edge_trussness_2(self):
        for h in (1, 2, 3):
            assert decompose_peeling(SMALL_GRAPHS["single_edge"], h) == {(3, 7): 2}

    def test_h1_equals_classic_truss_on_bowtie(self):
        t = decompose_peeling(SMALL_GRAPHS["bowtie"], 1)
        assert set(t.values()) == {3}


class TestHIndexFixpoint:
    """Empirical Theorems 1-2: the fixpoint equals the peeling result."""

    @pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
    @pytest.mark.parametrize("h", [1, 2])
    def test_sync_equals_peeling_catalog(self, name, h):
        edges = SMALL_GRAPHS[name]
        assert serial_hindex_decompose(edges, h)[0] == decompose_peeling(edges, h)

    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("h", [1, 2, 3])
    def test_sync_equals_peeling_random(self, seed, h):
        edges = random_graph(seed)
        assert serial_hindex_decompose(edges, h)[0] == decompose_peeling(edges, h)

    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("h", [1, 2, 3])
    def test_async_equals_peeling_random(self, seed, h):
        edges = random_graph(seed)
        assert (
            serial_hindex_decompose(edges, h, asynchronous=True)[0]
            == decompose_peeling(edges, h)
        )

    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("h", [2, 3])
    def test_async_never_more_sweeps(self, seed, h):
        """§4.3: fresh values can only accelerate convergence."""
        edges = random_graph(seed, n=14, p=0.25)
        _, sync = serial_hindex_decompose(edges, h)
        _, asyn = serial_hindex_decompose(edges, h, asynchronous=True)
        assert asyn <= sync

    def test_toy_sweep_counts_match_figure3(self):
        """Figure 3: four update rounds to converge at h=2."""
        edges = SMALL_GRAPHS["toy"]
        _, sync = serial_hindex_decompose(edges, 2)
        _, asyn = serial_hindex_decompose(edges, 2, asynchronous=True)
        assert sync == 4
        assert asyn < sync
