"""Unit tests for the pure-Python graph helpers (reference layer)."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.pyref.graphs import adjacency, bfs_within, canonical_edges

from .graph_catalog import SMALL_GRAPHS, random_graph


class TestCanonicalEdges:
    def test_orients_and_sorts(self):
        assert canonical_edges([(2, 1), (3, 0)]) == [(0, 3), (1, 2)]

    def test_drops_self_loops(self):
        assert canonical_edges([(1, 1), (1, 2)]) == [(1, 2)]

    def test_collapses_duplicates_both_orientations(self):
        assert canonical_edges([(1, 2), (2, 1), (1, 2)]) == [(1, 2)]

    def test_empty(self):
        assert canonical_edges([]) == []

    def test_dirty_catalog_graph(self):
        assert canonical_edges(SMALL_GRAPHS["dirty"]) == [(1, 2), (4, 5)]

    @pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
    def test_idempotent(self, name):
        once = canonical_edges(SMALL_GRAPHS[name])
        assert canonical_edges(once) == once

    @given(
        st.lists(
            st.tuples(st.integers(0, 20), st.integers(0, 20)), max_size=60
        )
    )
    def test_property_canonical_shape(self, edges):
        out = canonical_edges(edges)
        assert all(u < v for u, v in out)
        assert out == sorted(set(out))


class TestAdjacency:
    def test_triangle(self):
        adj = adjacency(canonical_edges(SMALL_GRAPHS["triangle"]))
        assert adj == {0: {1, 2}, 1: {0, 2}, 2: {0, 1}}

    def test_symmetry(self):
        adj = adjacency(canonical_edges(SMALL_GRAPHS["toy"]))
        for v, nbrs in adj.items():
            for w in nbrs:
                assert v in adj[w]

    @pytest.mark.parametrize("seed", range(5))
    def test_degree_sum_is_twice_edges(self, seed):
        edges = canonical_edges(random_graph(seed))
        adj = adjacency(edges)
        assert sum(len(n) for n in adj.values()) == 2 * len(edges)


class TestBfsWithin:
    def test_path_distances(self):
        adj = adjacency(canonical_edges(SMALL_GRAPHS["path5"]))
        assert bfs_within(adj, 0, 2) == {1: 1, 2: 2}
        assert bfs_within(adj, 0, 4) == {1: 1, 2: 2, 3: 3, 4: 4}

    def test_excludes_source(self):
        adj = adjacency(canonical_edges(SMALL_GRAPHS["triangle"]))
        assert 0 not in bfs_within(adj, 0, 3)

    def test_h1_is_neighbors(self):
        edges = canonical_edges(SMALL_GRAPHS["toy"])
        adj = adjacency(edges)
        for v in adj:
            assert set(bfs_within(adj, v, 1)) == adj[v]

    def test_isolated_vertex(self):
        assert bfs_within({}, 42, 3) == {}

    @pytest.mark.parametrize("name", ["cycle6", "petersen", "toy", "bowtie"])
    @pytest.mark.parametrize("h", [1, 2, 3])
    def test_monotone_in_h(self, name, h):
        adj = adjacency(canonical_edges(SMALL_GRAPHS[name]))
        for v in adj:
            inner = bfs_within(adj, v, h)
            outer = bfs_within(adj, v, h + 1)
            assert set(inner) <= set(outer)
            for w, d in inner.items():
                assert outer[w] == d <= h

    @pytest.mark.parametrize("seed", range(5))
    def test_matches_floyd_warshall(self, seed):
        edges = canonical_edges(random_graph(seed, n=9, p=0.35))
        adj = adjacency(edges)
        verts = sorted(adj)
        big = 10**9
        dist = {a: {b: (0 if a == b else big) for b in verts} for a in verts}
        for u, v in edges:
            dist[u][v] = dist[v][u] = 1
        for k in verts:
            for i in verts:
                for j in verts:
                    d = dist[i][k] + dist[k][j]
                    if d < dist[i][j]:
                        dist[i][j] = d
        for h in (1, 2, 3):
            for a in verts:
                expect = {
                    b: dist[a][b] for b in verts if 1 <= dist[a][b] <= h
                }
                assert bfs_within(adj, a, h) == expect
