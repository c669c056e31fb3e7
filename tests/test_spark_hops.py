"""Tests for the h-hop neighborhood pair table against reference BFS."""
import pytest

from repro.graph.edges import edges_df
from repro.graph.hops import hop_pairs_df
from repro.pyref.graphs import adjacency, bfs_within, canonical_edges

from .graph_catalog import SMALL_GRAPHS, random_graph


def _reference_pairs(edges, h):
    adj = adjacency(canonical_edges(edges))
    out = {}
    for v in adj:
        for w, d in bfs_within(adj, v, h).items():
            out[(v, w)] = d
    return out


class TestHopPairs:
    @pytest.mark.parametrize("name", ["path5", "cycle6", "toy", "petersen", "star5"])
    @pytest.mark.parametrize("h", [1, 2, 3])
    def test_matches_reference_bfs(self, sparkf, name, h):
        edges = SMALL_GRAPHS[name]
        df = hop_pairs_df(edges_df(sparkf, edges), h)
        got = {(r.a, r.b): r.dist for r in df.collect()}
        assert got == _reference_pairs(edges, h)

    @pytest.mark.parametrize("seed", range(4))
    @pytest.mark.parametrize("h", [2, 3])
    def test_matches_reference_bfs_random(self, sparkf, seed, h):
        edges = random_graph(seed)
        df = hop_pairs_df(edges_df(sparkf, edges), h)
        got = {(r.a, r.b): r.dist for r in df.collect()}
        assert got == _reference_pairs(edges, h)

    def test_h1_is_adjacency(self, sparkf):
        e = edges_df(sparkf, SMALL_GRAPHS["toy"])
        assert hop_pairs_df(e, 1).count() == 2 * e.count()

    def test_symmetric(self, sparkf):
        df = hop_pairs_df(edges_df(sparkf, SMALL_GRAPHS["bowtie"]), 2)
        pairs = {(r.a, r.b, r.dist) for r in df.collect()}
        assert pairs == {(b, a, d) for a, b, d in pairs}

    def test_invalid_h_raises(self, sparkf):
        with pytest.raises(ValueError, match=">= 1"):
            hop_pairs_df(edges_df(sparkf, SMALL_GRAPHS["triangle"]), 0)
