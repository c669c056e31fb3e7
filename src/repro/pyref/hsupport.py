"""Reference h-support computation (Definitions 2 and 3 of the paper)."""
from .graphs import adjacency, bfs_within, canonical_edges


def common_h_neighbors(adj, u, v, h):
    """``Δ_G((u,v), h)``: vertices ``w ∉ {u, v}`` within distance ``h`` of
    both ``u`` and ``v`` (distances in the graph given by ``adj``)."""
    near_u = bfs_within(adj, u, h)
    near_v = bfs_within(adj, v, h)
    return {w for w in near_u if w in near_v and w != u and w != v}


def h_support(adj, u, v, h):
    """``sup_G((u,v), h) = |Δ_G((u,v), h)|`` (Definition 3)."""
    return len(common_h_neighbors(adj, u, v, h))


def all_h_supports(edges, h):
    """h-support of every edge; returns ``{(u,v): support}`` with u < v."""
    edges = canonical_edges(edges)
    adj = adjacency(edges)
    return {(u, v): h_support(adj, u, v, h) for u, v in edges}
