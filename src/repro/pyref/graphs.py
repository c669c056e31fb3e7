"""Tiny in-memory graph helpers for the reference implementations.

Graphs are edge lists of ``(u, v)`` int pairs; all helpers treat them as
undirected simple graphs (self-loops dropped, duplicates collapsed,
endpoints sorted).
"""
from collections import deque


def canonical_edges(edges):
    """Canonicalize an undirected edge list.

    Returns a sorted list of ``(u, v)`` tuples with ``u < v``, self-loops
    removed and duplicates (in either orientation) collapsed.
    """
    out = set()
    for u, v in edges:
        u, v = int(u), int(v)
        if u == v:
            continue
        out.add((u, v) if u < v else (v, u))
    return sorted(out)


def adjacency(edges):
    """Adjacency sets ``{v: {neighbors}}`` for a canonical edge list."""
    adj = {}
    for u, v in edges:
        adj.setdefault(u, set()).add(v)
        adj.setdefault(v, set()).add(u)
    return adj


def bfs_within(adj, source, h):
    """Vertices within distance ``h`` of ``source`` (source excluded).

    Returns ``{vertex: dist}`` for ``1 <= dist <= h``.
    """
    dist = {source: 0}
    frontier = deque([source])
    while frontier:
        v = frontier.popleft()
        if dist[v] == h:
            continue
        for w in adj.get(v, ()):
            if w not in dist:
                dist[w] = dist[v] + 1
                frontier.append(w)
    del dist[source]
    return dist
