"""The 14-node / 20-edge running example (paper Figures 1-3).

The figure images are not recoverable from the text, so this graph is a
reconstruction satisfying every property the paper *states* about it
(verified by tests in ``tests/test_graphgen.py``):

* 14 nodes and 20 edges;
* plain k-truss (h=1) decomposition yields trussness {2, 3} only
  ("2-truss and 3-truss ... lacks a sense of hierarchy");
* the (k,2)-truss decomposition yields the nested hierarchy
  (4,2)-truss ⊃ (5,2)-truss ⊃ (6,2)-truss, with one edge of
  2-trussness 4, nine of 5 and ten of 6 (paper figure: 1/8/11);
* the globally minimum initial 2-support is 2 and that edge has
  2-trussness 4 — the first edge peeled in Example 2;
* the synchronous H-index iteration (Paral) converges in 4 sweeps, as
  in Figure 3, and the asynchronous variant in fewer.

Topology: a 5-wheel (hub 0, rim 1-5; the (6,2)-truss), a 5-cycle
(6-10) sharing edge (6,7) with a 4-cycle (6,7,11,12), a bridge (1,6)
joining the two communities, and a pendant edge (7,13).
"""

_TOY = [
    # 5-wheel: hub 0, rim 1..5
    (0, 1), (0, 2), (0, 3), (0, 4), (0, 5),
    (1, 2), (2, 3), (3, 4), (4, 5), (1, 5),
    # 5-cycle
    (6, 7), (7, 8), (8, 9), (9, 10), (6, 10),
    # 4-cycle glued to the 5-cycle along edge (6, 7)
    (7, 11), (11, 12), (6, 12),
    # bridge between the communities
    (1, 6),
    # pendant
    (7, 13),
]


def toy_edges():
    """Edge list of the running-example graph (canonical (u,v), u < v)."""
    return list(_TOY)
