"""Hand-built toy graphs: known truss structure + the NP-hardness gadget.

``truss_ladder`` mirrors the paper's Fig. 3 role (a graph with 3-, 4-
and 5-hulls and a multi-layer 3-hull tail for upward-route examples);
``np_gadget`` realises the Theorem 1 reduction from maximum coverage so
tests can verify claims (i)-(v) of the proof mechanically.
"""
from __future__ import annotations

import pandas as pd

from repro.graphs.gen import clique, union


def two_triangles() -> pd.DataFrame:
    """Two triangles sharing one edge — smallest non-trivial truss case."""
    return union(
        pd.DataFrame({"src": [0, 0, 1, 1, 2], "dst": [1, 2, 2, 3, 3]})
    )


def truss_ladder() -> pd.DataFrame:
    """A Fig.3-style graph: K5 core, K4 attachment, layered 3-hull tail.

    * ``{0..4}`` is a 5-clique (trussness 5).
    * ``{3, 4, 5}``+``{3, 4, 6}`` wrap edge (3,4) into extra 4-truss
      structure together with 5: edges among {3,4,5,6} form two
      triangles sharing (3,4) plus edge (5,6) closing a K4 on {3,4,5,6}
      (trussness 4).
    * a tail of triangles ``(6,7,8), (7,8,9), (8,9,10)`` hangs off the
      K4: trussness-3 edges that peel in multiple layers, giving
      non-trivial ``l(e)`` and upward routes.
    """
    k5 = clique([0, 1, 2, 3, 4])
    k4 = clique([3, 4, 5, 6])
    tail = pd.DataFrame(
        {
            "src": [6, 6, 7, 7, 8, 8, 9],
            "dst": [7, 8, 8, 9, 9, 10, 10],
        }
    )
    return union(k5, k4, tail)


def np_gadget(
    sets: list[set[int]], t_elems: int
) -> tuple[pd.DataFrame, list[tuple[int, int]], list[tuple[int, int]]]:
    """The Theorem-1 reduction graph for a maximum-coverage instance.

    ``sets`` are ``T_1..T_s`` over elements ``{0..t_elems-1}``. Returns
    ``(edges, a_edges, f_edges)`` where ``a_edges[i]`` corresponds to
    set ``T_i`` and ``f_edges[j]`` to element ``j``.

    Construction (concrete realisation of the proof):

    * a shared hub vertex ``q``; ``a_i = (p_i, q)`` and ``f_j = (q, y_j)``;
    * for each ``e_j in T_i`` a fresh ``(t+3)``-clique containing
      ``p_i`` and ``y_j`` — its edge ``(p_i, y_j)`` closes the triangle
      ``(a_i, f_j, clique-edge)`` of the proof;
    * for each ``f_j``, ``t`` support gadgets of two fresh
      ``(t+3)``-cliques sharing a fresh vertex ``z``: one contains
      ``{q, z}``, the other ``{y_j, z}``, so ``f_j`` sits in exactly
      ``t`` triangles whose partner edges have trussness ``t+3``.

    Expected structure (asserted in tests): ``t(a_i) = |T_i| + 2``,
    ``t(f_j) = t + 2``, anchoring ``a_i`` raises exactly the ``f_j``
    with ``e_j in T_i`` by one, and anchoring anything else gains 0.
    """
    t = t_elems
    csize = t + 3
    nxt = [0]

    def fresh(k: int) -> list[int]:
        out = list(range(nxt[0], nxt[0] + k))
        nxt[0] += k
        return out

    q = fresh(1)[0]
    p = fresh(len(sets))
    y = fresh(t_elems)
    frames = []
    a_edges = [(min(p[i], q), max(p[i], q)) for i in range(len(sets))]
    f_edges = [(min(q, y[j]), max(q, y[j])) for j in range(t_elems)]
    frames.append(
        pd.DataFrame(
            {
                "src": [e[0] for e in a_edges + f_edges],
                "dst": [e[1] for e in a_edges + f_edges],
            }
        )
    )
    for i, Ti in enumerate(sets):
        for j in sorted(Ti):
            frames.append(clique([p[i], y[j]] + fresh(csize - 2)))
    for j in range(t_elems):
        for _ in range(t):
            z = fresh(1)[0]
            frames.append(clique([q, z] + fresh(csize - 2)))
            frames.append(clique([y[j], z] + fresh(csize - 2)))
    return union(*frames), a_edges, f_edges
