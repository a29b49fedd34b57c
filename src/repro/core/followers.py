"""Follower computation for a single anchor edge (paper Algorithm 3).

Anchoring edge ``x`` (support := +inf) can raise each other edge's
trussness by at most 1 (Lemma 1), so the trussness gain of ``{x}`` is
the number of *followers* ``F(x, G)``. This module computes followers
with the paper's two pruning ideas:

1. **Upward-route candidates** (Lemma 2): only edges reachable from
   ``x``'s neighbour-edges along same-trussness, deletion-order-
   increasing routes can be followers. :func:`upward_candidates`
   enumerates them per trussness level.
2. **Support check**: within each level ``i``, a candidate survives iff
   it keeps ``>= i-1`` *effective triangles* — triangles whose partner
   edges are the anchor, an anchored edge, an edge of trussness ``> i``
   (already in every ``(i+1)``-truss), or another surviving candidate.
   We compute the maximal surviving set by peeling to a fixpoint, which
   is an equivalent batch formulation of Algorithm 3's
   survive/eliminate/Retract bookkeeping (the fixpoint is unique, so
   processing order does not matter).

Every edge whose ``(t, l, anchored)`` state the computation *reads* is
recorded in ``reads`` — the GAS reuse machinery invalidates a cached
result iff one of its read edges changed, which makes result reuse
provably exact.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass

from repro.truss.local import INF_T, LocalGraph, TrussState


@dataclass
class FollowerResult:
    """Followers of one prospective anchor plus reuse bookkeeping."""

    x: int
    followers: frozenset[int]
    candidates: frozenset[int]  # all upward-route candidates (route edges)
    reads: frozenset[int]  # every edge whose state was consulted

    @property
    def gain(self) -> int:
        """Trussness gain of anchoring ``x`` alone (= #followers, Lemma 1)."""
        return len(self.followers)


def _roots(
    g: LocalGraph, st: TrussState, x: int, reads: set[int]
) -> dict[int, list[int]]:
    """Neighbour-edges of ``x`` satisfying Lemma 2 condition (i), by level.

    Condition (i): ``t(e) > t(x)``, or ``t(e) = t(x)`` and
    ``l(e) > l(x)``. Anchored edges are skipped (they have no trussness
    to gain).
    """
    tx, lx = int(st.t[x]), int(st.layer[x])
    roots: dict[int, list[int]] = {}
    seen: set[int] = set()
    for _w, e1, e2 in g.triangles_of(x):
        for e in (e1, e2):
            if e in seen:
                continue
            seen.add(e)
            reads.add(e)
            te = int(st.t[e])
            if te >= INF_T:
                continue
            if te > tx or (te == tx and int(st.layer[e]) > lx):
                roots.setdefault(te, []).append(e)
    return roots


def upward_candidates(
    g: LocalGraph, st: TrussState, x: int
) -> tuple[dict[int, set[int]], set[int]]:
    """Upward-route candidate followers of ``x``, grouped by trussness.

    Per level ``i``: BFS from the level-``i`` roots, expanding from
    edge ``e`` to any neighbour-edge ``e'`` with ``t(e') = i`` and
    ``e < e'`` in deletion order (Definition 7). Returns the per-level
    candidate sets and the read-set of consulted edges.
    """
    reads: set[int] = {x}
    roots = _roots(g, st, x, reads)
    cands: dict[int, set[int]] = {}
    for i, rs in roots.items():
        level: set[int] = set(rs)
        queue = deque(rs)
        while queue:
            e = queue.popleft()
            oe = st.order(e)
            for _w, e1, e2 in g.triangles_of(e):
                for p in (e1, e2):
                    if p in level:
                        continue
                    reads.add(p)
                    if (
                        int(st.t[p]) == i
                        and p != x
                        and oe <= st.order(p)
                    ):
                        level.add(p)
                        queue.append(p)
        cands[i] = level
    return cands, reads


def _peel_level(
    g: LocalGraph,
    st: TrussState,
    x: int,
    i: int,
    cand: set[int],
    reads: set[int],
) -> set[int]:
    """Maximal subset of level-``i`` candidates passing the support check.

    An edge survives iff it has ``>= i-1`` effective triangles, where a
    partner edge counts iff it is the anchor ``x``, an anchored edge,
    has trussness ``> i``, or is itself a surviving candidate. Peeling
    to the greatest fixpoint reproduces Algorithm 3's
    survived/eliminated/Retract outcome exactly.
    """
    survivors = set(cand)

    def eff(e: int) -> int:
        s = 0
        for _w, e1, e2 in g.triangles_of(e):
            ok = True
            for p in (e1, e2):
                reads.add(p)
                tp = int(st.t[p])
                if p == x or tp >= INF_T or tp > i or (tp == i and p in survivors):
                    continue
                ok = False
                break
            if ok:
                s += 1
        return s

    queue = deque(survivors)
    queued = set(survivors)
    while queue:
        e = queue.popleft()
        queued.discard(e)
        if e not in survivors:
            continue
        if eff(e) < i - 1:
            survivors.discard(e)
            for _w, e1, e2 in g.triangles_of(e):
                for p in (e1, e2):
                    if p in survivors and p not in queued:
                        queue.append(p)
                        queued.add(p)
    return survivors


def get_followers(g: LocalGraph, st: TrussState, x: int) -> FollowerResult:
    """``F(x, G_A)`` — the exact follower set of anchoring edge ``x``.

    ``st`` must be the decomposition of the current (possibly already
    anchored) graph; ``x`` must not itself be anchored.
    """
    cands, reads = upward_candidates(g, st, x)
    followers: set[int] = set()
    all_cands: set[int] = set()
    for i, cand in cands.items():
        all_cands |= cand
        followers |= _peel_level(g, st, x, i, cand, reads)
    return FollowerResult(
        x=x,
        followers=frozenset(followers),
        candidates=frozenset(all_cands),
        reads=frozenset(reads),
    )
