"""Synthetic social-network generators.

The paper evaluates on eight SNAP graphs. Those downloads are not
available offline, so experiments run on *synthetic community graphs*:
a union of planted cliques (sizes drawn from a truncated power law,
members drawn with a Zipf-like preference so hubs and overlapping
communities emerge) plus uniform noise edges. Planted cliques give the
graph real truss structure — ``k_max`` tracks the largest surviving
clique — while the preference skew reproduces the heavy-tailed degree
profile that makes upward routes short on real networks (paper
Table IV). Each substitution is documented in DESIGN.md.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.graphs.edges import canonical_edges


def community_graph(
    *,
    n: int,
    n_cliques: int,
    clique_min: int = 3,
    clique_max: int = 8,
    clique_exp: float = 2.0,
    n_noise: int = 0,
    pref_exp: float = 0.8,
    drop_frac: float = 0.08,
    n_strips: int = 0,
    strip_min: int = 2,
    strip_max: int = 6,
    seed: int = 0,
) -> pd.DataFrame:
    """Planted-clique community graph as a canonical edge frame.

    * ``n_cliques`` cliques with sizes ``s ~ powerlaw(clique_exp)`` in
      ``[clique_min, clique_max]`` are planted on vertices drawn with
      Zipf-like weights ``(rank+1)^-pref_exp`` (overlap + hubs).
    * ``n_noise`` uniform random non-loop edges are unioned in.
    * a ``drop_frac`` fraction of the final edges is removed: real
      communities are imperfect cliques, and the resulting
      just-below-threshold edges are what edge anchoring can lift —
      with ``drop_frac = 0`` every planted clique is perfect and
      almost no anchor has followers.
    * ``n_strips`` triangle strips (paths of triangles, the paper's
      Fig. 3 tail motif) grown from random planted-clique edges, with
      ``strip_min..strip_max`` strip vertices. Strips peel layer by
      layer at the 3-hull, so anchoring near a strip's tip lifts the
      whole chain — low-trussness gain opportunities that complement
      the high-trussness ones from clique overlap. Real social
      networks have both; without strips the gain profile collapses
      onto a single trussness level.

    Deterministic in ``seed``. Strip edges are exempt from
    ``drop_frac`` (a broken strip is just noise).
    """
    g = np.random.default_rng(seed)
    sizes = np.arange(clique_min, clique_max + 1)
    size_w = sizes.astype(float) ** (-clique_exp)
    size_w /= size_w.sum()
    vert_w = (np.arange(n) + 1.0) ** (-pref_exp)
    vert_w /= vert_w.sum()

    src: list[int] = []
    dst: list[int] = []
    base_edges: list[tuple[int, int]] = []
    for _ in range(n_cliques):
        s = int(g.choice(sizes, p=size_w))
        members = g.choice(n, size=min(s, n), replace=False, p=vert_w)
        for i in range(len(members)):
            for j in range(i + 1, len(members)):
                src.append(int(members[i]))
                dst.append(int(members[j]))
        if len(members) >= 2:
            base_edges.append((int(members[0]), int(members[1])))
    if n_noise:
        a = g.integers(0, n, n_noise)
        b = g.integers(0, n, n_noise)
        src.extend(a.tolist())
        dst.extend(b.tolist())
    pdf = canonical_edges(pd.DataFrame({"src": src, "dst": dst}))
    if drop_frac > 0 and len(pdf):
        keep = g.random(len(pdf)) >= drop_frac
        pdf = pdf[keep].reset_index(drop=True)

    if n_strips:
        frames = [pdf]
        nxt = n  # gadget vertices are fresh, above the community range
        for _ in range(n_strips):
            length = int(g.integers(strip_min, strip_max + 1))
            gadget, nxt = chain_gadget(nxt, length)
            # one noise edge ties the gadget into the community (a
            # single bridge edge creates no triangles, so the gadget's
            # truss structure is untouched)
            anchor_v = int(g.integers(0, n))
            frames.append(gadget)
            frames.append(pd.DataFrame({"src": [anchor_v], "dst": [nxt - 1]}))
        pdf = canonical_edges(pd.concat(frames, ignore_index=True))
    return pdf


def chain_gadget(
    start: int, length: int, clique_size: int = 5
) -> tuple[pd.DataFrame, int]:
    """A Fig.-3-style anchor chain on fresh vertices ``start, start+1, …``.

    A zigzag path of ``length + 1`` trussness-3 edges between two
    cliques ``C`` (even path positions) and ``D`` (odd positions), a
    terminal hop to ``f``, and three support cliques so that:

    * consecutive weak edges share a triangle whose third edge is a
      clique (strong) edge;
    * the terminal edge additionally has one triangle with two strong
      partners (via ``y``), and *only* the terminal edge does — any
      earlier edge with such a "sure" triangle would make a chain
      suffix self-supporting and lift it to trussness 4 without an
      anchor.

    The chain peels layer by layer (layers ``1..length+1``), and
    anchoring the outermost edge lifts the entire chain: gain
    ``length``. This is the motif behind the paper's Example 4 and the
    source of low-trussness anchoring gains in real networks.

    Returns ``(edge frame, next_free_vertex)``.
    """
    fillers = max(clique_size - 2, 2)
    nxt = start

    def fresh(k: int) -> list[int]:
        nonlocal nxt
        out = list(range(nxt, nxt + k))
        nxt += k
        return out

    n_c = (length + 2) // 2 + 1
    n_d = (length + 1) // 2 + 1
    c = fresh(n_c)
    d = fresh(n_d)
    f = fresh(1)[0]
    y = fresh(1)[0]
    path = [c[i // 2] if i % 2 == 0 else d[i // 2] for i in range(length + 1)]
    frames = [
        clique(c + fresh(2)),  # C
        clique(d + fresh(2)),  # D
        clique([path[-2], f] + fresh(fillers)),  # G: consecutive support
        clique([path[-1], y] + fresh(fillers)),  # H: terminal sure (side 1)
        clique([f, y] + fresh(fillers)),  # I: terminal sure (side 2)
    ]
    weak_src = [path[i] for i in range(length)] + [path[-1]]
    weak_dst = [path[i + 1] for i in range(length)] + [f]
    frames.append(pd.DataFrame({"src": weak_src, "dst": weak_dst}))
    return union(*frames), nxt


def random_graph(*, n: int, m: int, seed: int = 0) -> pd.DataFrame:
    """Uniform G(n, m)-style random simple graph (canonical frame).

    Used heavily by tests as an adversarial input source: uniform
    random graphs have thin, irregular truss structure that exercises
    cascade corner cases.
    """
    g = np.random.default_rng(seed)
    a = g.integers(0, n, 3 * m)
    b = g.integers(0, n, 3 * m)
    pdf = canonical_edges(pd.DataFrame({"src": a, "dst": b}))
    return pdf.iloc[:m].reset_index(drop=True)


def clique(vertices: list[int]) -> pd.DataFrame:
    """The complete graph on ``vertices`` as a canonical edge frame."""
    src, dst = [], []
    for i in range(len(vertices)):
        for j in range(i + 1, len(vertices)):
            src.append(vertices[i])
            dst.append(vertices[j])
    return canonical_edges(pd.DataFrame({"src": src, "dst": dst}))


def union(*frames: pd.DataFrame) -> pd.DataFrame:
    """Union of several edge frames, re-canonicalised."""
    return canonical_edges(pd.concat(frames, ignore_index=True))
