"""Theorem 2: the trussness-gain function is not submodular.

Concrete witnesses: pairs of edges with TG(A) + TG(B) < TG(A ∪ B) —
two edges that individually anchor nothing but jointly lift an edge,
the paper's Fig. 1(a) phenomenon. The witness graphs below were found
by exhaustive pair search and are pinned for determinism.
"""
import itertools

import pytest

from repro.graphs.gen import community_graph, random_graph
from repro.truss.local import LocalGraph, decompose, trussness_gain

#: (graph frame, anchor pair as vertex pairs)
WITNESSES = [
    (random_graph(n=10, m=22, seed=0), ((4, 6), (4, 8))),
    (
        community_graph(
            n=14, n_cliques=5, clique_min=4, clique_max=5, n_noise=4,
            drop_frac=0.25, seed=1,
        ),
        ((2, 3), (2, 10)),
    ),
]


@pytest.mark.parametrize("pdf,pair", WITNESSES, ids=["rand", "comm"])
def test_pinned_witness_violates_submodularity(pdf, pair):
    g = LocalGraph(pdf)
    st = decompose(g)
    e1, e2 = (g.edge_id(*pair[0]), g.edge_id(*pair[1]))
    s1 = trussness_gain(g, st, {e1})
    s2 = trussness_gain(g, st, {e2})
    joint = trussness_gain(g, st, {e1, e2})
    # TG(A) + TG(B) >= TG(A∪B) + TG(A∩B) fails (A∩B = ∅ has gain 0).
    assert s1 + s2 < joint
    assert s1 == s2 == 0 and joint >= 1


def test_search_confirms_witnesses_not_rare():
    """A bounded fresh search finds a violation too (not a fluke pin)."""
    pdf = random_graph(n=10, m=22, seed=0)
    g = LocalGraph(pdf)
    st = decompose(g)
    singles = [trussness_gain(g, st, {x}) for x in range(g.m)]
    found = False
    for e1, e2 in itertools.combinations(range(g.m), 2):
        if trussness_gain(g, st, {e1, e2}) > singles[e1] + singles[e2]:
            found = True
            break
    assert found
