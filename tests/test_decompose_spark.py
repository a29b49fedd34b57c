"""Distributed truss decomposition vs the local kernel.

Both implement synchronous batch peeling, so trussness *and* layer
indices must agree edge-for-edge, with and without anchors.
"""
import pandas as pd
import pytest

from repro.graphs.edges import spark_edges
from repro.graphs.gen import community_graph, random_graph
from repro.graphs.toys import truss_ladder, two_triangles
from repro.truss.decompose import truss_decomposition
from repro.truss.local import LocalGraph, decompose


def _check(spark, pdf: pd.DataFrame, anchor_pairs: list[tuple[int, int]]):
    g = LocalGraph(pdf)
    anchors = frozenset(g.edge_id(u, v) for u, v in anchor_pairs)
    st = decompose(g, anchors)
    out = truss_decomposition(
        spark, spark_edges(spark, pdf), anchors=anchor_pairs
    ).toPandas()
    assert len(out) == g.m - len(anchors)
    for row in out.itertuples(index=False):
        e = g.edge_id(int(row.src), int(row.dst))
        assert int(row.t) == int(st.t[e]), (row, int(st.t[e]))
        assert int(row.l) == int(st.layer[e]), (row, int(st.layer[e]))


def test_spark_decompose_two_triangles(spark):
    _check(spark, two_triangles(), [])


def test_spark_decompose_ladder(spark):
    _check(spark, truss_ladder(), [])


@pytest.mark.parametrize("seed", range(2))
def test_spark_decompose_random(spark, seed):
    _check(spark, random_graph(n=20, m=45, seed=seed), [])


def test_spark_decompose_community(spark):
    _check(spark, community_graph(n=30, n_cliques=8, n_noise=8, seed=5), [])


def test_spark_decompose_with_anchors(spark):
    pdf = truss_ladder()
    g = LocalGraph(pdf)
    _check(spark, pdf, [g.edge(2), g.edge(7)])


def test_spark_decompose_empty(spark):
    out = truss_decomposition(
        spark, spark_edges(spark, pd.DataFrame({"src": [0], "dst": [1]})), anchors=[(0, 1)]
    ).toPandas()
    assert len(out) == 0
