"""Distributed triangle enumeration and edge support (DataFrame API).

The classic oriented-join formulation: with canonical edges
``src < dst``, every triangle ``a < b < c`` is found exactly once by
joining ``(a,b)`` with ``(b,c)`` on the middle vertex and closing the
wedge against ``(a,c)``. Support is then the per-edge count over the
three edge projections of each triangle. These are the bulk primitives
the distributed truss decomposition iterates on.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def triangles(edges: DataFrame) -> DataFrame:
    """All triangles of a canonical edge DataFrame as rows ``(a, b, c)``.

    ``a < b < c``; each triangle appears exactly once.
    """
    e1 = edges.select(F.col("src").alias("a"), F.col("dst").alias("b"))
    e2 = edges.select(F.col("src").alias("b"), F.col("dst").alias("c"))
    e3 = edges.select(F.col("src").alias("a"), F.col("dst").alias("c"))
    wedges = e1.join(e2, on="b")
    return wedges.join(e3, on=["a", "c"]).select("a", "b", "c")


def support(edges: DataFrame) -> DataFrame:
    """Edge support ``sup(e, G)`` as a DataFrame ``(src, dst, sup)``.

    Edges in no triangle get ``sup = 0``. One wide shuffle: triangles
    are exploded into their three edges and counted per edge.
    """
    tri = triangles(edges)
    sides = (
        tri.select(F.col("a").alias("src"), F.col("b").alias("dst"))
        .unionAll(tri.select(F.col("b").alias("src"), F.col("c").alias("dst")))
        .unionAll(tri.select(F.col("a").alias("src"), F.col("c").alias("dst")))
    )
    counts = sides.groupBy("src", "dst").agg(F.count(F.lit(1)).alias("sup"))
    return (
        edges.join(counts, on=["src", "dst"], how="left")
        .select("src", "dst", F.coalesce("sup", F.lit(0)).alias("sup"))
    )
